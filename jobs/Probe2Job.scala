package repro.jobs

import repro.core._
import repro.env._
import repro.space.{SparkParams => SP}

/** Diagnostic: feature bisect for the runtime objective on kmeans. */
object Probe2Job {
  def main(args: Array[String]): Unit = {
    val cs = FleetGen.hibenchSpace
    val spec = Workloads.KMeans
    val sim = new SparkClusterSim(spec, cs)
    val default = SP.defaults(cs)
    val defRt = sim.expectedRuntime(default, spec.inputGB)
    val obj = Objective(1.0, tMax = 2.0 * defRt)
    def run(name: String, f: TunerSettings => TunerSettings): Unit = {
      val best = (0 until 4).map { s =>
        new OnlineTuner(sim, obj, f(TunerSettings(seed = 997 * s + 13)), Vector(default))
          .tune(30).history.bestObjective
      }
      println(f"$name%-22s avg best runtime = ${best.sum / best.size}%8.2f  (${best.map(b => f"$b%.1f").mkString(", ")})")
    }
    run("all-on (ours)", identity)
    run("no-subspace", _.copy(useSubspace = false))
    run("no-agd", _.copy(useAgd = false))
    run("no-safety", _.copy(useSafety = false, useEic = false))
    run("no-datasize", _.copy(useDataSize = false))
    run("none (cherrypick-ish)", _.copy(useSubspace = false, useAgd = false,
      useSafety = false, useDataSize = false))
  }
}
