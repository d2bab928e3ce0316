package repro.jobs

import repro.core._
import repro.env._

/** Diagnostic: per-iteration runtime ratio vs pre-tuning for fleet tasks. */
object ProbeJob {
  def main(args: Array[String]): Unit = {
    val cs = FleetGen.prodSpace
    val tasks = FleetGen.fleet(8, seed = 42)
    tasks.foreach { task =>
      val sim = new SparkClusterSim(task.spec, cs)
      val pre = (0 until 5).map(i => sim.run(task.manual, i))
      val preRt = pre.map(_.runtimeSec).sum / 5
      val obj = Objective(0.5).withConstraintsFrom(preRt, sim.resource(task.manual))
      val out = new OnlineTuner(sim, obj, TunerSettings(seed = task.spec.seed, nInit = 1),
        Vector(task.manual)).tune(20, startIter = 5)
      val ratios = out.history.all.map(o => f"${o.result.runtimeSec / preRt}%.2f${if (o.result.failed) "F" else ""}")
      println(f"${task.name}%-10s preRt=$preRt%8.1f  " + ratios.mkString(" "))
    }
  }
}
