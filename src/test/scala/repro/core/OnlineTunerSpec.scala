package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.env.{FleetGen, SparkClusterSim, Workloads}
import repro.space.{SparkParams => SP}

class OnlineTunerSpec extends AnyFunSuite {
  private val cs = FleetGen.hibenchSpace
  private val sim = new SparkClusterSim(Workloads.TeraSort, cs)
  private val manual = FleetGen.manualConfig(cs, 16, 4, 8)
  private val manualRt = sim.expectedRuntime(manual, Workloads.TeraSort.inputGB)
  private val objective = Objective(0.5).withConstraintsFrom(manualRt, sim.resource(manual))

  test("history length equals the budget") {
    val out = new OnlineTuner(sim, objective, TunerSettings(seed = 1), Vector(manual)).tune(12)
    assert(out.history.size == 12)
  }

  test("warm-start configs are evaluated first, in order") {
    val w2 = cs.withValue(manual, SP.Instances, 8)
    val out = new OnlineTuner(sim, objective, TunerSettings(seed = 2),
      Vector(manual, w2)).tune(8)
    assert(out.history.all(0).config == manual)
    assert(out.history.all(1).config == w2)
  }

  test("tuning improves the execution cost over the incumbent") {
    val out = new OnlineTuner(sim, objective, TunerSettings(seed = 3), Vector(manual)).tune(20)
    val manualCost = objective.value(manualRt, sim.resource(manual))
    assert(out.history.bestObjective < manualCost)
  }

  test("best configuration respects the runtime constraint") {
    val out = new OnlineTuner(sim, objective, TunerSettings(seed = 4), Vector(manual)).tune(20)
    val best = out.history.best.get
    assert(best.feasible)
    assert(best.result.runtimeSec <= objective.tMax * 1.05)
  }

  test("deterministic in seed") {
    def run(seed: Long) =
      new OnlineTuner(sim, objective, TunerSettings(seed = seed), Vector(manual))
        .tune(10).history.all.map(_.objective)
    assert(run(7) == run(7))
  }

  test("safety on yields at least as many feasible trials as safety off") {
    def feasibleCount(safety: Boolean) = (0 until 3).map { s =>
      val settings = TunerSettings(seed = 50 + s, useSafety = safety)
      new OnlineTuner(sim, objective, settings, Vector(manual)).tune(15)
        .history.all.count(_.feasible)
    }.sum
    assert(feasibleCount(true) >= feasibleCount(false))
  }

  test("stopping criterion halts the loop early when EI threshold is huge") {
    val out = new OnlineTuner(sim, objective,
      TunerSettings(seed = 6, stopEi = 1e6), Vector(manual)).tune(20)
    assert(out.stoppedAt.isDefined)
    assert(out.history.size < 20)
  }

  test("stopEi=0 never triggers early stop") {
    val out = new OnlineTuner(sim, objective, TunerSettings(seed = 7), Vector(manual)).tune(10)
    assert(out.stoppedAt.isEmpty)
  }

  test("degradation detection fires on sustained regressions only") {
    val tuner = new OnlineTuner(sim, objective, TunerSettings(seed = 8))
    val h = new RunHistory
    def obs(y: Double, i: Int) = Observation(manual,
      repro.env.RunResult(y, 0, 0, 1, 10, failed = false), y, feasible = true, i)
    h.add(obs(100, 0)); h.add(obs(100, 1))
    h.add(obs(200, 2)); h.add(obs(210, 3)); h.add(obs(220, 4))
    assert(tuner.degradationDetected(h, window = 3, tol = 0.3))
    val h2 = new RunHistory
    h2.add(obs(100, 0)); h2.add(obs(100, 1)); h2.add(obs(101, 2))
    assert(!tuner.degradationDetected(h2, window = 3, tol = 0.3))
  }

  test("AGD iterations appear every N_AGD trials and stay legal") {
    val out = new OnlineTuner(sim, objective,
      TunerSettings(seed = 9, nAgd = 5), Vector(manual)).tune(12)
    out.history.all.foreach(o => assert(cs.clip(o.config) == o.config))
  }

  test("meta ensemble path runs (bases from a source task)") {
    val srcOut = new OnlineTuner(sim, objective, TunerSettings(seed = 10), Vector(manual)).tune(10)
    val src = repro.meta.SourceTask.fromHistory(cs, "src",
      repro.meta.MetaFeatures.fromSpec(Workloads.TeraSort), srcOut.history.all)
    val out = new OnlineTuner(sim, objective, TunerSettings(seed = 11),
      Vector(manual), Vector((src.surrogate, 0.8))).tune(10)
    assert(out.history.size == 10)
  }
}
