package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.env.RunResult

class ObjectiveSpec extends AnyFunSuite {

  private def rr(t: Double, r: Double, failed: Boolean = false) =
    RunResult(t, 0, 0, r, 10.0, failed)

  test("beta=1 is pure runtime") {
    assert(Objective(1.0).value(120.0, 999.0) == 120.0)
  }

  test("beta=0 is pure resource") {
    assert(Objective(0.0).value(999.0, 64.0) == 64.0)
  }

  test("beta=0.5 is sqrt(T*R) — same minimizer as execution cost T*R") {
    val o = Objective(0.5)
    assert(math.abs(o.value(4.0, 9.0) - 6.0) < 1e-12)
    // Monotone in the product:
    assert(o.value(4.0, 9.0) < o.value(5.0, 9.0))
  }

  test("beta=0.7 weights runtime more than resource") {
    val o = Objective(0.7)
    val base = o.value(100.0, 100.0)
    val fasterBigger = o.value(50.0, 180.0) // product lower runtime
    assert(fasterBigger < base)
  }

  test("rejects beta outside [0,1]") {
    assertThrows[IllegalArgumentException](Objective(1.2))
    assertThrows[IllegalArgumentException](Objective(-0.1))
  }

  test("feasible requires success and both constraints") {
    val o = Objective(0.5, tMax = 100.0, rMax = 50.0)
    assert(o.feasible(rr(90, 40)))
    assert(!o.feasible(rr(110, 40)))
    assert(!o.feasible(rr(90, 60)))
    assert(!o.feasible(rr(90, 40, failed = true)))
  }

  test("unconstrained objective accepts any successful run") {
    assert(Objective(0.5).feasible(rr(1e9, 1e9)))
  }

  test("withConstraintsFrom sets 2x manual thresholds (§6.2)") {
    val o = Objective(0.5).withConstraintsFrom(100.0, 40.0)
    assert(o.tMax == 200.0 && o.rMax == 80.0)
  }

  test("RunHistory.best prefers feasible observations") {
    val h = new RunHistory
    val cfg = repro.space.Config(Vector(1.0))
    h.add(Observation(cfg, rr(10, 10), 5.0, feasible = false, 0))
    h.add(Observation(cfg, rr(10, 10), 8.0, feasible = true, 1))
    assert(h.best.get.objective == 8.0)
  }

  test("RunHistory.best falls back to all observations when none feasible") {
    val h = new RunHistory
    val cfg = repro.space.Config(Vector(1.0))
    h.add(Observation(cfg, rr(10, 10), 5.0, feasible = false, 0))
    h.add(Observation(cfg, rr(10, 10), 3.0, feasible = false, 1))
    assert(h.best.get.objective == 3.0)
  }

  test("RunHistory bestObjective of empty history is +inf") {
    assert(new RunHistory().bestObjective.isPosInfinity)
  }
}
