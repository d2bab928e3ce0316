package repro.bo

import org.scalatest.funsuite.AnyFunSuite
import repro.surrogate.Pred

class AcquisitionSpec extends AnyFunSuite {
  import Acquisition._

  test("Phi matches known standard-normal values") {
    assert(math.abs(Phi(0.0) - 0.5) < 1e-7)
    assert(math.abs(Phi(1.0) - 0.8413447) < 1e-6)
    assert(math.abs(Phi(-1.0) - 0.1586553) < 1e-6)
    assert(math.abs(Phi(1.96) - 0.9750021) < 1e-5)
    assert(Phi(8.0) > 0.999999)
    assert(Phi(-8.0) < 1e-6)
  }

  test("phi is the standard normal density") {
    assert(math.abs(phi(0.0) - 0.3989423) < 1e-6)
    assert(math.abs(phi(1.0) - 0.2419707) < 1e-6)
  }

  test("EI is non-negative") {
    for (mu <- Seq(-2.0, 0.0, 2.0); s <- Seq(0.1, 1.0))
      assert(ei(Pred(mu, s * s), 0.0) >= 0.0)
  }

  test("EI increases as predicted mean drops below the incumbent") {
    val better = ei(Pred(-1.0, 1.0), 0.0)
    val worse = ei(Pred(1.0, 1.0), 0.0)
    assert(better > worse)
  }

  test("EI at zero variance equals max(y*-mu, 0)") {
    assert(math.abs(ei(Pred(-2.0, 0.0), 0.0) - 2.0) < 1e-9)
    assert(ei(Pred(2.0, 0.0), 0.0) == 0.0)
  }

  test("EI closed form at mu=y*, sigma=1 is phi(0)") {
    assert(math.abs(ei(Pred(0.0, 1.0), 0.0) - phi(0.0)) < 1e-9)
  }

  test("higher uncertainty raises EI for an at-par candidate (exploration)") {
    assert(ei(Pred(0.0, 4.0), 0.0) > ei(Pred(0.0, 0.25), 0.0))
  }

  test("prFeasible limits: far below threshold ~1, far above ~0") {
    assert(prFeasible(Pred(0.0, 1.0), 100.0) > 0.999)
    assert(prFeasible(Pred(100.0, 1.0), 0.0) < 1e-6)
    assert(math.abs(prFeasible(Pred(5.0, 4.0), 5.0) - 0.5) < 1e-9)
  }

  test("prFeasible with infinite threshold is 1") {
    assert(prFeasible(Pred(1e9, 1.0), Double.PositiveInfinity) == 1.0)
  }

  test("EIC multiplies EI by feasibility probabilities (Eq. 6)") {
    val obj = Pred(-1.0, 1.0)
    val base = ei(obj, 0.0)
    val c1 = (Pred(0.0, 1.0), 0.0) // Pr = 0.5
    val v = eic(obj, 0.0, Seq(c1))
    assert(math.abs(v - base * 0.5) < 1e-9)
  }

  test("EIC with two constraints multiplies both") {
    val obj = Pred(-1.0, 1.0)
    val c = (Pred(0.0, 1.0), 0.0)
    assert(math.abs(eic(obj, 0.0, Seq(c, c)) - ei(obj, 0.0) * 0.25) < 1e-9)
  }

  test("SafeRegion upper bound is mu + gamma*sigma (Eq. 8)") {
    val sr = new SafeRegion(0.7)
    assert(math.abs(sr.upperBound(Pred(2.0, 4.0)) - (2.0 + 0.7 * 2.0)) < 1e-12)
  }

  test("SafeRegion membership across thresholds") {
    val sr = new SafeRegion(1.0)
    assert(sr.isSafe(Seq((Pred(1.0, 1.0), 3.0))))        // u = 2 <= 3
    assert(!sr.isSafe(Seq((Pred(1.0, 1.0), 1.5))))       // u = 2 > 1.5
    assert(sr.isSafe(Seq((Pred(1.0, 1.0), Double.PositiveInfinity))))
  }

  test("SafeRegion intersects multiple constraints") {
    val sr = new SafeRegion(1.0)
    val ok = (Pred(0.0, 1.0), 5.0)
    val bad = (Pred(10.0, 1.0), 5.0)
    assert(sr.isSafe(Seq(ok, ok)))
    assert(!sr.isSafe(Seq(ok, bad)))
  }

  test("SafeRegion rejects gamma outside (0,1]") {
    assertThrows[IllegalArgumentException](new SafeRegion(0.0))
    assertThrows[IllegalArgumentException](new SafeRegion(1.5))
  }
}
