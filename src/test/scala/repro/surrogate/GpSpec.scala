package repro.surrogate

import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite

class GpSpec extends AnyFunSuite {
  private def kOf(ls: Double): Kernel = new Matern52(Array(0), 0.5 * ls)

  private def fit1d(xs: Seq[Double], ys: Seq[Double], noise: Double = 1e-6): Gp =
    Gp.fit(xs.map(Array(_)).toArray, ys.toArray, kOf, noise)

  test("GP interpolates noiseless observations") {
    val xs = Seq(0.0, 0.25, 0.5, 0.75, 1.0)
    val ys = xs.map(x => math.sin(6 * x))
    val gp = fit1d(xs, ys)
    xs.zip(ys).foreach { case (x, y) =>
      assert(math.abs(gp.predict(Array(x)).mean - y) < 1e-2)
    }
  }

  test("predictive variance is near zero at data, larger away") {
    val gp = fit1d(Seq(0.0, 1.0), Seq(0.0, 1.0))
    val atData = gp.predict(Array(0.0)).variance
    val far = gp.predict(Array(0.5)).variance
    assert(atData < far)
  }

  test("mean reverts toward the target mean far from data") {
    val gp = fit1d(Seq(0.45, 0.55), Seq(10.0, 12.0))
    // With a short lengthscale, x=5 is far away in kernel terms.
    val p = gp.predict(Array(5.0))
    assert(math.abs(p.mean - 11.0) < 1.5)
  }

  test("fit selects lengthscale by marginal likelihood (no crash, n=1..3)") {
    (1 to 3).foreach { n =>
      val gp = fit1d((1 to n).map(_.toDouble / 4), (1 to n).map(_.toDouble))
      assert(gp.n == n)
      assert(!gp.predict(Array(0.1)).mean.isNaN)
    }
  }

  test("fit rejects empty and mismatched data") {
    assertThrows[IllegalArgumentException](Gp.fit(Array.empty, Array.empty, kOf))
    assertThrows[IllegalArgumentException](
      Gp.fit(Array(Array(0.0)), Array(1.0, 2.0), kOf))
  }

  test("predictions are finite under noisy targets") {
    val r = new Random(5)
    val xs = Seq.fill(30)(r.nextDouble())
    val ys = xs.map(x => x * x + 0.05 * r.nextGaussian())
    val gp = fit1d(xs, ys, noise = 1e-3)
    (0 to 10).foreach { i =>
      val p = gp.predict(Array(i / 10.0))
      assert(!p.mean.isNaN && p.variance > 0)
    }
  }

  test("GP roughly recovers a quadratic") {
    val xs = (0 to 10).map(_ / 10.0)
    val ys = xs.map(x => (x - 0.3) * (x - 0.3))
    val gp = fit1d(xs, ys, noise = 1e-6)
    assert(math.abs(gp.predict(Array(0.35)).mean - 0.0025) < 0.02)
  }

  test("MetaEnsemble normalizes weights") {
    val gp = fit1d(Seq(0.0, 1.0), Seq(0.0, 1.0))
    val me = new MetaEnsemble(Vector(gp, gp), Vector(3.0, 1.0))
    assert(math.abs(me.normalizedWeights.sum - 1.0) < 1e-12)
    assert(math.abs(me.normalizedWeights(0) - 0.75) < 1e-12)
  }

  test("MetaEnsemble mean is the weighted mean of bases (Eq. 12)") {
    val a = fit1d(Seq(0.0, 1.0), Seq(0.0, 0.0))
    val b = fit1d(Seq(0.0, 1.0), Seq(10.0, 10.0))
    val me = new MetaEnsemble(Vector(a, b), Vector(0.5, 0.5))
    val p = me.predict(Array(0.5))
    val expected = 0.5 * a.predict(Array(0.5)).mean + 0.5 * b.predict(Array(0.5)).mean
    assert(math.abs(p.mean - expected) < 1e-9)
  }

  test("MetaEnsemble variance uses squared weights (Eq. 12)") {
    val a = fit1d(Seq(0.0, 1.0), Seq(0.0, 1.0))
    val me = new MetaEnsemble(Vector(a, a), Vector(0.5, 0.5))
    val single = a.predict(Array(0.5)).variance
    assert(math.abs(me.predict(Array(0.5)).variance - 0.5 * single) < 1e-9)
  }

  test("MetaEnsemble with all-zero weights falls back to uniform") {
    val a = fit1d(Seq(0.0, 1.0), Seq(0.0, 1.0))
    val me = new MetaEnsemble(Vector(a, a), Vector(0.0, 0.0))
    assert(me.normalizedWeights.forall(w => math.abs(w - 0.5) < 1e-12))
  }

  test("Pred.sigma is sqrt of variance, floored") {
    assert(Pred(0.0, 4.0).sigma == 2.0)
    assert(Pred(0.0, -1.0).sigma > 0)
  }
}
