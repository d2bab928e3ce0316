package repro.surrogate

import org.scalatest.funsuite.AnyFunSuite
import repro.space.SparkParams

class KernelsSpec extends AnyFunSuite {
  private val cs = SparkParams.space()

  test("Matern52 at zero distance is 1") {
    val k = new Matern52(Array(0, 1, 2), 0.5)
    val x = Array(0.3, 0.4, 0.5)
    assert(math.abs(k(x, x) - 1.0) < 1e-12)
  }

  test("Matern52 decays with distance and is symmetric") {
    val k = new Matern52(Array(0), 0.5)
    val a = Array(0.0); val b = Array(0.3); val c = Array(0.9)
    assert(k(a, b) > k(a, c))
    assert(k(a, b) == k(b, a))
    assert(k(a, c) > 0.0 && k(a, c) < 1.0)
  }

  test("Matern52 closed form at r = lengthscale") {
    val k = new Matern52(Array(0), 1.0)
    val v = k(Array(0.0), Array(1.0)) // r = 1
    val expected = (1.0 + math.sqrt(5.0) + 5.0 / 3.0) * math.exp(-math.sqrt(5.0))
    assert(math.abs(v - expected) < 1e-12)
  }

  test("Matern52 over empty dims is constant 1") {
    val k = new Matern52(Array.empty, 0.5)
    assert(k(Array(0.1), Array(0.9)) == 1.0)
  }

  test("SqExp matches exp(-d²/2ℓ²)") {
    val k = new SqExp(Array(0), 0.5)
    val v = k(Array(0.0), Array(0.5)) // d=0.5, ℓ=0.5 → exp(-0.5)
    assert(math.abs(v - math.exp(-0.5)) < 1e-12)
  }

  test("Hamming counts mismatching categorical dims") {
    val k = new Hamming(Array(0, 1), 1.0)
    assert(k(Array(0.0, 1.0), Array(0.0, 1.0)) == 1.0)
    assert(math.abs(k(Array(0.0, 1.0), Array(0.0, 2.0)) - math.exp(-1.0)) < 1e-12)
    assert(math.abs(k(Array(0.0, 1.0), Array(1.0, 2.0)) - math.exp(-2.0)) < 1e-12)
  }

  test("MixedKernel multiplies components and amplitude") {
    val k = new MixedKernel(Vector(new SqExp(Array(0), 1.0)), amplitude = 2.0)
    assert(math.abs(k(Array(0.0), Array(0.0)) - 2.0) < 1e-12)
  }

  test("forSpace builds a kernel with k(x,x)=amplitude") {
    val k = MixedKernel.forSpace(cs, withDataSize = false, amplitude = 1.0)
    val x = cs.toUnit(SparkParams.defaults(cs))
    assert(math.abs(k(x, x) - 1.0) < 1e-12)
  }

  test("forSpace with data size reacts to the trailing dim") {
    val k = MixedKernel.forSpace(cs, withDataSize = true)
    val x = cs.toUnit(SparkParams.defaults(cs)) :+ 0.2
    val y = cs.toUnit(SparkParams.defaults(cs)) :+ 0.9
    assert(k(x, y) < k(x, x))
  }

  test("categorical change lowers the mixed kernel via Hamming") {
    val k = MixedKernel.forSpace(cs, withDataSize = false)
    val c0 = SparkParams.defaults(cs)
    val c1 = cs.withValue(c0, SparkParams.IoCodec, 2.0)
    assert(k(cs.toUnit(c0), cs.toUnit(c1)) < 1.0)
  }
}
