package repro.linalg

import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite

class LinSpec extends AnyFunSuite {

  private def matmulT(l: Array[Array[Double]]): Array[Array[Double]] = {
    val n = l.length
    Array.tabulate(n, n)((i, j) => (0 until n).map(k => l(i)(k) * l(j)(k)).sum)
  }

  private def randomSpd(n: Int, seed: Int): Array[Array[Double]] = {
    val r = new Random(seed)
    val a = Array.fill(n, n)(r.nextGaussian())
    val m = Array.tabulate(n, n)((i, j) => (0 until n).map(k => a(i)(k) * a(j)(k)).sum)
    (0 until n).foreach(i => m(i)(i) += n) // well-conditioned
    m
  }

  test("cholesky of identity is identity") {
    val (l, _) = Lin.cholesky(Array.tabulate(4, 4)((i, j) => if (i == j) 1.0 else 0.0))
    // Default jitter 1e-10 shifts the diagonal by ~5e-11.
    (0 until 4).foreach(i => (0 until 4).foreach(j =>
      assert(math.abs(l(i)(j) - (if (i == j) 1.0 else 0.0)) < 1e-9)))
  }

  test("cholesky reconstructs the input: L·Lᵀ = A") {
    val a = randomSpd(8, 1)
    val (l, _) = Lin.cholesky(a)
    val rec = matmulT(l)
    for (i <- 0 until 8; j <- 0 until 8)
      assert(math.abs(rec(i)(j) - a(i)(j)) < 1e-6, s"($i,$j)")
  }

  test("cholesky of known 2x2") {
    val (l, _) = Lin.cholesky(Array(Array(4.0, 2.0), Array(2.0, 3.0)))
    assert(math.abs(l(0)(0) - 2.0) < 1e-9)
    assert(math.abs(l(1)(0) - 1.0) < 1e-9)
    assert(math.abs(l(1)(1) - math.sqrt(2.0)) < 1e-9)
  }

  test("choleskySolve solves A x = b") {
    val a = randomSpd(6, 2)
    val r = new Random(3)
    val x = Array.fill(6)(r.nextGaussian())
    val b = Array.tabulate(6)(i => (0 until 6).map(j => a(i)(j) * x(j)).sum)
    val (l, _) = Lin.cholesky(a)
    val got = Lin.choleskySolve(l, b)
    (0 until 6).foreach(i => assert(math.abs(got(i) - x(i)) < 1e-6))
  }

  test("solveLower then solveUpperT invert the triangular factors") {
    val a = randomSpd(5, 4)
    val (l, _) = Lin.cholesky(a)
    val b = Array.fill(5)(1.0)
    val y = Lin.solveLower(l, b)
    // L y = b
    (0 until 5).foreach { i =>
      val s = (0 to i).map(k => l(i)(k) * y(k)).sum
      assert(math.abs(s - 1.0) < 1e-9)
    }
  }

  test("logDet matches known determinant") {
    val a = Array(Array(4.0, 0.0), Array(0.0, 9.0))
    val (l, _) = Lin.cholesky(a)
    assert(math.abs(Lin.logDet(l) - math.log(36.0)) < 1e-9)
  }

  test("jitter escalation recovers a singular matrix") {
    val a = Array(Array(1.0, 1.0), Array(1.0, 1.0)) // rank 1
    val (l, j) = Lin.cholesky(a)
    assert(j > 0)
    assert(!l(1)(1).isNaN)
  }

  test("dot product") {
    assert(Lin.dot(Array(1.0, 2.0, 3.0), Array(4.0, 5.0, 6.0)) == 32.0)
  }
}
