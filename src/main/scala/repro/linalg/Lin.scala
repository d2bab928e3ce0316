package repro.linalg

/** Minimal dense linear algebra for small GP systems (n ≤ a few hundred).
  *
  * Everything operates on `Array[Array[Double]]` row-major matrices and is
  * written for clarity over speed; GP fits here never exceed ~100×100.
  */
object Lin {

  /** Cholesky factor L (lower-triangular) of SPD matrix `a`, with jitter
    * escalation: if the factorization fails, `jitter` is multiplied by 10
    * and retried up to `maxTries` times. Returns (L, usedJitter).
    */
  def cholesky(a: Array[Array[Double]], jitter: Double = 1e-10, maxTries: Int = 8): (Array[Array[Double]], Double) = {
    val n = a.length
    var j = jitter
    var tries = 0
    while (tries < maxTries) {
      val l = Array.ofDim[Double](n, n)
      var ok = true
      var i = 0
      while (ok && i < n) {
        var k = 0
        while (ok && k <= i) {
          var s = 0.0
          var m = 0
          while (m < k) { s += l(i)(m) * l(k)(m); m += 1 }
          if (i == k) {
            val d = a(i)(i) + j - s
            if (d <= 0.0) ok = false else l(i)(i) = math.sqrt(d)
          } else {
            l(i)(k) = (a(i)(k) - s) / l(k)(k)
          }
          k += 1
        }
        i += 1
      }
      if (ok) return (l, j)
      j *= 10; tries += 1
    }
    throw new ArithmeticException(s"cholesky failed after $maxTries jitter escalations")
  }

  /** Solve L y = b for lower-triangular L. */
  def solveLower(l: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val n = l.length
    val y = new Array[Double](n)
    var i = 0
    while (i < n) {
      var s = b(i)
      var k = 0
      while (k < i) { s -= l(i)(k) * y(k); k += 1 }
      y(i) = s / l(i)(i)
      i += 1
    }
    y
  }

  /** Solve Lᵀ x = b for lower-triangular L. */
  def solveUpperT(l: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val n = l.length
    val x = new Array[Double](n)
    var i = n - 1
    while (i >= 0) {
      var s = b(i)
      var k = i + 1
      while (k < n) { s -= l(k)(i) * x(k); k += 1 }
      x(i) = s / l(i)(i)
      i -= 1
    }
    x
  }

  /** Solve (L Lᵀ) x = b given the Cholesky factor L. */
  def choleskySolve(l: Array[Array[Double]], b: Array[Double]): Array[Double] =
    solveUpperT(l, solveLower(l, b))

  /** Dot product. */
  def dot(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  /** log|K| from the Cholesky factor. */
  def logDet(l: Array[Array[Double]]): Double = {
    var s = 0.0; var i = 0
    while (i < l.length) { s += math.log(l(i)(i)); i += 1 }
    2.0 * s
  }
}
