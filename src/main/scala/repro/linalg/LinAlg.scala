package repro.linalg

/** Minimal dense linear algebra for the Gaussian-process surrogate: the
  * sample counts in this problem are tens, so an O(n^3) Cholesky on plain
  * arrays is simpler and faster than pulling in a library.
  */
object LinAlg {

  /** Cholesky factor L (lower-triangular, row-major) of a symmetric
    * positive-definite matrix A (n×n, row-major). Jitters the diagonal if A
    * is borderline.
    */
  def cholesky(a: Array[Array[Double]]): Array[Array[Double]] = {
    val n = a.length
    val l = Array.ofDim[Double](n, n)
    var jitter = 0.0
    var done = false
    while (!done) {
      done = true
      var i = 0
      while (done && i < n) {
        var j = 0
        while (done && j <= i) {
          var s = 0.0
          var k = 0
          while (k < j) { s += l(i)(k) * l(j)(k); k += 1 }
          if (i == j) {
            val d = a(i)(i) + jitter - s
            if (d <= 0) {
              jitter = if (jitter == 0) 1e-10 else jitter * 10
              require(jitter < 1e-2, "cholesky: matrix far from PD")
              var x = 0
              while (x < n) { java.util.Arrays.fill(l(x), 0.0); x += 1 }
              done = false
            } else l(i)(i) = math.sqrt(d)
          } else l(i)(j) = (a(i)(j) - s) / l(j)(j)
          j += 1
        }
        i += 1
      }
    }
    l
  }

  /** Solve L y = b (forward substitution). */
  def forwardSolve(l: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val n = b.length
    val y = new Array[Double](n)
    var i = 0
    while (i < n) {
      var s = b(i)
      var j = 0
      while (j < i) { s -= l(i)(j) * y(j); j += 1 }
      y(i) = s / l(i)(i)
      i += 1
    }
    y
  }

  /** Solve L^T x = y (backward substitution). */
  def backwardSolve(l: Array[Array[Double]], y: Array[Double]): Array[Double] = {
    val n = y.length
    val x = new Array[Double](n)
    var i = n - 1
    while (i >= 0) {
      var s = y(i)
      var j = i + 1
      while (j < n) { s -= l(j)(i) * x(j); j += 1 }
      x(i) = s / l(i)(i)
      i -= 1
    }
    x
  }

  /** Solve A x = b via the Cholesky factor of A. */
  def choleskySolve(l: Array[Array[Double]], b: Array[Double]): Array[Double] =
    backwardSolve(l, forwardSolve(l, b))

  def dot(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }
}
