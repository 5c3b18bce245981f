package repro.linalg

/** Cholesky factorization of a symmetric positive-definite matrix, used to
  * invert GMM covariance matrices and compute their log-determinants.
  *
  * `A = L Lᵀ` with L lower-triangular. Throws `IllegalArgumentException`
  * when A is not (numerically) SPD — callers regularize Σ with a ridge
  * before factorizing.
  */
final class Chol private (val n: Int, private val l: Mat) extends Serializable {

  /** Lower-triangular factor L (copy). */
  def lower: Mat = l.copy

  /** log|A| = 2 Σ log L(i,i). */
  def logDet: Double = {
    var s = 0.0; var i = 0
    while (i < n) { s += math.log(l(i, i)); i += 1 }
    2.0 * s
  }

  /** Solve `A x = b` via forward + backward substitution. */
  def solve(b: Array[Double]): Array[Double] = {
    require(b.length == n)
    // forward: L y = b
    val y = new Array[Double](n)
    var i = 0
    while (i < n) {
      var s = b(i); var j = 0
      while (j < i) { s -= l(i, j) * y(j); j += 1 }
      y(i) = s / l(i, i); i += 1
    }
    // backward: Lᵀ x = y
    val x = new Array[Double](n)
    i = n - 1
    while (i >= 0) {
      var s = y(i); var j = i + 1
      while (j < n) { s -= l(j, i) * x(j); j += 1 }
      x(i) = s / l(i, i); i -= 1
    }
    x
  }

  /** Dense inverse A⁻¹ (symmetric). Column-by-column solve of the identity. */
  def inverse: Mat = {
    val inv = Mat.zeros(n, n)
    val e = new Array[Double](n)
    var j = 0
    while (j < n) {
      e(j) = 1.0
      val col = solve(e)
      e(j) = 0.0
      var i = 0
      while (i < n) { inv(i, j) = col(i); i += 1 }
      j += 1
    }
    inv.symmetrize()
    inv
  }
}

object Chol {

  /** Factorize SPD `a`; throws if a pivot is non-positive. */
  def apply(m: Mat): Chol = {
    require(m.rows == m.cols, "Cholesky needs a square matrix")
    val n = m.rows
    val l = Mat.zeros(n, n)
    var i = 0
    while (i < n) {
      var j = 0
      while (j <= i) {
        var s = m(i, j)
        var k = 0
        while (k < j) { s -= l(i, k) * l(j, k); k += 1 }
        if (i == j) {
          require(s > 0.0, s"matrix not positive definite at pivot $i (got $s)")
          l(i, i) = math.sqrt(s)
        } else {
          l(i, j) = s / l(j, j)
        }
        j += 1
      }
      i += 1
    }
    new Chol(n, l)
  }

  /** Factorize `a + ridge*I` — the standard EM covariance regularization. */
  def regularized(m: Mat, ridge: Double): Chol = {
    val r = m.copy
    var i = 0
    while (i < r.rows) { r(i, i) += ridge; i += 1 }
    apply(r)
  }
}
