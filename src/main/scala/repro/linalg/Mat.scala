package repro.linalg

/** Dense row-major matrix with the small set of kernels GMM/NN training
  * needs: products, outer-product accumulation, block extraction, and (via
  * [[Chol]]) SPD inverse / log-determinant.
  *
  * Matrices here are small (d ≤ a few hundred, nh ≤ a few hundred); the
  * large dimension (number of tuples) is handled by Spark, never
  * materialized into a `Mat`.
  *
  * @param rows number of rows
  * @param cols number of columns
  * @param a    row-major backing array of length rows*cols
  */
final class Mat(val rows: Int, val cols: Int, val a: Array[Double]) extends Serializable {
  require(a.length == rows * cols, s"backing array ${a.length} != $rows*$cols")

  @inline def apply(i: Int, j: Int): Double = a(i * cols + j)
  @inline def update(i: Int, j: Int, v: Double): Unit = a(i * cols + j) = v

  def copy: Mat = new Mat(rows, cols, a.clone())

  /** Matrix–vector product `this * x`. */
  def mv(x: Array[Double]): Array[Double] = {
    require(x.length == cols, s"mv: $cols vs ${x.length}")
    val out = new Array[Double](rows)
    var i = 0
    while (i < rows) {
      var s = 0.0; var j = 0; val off = i * cols
      while (j < cols) { s += a(off + j) * x(j); j += 1 }
      out(i) = s; i += 1
    }
    out
  }

  /** Transposed matrix–vector product `thisᵀ * x`. */
  def tmv(x: Array[Double]): Array[Double] = {
    require(x.length == rows, s"tmv: $rows vs ${x.length}")
    val out = new Array[Double](cols)
    var i = 0
    while (i < rows) {
      val xi = x(i); val off = i * cols; var j = 0
      while (j < cols) { out(j) += a(off + j) * xi; j += 1 }
      i += 1
    }
    out
  }

  /** Matrix–matrix product `this * other`. */
  def mm(other: Mat): Mat = {
    require(cols == other.rows, s"mm: $cols vs ${other.rows}")
    val out = Mat.zeros(rows, other.cols)
    var i = 0
    while (i < rows) {
      var k = 0
      while (k < cols) {
        val v = a(i * cols + k)
        if (v != 0.0) {
          val off = k * other.cols; val oOff = i * other.cols; var j = 0
          while (j < other.cols) { out.a(oOff + j) += v * other.a(off + j); j += 1 }
        }
        k += 1
      }
      i += 1
    }
    out
  }

  /** Quadratic form `xᵀ * this * x` (square matrices). */
  def quadForm(x: Array[Double]): Double = {
    require(rows == cols && x.length == rows, s"quadForm: $rows x $cols vs ${x.length}")
    var s = 0.0; var i = 0
    while (i < rows) {
      val xi = x(i); val off = i * cols; var j = 0
      var ri = 0.0
      while (j < cols) { ri += a(off + j) * x(j); j += 1 }
      s += xi * ri; i += 1
    }
    s
  }

  /** Bilinear form `xᵀ * this * y` where x has `rows` entries and y `cols`. */
  def bilinear(x: Array[Double], y: Array[Double]): Double = {
    require(x.length == rows && y.length == cols)
    var s = 0.0; var i = 0
    while (i < rows) {
      val xi = x(i); val off = i * cols; var j = 0
      var ri = 0.0
      while (j < cols) { ri += a(off + j) * y(j); j += 1 }
      s += xi * ri; i += 1
    }
    s
  }

  def transpose: Mat = {
    val out = Mat.zeros(cols, rows)
    var i = 0
    while (i < rows) { var j = 0; while (j < cols) { out.a(j * rows + i) = a(i * cols + j); j += 1 }; i += 1 }
    out
  }

  /** Sub-matrix `this(r0 until r1, c0 until c1)` as a fresh Mat. */
  def block(r0: Int, r1: Int, c0: Int, c1: Int): Mat = {
    require(0 <= r0 && r0 <= r1 && r1 <= rows && 0 <= c0 && c0 <= c1 && c1 <= cols)
    val out = Mat.zeros(r1 - r0, c1 - c0)
    var i = r0
    while (i < r1) {
      System.arraycopy(a, i * cols + c0, out.a, (i - r0) * out.cols, c1 - c0)
      i += 1
    }
    out
  }

  /** Write `src` into this matrix at offset (r0, c0) in place. */
  def setBlock(r0: Int, c0: Int, src: Mat): Unit = {
    require(r0 + src.rows <= rows && c0 + src.cols <= cols)
    var i = 0
    while (i < src.rows) {
      System.arraycopy(src.a, i * src.cols, a, (r0 + i) * cols + c0, src.cols)
      i += 1
    }
  }

  /** `this += s * x yᵀ` in place (outer-product accumulation). */
  def addOuter(s: Double, x: Array[Double], y: Array[Double]): Unit = {
    require(x.length == rows && y.length == cols)
    var i = 0
    while (i < rows) {
      val sxi = s * x(i); val off = i * cols; var j = 0
      while (j < cols) { a(off + j) += sxi * y(j); j += 1 }
      i += 1
    }
  }

  /** `this += other` in place. */
  def addInPlace(other: Mat): Unit = {
    require(rows == other.rows && cols == other.cols)
    var i = 0
    while (i < a.length) { a(i) += other.a(i); i += 1 }
  }

  /** Fresh `this * s`. */
  def scaled(s: Double): Mat = new Mat(rows, cols, Vec.scale(s, a))

  /** Fresh `this - other`. */
  def minus(other: Mat): Mat = {
    require(rows == other.rows && cols == other.cols)
    new Mat(rows, cols, Vec.sub(a, other.a))
  }

  /** Symmetrize in place: `this = (this + thisᵀ)/2` — kills fp drift in Σ. */
  def symmetrize(): Unit = {
    require(rows == cols)
    var i = 0
    while (i < rows) {
      var j = i + 1
      while (j < cols) {
        val m = 0.5 * (a(i * cols + j) + a(j * cols + i))
        a(i * cols + j) = m; a(j * cols + i) = m
        j += 1
      }
      i += 1
    }
  }

  def maxAbsDiff(other: Mat): Double = Vec.maxAbsDiff(a, other.a)

  override def toString: String =
    (0 until rows).map(i => (0 until cols).map(j => f"${apply(i, j)}%10.4f").mkString(" ")).mkString("\n")
}

object Mat {
  def zeros(rows: Int, cols: Int): Mat = new Mat(rows, cols, new Array[Double](rows * cols))

  def eye(n: Int): Mat = {
    val m = zeros(n, n)
    var i = 0
    while (i < n) { m(i, i) = 1.0; i += 1 }
    m
  }

  def diag(d: Array[Double]): Mat = {
    val m = zeros(d.length, d.length)
    var i = 0
    while (i < d.length) { m(i, i) = d(i); i += 1 }
    m
  }

  /** Build from a row-of-rows literal (used by tests). */
  def fromRows(rs: Seq[Seq[Double]]): Mat = {
    val r = rs.length; val c = rs.head.length
    require(rs.forall(_.length == c), "ragged rows")
    new Mat(r, c, rs.flatten.toArray)
  }

  /** Outer product `x yᵀ` as a fresh matrix. */
  def outer(x: Array[Double], y: Array[Double]): Mat = {
    val m = zeros(x.length, y.length)
    m.addOuter(1.0, x, y)
    m
  }
}
