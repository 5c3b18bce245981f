package repro.linalg

/** Dense double-vector kernels used in the per-tuple hot loops.
  *
  * Everything operates on raw `Array[Double]` to keep the EM / backprop
  * inner loops allocation-free; no Breeze is available offline.
  */
object Vec {

  /** Dot product of `a` and `b` (lengths must match). */
  def dot(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dot: ${a.length} vs ${b.length}")
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  /** Element-wise `a - b` into a fresh array. */
  def sub(a: Array[Double], b: Array[Double]): Array[Double] = {
    require(a.length == b.length, s"sub: ${a.length} vs ${b.length}")
    val out = new Array[Double](a.length)
    var i = 0
    while (i < a.length) { out(i) = a(i) - b(i); i += 1 }
    out
  }

  /** `acc += s * x` in place. */
  def axpy(s: Double, x: Array[Double], acc: Array[Double]): Unit = {
    require(x.length == acc.length, s"axpy: ${x.length} vs ${acc.length}")
    var i = 0
    while (i < acc.length) { acc(i) += s * x(i); i += 1 }
  }

  /** `acc += x` in place. */
  def addInPlace(acc: Array[Double], x: Array[Double]): Unit = axpy(1.0, x, acc)

  /** Scale a copy of `x` by `s`. */
  def scale(s: Double, x: Array[Double]): Array[Double] = {
    val out = new Array[Double](x.length)
    var i = 0
    while (i < x.length) { out(i) = s * x(i); i += 1 }
    out
  }

  /** Concatenate vectors in order. */
  def concat(parts: Array[Double]*): Array[Double] = {
    val out = new Array[Double](parts.map(_.length).sum)
    var off = 0
    parts.foreach { p => System.arraycopy(p, 0, out, off, p.length); off += p.length }
    out
  }

  /** Slice `x(from until until)` into a fresh array. */
  def slice(x: Array[Double], from: Int, until: Int): Array[Double] =
    java.util.Arrays.copyOfRange(x, from, until)

  /** Max |a(i) - b(i)|. */
  def maxAbsDiff(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length)
    var m = 0.0; var i = 0
    while (i < a.length) { m = math.max(m, math.abs(a(i) - b(i))); i += 1 }
    m
  }
}
