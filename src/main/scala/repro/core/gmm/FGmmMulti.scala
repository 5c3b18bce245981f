package repro.core.gmm

import org.apache.spark.sql.{DataFrame, Encoders}
import org.apache.spark.sql.functions.{array, col}
import repro.linalg.{Mat, Vec}
import scala.collection.parallel.CollectionConverters._

/** Per-Ri-tuple reusable blocks for the multi-way E-step (paper §V-C,
  * Eq. 19–21), per component k:
  *  - `pd(k)`  = x_r − μ_{Ri,k}                  (Eq. 20, computed once)
  *  - `v(k)`   = I_{0i} · pd(k)   (dS-vector)    (S↔Ri cross term)
  *  - `c(k)`   = pd(k)ᵀ I_{ii} pd(k)             (diagonal term, reused)
  *  - `t(m)(k)` = I_{mi} · pd(k)  (dRm-vector, m < i)  (Ri↔Rm cross term:
  *    the per-row work drops to a dot product against the other table's pd)
  */
private[gmm] final case class MPre(raw: Array[Double], pd: Array[Array[Double]],
                                   v: Array[Array[Double]], c: Array[Double],
                                   t: Array[Array[Array[Double]]])

/** Partition-local statistics of the factorized multi-way S-pass: global
  * S-block sums, per-FK grouped statistics for **each** attribute relation,
  * and the off-diagonal R×R covariance blocks (accumulated per row — the
  * paper reuses only the diagonal blocks M_ii, Eq. 23).
  */
private[gmm] final class FGmmMultiAccum(val k: Int, val dS: Int, val dims: Array[Int])
    extends Serializable {
  val q: Int = dims.length
  var n: Long = 0L
  var loglik: Double = 0.0
  val nk: Array[Double] = new Array[Double](k)
  val sxS: Array[Array[Double]] = Array.fill(k)(new Array[Double](dS))
  val sxxSS: Array[Mat] = Array.fill(k)(Mat.zeros(dS, dS))
  val perFk: Array[java.util.HashMap[Long, Array[Double]]] =
    Array.fill(q)(new java.util.HashMap[Long, Array[Double]]())
  // cross(i)(j-i-1)(k): Σ γ x_{Ri} x_{Rj}ᵀ for 0 ≤ i < j < q (R-indexing)
  val cross: Array[Array[Array[Mat]]] =
    Array.tabulate(q) { i => Array.tabulate(q - i - 1) { jOff =>
      Array.fill(k)(Mat.zeros(dims(i), dims(i + 1 + jOff))) } }

  @inline def fkSlot(rel: Int, fk: Long): Array[Double] = {
    val m = perFk(rel)
    var a = m.get(fk)
    if (a == null) { a = new Array[Double](k * (1 + dS)); m.put(fk, a) }
    a
  }

  def add(fks: Array[Long], xs: Array[Double], raws: Array[Array[Double]],
          gamma: Array[Double], ll: Double): Unit = {
    n += 1; loglik += ll
    var i = 0
    while (i < k) {
      val g = gamma(i)
      nk(i) += g
      Vec.axpy(g, xs, sxS(i))
      sxxSS(i).addOuter(g, xs, xs)
      var rel = 0
      while (rel < q) {
        val slot = fkSlot(rel, fks(rel))
        slot(i) += g
        val off = k + i * dS
        var j = 0
        while (j < dS) { slot(off + j) += g * xs(j); j += 1 }
        rel += 1
      }
      // off-diagonal R×R blocks, per row (no reuse — paper Eq. 23)
      var a = 0
      while (a < q) {
        var b = a + 1
        while (b < q) {
          cross(a)(b - a - 1)(i).addOuter(g, raws(a), raws(b))
          b += 1
        }
        a += 1
      }
      i += 1
    }
  }

  def merge(o: FGmmMultiAccum): FGmmMultiAccum = {
    require(o.k == k && o.dS == dS && o.dims.sameElements(dims))
    n += o.n; loglik += o.loglik
    var i = 0
    while (i < k) {
      nk(i) += o.nk(i)
      Vec.addInPlace(sxS(i), o.sxS(i))
      sxxSS(i).addInPlace(o.sxxSS(i))
      i += 1
    }
    var rel = 0
    while (rel < q) {
      val it = o.perFk(rel).entrySet().iterator()
      while (it.hasNext) {
        val e = it.next()
        Vec.addInPlace(fkSlot(rel, e.getKey), e.getValue)
      }
      rel += 1
    }
    for (a <- 0 until q; bOff <- 0 until q - a - 1; i <- 0 until k)
      cross(a)(bOff)(i).addInPlace(o.cross(a)(bOff)(i))
    this
  }
}

/** Algorithm F-GMM for multi-way joins S ⋈ R1 ⋈ … ⋈ Rq (paper §V-C).
  * The quadratic form decomposes into (q+1)² block terms (Eq. 19); all
  * Ri-only terms and all vectors `I_mn · PD` are precomputed once per Ri
  * tuple, so the per-S-row cost no longer scales with Σ dRi².
  */
object FGmmMulti {

  def emStep(s: DataFrame, rRows: Seq[Array[(Long, Array[Double])]], model: GmmModel,
             dS: Int): (GmmModel, Double) = {
    val spark = s.sparkSession
    import spark.implicits._
    val q = rRows.length
    val dims = rRows.map(_.head._2.length).toArray
    val d = dS + dims.sum
    require(model.d == d, s"model d=${model.d} != $dS + ${dims.mkString("+")}")
    val k = model.k
    val cache = GmmComponentCache(model)
    // offsets of each block inside the concatenated feature vector
    val offs = dims.scanLeft(dS)(_ + _) // offs(i) = start of Ri block; offs(q) = d

    val muS = model.means.map(Vec.slice(_, 0, dS))
    val muR = (0 until q).map(i => model.means.map(Vec.slice(_, offs(i), offs(i) + dims(i))))
    val iSS = cache.inv.map(_.block(0, dS, 0, dS))
    // iBlk(a)(b)(k) = I_{ab} in R-indexing (a,b over R relations)
    def blk(kk: Int, a: Int, b: Int): Mat =
      cache.inv(kk).block(offs(a), offs(a) + dims(a), offs(b), offs(b) + dims(b))
    val iS_R = (0 until q).map(i => (0 until k).map(kk =>
      cache.inv(kk).block(0, dS, offs(i), offs(i) + dims(i))).toArray)

    // (1) per-Ri-tuple reusable blocks (independent per tuple — parallel)
    val pres: Array[java.util.HashMap[Long, MPre]] = Array.tabulate(q) { i =>
      val entries = rRows(i).par.map { case (rid, xr) =>
        val pd = new Array[Array[Double]](k)
        val v  = new Array[Array[Double]](k)
        val c  = new Array[Double](k)
        val t  = Array.tabulate(i) { mRel => new Array[Array[Double]](k) }
        var kk = 0
        while (kk < k) {
          pd(kk) = Vec.sub(xr, muR(i)(kk))
          v(kk)  = iS_R(i)(kk).mv(pd(kk))
          c(kk)  = blk(kk, i, i).quadForm(pd(kk))
          var mRel = 0
          while (mRel < i) { t(mRel)(kk) = blk(kk, mRel, i).mv(pd(kk)); mRel += 1 }
          kk += 1
        }
        (rid, MPre(xr, pd, v, c, t))
      }.toArray
      val m = new java.util.HashMap[Long, MPre](rRows(i).length * 2)
      entries.foreach { case (rid, p) => m.put(rid, p) }
      m
    }
    val bc = spark.sparkContext.broadcast(pres)

    // (2) factorized aggregation pass over S only
    val fkCols = (1 to q).map(i => col(s"fk$i"))
    implicit val accEnc = Encoders.kryo[FGmmMultiAccum]
    val acc =
      try {
        s.select(array(fkCols: _*) as "fks", col("xs")).as[(Array[Long], Array[Double])]
          .mapPartitions { it =>
            val a = new FGmmMultiAccum(k, dS, dims)
            val gamma = new Array[Double](k)
            val quad = new Array[Double](k)
            val lookup = bc.value
            val ps = new Array[MPre](q)
            val raws = new Array[Array[Double]](q)
            it.foreach { case (fks, xs) =>
              var rel = 0
              while (rel < q) { ps(rel) = lookup(rel).get(fks(rel)); raws(rel) = ps(rel).raw; rel += 1 }
              var i = 0
              while (i < k) {
                val pds = Vec.sub(xs, muS(i))
                var v = iSS(i).quadForm(pds)  // S diagonal term
                rel = 0
                while (rel < q) {
                  v += 2.0 * Vec.dot(pds, ps(rel).v(i)) + ps(rel).c(i)
                  var mRel = 0
                  while (mRel < rel) { // Rm ↔ Rrel cross terms (m < rel)
                    v += 2.0 * Vec.dot(ps(mRel).pd(i), ps(rel).t(mRel)(i))
                    mRel += 1
                  }
                  rel += 1
                }
                quad(i) = v
                i += 1
              }
              val ll = GmmMath.responsibilities(cache, quad, gamma)
              a.add(fks, xs, raws, gamma, ll)
            }
            Iterator.single(a)
          }
          .reduce(_.merge(_))
      } finally bc.destroy()

    // (3) finish R-side blocks per relation, one kernel per Ri tuple
    val sxR = Array.tabulate(q)(i => Array.fill(k)(new Array[Double](dims(i))))
    val ur  = Array.tabulate(q)(i => Array.fill(k)(Mat.zeros(dS, dims(i))))
    val lr  = Array.tabulate(q)(i => Array.fill(k)(Mat.zeros(dims(i), dims(i))))
    for (rel <- 0 until q) {
      rRows(rel).foreach { case (rid, xr) =>
        val slot = acc.perFk(rel).get(rid)
        if (slot != null) {
          var i = 0
          while (i < k) {
            val g = slot(i)
            if (g != 0.0) {
              Vec.axpy(g, xr, sxR(rel)(i))
              lr(rel)(i).addOuter(g, xr, xr)
            }
            val sgx = Vec.slice(slot, k + i * dS, k + (i + 1) * dS)
            ur(rel)(i).addOuter(1.0, sgx, xr)
            i += 1
          }
        }
      }
    }

    val weights = new Array[Double](k)
    val means   = new Array[Array[Double]](k)
    val covs    = new Array[Mat](k)
    var i = 0
    while (i < k) {
      weights(i) = acc.nk(i) / acc.n
      means(i) = Vec.concat(
        (Vec.scale(1.0 / acc.nk(i), acc.sxS(i)) +: (0 until q).map(rel =>
          Vec.scale(1.0 / acc.nk(i), sxR(rel)(i)))): _*)
      val sxx = Mat.zeros(d, d) // Eq. (23) block assembly
      sxx.setBlock(0, 0, acc.sxxSS(i))
      for (rel <- 0 until q) {
        sxx.setBlock(0, offs(rel), ur(rel)(i))
        sxx.setBlock(offs(rel), 0, ur(rel)(i).transpose)
        sxx.setBlock(offs(rel), offs(rel), lr(rel)(i))
      }
      for (a <- 0 until q; b <- a + 1 until q) {
        val m = acc.cross(a)(b - a - 1)(i)
        sxx.setBlock(offs(a), offs(b), m)
        sxx.setBlock(offs(b), offs(a), m.transpose)
      }
      val c = sxx.scaled(1.0 / acc.nk(i))
      c.addOuter(-1.0, means(i), means(i))
      c.symmetrize()
      covs(i) = c
      i += 1
    }
    (GmmModel(weights, means, covs), acc.loglik)
  }

  /** Collect each Ri once and run `iters` factorized EM iterations. */
  def train(s: DataFrame, rs: Seq[DataFrame], init: GmmModel, iters: Int): GmmFit = {
    val spark = s.sparkSession
    import spark.implicits._
    val rRows = rs.map(_.select("rid", "xr").as[(Long, Array[Double])].collect())
    val dS = init.d - rRows.map(_.head._2.length).sum
    var model = init
    val lls = Seq.newBuilder[Double]
    var i = 0
    while (i < iters) {
      val (next, ll) = emStep(s, rRows, model, dS)
      model = next
      lls += ll
      i += 1
    }
    GmmFit(model, lls.result())
  }
}
