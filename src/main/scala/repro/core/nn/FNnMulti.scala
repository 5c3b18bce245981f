package repro.core.nn

import org.apache.spark.sql.{DataFrame, Encoders}
import org.apache.spark.sql.functions.{array, col}
import repro.linalg.{Mat, Vec}

/** Partition-local statistics of the factorized multi-way backprop pass:
  * S-block gradient sums plus per-FK grouped δ-sums for each Ri.
  */
private[nn] final class FNnMultiAccum(val nh: Int, val dS: Int, val q: Int)
    extends Serializable {
  var n: Long = 0L
  var sqErr: Double = 0.0
  val dW1S: Mat = Mat.zeros(nh, dS)
  val db1: Array[Double] = new Array[Double](nh)
  val dW2: Array[Double] = new Array[Double](nh)
  var db2: Double = 0.0
  val perFk: Array[java.util.HashMap[Long, Array[Double]]] =
    Array.fill(q)(new java.util.HashMap[Long, Array[Double]]())

  @inline def fkSlot(rel: Int, fk: Long): Array[Double] = {
    val m = perFk(rel)
    var a = m.get(fk)
    if (a == null) { a = new Array[Double](nh); m.put(fk, a) }
    a
  }

  def merge(o: FNnMultiAccum): FNnMultiAccum = {
    require(o.nh == nh && o.dS == dS && o.q == q)
    n += o.n; sqErr += o.sqErr; db2 += o.db2
    dW1S.addInPlace(o.dW1S)
    Vec.addInPlace(db1, o.db1)
    Vec.addInPlace(dW2, o.dW2)
    var rel = 0
    while (rel < q) {
      val it = o.perFk(rel).entrySet().iterator()
      while (it.hasNext) {
        val e = it.next()
        Vec.addInPlace(fkSlot(rel, e.getKey), e.getValue)
      }
      rel += 1
    }
    this
  }
}

/** Algorithm F-NN for multi-way joins (paper §VI-B): the first-layer
  * pre-activation is assembled as `W1_S x_S + Σ_i (W1_Ri x_{Ri}) + b1`
  * (Eq. 31) with each `W1_Ri x_r` computed once per Ri tuple per epoch;
  * backward finishes each PG_Ri block from per-FK grouped δ-sums (Eq. 32).
  */
object FNnMulti {

  def epoch(s: DataFrame, rRows: Seq[Array[(Long, Array[Double])]], model: NnModel,
            lr: Double, dS: Int): (NnModel, Double) = {
    val spark = s.sparkSession
    import spark.implicits._
    val q = rRows.length
    val nh = model.nh; val d = model.d
    val dims = rRows.map(_.head._2.length).toArray
    require(d == dS + dims.sum, s"model d=$d != $dS + ${dims.mkString("+")}")
    val offs = dims.scanLeft(dS)(_ + _)
    val w1S = model.w1.block(0, nh, 0, dS)
    val w1R = (0 until q).map(i => model.w1.block(0, nh, offs(i), offs(i) + dims(i)))
    val b1 = model.b1; val w2 = model.w2; val b2 = model.b2
    val act = model.activation

    // (1) per-Ri-tuple reusable partial pre-activations W1_Ri x_r
    val pres: Array[java.util.HashMap[Long, Array[Double]]] = Array.tabulate(q) { i =>
      val m = new java.util.HashMap[Long, Array[Double]](rRows(i).length * 2)
      rRows(i).foreach { case (rid, xr) => m.put(rid, w1R(i).mv(xr)) }
      m
    }
    val bc = spark.sparkContext.broadcast(pres)

    // (2) factorized S-side pass
    val fkCols = (1 to q).map(i => col(s"fk$i"))
    implicit val accEnc = Encoders.kryo[FNnMultiAccum]
    val acc =
      try {
        s.select(array(fkCols: _*) as "fks", col("xs"), col("y"))
          .as[(Array[Long], Array[Double], Double)]
          .mapPartitions { it =>
            val a = new FNnMultiAccum(nh, dS, q)
            val lookup = bc.value
            it.foreach { case (fks, xs, y) =>
              val preAct = w1S.mv(xs)
              Vec.addInPlace(preAct, b1)
              var rel = 0
              while (rel < q) { Vec.addInPlace(preAct, lookup(rel).get(fks(rel))); rel += 1 }
              var o = b2
              var j = 0
              while (j < nh) { o += w2(j) * act.f(preAct(j)); j += 1 }
              val e = o - y
              a.n += 1; a.sqErr += e * e; a.db2 += e
              val delta = new Array[Double](nh)
              j = 0
              while (j < nh) {
                a.dW2(j) += e * act.f(preAct(j))
                delta(j) = e * w2(j) * act.fPrime(preAct(j))
                a.db1(j) += delta(j)
                j += 1
              }
              a.dW1S.addOuter(1.0, delta, xs)
              rel = 0
              while (rel < q) { Vec.addInPlace(a.fkSlot(rel, fks(rel)), delta); rel += 1 }
            }
            Iterator.single(a)
          }
          .reduce(_.merge(_))
      } finally bc.destroy()

    // (3) finish each PG_Ri block
    val inv = 1.0 / acc.n
    val dW1 = Mat.zeros(nh, d)
    dW1.setBlock(0, 0, acc.dW1S)
    for (rel <- 0 until q) {
      val blockGrad = Mat.zeros(nh, dims(rel))
      rRows(rel).foreach { case (rid, xr) =>
        val sd = acc.perFk(rel).get(rid)
        if (sd != null) blockGrad.addOuter(1.0, sd, xr)
      }
      dW1.setBlock(0, offs(rel), blockGrad)
    }
    val grads = NnGrads(dW1.scaled(inv), Vec.scale(inv, acc.db1),
                        Vec.scale(inv, acc.dW2), acc.db2 * inv)
    (model.step(grads, lr), acc.sqErr * 0.5 * inv)
  }

  def train(s: DataFrame, rs: Seq[DataFrame], init: NnModel, epochs: Int, lr: Double): NnFit = {
    val spark = s.sparkSession
    import spark.implicits._
    val rRows = rs.map(_.select("rid", "xr").as[(Long, Array[Double])].collect())
    val dS = init.d - rRows.map(_.head._2.length).sum
    var model = init
    val losses = Seq.newBuilder[Double]
    var i = 0
    while (i < epochs) {
      val (next, loss) = epoch(s, rRows, model, lr, dS)
      model = next
      losses += loss
      i += 1
    }
    NnFit(model, losses.result())
  }
}
