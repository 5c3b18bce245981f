package repro.core.nn

import org.apache.spark.sql.{DataFrame, Encoders}
import repro.linalg.{Mat, Vec}

/** Result of an NN training run: final model plus the mean-squared-error
  * loss E of the model *entering* each epoch.
  */
final case class NnFit(model: NnModel, losses: Seq[Double])

/** Partition-local backprop sums for one full-batch epoch: raw (un-scaled)
  * Σ e·h, Σ e, Σ δ xᵀ, Σ δ and Σ e² — the 1/N factors are applied once at
  * the end, so partition order cannot perturb the result.
  */
private[nn] final class NnAccum(val nh: Int, val d: Int) extends Serializable {
  var n: Long = 0L
  var sqErr: Double = 0.0
  val dW1: Mat = Mat.zeros(nh, d)
  val db1: Array[Double] = new Array[Double](nh)
  val dW2: Array[Double] = new Array[Double](nh)
  var db2: Double = 0.0

  def merge(o: NnAccum): NnAccum = {
    require(o.nh == nh && o.d == d)
    n += o.n; sqErr += o.sqErr; db2 += o.db2
    dW1.addInPlace(o.dW1)
    Vec.addInPlace(db1, o.db1)
    Vec.addInPlace(dW2, o.dW2)
    this
  }

  /** Scale the sums into (E, ∂E/∂θ): E = sqErr/(2N), gradients get 1/N. */
  def toGrads: (Double, NnGrads) = {
    val inv = 1.0 / n
    (sqErr * 0.5 * inv,
     NnGrads(dW1.scaled(inv), Vec.scale(inv, db1), Vec.scale(inv, dW2), db2 * inv))
  }
}

/** Backprop over the *denormalized* representation — the compute shared by
  * M-NN (T materialized) and S-NN (join on the fly). Every joined tuple is
  * pushed through the full d-wide first layer; partial products for shared
  * R tuples are recomputed every time — the redundancy F-NN removes.
  */
object DenormNn {

  /** T(sid, xs, xr, y): the projected equi-join with the learning target. */
  def joined(s: DataFrame, r: DataFrame): DataFrame =
    s.join(r, s("fk") === r("rid")).select(s("sid"), s("xs"), r("xr"), s("y"))

  /** One full-batch epoch over T: returns (updated model, loss E of the
    * incoming model).
    */
  def epoch(t: DataFrame, model: NnModel, lr: Double): (NnModel, Double) = {
    val spark = t.sparkSession
    import spark.implicits._
    val nh = model.nh; val d = model.d
    val w1 = model.w1; val b1 = model.b1; val w2 = model.w2; val b2 = model.b2
    val act = model.activation

    implicit val accEnc = Encoders.kryo[NnAccum]
    val acc = t.select("xs", "xr", "y").as[(Array[Double], Array[Double], Double)]
      .mapPartitions { it =>
        val a = new NnAccum(nh, d)
        it.foreach { case (xs, xr, y) =>
          val x = Vec.concat(xs, xr) // full-width tuple as stored in T
          // forward: a_j = Σ_i w1_ji x_i + b1_j (paper §VI-A1, undecomposed)
          val pre = w1.mv(x)
          Vec.addInPlace(pre, b1)
          var o = b2
          var j = 0
          while (j < nh) { o += w2(j) * act.f(pre(j)); j += 1 }
          val e = o - y
          a.n += 1; a.sqErr += e * e; a.db2 += e
          // backward: δ_j = e · w2_j · f'(a_j); dW1 += δ xᵀ (Eq. 28)
          val delta = new Array[Double](nh)
          j = 0
          while (j < nh) {
            a.dW2(j) += e * act.f(pre(j))
            delta(j) = e * w2(j) * act.fPrime(pre(j))
            a.db1(j) += delta(j)
            j += 1
          }
          a.dW1.addOuter(1.0, delta, x)
        }
        Iterator.single(a)
      }
      .reduce(_.merge(_))
    val (loss, grads) = acc.toGrads
    (model.step(grads, lr), loss)
  }

  /** Run `epochs` full-batch GD epochs (shared loop for M-NN and S-NN). */
  def train(t: DataFrame, init: NnModel, epochs: Int, lr: Double): NnFit = {
    var model = init
    val losses = Seq.newBuilder[Double]
    var i = 0
    while (i < epochs) {
      val (next, loss) = epoch(t, model, lr)
      model = next
      losses += loss
      i += 1
    }
    NnFit(model, losses.result())
  }
}
