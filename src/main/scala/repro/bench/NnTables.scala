package repro.bench

import org.apache.spark.sql.SparkSession
import repro.bench.Harness.AlgoRow
import repro.core.nn._
import repro.data.{NormalizedSynth, Store}

/** Reproduction of paper **Table VII** — NN training time (seconds) for
  * M-NN / S-NN / F-NN on the Sparse real-dataset surrogates plus
  * Movies-3way, nh = 50, single hidden layer (paper §VII defaults).
  */
object NnTables {

  val Nh = 50
  val Lr = 0.01

  /** Paper Table VII, seconds: dataset → (M-NN, S-NN, F-NN). */
  val paperTable7: Map[String, (Double, Double, Double)] = Map(
    "Walmart(Sparse)" -> (743.1, 845.5, 104.1),
    "Movies (Sparse)" -> (437.4, 507.2, 112.3),
    "Movies-3way"     -> (890.1, 1022.3, 202.1),
  )

  def runBinary(spark: SparkSession, dims: NormalizedSynth.DatasetDims, seed: Long,
                scale: Double, epochs: Int,
                paper: (Double, Double, Double) = null): AlgoRow = {
    val store = Store.temp(spark, "nn-bench")
    try {
      val (s0, r0) = NormalizedSynth.surrogate(spark, dims, seed, scale, withTarget = true)
      val s = store.write("s", s0)
      val r = store.write("r", r0)
      val d = dims.dS + dims.dR
      val init = NnModel.init(Nh, d, seed)
      val (fitM, tM) = Harness.timed(MNn.train(store, s, r, init, epochs, Lr))
      val (fitS, tS) = Harness.timed(SNn.train(s, r, init, epochs, Lr))
      val (fitF, tF) = Harness.timed(FNn.train(s, r, init, epochs, Lr))
      requireAgreement(dims.name, fitM, fitS, fitF)
      val (pM, pS, pF) = Option(paper).getOrElse(paperTable7(dims.name))
      AlgoRow(dims.name, tM, tS, tF, pM, pS, pF)
    } finally store.close()
  }

  def runMovies3way(spark: SparkSession, seed: Long, scale: Double, epochs: Int,
                    dR1: Int = 20): AlgoRow = {
    val store = Store.temp(spark, "nn-bench-3way")
    try {
      val (s0, rs0) = NormalizedSynth.movies3way(spark, seed,
        nS = math.max(1L, (1000209L * scale).toLong), dR1 = dR1, withTarget = true)
      val s = store.write("s", s0)
      val rs = rs0.zipWithIndex.map { case (r, i) => store.write(s"r${i + 1}", r) }
      val d = 1 + dR1 + 21
      val init = NnModel.init(Nh, d, seed)
      val (fitM, tM) = Harness.timed(MNn.trainMulti(store, s, rs, init, epochs, Lr))
      val (fitS, tS) = Harness.timed(SNn.trainMulti(s, rs, init, epochs, Lr))
      val (fitF, tF) = Harness.timed(FNnMulti.train(s, rs, init, epochs, Lr))
      requireAgreement("Movies-3way", fitM, fitS, fitF)
      val (pM, pS, pF) = paperTable7("Movies-3way")
      AlgoRow("Movies-3way", tM, tS, tF, pM, pS, pF)
    } finally store.close()
  }

  private def requireAgreement(name: String, fits: NnFit*): Unit = {
    val losses = fits.map(_.losses.last)
    val ref = losses.head
    require(losses.forall(l => math.abs(l - ref) / math.max(1e-12, math.abs(ref)) < 1e-6),
      s"$name: algorithms diverged, final losses = ${losses.mkString(", ")}")
  }

  /** JIT warmup — see [[GmmTables.warmup]]. */
  def warmup(spark: SparkSession): Unit = {
    val dims = NormalizedSynth.DatasetDims("warmup", 5000L, 4, 100L, 6)
    runBinary(spark, dims, seed = 1, scale = 1.0, epochs = 1,
      paper = (1.0, 1.0, 1.0)): Unit
  }

  /** All of Table VII in paper order. */
  def runAll(spark: SparkSession, scale: Double = Harness.scale,
             epochs: Int = Harness.nnEpochs, seed: Long = 4321): Seq[AlgoRow] = {
    warmup(spark)
    NormalizedSynth.table4Sparse.map(d => runBinary(spark, d, seed, scale, epochs)) :+
      runMovies3way(spark, seed, scale, epochs)
  }
}
