package repro.bench

/** Shared benchmark plumbing: wall-clock timing, environment knobs and
  * fixed-width table rendering (the bench suites print the same rows as
  * the paper's tables, with the paper's numbers alongside — see
  * EXPERIMENTS.md).
  */
object Harness {

  /** Scale factor applied to nS of the real-dataset surrogates (dims and nR
    * stay as in the paper). Default 0.1 — see DESIGN.md §6.
    */
  def scale: Double = sys.env.getOrElse("BENCH_SCALE", "0.1").toDouble

  /** EM iterations per GMM training run (paper trains to convergence; all
    * algorithms are per-iteration identical, so ratios are invariant).
    */
  def gmmIters: Int = sys.env.getOrElse("BENCH_GMM_ITERS", "3").toInt

  /** Epochs per NN training run (paper uses 10). */
  def nnEpochs: Int = sys.env.getOrElse("BENCH_NN_EPOCHS", "3").toInt

  /** Time a block, returning (result, seconds). */
  def timed[A](body: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = body
    (a, (System.nanoTime() - t0) / 1e9)
  }

  /** One measured row of a paper table: our three times plus the paper's. */
  final case class AlgoRow(dataset: String, m: Double, s: Double, f: Double,
                           paperM: Double, paperS: Double, paperF: Double) {
    /** Speedup of F over the faster baseline, ours and the paper's. */
    def speedup: Double = math.min(m, s) / f
    def paperSpeedup: Double = math.min(paperM, paperS) / paperF
  }

  def renderTable(title: String, rows: Seq[AlgoRow]): String = {
    val sb = new StringBuilder
    sb ++= s"\n== $title ==\n"
    sb ++= f"${"dataset"}%-22s ${"M(s)"}%8s ${"S(s)"}%8s ${"F(s)"}%8s ${"F-speedup"}%10s ${"paper"}%8s\n"
    rows.foreach { r =>
      sb ++= f"${r.dataset}%-22s ${r.m}%8.1f ${r.s}%8.1f ${r.f}%8.1f ${r.speedup}%9.2fx ${r.paperSpeedup}%7.2fx\n"
    }
    sb.result()
  }

  /** Sweep row: a parameter point with S-vs-F times (sweeps skip M — the
    * paper's figures show M ≈ S throughout).
    */
  final case class SweepRow(param: String, value: String, s: Double, f: Double) {
    def speedup: Double = s / f
  }

  def renderSweep(title: String, rows: Seq[SweepRow]): String = {
    val sb = new StringBuilder
    sb ++= s"\n== $title ==\n"
    sb ++= f"${"param"}%-10s ${"value"}%10s ${"S(s)"}%8s ${"F(s)"}%8s ${"speedup"}%8s\n"
    rows.foreach { r =>
      sb ++= f"${r.param}%-10s ${r.value}%10s ${r.s}%8.1f ${r.f}%8.1f ${r.speedup}%7.2fx\n"
    }
    sb.result()
  }
}
