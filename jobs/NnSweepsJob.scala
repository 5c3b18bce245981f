package repro.jobs

import repro.bench.{Harness, Sweeps}

/** spark-submit entrypoint for the synthetic NN sweeps (Figures 5–6
  * trends): varying rr, dR, nh and the multi-way dR1.
  */
object NnSweepsJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("nn-sweeps")
    try {
      println(Harness.renderSweep("NN varying rr", Sweeps.nnVaryRr(spark)))
      println(Harness.renderSweep("NN varying dR", Sweeps.nnVaryDr(spark)))
      println(Harness.renderSweep("NN varying nh", Sweeps.nnVaryNh(spark)))
      println(Harness.renderSweep("NN 3-way varying dR1", Sweeps.nnMultiVaryDr1(spark)))
    } finally spark.stop()
  }
}
