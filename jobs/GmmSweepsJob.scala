package repro.jobs

import repro.bench.{Harness, Sweeps}

/** spark-submit entrypoint for the synthetic GMM sweeps (Figures 3–4
  * trends): varying rr, dR, K and the multi-way dR1.
  */
object GmmSweepsJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("gmm-sweeps")
    try {
      println(Harness.renderSweep("GMM varying rr", Sweeps.gmmVaryRr(spark)))
      println(Harness.renderSweep("GMM varying dR", Sweeps.gmmVaryDr(spark)))
      println(Harness.renderSweep("GMM varying K", Sweeps.gmmVaryK(spark)))
      println(Harness.renderSweep("GMM 3-way varying dR1", Sweeps.gmmMultiVaryDr1(spark)))
    } finally spark.stop()
  }
}
