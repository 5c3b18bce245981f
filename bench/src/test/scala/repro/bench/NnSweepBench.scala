package repro.bench

import repro.SparkSpec

/** Scaled reproductions of the synthetic NN sweeps behind Figures 5–6:
  * F-NN's advantage must grow with rr and dR (dR1) and persist across nh
  * (paper text: 2–3.5× binary, 3–6× multi-way).
  */
class NnSweepBench extends SparkSpec {

  test("Fig 5(a): F-NN wins at every rr and decisively at high rr") {
    // Same substrate note as the GMM rr sweep: Spark's join avoidance pays
    // off immediately, so the rr crossover the paper reports (rr≈50–200)
    // moves to rr≈1 here; we assert the decisive high-rr win.
    val rows = Sweeps.nnVaryRr(spark)
    println(Harness.renderSweep("NN varying rr (nR=1000, dS=5, dR=15, nh=50)", rows))
    assert(rows.forall(_.speedup > 1.0), "F should win at every rr point")
    assert(rows.last.speedup > 1.5, "F should win decisively at high rr")
  }

  test("Fig 5(b) trend: F-NN speedup grows with dR") {
    val rows = Sweeps.nnVaryDr(spark)
    println(Harness.renderSweep("NN varying dR (nS=1e5, nR=1000, dS=5, nh=50)", rows))
    assert(rows.last.speedup > rows.head.speedup,
      s"speedup should grow with dR: ${rows.map(_.speedup).mkString(" -> ")}")
  }

  test("Fig 5(c) trend: F-NN stays ahead as nh varies") {
    val rows = Sweeps.nnVaryNh(spark)
    println(Harness.renderSweep("NN varying nh (nS=1e5, nR=1000, dS=5, dR=15)", rows))
    assert(rows.forall(_.speedup > 1.0), "F should win at every nh")
  }

  test("Fig 6 trend: multi-way F-NN speedup grows with dR1") {
    val rows = Sweeps.nnMultiVaryDr1(spark)
    println(Harness.renderSweep("NN 3-way varying dR1 (Movies-3way shape)", rows))
    assert(rows.forall(_.speedup > 1.0), "F should win at every dR1")
    assert(rows.last.speedup > rows.head.speedup,
      s"speedup should grow with dR1: ${rows.map(_.speedup).mkString(" -> ")}")
  }
}
