package repro.core.nn

/** Paper §VI-A2: when can the factorization be pushed past the first
  * layer? Only for *additive* activations (solutions of the Cauchy
  * functional equation f(x+y) = f(x) + f(y)), and even then the op count
  * at layer 2 rises. This module packages both arguments so the claim is
  * testable rather than prose.
  */
object Additivity {

  /** Empirical additivity check: max |f(x+y) − f(x) − f(y)| over a grid.
    * Zero (≤ tol) for additive functions; strictly positive otherwise.
    */
  def additivityDefect(act: Activation, lo: Double = -4.0, hi: Double = 4.0,
                       steps: Int = 41): Double = {
    var worst = 0.0
    var i = 0
    while (i < steps) {
      val x = lo + (hi - lo) * i / (steps - 1)
      var j = 0
      while (j < steps) {
        val y = lo + (hi - lo) * j / (steps - 1)
        val defect = math.abs(act.f(x + y) - act.f(x) - act.f(y))
        if (defect > worst) worst = defect
        j += 1
      }
      i += 1
    }
    worst
  }

  def isAdditive(act: Activation, tol: Double = 1e-12): Boolean =
    additivityDefect(act) <= tol

  /** ReLU is additive exactly when the two addends share a sign — the
    * paper's "piece-wise" observation. Returns the defect for a pair.
    */
  def reluPairDefect(t1: Double, t2: Double): Double =
    math.abs(math.max(0.0, t1 + t2) - (math.max(0.0, t1) + math.max(0.0, t2)))

  /** Operation counts for computing one second-layer unit's pre-activation
    * (paper §VI-A2 cost analysis). Direct: nh multiplications + nh
    * additions.
    */
  def layer2DirectOps(nh: Int): Long = 2L * nh

  /** Factorized layer-2 ops per joined tuple: still nh mults + nh adds
    * (Σ w2·f(T1) plus adding T3) — and each R tuple additionally pays
    * nh mults + nh adds to build T3. Total is strictly higher whenever
    * nR ≥ 1, the paper's argument against sharing beyond layer 1.
    */
  def layer2FactorizedOps(nh: Int, nS: Long, nR: Long): Long =
    2L * nh * nS + 2L * nh * nR

  /** The comparison the paper makes: factorized total vs direct total for
    * the second layer over the whole pass. Positive = factorization loses.
    */
  def layer2ExtraOps(nh: Int, nS: Long, nR: Long): Long =
    layer2FactorizedOps(nh, nS, nR) - 2L * nh * nS
}
