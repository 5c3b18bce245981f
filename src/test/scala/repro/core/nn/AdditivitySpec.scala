package repro.core.nn

import org.scalatest.funsuite.AnyFunSuite

/** Tests of the paper's §VI-A2 analysis: which activations admit exact
  * factorization past the first layer, and why it is not worth it anyway.
  */
class AdditivitySpec extends AnyFunSuite {

  test("sigmoid is not additive (no layer-2 sharing possible)") {
    assert(Additivity.additivityDefect(Activation.Sigmoid) > 0.1)
    assert(!Additivity.isAdditive(Activation.Sigmoid))
  }

  test("tanh is not additive") {
    assert(Additivity.additivityDefect(Activation.Tanh) > 0.1)
    assert(!Additivity.isAdditive(Activation.Tanh))
  }

  test("identity (linear) is additive — the Cauchy solution") {
    assert(Additivity.isAdditive(Activation.Identity))
  }

  test("relu is additive exactly when T1 and T2 share a sign") {
    assert(Additivity.reluPairDefect(1.0, 2.0) === 0.0)
    assert(Additivity.reluPairDefect(-1.0, -2.0) === 0.0)
    assert(Additivity.reluPairDefect(3.0, -1.0) > 0.0)
    assert(Additivity.reluPairDefect(-0.5, 2.0) > 0.0)
    // so as a function it is NOT additive overall
    assert(!Additivity.isAdditive(Activation.Relu))
  }

  test("layer-2 factorization always costs extra operations (paper's op-count argument)") {
    for (nh <- Seq(10, 50, 200); nS <- Seq(1000L, 100000L); nR <- Seq(10L, 1000L)) {
      assert(Additivity.layer2ExtraOps(nh, nS, nR) == 2L * nh * nR)
      assert(Additivity.layer2FactorizedOps(nh, nS, nR) > Additivity.layer2DirectOps(nh) * nS)
    }
  }

  test("extra cost grows with nR — reuse across layers never pays off") {
    val small = Additivity.layer2ExtraOps(nh = 50, nS = 100000L, nR = 100L)
    val large = Additivity.layer2ExtraOps(nh = 50, nS = 100000L, nR = 10000L)
    assert(large > small)
  }
}
