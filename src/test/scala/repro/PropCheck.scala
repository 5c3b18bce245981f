package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-check bridge.
  *
  * The offline cache has scalatest and scalacheck but not the
  * `scalatestplus` bridge artifact, so suites sample `Gen`s directly:
  * `check(gen) { a => ... assertions ... }` draws `n` values from a fixed
  * seed sequence and runs the body on each — failures surface as normal
  * ScalaTest assertion errors with the offending sample attached.
  */
trait PropCheck {
  def check[A](gen: Gen[A], n: Int = 50, seed: Long = 42L)(body: A => Unit): Unit = {
    var s = Seed(seed)
    var i = 0
    var drawn = 0
    // Bounded retries so a sparse generator can't loop forever.
    while (drawn < n && i < n * 100) {
      gen.apply(Gen.Parameters.default, s) match {
        case Some(a) =>
          try body(a)
          catch {
            case e: Throwable =>
              throw new AssertionError(s"property failed on sample #$drawn: $a", e)
          }
          drawn += 1
        case None => // generator returned no value for this seed; advance
      }
      s = s.next
      i += 1
    }
    require(drawn == n, s"generator too sparse: only $drawn/$n samples drawn")
  }
}
