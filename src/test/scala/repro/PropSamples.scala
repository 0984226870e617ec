package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-check helper over raw ScalaCheck `Gen`
  * (the scalatest–scalacheck bridge artifact is not available offline).
  * Samples `n` values from fixed seeds and applies the assertion block to
  * each, so failures are reproducible.
  */
trait PropSamples {
  def forAllSamples[A](gen: Gen[A], n: Int = 50)(f: A => Unit): Unit = {
    var k = 0
    while (k < n) {
      val a = gen.pureApply(Gen.Parameters.default, Seed(0xABCDE000L + k))
      f(a)
      k += 1
    }
  }
}
