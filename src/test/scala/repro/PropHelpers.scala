package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal property-testing driver over raw scalacheck generators.
  * (org.scalatestplus:scalacheck-1-18 is not in the offline cache, so the
  * scalatest<->scalacheck bridge is replaced by this deterministic sampler.)
  */
object PropHelpers {
  def forAllSamples[T](gen: Gen[T], n: Int = 50, seed0: Long = 42L)(f: T => Unit): Unit = {
    var seed = Seed(seed0)
    var produced = 0
    var attempts = 0
    while (produced < n && attempts < n * 20) {
      gen.apply(Gen.Parameters.default, seed) match {
        case Some(t) => f(t); produced += 1
        case None    =>
      }
      seed = seed.next
      attempts += 1
    }
    assert(produced > 0, "generator produced no samples")
  }
}
