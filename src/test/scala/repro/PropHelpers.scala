package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal property-test driver over ScalaCheck generators.
  *
  * The offline cache carries scalacheck but not the scalatest-plus
  * bridge, so suites sample generators deterministically and assert with
  * plain ScalaTest — same coverage, fixed seeds, reproducible failures.
  */
trait PropHelpers {
  def forAllSamples[A](gen: Gen[A], n: Int = 50, seed0: Long = 12345L)(f: A => Unit): Unit = {
    val params = Gen.Parameters.default
    var seed = Seed(seed0)
    var produced = 0
    var attempts = 0
    while (produced < n && attempts < n * 20) {
      gen.apply(params, seed) match {
        case Some(a) => f(a); produced += 1
        case None    => // generator filtered this seed out; retry
      }
      seed = seed.next
      attempts += 1
    }
    assert(produced > 0, "generator produced no samples")
  }
}
