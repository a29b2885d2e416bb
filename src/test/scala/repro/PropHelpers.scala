package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-testing harness over ScalaCheck
  * generators (the scalatest–scalacheck bridge artifact is not in the
  * offline cache, so suites sample `Gen` directly).
  */
trait PropHelpers {
  /** Run `f` on `n` deterministic samples of `gen` (seeds 0 until n). */
  def forAllSamples[A](gen: Gen[A], n: Int = 40)(f: A => Unit): Unit =
    (0 until n).foreach { i =>
      gen.apply(Gen.Parameters.default, Seed(i.toLong)).foreach(f)
    }
}
