package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal property-testing bridge: the offline image ships scalacheck but
  * not the scalatestplus adapter, so suites sample generators explicitly
  * with deterministic seeds.
  */
trait PropHelpers {
  /** Evaluate `f` on `n` deterministic samples of `gen`. */
  def forAllSeeded[A](gen: Gen[A], n: Int = 50)(f: A => Unit): Unit =
    (1 to n).foreach { i =>
      f(gen.pureApply(Gen.Parameters.default, Seed(i.toLong)))
    }
}
