package repro

import org.scalacheck.{Gen, Test => SCTest, Prop}

/** Property-testing support without the scalatestplus bridge (only scalatest
  * and scalacheck are available offline): run a ScalaCheck property and
  * assert it passed, or draw deterministic samples from a Gen.
  */
trait PropSupport {

  /** Check a ScalaCheck property (100 cases) and fail the test if it fails. */
  def checkProp(prop: Prop, cases: Int = 100): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(cases)
    val result = SCTest.check(params, prop)
    assert(result.passed, s"property failed: ${result.status}")
  }

  /** Deterministic samples from a generator (fixed seeds). */
  def samples[A](gen: Gen[A], n: Int = 100): Seq[A] =
    (0 until n).flatMap { i =>
      gen(Gen.Parameters.default, org.scalacheck.rng.Seed(i.toLong)).toSeq
    }

  /** Run `body` for `n` deterministic Randoms. */
  def forAllSeeded(n: Int = 50)(body: scala.util.Random => Unit): Unit =
    (1 to n).foreach(i => body(new scala.util.Random(i)))
}
