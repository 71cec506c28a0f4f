package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-check helper over raw ScalaCheck
  * generators (the scalatest/scalacheck bridge artifact is not in the
  * offline dependency set).
  */
trait PropSupport {

  /** Run `body` over `n` deterministic samples of `gen`. */
  def forAllSamples[A](gen: Gen[A], n: Int = 60, seed: Long = 42L)(body: A => Unit): Unit = {
    var s = Seed(seed)
    var produced = 0
    var attempts = 0
    while (produced < n && attempts < n * 20) {
      gen.apply(Gen.Parameters.default, s) match {
        case Some(a) => body(a); produced += 1
        case None    => // generator shrunk away; retry with next seed
      }
      s = s.next
      attempts += 1
    }
    require(produced == n, s"generator yielded only $produced/$n samples")
  }

  /** Two-generator convenience overload. */
  def forAllSamples2[A, B](ga: Gen[A], gb: Gen[B], n: Int = 60, seed: Long = 42L)(
      body: (A, B) => Unit
  ): Unit =
    forAllSamples(Gen.zip(ga, gb), n, seed) { case (a, b) => body(a, b) }
}
