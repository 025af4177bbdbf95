package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal property-testing support over raw ScalaCheck generators.
  *
  * The offline cache ships scalacheck but not the scalatestplus bridge, so
  * suites draw deterministic samples from a [[Gen]] and assert directly —
  * failures report the sample that broke the property.
  */
trait PropSupport {

  /** Run `body` over `n` deterministic samples of `gen`. */
  def forAllSamples[A](gen: Gen[A], n: Int = 100, seed: Long = 0xC1A0L)(body: A => Unit): Unit = {
    var s = Seed(seed)
    var produced = 0
    var attempts = 0
    while (produced < n && attempts < n * 20) {
      gen.apply(Gen.Parameters.default, s) match {
        case Some(a) =>
          try body(a)
          catch {
            case e: Throwable =>
              throw new AssertionError(s"property failed for sample #$produced: $a", e)
          }
          produced += 1
        case None => ()
      }
      s = s.next
      attempts += 1
    }
    require(produced >= math.min(n, 30), s"generator too restrictive: only $produced/$n samples")
  }

  /** Two-generator convenience overload. */
  def forAllSamples2[A, B](ga: Gen[A], gb: Gen[B], n: Int = 100, seed: Long = 0xC1A0L)(body: (A, B) => Unit): Unit =
    forAllSamples(Gen.zip(ga, gb), n, seed) { case (a, b) => body(a, b) }
}
