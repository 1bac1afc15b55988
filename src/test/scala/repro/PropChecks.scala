package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal property-testing bridge: the offline image ships scalacheck but
  * not the org.scalatestplus bridge artifact, so suites sample generators
  * directly and assert inside the loop.
  */
trait PropChecks {
  protected def samples: Int = 50

  private def stream[A](gen: Gen[A]): Iterator[A] = {
    var seed = Seed(0xC0FFEE)
    Iterator.continually {
      val a = gen.pureApply(Gen.Parameters.default, seed, retries = 1000)
      seed = seed.next
      a
    }
  }

  def forAllSampled[A](gen: Gen[A])(body: A => Unit): Unit =
    stream(gen).take(samples).foreach(body)

  def forAllSampled[A, B](ga: Gen[A], gb: Gen[B])(body: (A, B) => Unit): Unit =
    forAllSampled(Gen.zip(ga, gb)) { case (a, b) => body(a, b) }

  def forAllSampled[A, B, C](ga: Gen[A], gb: Gen[B], gc: Gen[C])(body: (A, B, C) => Unit): Unit =
    forAllSampled(Gen.zip(ga, gb, gc)) { case (a, b, c) => body(a, b, c) }
}
