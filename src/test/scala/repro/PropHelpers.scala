package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal property-check helper: samples ScalaCheck generators with a
  * fixed seed (the scalatestplus bridge is not on the offline classpath).
  */
trait PropHelpers {

  val DefaultTrials = 200

  def forAllG[A](gen: Gen[A], trials: Int = DefaultTrials)(body: A => Unit): Unit = {
    var seed = Seed(0xC0FFEEL)
    var i    = 0
    var produced = 0
    while (produced < trials && i < trials * 20) {
      gen.apply(Gen.Parameters.default, seed) match {
        case Some(a) =>
          try body(a)
          catch {
            case e: Throwable =>
              throw new AssertionError(s"property failed for input $a: ${e.getMessage}", e)
          }
          produced += 1
        case None =>
      }
      seed = seed.next
      i += 1
    }
    require(produced == trials, s"generator too sparse: $produced/$trials")
  }

  def forAllG2[A, B](ga: Gen[A], gb: Gen[B], trials: Int = DefaultTrials)(body: (A, B) => Unit): Unit =
    forAllG(Gen.zip(ga, gb), trials) { case (a, b) => body(a, b) }

  def forAllG3[A, B, C](ga: Gen[A], gb: Gen[B], gc: Gen[C], trials: Int = DefaultTrials)(
      body: (A, B, C) => Unit): Unit =
    forAllG(Gen.zip(ga, gb, gc), trials) { case (a, b, c) => body(a, b, c) }
}
