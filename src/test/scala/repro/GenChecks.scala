package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal ScalaCheck-in-ScalaTest driver: the image ships raw scalacheck
  * but not the org.scalatestplus bridge, so properties are exercised by
  * sampling a Gen deterministically and asserting inside the loop.
  */
trait GenChecks {
  def forAllG[A](gen: Gen[A], n: Int = 60)(f: A => Unit): Unit = {
    var i = 0
    while (i < n) {
      f(gen.pureApply(Gen.Parameters.default, Seed(0xC0FFEE + i.toLong)))
      i += 1
    }
  }
  def forAllG2[A, B](ga: Gen[A], gb: Gen[B], n: Int = 60)(f: (A, B) => Unit): Unit =
    forAllG(Gen.zip(ga, gb), n) { case (a, b) => f(a, b) }
  def forAllG3[A, B, C](ga: Gen[A], gb: Gen[B], gc: Gen[C], n: Int = 60)(f: (A, B, C) => Unit): Unit =
    forAllG(Gen.zip(ga, gb, gc), n) { case (a, b, c) => f(a, b, c) }
}
