package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-testing harness over ScalaCheck
  * generators. (The scalatest↔scalacheck bridge artifact is not available
  * offline, so suites drive `Gen` directly: each trial evaluates the
  * generator at a fixed seed and runs the assertion body.)
  */
trait GenChecks {
  def forAllG[A](gen: Gen[A], trials: Int = 100)(f: A => Unit): Unit =
    (0 until trials).foreach { i =>
      val a = gen.pureApply(Gen.Parameters.default, Seed(0xC0FFEEL + i * 7919L))
      f(a)
    }
}
