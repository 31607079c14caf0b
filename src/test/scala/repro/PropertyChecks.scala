package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-check harness over raw ScalaCheck
  * generators (the scalatest/scalacheck bridge artifact is not available
  * offline). `forAll` draws `trials` samples from a fixed seed sequence
  * and runs the assertion body on each.
  */
trait PropertyChecks {

  protected def propertyTrials: Int = 100

  def forAll[A](gen: Gen[A])(f: A => Unit): Unit = {
    var seed = Seed(987654321L)
    var done = 0
    var misses = 0
    while (done < propertyTrials) {
      gen.apply(Gen.Parameters.default, seed) match {
        case Some(a) => f(a); done += 1
        case None =>
          misses += 1
          require(misses < propertyTrials * 50, "generator kept failing its filters")
      }
      seed = seed.next
    }
  }

  def forAll[A, B](ga: Gen[A], gb: Gen[B])(f: (A, B) => Unit): Unit =
    forAll(Gen.zip(ga, gb))(t => f(t._1, t._2))

  def forAll[A, B, C](ga: Gen[A], gb: Gen[B], gc: Gen[C])(f: (A, B, C) => Unit): Unit =
    forAll(Gen.zip(ga, gb, gc))(t => f(t._1, t._2, t._3))

  /** Skip the body when a sampled precondition fails (scalatest-style). */
  def whenever(cond: Boolean)(body: => Unit): Unit = if (cond) body
}
