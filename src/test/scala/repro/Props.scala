package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-testing harness over raw ScalaCheck
  * generators (the scalatest-scalacheck bridge artifact is not available in
  * the offline image).
  */
object Props {
  val DefaultRuns = 100

  def forAll[A](g: Gen[A], runs: Int = DefaultRuns)(f: A => Unit): Unit = {
    var seed = Seed(0xbeef1e5L)
    (0 until runs).foreach { i =>
      val v = g.pureApply(Gen.Parameters.default, seed)
      try f(v)
      catch {
        case t: Throwable =>
          throw new AssertionError(s"property failed at run $i for input $v: ${t.getMessage}", t)
      }
      seed = seed.next
    }
  }

  def forAll2[A, B](ga: Gen[A], gb: Gen[B], runs: Int = DefaultRuns)(f: (A, B) => Unit): Unit =
    forAll(Gen.zip(ga, gb), runs)(t => f(t._1, t._2))

  def forAll3[A, B, C](ga: Gen[A], gb: Gen[B], gc: Gen[C], runs: Int = DefaultRuns)(
      f: (A, B, C) => Unit): Unit =
    forAll(Gen.zip(ga, gb, gc), runs)(t => f(t._1, t._2, t._3))
}
