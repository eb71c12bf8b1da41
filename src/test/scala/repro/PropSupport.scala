package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-checking bridge: the offline cache has raw
  * scalacheck but not scalatestplus, so this drives Gen sampling directly
  * (fixed seeds => reproducible failures).
  */
trait PropSupport {
  protected def propIterations: Int = 50

  def forAllG[A](g: Gen[A])(f: A => Unit): Unit = {
    var i = 0
    while (i < propIterations) {
      val a = g.pureApply(Gen.Parameters.default, Seed(1000L + i))
      try f(a)
      catch {
        case e: Throwable =>
          throw new AssertionError(s"property failed for input $a (iteration $i)", e)
      }
      i += 1
    }
  }

  def forAllG[A, B](ga: Gen[A], gb: Gen[B])(f: (A, B) => Unit): Unit =
    forAllG(Gen.zip(ga, gb))(t => f(t._1, t._2))

  def forAllG[A, B, C](ga: Gen[A], gb: Gen[B], gc: Gen[C])(f: (A, B, C) => Unit): Unit =
    forAllG(Gen.zip(ga, gb, gc))(t => f(t._1, t._2, t._3))
}
