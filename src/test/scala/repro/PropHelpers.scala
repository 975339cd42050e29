package repro

import org.scalacheck.Gen

/** Minimal property-check driver over ScalaCheck generators.
  *
  * The offline image ships scalacheck but not the scalatestplus bridge, so
  * suites sample generators directly: each `forAllG` runs the assertion body
  * over `n` sampled values (retrying empty samples).
  */
trait PropHelpers {

  private def draw[A](gen: Gen[A]): A = {
    var i = 0
    while (i < 100) {
      gen.sample match {
        case Some(a) => return a
        case None    => i += 1
      }
    }
    throw new IllegalStateException("generator failed to produce a value in 100 tries")
  }

  def forAllG[A](gen: Gen[A], n: Int = 30)(f: A => Unit): Unit =
    (0 until n).foreach(_ => f(draw(gen)))

  def forAllG[A, B](g1: Gen[A], g2: Gen[B])(f: (A, B) => Unit): Unit =
    (0 until 30).foreach(_ => f(draw(g1), draw(g2)))

  def forAllG[A, B, C](g1: Gen[A], g2: Gen[B], g3: Gen[C])(f: (A, B, C) => Unit): Unit =
    (0 until 30).foreach(_ => f(draw(g1), draw(g2), draw(g3)))
}
