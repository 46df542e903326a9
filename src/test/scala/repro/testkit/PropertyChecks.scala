package repro.testkit

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-check driver over ScalaCheck generators.
  *
  * The offline image ships scalacheck but not the scalatestplus bridge, so
  * suites use this trait instead of `ScalaCheckPropertyChecks`: a fixed
  * seed walks `n` generated samples through the assertion body.
  */
trait PropertyChecks {

  def forAllGen[A](gen: Gen[A], n: Int = 100, seed0: Long = 0xC0FFEEL)(f: A => Unit): Unit = {
    var seed = Seed(seed0)
    var i = 0
    while (i < n) {
      gen.apply(Gen.Parameters.default, seed).foreach(f)
      seed = seed.next
      i += 1
    }
  }

  def forAllGen2[A, B](ga: Gen[A], gb: Gen[B], n: Int = 100)(f: (A, B) => Unit): Unit =
    forAllGen(Gen.zip(ga, gb), n)(t => f(t._1, t._2))

  def forAllGen3[A, B, C](ga: Gen[A], gb: Gen[B], gc: Gen[C], n: Int = 100)
                         (f: (A, B, C) => Unit): Unit =
    forAllGen(Gen.zip(ga, gb, gc), n)(t => f(t._1, t._2, t._3))

  def forAllLongs(n: Int = 100)(f: Long => Unit): Unit =
    forAllGen(Gen.chooseNum(Long.MinValue, Long.MaxValue), n)(f)
}
