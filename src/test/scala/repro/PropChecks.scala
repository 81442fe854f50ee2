package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal property-testing glue: the scalatestplus bridge is not in the
  * offline cache, so we sample ScalaCheck generators deterministically and
  * assert inside the body. Seeds are fixed — failures are reproducible.
  */
trait PropChecks {

  def forAll[A](gen: Gen[A], samples: Int = 60)(body: A => Unit): Unit = {
    val params = Gen.Parameters.default
    var produced = 0
    var attempt = 0
    while (produced < samples && attempt < samples * 20) {
      gen.apply(params, Seed(0xC0FFEE00L + attempt)) match {
        case Some(a) => body(a); produced += 1
        case None    => ()
      }
      attempt += 1
    }
    assert(produced > 0, "generator produced no samples")
  }

  def forAll[A, B](ga: Gen[A], gb: Gen[B])(body: (A, B) => Unit): Unit =
    forAll(Gen.zip(ga, gb))(t => body(t._1, t._2))

  def whenever(cond: Boolean)(body: => Unit): Unit = if (cond) body
}
