package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-testing bridge.
  *
  * The image ships scalacheck but not the scalatestplus bridge, so suites mix
  * this in and call `forAll(gen)(assertion)`: it draws `samples` values from
  * the generator with a fixed seed and runs the assertion on each.
  */
trait PropSampling {
  def samples: Int = 200

  def forAll[A](g: Gen[A])(f: A => Unit): Unit = {
    var seed = Seed(42L)
    var drawn = 0
    var attempts = 0
    while (drawn < samples && attempts < samples * 10) {
      g.apply(Gen.Parameters.default, seed) match {
        case Some(a) => f(a); drawn += 1
        case None    => ()
      }
      seed = seed.next
      attempts += 1
    }
    require(drawn > 0, "generator produced no values")
  }

  def forAll[A, B](ga: Gen[A], gb: Gen[B])(f: (A, B) => Unit): Unit =
    forAll(Gen.zip(ga, gb)) { case (a, b) => f(a, b) }
}
