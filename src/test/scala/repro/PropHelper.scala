package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-testing bridge: the image's offline cache
  * has scalacheck but not the scalatestplus glue, so suites drive generators
  * directly. Failures surface as normal scalatest assertion errors with the
  * generated value in scope.
  */
object PropHelper {
  def forAllSeeded[A](gen: Gen[A], n: Int = 200, seed0: Long = 42L)(f: A => Unit): Unit = {
    var seed = Seed(seed0)
    var produced = 0
    var attempts = 0
    while (produced < n && attempts < n * 10) {
      gen.apply(Gen.Parameters.default, seed) match {
        case Some(a) => f(a); produced += 1
        case None    => ()
      }
      seed = seed.next
      attempts += 1
    }
    require(produced > n / 2, s"generator produced too few values ($produced/$n)")
  }
}
