package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-testing driver.
  *
  * The offline cache ships scalacheck but not the scalatestplus bridge, so we
  * pull samples from a Gen directly with fixed seeds and run assertions on
  * each — reproducible across runs, no implicit integration needed.
  */
trait GenDriven {

  /** Run `f` on `n` deterministic samples of `gen`. */
  def forAllG[A](gen: Gen[A], n: Int = 60)(f: A => Unit): Unit = {
    var produced = 0
    var attempts = 0
    while (produced < n && attempts < n * 20) {
      gen(Gen.Parameters.default, Seed(attempts.toLong)) match {
        case Some(a) => f(a); produced += 1
        case None    =>
      }
      attempts += 1
    }
    assert(produced >= math.max(1, n / 2),
           s"generator produced too few samples ($produced of $n)")
  }
}
