package repro

import org.scalacheck.Gen

/** Minimal property-testing bridge: scalatestplus is not available offline,
  * so suites sample ScalaCheck generators directly.
  */
trait PropHelpers {
  def forSamples[A](gen: Gen[A], n: Int = 100)(f: A => Unit): Unit = {
    var produced = 0
    var attempts = 0
    while (produced < n && attempts < n * 10) {
      gen.sample match {
        case Some(a) => f(a); produced += 1
        case None    => ()
      }
      attempts += 1
    }
    assert(produced > 0, "generator produced no samples")
  }
}
