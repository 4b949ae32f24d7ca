package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal property-testing bridge: the offline image has scalacheck but
  * not scalatestplus, so suites sample generators directly. */
trait PropHelpers {
  /** Run `body` on `n` deterministic samples of `gen`. */
  def forAllN[T](gen: Gen[T], n: Int = 30)(body: T => Unit): Unit = {
    var i = 0
    while (i < n) {
      gen.apply(Gen.Parameters.default, Seed(i.toLong * 7919 + 13)) match {
        case Some(v) =>
          try body(v)
          catch {
            case e: Throwable =>
              throw new AssertionError(s"property failed for sample #$i: $v", e)
          }
        case None =>
      }
      i += 1
    }
  }
}
