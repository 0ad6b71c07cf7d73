package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.Assertions

/** Minimal scalatest/scalacheck bridge (the scalatestplus artifact is not
  * in the offline cache): run a Prop and fail the surrounding test with the
  * counter-example on falsification.
  */
trait PropSupport extends Assertions {
  def checkProp(prop: Prop, minTests: Int = 200): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(minTests), prop)
    assert(res.passed, s"property falsified: ${res.status}")
  }
}
