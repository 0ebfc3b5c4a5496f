package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.Assertions

/** Minimal scalacheck bridge (the scalatestplus adapter is not available
  * offline): run a property with the default parameters and fail the
  * surrounding ScalaTest test if it does not pass.
  */
trait PropSupport extends Assertions {
  def checkProp(p: Prop, minTests: Int = 100): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(minTests), p)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
