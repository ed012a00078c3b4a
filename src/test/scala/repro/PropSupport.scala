package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.Assertions

/** Minimal ScalaCheck bridge (the scalatestplus artifact is not available
  * offline): run a Prop and fail the surrounding ScalaTest test on a
  * falsified property.
  */
trait PropSupport extends Assertions {
  def checkProp(p: Prop, label: String = "property"): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(50), p)
    assert(res.passed, s"$label falsified: ${res.status}")
  }
}
