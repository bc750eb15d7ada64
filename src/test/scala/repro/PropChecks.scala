package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.Assertions

/** Bridges raw scalacheck (no scalatestplus in this image) into funsuite:
  * run a property and fail the test if it does not pass.
  */
trait PropChecks { this: Assertions =>
  def checkProp(prop: Prop, minTests: Int = 50): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(minTests), prop)
    assert(res.passed, s"ScalaCheck property failed: ${res.status}")
  }
}
