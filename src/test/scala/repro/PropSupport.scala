package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.Assertions

/** Bridges raw ScalaCheck into FunSuite tests (scalatestplus-scalacheck is
  * not available offline): run a Prop with a fixed seed count and fail the
  * surrounding test if it does not pass.
  */
trait PropSupport extends Assertions {

  def checkProp(prop: Prop, tries: Int = 60): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(tries)
    val result = SCTest.check(params, prop)
    assert(result.passed, s"property failed: ${result.status}")
  }
}
