package repro

import org.scalacheck.Prop
import org.scalacheck.Test.{check, Parameters}

/** Bridge to run ScalaCheck properties inside ScalaTest suites without the
  * (offline-unavailable) scalatestplus integration.
  */
trait PropHelper {
  def checkProp(prop: Prop, minTests: Int = 50): Unit = {
    val result = check(Parameters.default.withMinSuccessfulTests(minTests), prop)
    assert(result.passed, s"property failed: $result")
  }
}
