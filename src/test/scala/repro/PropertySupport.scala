package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.Assertions

/** Bridges raw ScalaCheck (scalatestplus is not in the offline cache) into
  * ScalaTest suites: `checkProp(prop)` runs 100 cases and fails the test
  * with ScalaCheck's reporting on the first counterexample.
  */
trait PropertySupport extends Assertions {

  def checkProp(prop: Prop, minSuccessful: Int = 100): Unit = {
    val params = SCTest.Parameters.default
      .withMinSuccessfulTests(minSuccessful)
      .withWorkers(1)
    val result = SCTest.check(params, prop)
    assert(result.passed, s"property failed: ${SCTest.Parameters.default}: ${result.status}")
  }
}
