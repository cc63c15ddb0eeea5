package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

/** Bridge for running raw ScalaCheck properties inside ScalaTest suites
  * (the scalatestplus adapter is not available offline).
  */
trait PropSpec extends AnyFunSuite {
  def checkProp(prop: Prop, minSuccessful: Int = 50): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val result = SCTest.check(params, prop)
    assert(result.passed, s"property failed: ${result.status}")
  }
}
