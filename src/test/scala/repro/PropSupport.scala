package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

/** Bridge between ScalaCheck and ScalaTest (the scalatestplus bridge is not
  * in the offline dependency set, so properties are run through ScalaCheck's
  * own test runner and surfaced as a single ScalaTest assertion).
  */
trait PropSupport { this: AnyFunSuite =>

  /** Run `prop` with 100 successful cases; fail the test with ScalaCheck's
    * diagnostics otherwise. */
  def checkProp(prop: Prop, minSuccessful: Int = 100): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val result = SCTest.check(params, prop)
    result.status match {
      case SCTest.PropException(_, e, _) => throw e
      case _ => ()
    }
    assert(result.passed, "ScalaCheck: " + result.status.toString)
  }
}
