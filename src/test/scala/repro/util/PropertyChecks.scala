package repro.util

import org.scalacheck.{Prop, Test => ScTest}

/** Minimal ScalaCheck bridge — the scalatestplus adapter is not in the
  * offline dependency set, so properties run through ScalaCheck's own
  * test runner and surface as a plain assertion.
  */
trait PropertyChecks {
  def checkProp(prop: Prop, minTests: Int = 60): Unit = {
    val params = ScTest.Parameters.default.withMinSuccessfulTests(minTests)
    val result = ScTest.check(params, prop)
    assert(result.passed, s"property failed: ${result.status}")
  }
}
