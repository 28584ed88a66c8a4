package repro

import org.scalacheck.{Prop, Test => ScTest}

/** Thin scalacheck runner for ScalaTest suites (the scalatestplus bridge is
  * not in the offline cache, so properties are executed directly).
  */
trait PropCheck {
  def checkProp(prop: Prop, minTests: Int = 100): Unit = {
    val params = ScTest.Parameters.default.withMinSuccessfulTests(minTests)
    val res = ScTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
