package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Bridges raw ScalaCheck into ScalaTest suites (the scalatestplus
  * adapter is not in the offline dependency set). `check` runs a property
  * with 100 cases and fails the surrounding test on the first
  * counterexample.
  */
object PropHelper {
  def check(prop: Prop, cases: Int = 100): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(cases), prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
