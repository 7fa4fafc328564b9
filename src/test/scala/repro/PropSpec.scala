package repro

import org.scalacheck.{Prop, Test => ScTest}

/** Minimal ScalaCheck bridge (the scalatestplus adapter artifact is not
  * in the offline dependency set): run a property and fail the
  * surrounding ScalaTest test if it does not pass.
  */
trait PropSpec { self: org.scalatest.Assertions =>
  def checkProp(prop: Prop, minTests: Int = 50): Unit = {
    val res = ScTest.check(
      ScTest.Parameters.default.withMinSuccessfulTests(minTests), prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
