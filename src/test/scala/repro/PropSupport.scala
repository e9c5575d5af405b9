package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck runner (the scalatestplus bridge is not in the offline
  * cache). `checkProp` runs a property and fails the scalatest test with the
  * ScalaCheck result on falsification.
  */
trait PropSupport { self: org.scalatest.Assertions =>
  def checkProp(prop: Prop, minTests: Int = 50): Unit = {
    val result = SCTest.check(
      SCTest.Parameters.default.withMinSuccessfulTests(minTests), prop)
    assert(result.passed, result.status.toString)
  }
}
