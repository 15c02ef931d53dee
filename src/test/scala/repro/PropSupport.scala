package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck bridge (the scalatestplus artifact is not in the
  * offline cache): run a property and assert it passed.
  */
trait PropSupport { self: org.scalatest.Assertions =>
  def checkProp(prop: Prop, minTests: Int = 60): Unit = {
    val res = SCTest.check(
      SCTest.Parameters.default.withMinSuccessfulTests(minTests), prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
