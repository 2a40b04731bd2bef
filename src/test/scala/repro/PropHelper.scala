package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaTest ↔ ScalaCheck bridge (the scalatestplus artifact is
  * not available offline): run a Prop and assert it passed.
  */
trait PropHelper { self: org.scalatest.Assertions =>
  def checkProp(prop: Prop, minSuccessful: Int = 50): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val res = SCTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
