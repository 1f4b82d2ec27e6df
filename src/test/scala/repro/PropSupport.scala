package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck bridge: the scalatestplus integration artifact is not
  * in the offline cache, so properties are checked directly and surfaced as
  * a ScalaTest assertion.
  */
trait PropSupport { self: org.scalatest.Assertions =>
  def checkProp(p: Prop, minSuccessful: Int = 60): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val result = SCTest.check(params, p)
    assert(result.passed, s"property failed: ${result.status}")
  }
}
