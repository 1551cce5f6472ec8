package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck-in-ScalaTest bridge — the offline image carries
  * scalacheck but not the scalatestplus adapter, so suites run properties
  * through this helper and assert the result.
  */
trait PropSupport {
  def checkProp(prop: Prop, minTests: Int = 50): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(minTests), prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
