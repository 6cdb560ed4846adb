package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck bridge: the image ships raw scalacheck without the
  * scalatestplus adapter, so suites run properties through this helper.
  */
trait PropSupport {
  def checkProp(prop: Prop, minTests: Int = 50): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minTests)
    val result = SCTest.check(params, prop)
    assert(result.passed, s"property failed: ${result.status}")
  }
}
