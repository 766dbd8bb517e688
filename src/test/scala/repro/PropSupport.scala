package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck bridge: the offline dependency set has scalacheck but
  * not the scalatestplus adapter, so property tests run ScalaCheck directly
  * and surface failures as plain assertions.
  */
trait PropSupport {
  def checkProp(p: Prop, minTests: Int = 50): Unit = {
    val res = SCTest.check(
      SCTest.Parameters.default.withMinSuccessfulTests(minTests), p)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
