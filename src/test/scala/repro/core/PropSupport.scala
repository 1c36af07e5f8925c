package repro.core

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck bridge: the scalatestplus adapter is not in the
  * offline cache, so properties are run through scalacheck's own runner and
  * asserted to pass.
  */
trait PropSupport {
  def checkProp(prop: Prop, minTests: Int = 50): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minTests)
    val res = SCTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
