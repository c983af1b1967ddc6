package repro

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Prop, Test => SCTest}

/** Bridges raw scalacheck into scalatest suites (the scalatestplus bridge
  * artifact is not available offline): run a Prop and assert it passed.
  */
trait PropSupport { self: AnyFunSuite =>
  def checkProp(prop: Prop, minTests: Int = 50): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minTests)
    val res = SCTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
