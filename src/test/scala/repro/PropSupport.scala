package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

/** Raw-ScalaCheck bridge (the scalatestplus artifact is not in the offline
  * cache): run a Prop with a fixed seed count and assert it passed.
  */
trait PropSupport { self: AnyFunSuite =>
  def checkProp(p: Prop, minTests: Int = 50): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(minTests), p)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
