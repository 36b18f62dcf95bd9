package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

/** Minimal ScalaCheck-in-ScalaTest bridge (the scalatestplus adapter is not
  * available offline): registers a ScalaTest test that runs a ScalaCheck
  * property and fails with the reported status if it does not pass.
  */
trait PropSpec { self: AnyFunSuite =>
  def checkProp(name: String, minSuccessful: Int = 50)(prop: => Prop): Unit =
    test(name) {
      val params = SCTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
      val result = SCTest.check(params, prop)
      assert(result.passed, s"property failed: ${result.status}")
    }
}
