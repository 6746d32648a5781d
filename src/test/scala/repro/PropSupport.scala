package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.Assertions

/** Minimal ScalaCheck bridge (only scalatest + scalacheck cores are
  * available offline — no scalatestplus artifact).
  */
trait PropSupport { this: Assertions =>
  def checkProp(prop: Prop, minSuccessful: Int = 60): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val res    = SCTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
