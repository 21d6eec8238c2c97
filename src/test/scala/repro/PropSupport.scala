package repro

import org.scalacheck.{Prop, Test => ScTest}

/** Minimal ScalaCheck bridge: the offline cache ships scalacheck but not
  * scalatestplus-scalacheck, so properties are executed directly and surfaced
  * as a plain assertion.
  */
trait PropSupport {
  def checkProp(p: Prop, minSuccessful: Int = 50): Unit = {
    val params = ScTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val result = ScTest.check(params, p)
    assert(result.passed, s"property failed: ${result.status}")
  }
}
