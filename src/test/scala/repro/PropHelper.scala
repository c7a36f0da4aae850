package repro

import org.scalacheck.{Prop, Test => ScTest}

/** Minimal ScalaCheck bridge (the scalatestplus integration artifact is not
  * available offline): run a `Prop` and fail the surrounding ScalaTest test
  * with the ScalaCheck status on falsification.
  */
trait PropHelper {
  def checkProp(p: Prop, minTests: Int = 30): Unit = {
    val params = ScTest.Parameters.default.withMinSuccessfulTests(minTests)
    val res = ScTest.check(params, p)
    assert(res.passed, s"property falsified: ${res.status}")
  }
}
