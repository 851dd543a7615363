package repro

import org.scalacheck.{Prop, Test => ScTest}
import org.scalatest.Assertions

/** Minimal ScalaCheck ↔ ScalaTest bridge (the scalatestplus adapter artifact
  * is not available offline): run a `Prop` and fail the ScalaTest test with
  * the ScalaCheck report if it does not pass.
  */
trait PropertyCheck extends Assertions {
  def checkProp(prop: Prop, minSuccessful: Int = 100): Unit = {
    val params = ScTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val result = ScTest.check(params, prop)
    assert(result.passed, s"property failed: ${ScTest.Result.toString} ${result.status}")
  }
}
