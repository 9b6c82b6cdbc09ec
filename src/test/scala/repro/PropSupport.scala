package repro

import org.scalacheck.{Prop, Test => SchkTest}
import org.scalatest.Assertions

/** Minimal ScalaCheck bridge (the scalatestplus adapter is not among the
  * offline deps): run a property with a fixed seed budget and fail the
  * surrounding ScalaTest test with the counterexample on falsification.
  */
trait PropSupport extends Assertions {
  def checkProp(p: Prop, minTests: Int = 40): Unit = {
    val params = SchkTest.Parameters.default
      .withMinSuccessfulTests(minTests)
      .withInitialSeed(org.scalacheck.rng.Seed(12345L))
    val res = SchkTest.check(params, p)
    assert(res.passed, s"property falsified: ${res.status}")
  }
}
