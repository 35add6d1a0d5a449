package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck bridge (the scalatest-plus adapter is not in the
  * offline cache): run a Prop and fail the surrounding ScalaTest test with
  * the ScalaCheck status on falsification.
  */
trait PropSupport {
  def checkProp(p: Prop, minSuccessful: Int = 50): Unit = {
    val params = SCTest.Parameters.default
      .withMinSuccessfulTests(minSuccessful)
      .withInitialSeed(org.scalacheck.rng.Seed(42L))
    val res = SCTest.check(params, p)
    assert(res.passed, s"scalacheck: ${res.status}")
  }
}
