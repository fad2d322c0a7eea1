package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck runner for use inside ScalaTest suites — the
  * scalatestplus bridge artifact is not in the offline cache, so
  * properties are checked directly and surfaced as assertions.
  */
trait PropHelper {
  def checkProp(p: Prop, minSuccessful: Int = 30): Unit = {
    val params = SCTest.Parameters.default
      .withMinSuccessfulTests(minSuccessful)
      .withInitialSeed(org.scalacheck.rng.Seed(42L))
    val res = SCTest.check(params, p)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
