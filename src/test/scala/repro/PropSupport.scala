package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.Assertions

/** Minimal ScalaTest ↔ ScalaCheck bridge.
  *
  * The offline image ships scalatest and scalacheck but not the
  * `scalatestplus` integration artifact, so property checks run through
  * scalacheck's own runner and surface as a single assertion.
  */
trait PropSupport { self: Assertions =>

  /** Run `prop` with `n` successful cases required; fail the test with the
    * scalacheck status (including the shrunk counterexample) otherwise.
    */
  def checkProp(prop: Prop, n: Int = 100): Unit = {
    val params = SCTest.Parameters.default
      .withMinSuccessfulTests(n)
      .withInitialSeed(org.scalacheck.rng.Seed(42L))
    val res = SCTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
