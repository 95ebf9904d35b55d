package repro.testkit

import org.scalacheck.{Prop, Test => SCTest}
import org.scalacheck.rng.Seed

/** Minimal ScalaCheck-in-ScalaTest bridge.
  *
  * The offline image ships scalatest and scalacheck but not the
  * `scalatestplus` bridge artifact, so properties are executed through
  * ScalaCheck's own runner with a fixed seed (deterministic CI) and surfaced
  * as a plain assertion.
  */
trait Props {
  def checkProp(prop: Prop, minTests: Int = 60): Unit = {
    val params = SCTest.Parameters.default
      .withMinSuccessfulTests(minTests)
      .withInitialSeed(Seed(42L))
    val res = SCTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
