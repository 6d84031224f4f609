package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalacheck.rng.Seed
import org.scalatest.Assertions

/** Bridges raw ScalaCheck into ScalaTest suites (the offline cache has no
  * scalatestplus integration artifact). Properties run with a fixed initial
  * seed so failures are reproducible.
  */
trait PropSupport { self: Assertions =>

  def checkProp(prop: Prop, minSuccess: Int = 100, seed: Long = 42L): Unit = {
    val params = SCTest.Parameters.default
      .withMinSuccessfulTests(minSuccess)
      .withInitialSeed(Seed(seed))
    val res = SCTest.check(params, prop)
    assert(res.passed, s"ScalaCheck property failed: ${res.status}")
  }
}
