package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalacheck.rng.Seed
import org.scalatest.Assertions

/** Minimal ScalaCheck ↔ ScalaTest bridge (the `scalatestplus` artifact is
  * not in the offline cache). Runs a property deterministically and fails
  * the enclosing ScalaTest test on falsification.
  */
trait PropCheck extends Assertions {
  def checkProp(prop: Prop, minSuccess: Int = 50, seed: Long = 42L): Unit = {
    val params = SCTest.Parameters.default
      .withMinSuccessfulTests(minSuccess)
      .withInitialSeed(Seed(seed))
    val res = SCTest.check(params, prop)
    assert(res.passed, s"property falsified: ${res.status}")
  }
}
