package repro

import org.scalacheck.{Prop, Test => SC}

/** Minimal ScalaCheck↔ScalaTest bridge (the scalatestplus artifact is not
  * in the offline cache). Properties run with a fixed seed for
  * reproducibility; failures surface through a plain assert.
  */
trait PropChecks {
  def checkProp(p: Prop, min: Int = 50): Unit = {
    val params = SC.Parameters.default
      .withMinSuccessfulTests(min)
      .withInitialSeed(org.scalacheck.rng.Seed(20220094L))
    val r = SC.check(params, p)
    assert(r.passed, s"property failed: ${r.status}")
  }
}
