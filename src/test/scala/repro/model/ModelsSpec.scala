package repro.model

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Rng

class ModelsSpec extends AnyFunSuite {

  test("three tiers with strictly increasing history window") {
    val ks = Models.all.map(_.k)
    assert(ks == Seq(1, 4, 28))
    assert(Models.all.map(_.name) == Seq("lastday", "ha4", "ha28"))
  }

  test("byName resolves and rejects unknowns") {
    assert(Models.byName("ha4") == Models.ha4)
    assertThrows[NoSuchElementException](Models.byName("deepst"))
  }

  test("invalid window rejected") {
    assertThrows[IllegalArgumentException](ModelTier("bad", 0))
  }

  test("accuracy ladder: MAE of HA(k) on Poisson data decreases with k") {
    // simulate: alpha=6, predict day t as mean of previous k days
    val alpha = 6.0
    val days = 40
    val trials = 4000
    def mae(k: Int): Double = {
      var s = 0.0
      for (t <- 0 until trials) {
        val draws = Array.tabulate(days)(d => Rng.poisson(alpha, Rng.key(77, t, d)).toDouble)
        val pred = draws.slice(days - 1 - k, days - 1).sum / k
        s += math.abs(pred - draws(days - 1))
      }
      s / trials
    }
    val maes = Seq(1, 4, 28).map(mae)
    assert(maes(0) > maes(1) && maes(1) > maes(2), maes.toString)
  }
}
