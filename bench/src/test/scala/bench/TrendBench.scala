package bench

import repro.SparkSpec
import repro.data.CityConfig
import repro.exp.Experiments
import repro.model.Models

/** Shape check behind the paper's Figures 3–5 (and the premise of Tables
  * III/IV): expression error falls with n, model error rises with n, the
  * upper bound is U-shaped with an interior minimum, real error stays
  * below the bound and dips in the same region, and more accurate models
  * push the optimum toward larger n (paper §V-C: MLP 13² < DeepST 16² <
  * DMVST-Net 23² on NYC; Xi'an's optimum smaller than NYC's).
  *
  * Prints `TREND` rows consumed by EXPERIMENTS.md.
  */
class TrendBench extends SparkSpec {

  private val nSides = Seq(2, 3, 4, 6, 8, 12, 16, 20, 24, 28, 32)

  private lazy val rows = {
    val all = CityConfig.benchCities.flatMap { c =>
      Experiments.trend(BenchData.env(spark, c), nSides)
    }
    println("TREND | city | model | nSide | exprErr | modelErr | upper | realErr")
    all.foreach { r =>
      println(f"TREND | ${r.city}%-7s | ${r.model}%-7s | ${r.nSide}%2d | " +
        f"${r.exprErr}%12.1f | ${r.modelErr}%12.1f | ${r.upper}%12.1f | ${r.realErr}%12.1f")
    }
    all
  }

  private def byCityModel(city: String, model: String) =
    rows.filter(r => r.city == city && r.model == model).sortBy(_.nSide)

  private def optOf(city: String, model: String): Int =
    byCityModel(city, model).minBy(_.upper).nSide

  test("expression error decreases in n (Fig. 3)") {
    for (c <- CityConfig.benchCities) {
      val e = byCityModel(c.name, "ha4").map(_.exprErr)
      // ≤2% local tolerance: uneven block sizes at non-dividing n wiggle
      assert(e.zip(e.tail).forall { case (a, b) => b <= a * 1.02 }, s"${c.name}: $e")
      assert(e.last < e.head, s"${c.name} not decreasing overall")
    }
  }

  test("expression error ordering across cities: nyc > chengdu > xian (Fig. 3)") {
    def at16(city: String) = byCityModel(city, "ha4").find(_.nSide == 16).get.exprErr
    assert(at16("nyc") > at16("chengdu"), s"${at16("nyc")} vs ${at16("chengdu")}")
    assert(at16("chengdu") > at16("xian"), s"${at16("chengdu")} vs ${at16("xian")}")
  }

  test("model error grows with n for every tier (Fig. 4 / Eq. 20)") {
    for (c <- CityConfig.benchCities; m <- Models.all.map(_.name)) {
      val e = byCityModel(c.name, m).map(_.modelErr)
      assert(e.zip(e.tail).forall { case (a, b) => b >= a * 0.98 }, s"${c.name}/$m: $e")
      assert(e.last > 2 * e.head, s"${c.name}/$m growth too weak")
    }
  }

  test("model accuracy ladder holds at every n (Fig. 4)") {
    for (c <- CityConfig.benchCities; n <- nSides) {
      val at = Models.all.map(m =>
        rows.find(r => r.city == c.name && r.model == m.name && r.nSide == n).get)
      assert(at(0).modelErr >= at(1).modelErr && at(1).modelErr >= at(2).modelErr,
        s"${c.name} n=$n: ${at.map(_.modelErr)}")
    }
  }

  test("real error stays below its upper bound (Theorem II.1)") {
    for (r <- rows) {
      assert(r.realErr <= r.upper * 1.05 + 1e-6, s"$r")
    }
  }

  test("upper bound is U-shaped with an interior minimum (Fig. 5)") {
    for (c <- CityConfig.benchCities; m <- Seq("ha4", "ha28")) {
      val minN = optOf(c.name, m)
      assert(minN > nSides.head && minN < nSides.last,
        s"${c.name}/$m: upper-bound argmin at boundary $minN")
    }
  }

  test("minimizing the bound nearly minimizes the real error (Thm. II.1 in action)") {
    for (c <- CityConfig.benchCities; m <- Seq("ha4", "ha28")) {
      val e = byCityModel(c.name, m)
      val realAtBoundOpt = e.find(_.nSide == optOf(c.name, m)).get.realErr
      val bestReal = e.map(_.realErr).min
      assert(realAtBoundOpt <= bestReal * 1.15,
        s"${c.name}/$m: real at bound-opt $realAtBoundOpt vs best $bestReal")
    }
  }

  test("more accurate prediction model ⇒ optimal n at least as large (§V-C)") {
    for (c <- CityConfig.benchCities) {
      val (l, h4, h28) = (optOf(c.name, "lastday"), optOf(c.name, "ha4"), optOf(c.name, "ha28"))
      assert(h28 >= h4 && h4 >= l, s"${c.name}: lastday=$l ha4=$h4 ha28=$h28")
      println(s"TREND-OPT | ${c.name} | lastday=$l ha4=$h4 ha28=$h28")
    }
  }

  test("NYC's optimal n exceeds Xi'an's (paper §V-C)") {
    assert(optOf("nyc", "ha4") > optOf("xian", "ha4"))
  }
}
