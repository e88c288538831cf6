package bench

import repro.SparkSpec
import repro.data.CityConfig
import repro.exp.Experiments
import repro.exp.Experiments.SearchRow

/** Table IV — "Performance of the search algorithms": Ternary Search and
  * Iterative Method vs Brute-force Search over 48 per-slot OGSS instances
  * in each of the three cities.
  *
  * Paper reference values:
  *   NYC     Ternary 7.03h/52.08%/97.83%  Iterative 5.58h/81.25%/98.77%  Brute 47.43h/100%/100%
  *   Chengdu Ternary 6.32h/70.83%/98.35%  Iterative 4.53h/95.83%/99.77%  Brute 43.26h/100%/100%
  *   Xi'an   Ternary 3.90h/60.42%/97.98%  Iterative 3.31h/91.67%/97.98%  Brute 21.76h/100%/100%
  *
  * Our cost unit is seconds (aggregation substrate, not GPU training) plus
  * the count of UpperBound evaluations — the quantity the paper's hours
  * are proportional to.
  */
class Table4Bench extends SparkSpec {

  private lazy val rows: Map[String, Seq[SearchRow]] = {
    val all = CityConfig.benchCities.map { c =>
      c.name -> Experiments.table4(BenchData.env(spark, c))
    }.toMap
    println("TABLE4 | City | Algorithm | Cost (s) | Evals | Probability | OR")
    for (c <- CityConfig.benchCities; r <- all(c.name)) {
      println(f"TABLE4 | ${r.city}%-7s | ${r.algorithm}%-18s | ${r.costSec}%8.1f | " +
        f"${r.evals}%3d | ${r.probabilityPct}%6.2f%% | ${r.optimalRatioPct}%6.2f%%")
    }
    all
  }

  private def byAlg(city: String, alg: String): SearchRow =
    rows(city).find(_.algorithm == alg).get

  test("brute force is exact by construction (probability = OR = 100%)") {
    for (c <- CityConfig.benchCities) {
      val b = byAlg(c.name, "Brute-force Search")
      assert(b.probabilityPct == 100.0)
      assert(math.abs(b.optimalRatioPct - 100.0) < 1e-9)
      assert(b.evals == Experiments.SearchHi - Experiments.SearchLo + 1)
    }
  }

  test("both heuristics evaluate far fewer grid sizes than brute force") {
    for (c <- CityConfig.benchCities) {
      val b = byAlg(c.name, "Brute-force Search").evals
      assert(byAlg(c.name, "Ternary Search").evals < b)
      assert(byAlg(c.name, "Iterative Method").evals < b)
    }
  }

  test("both heuristics cost less wall time than brute force") {
    for (c <- CityConfig.benchCities) {
      val b = byAlg(c.name, "Brute-force Search").costSec
      assert(byAlg(c.name, "Ternary Search").costSec < b)
      assert(byAlg(c.name, "Iterative Method").costSec < b)
    }
  }

  test("heuristics find the per-slot optimum with substantial probability") {
    for (c <- CityConfig.benchCities; alg <- Seq("Ternary Search", "Iterative Method")) {
      val p = byAlg(c.name, alg).probabilityPct
      assert(p >= 25.0, s"${c.name}/$alg probability $p%")
    }
  }

  test("optimal ratio stays within a few percent of optimal (paper: ≥ 97%)") {
    for (c <- CityConfig.benchCities; alg <- Seq("Ternary Search", "Iterative Method")) {
      val or = byAlg(c.name, alg).optimalRatioPct
      assert(or >= 90.0, s"${c.name}/$alg OR $or%")
    }
  }

  test("iterative method beats ternary on hit probability (paper's ordering)") {
    // The paper also reports lower cost for Iterative; with our all-slot
    // memoized evaluator the *distinct grid sizes* visited across 48 slots
    // slightly favor Ternary (its probe points barely depend on the slot),
    // so the robust reproduced ordering is the success probability.
    for (c <- CityConfig.benchCities) {
      val t = byAlg(c.name, "Ternary Search")
      val i = byAlg(c.name, "Iterative Method")
      assert(i.probabilityPct >= t.probabilityPct,
        s"${c.name}: iter=${i.probabilityPct}% tern=${t.probabilityPct}%")
    }
  }
}
