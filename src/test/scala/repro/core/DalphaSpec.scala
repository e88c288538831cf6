package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.{CityConfig, EventGen, GridCounts}

/** D_α(N) (Eq. 2), Theorem III.1, and N-selection. */
class DalphaSpec extends SparkSpec {
  import spark.implicits._

  private lazy val toy = CityConfig.toy
  private lazy val counts =
    GridCounts.at(EventGen.eventsDf(spark, toy.copy(days = 4, dailyOrders = 500)), 8).cache()

  test("perSlot matches DuckDB (including absent zero cells)") {
    val side = 8
    val alphaDf = GridCounts.alpha(counts, 0, 4)
    val got = Dalpha.perSlot(alphaDf, side)
    val n = side * side
    Oracle.assertEquivalent(
      got,
      s"""WITH m AS (
         |  SELECT slot, SUM(CAST(alpha AS DOUBLE)) / $n AS meanAlpha, COUNT(*) AS present
         |  FROM a GROUP BY slot)
         |SELECT a.slot,
         |  SUM(ABS(CAST(a.alpha AS DOUBLE) - m.meanAlpha))
         |    + ($n - MAX(m.present)) * MAX(m.meanAlpha) AS dAlpha
         |FROM a JOIN m ON a.slot = m.slot
         |GROUP BY a.slot""".stripMargin,
      "a" -> alphaDf)
  }

  test("uniform distribution gives D_α = 0") {
    val alphaDf = Seq.tabulate(16)(i => (0, i / 4, i % 4, 2.5)).toDF("slot", "cx", "cy", "alpha")
    val d = Dalpha.perSlot(alphaDf, 4).head.getDouble(1)
    assert(math.abs(d) < 1e-9)
  }

  test("Theorem III.1: refining uniform HGrids K× preserves D_α") {
    // base 2×2 lattice with uneven α; refine each cell into 2×2 uniform quarters
    val base = Seq((0, 0, 0, 8.0), (0, 0, 1, 2.0), (0, 1, 0, 4.0), (0, 1, 1, 6.0))
      .toDF("slot", "cx", "cy", "alpha")
    val refined = base.collect().toSeq.flatMap { r =>
      val (cx, cy, a) = (r.getInt(1), r.getInt(2), r.getDouble(3))
      for (dx <- 0 to 1; dy <- 0 to 1) yield (0, cx * 2 + dx, cy * 2 + dy, a / 4)
    }.toDF("slot", "cx", "cy", "alpha")
    val d1 = Dalpha.perSlot(base, 2).head.getDouble(1)
    val d2 = Dalpha.perSlot(refined, 4).head.getDouble(1)
    assert(math.abs(d1 - d2) < 1e-9, s"d1=$d1 d2=$d2")
  }

  test("non-uniform refinement strictly increases D_α") {
    val base = Seq((0, 0, 0, 8.0), (0, 0, 1, 8.0)).toDF("slot", "cx", "cy", "alpha")
    // all of each cell's mass concentrated in one quarter
    val refined = Seq((0, 0, 0, 8.0), (0, 0, 2, 8.0)).toDF("slot", "cx", "cy", "alpha")
    val d1 = Dalpha.perSlot(base, 2).head.getDouble(1) // side 2: 4 cells
    val d2 = Dalpha.perSlot(refined, 4).head.getDouble(1)
    assert(d2 > d1 + 1e-9)
  }

  test("D_α grows with N on real uneven data, then plateaus at genSide") {
    val ev = EventGen.eventsDf(spark, toy.copy(days = 4, dailyOrders = 2000)).cache()
    val slot = 37 // evening peak
    def dAt(side: Int): Double = {
      val a = GridCounts.alpha(GridCounts.at(ev, side), 0, 4).where(col("slot") === slot)
      Dalpha.perSlot(a, side).head.getDouble(1)
    }
    val d4 = dAt(4); val d8 = dAt(8); val d16 = dAt(16)
    assert(d8 > d4, s"d4=$d4 d8=$d8")
    assert(d16 >= d8, s"d8=$d8 d16=$d16")
    // beyond the generation lattice the distribution really is uniform, so
    // growth comes only from sampling noise: relative step must shrink
    val growthCoarse = (d8 - d4) / d4
    ev.unpersist()
    assert(growthCoarse > 0.05, s"growthCoarse=$growthCoarse")
  }

  test("selectSide picks the knee of a plateauing curve") {
    val curve = Seq(4 -> 100.0, 8 -> 180.0, 16 -> 230.0, 32 -> 236.0, 64 -> 238.0)
    assert(Dalpha.selectSide(curve, 0.05) == 16)
  }

  test("selectSide falls back to the largest side without a knee") {
    val curve = Seq(4 -> 100.0, 8 -> 200.0, 16 -> 400.0)
    assert(Dalpha.selectSide(curve, 0.05) == 16)
  }

  test("selectSide handles unsorted input and rejects empty curves") {
    val curve = Seq(16 -> 230.0, 4 -> 100.0, 32 -> 235.0, 8 -> 180.0)
    assert(Dalpha.selectSide(curve, 0.05) == 16)
    assertThrows[IllegalArgumentException](Dalpha.selectSide(Nil))
  }
}
