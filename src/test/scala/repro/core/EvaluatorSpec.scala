package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.{CityConfig, EventGen, GridCounts}
import repro.model.ModelTier

/** Integration tests of the Algorithm-3 evaluator on the toy city. */
class EvaluatorSpec extends SparkSpec {

  private lazy val toy = CityConfig.toy // 12 days, 600 orders/day, genSide 16
  private lazy val events = EventGen.eventsDf(spark, toy).cache()

  private val tiers =
    Seq(ModelTier("lastday", 1), ModelTier("ha3", 3), ModelTier("ha8", 8))

  private def mkEval(computeReal: Boolean = true) =
    new Evaluator(spark, events,
      EvalConfig(nTargetSide = 16, models = tiers, testDay = 11,
        valDays = Seq(9, 10), trainWindow = 8, computeReal = computeReal))

  private lazy val ev = mkEval()
  private lazy val e2 = ev(2)
  private lazy val e4 = ev(4)
  private lazy val e8 = ev(8)
  private lazy val e16 = ev(16)

  private def total(r: Map[Int, SlotEval])(f: SlotEval => Double): Double =
    r.values.map(f).sum

  test("memoization: repeated evaluation costs nothing") {
    val before = ev.evalCount
    ev(4); ev(4)
    assert(ev.evalCount == before || ev.evalCount == before + 1)
    val c = ev.evalCount
    ev(4)
    assert(ev.evalCount == c)
  }

  test("expression error decreases as n grows (paper Fig. 3)") {
    val x2 = total(e2)(_.exprErr)
    val x4 = total(e4)(_.exprErr)
    val x8 = total(e8)(_.exprErr)
    assert(x2 > x4 && x4 > x8, s"expr: $x2, $x4, $x8")
  }

  test("expression error vanishes at n = N (m = 1)") {
    assert(total(e16)(_.exprErr) == 0.0)
  }

  test("model error increases as n grows (paper Fig. 4, Eq. 20)") {
    for (t <- tiers) {
      val m2 = total(e2)(_.modelErr(t.name))
      val m8 = total(e8)(_.modelErr(t.name))
      val m16 = total(e16)(_.modelErr(t.name))
      assert(m2 < m8 && m8 < m16, s"${t.name}: $m2, $m8, $m16")
    }
  }

  test("model accuracy ladder: lastday > ha3 > ha8 model error") {
    for (r <- Seq(e4, e8)) {
      val m = tiers.map(t => total(r)(_.modelErr(t.name)))
      assert(m(0) > m(1) && m(1) > m(2), s"ladder: $m")
    }
  }

  test("Theorem II.1: real error below its upper bound (summed over slots)") {
    for (r <- Seq(e2, e4, e8); t <- tiers) {
      val real = total(r)(_.realErr(t.name))
      val upper = total(r)(s => s.upper(t.name))
      assert(real <= upper * 1.05 + 1e-6, s"${t.name}: real=$real upper=$upper")
    }
  }

  test("real error is positive wherever there is demand") {
    assert(total(e4)(_.realErr("ha3")) > 0.0)
  }

  test("upper() = exprErr + modelErr") {
    val s = e4.values.head
    for (t <- tiers)
      assert(s.upper(t.name) == s.exprErr + s.modelErr(t.name))
  }

  test("objective() matches the evaluated upper bound") {
    val slot = 37
    val f = ev.objective(slot, tiers(1))
    assert(f(4) == e4(slot).upper("ha3"))
  }

  test("computeReal=false skips real error but keeps the bound") {
    val fast = mkEval(computeReal = false)
    val r = fast(4)
    assert(r.values.forall(_.realErr.values.forall(_ == 0.0)))
    val slot = r.keys.head
    assert(math.abs(r(slot).upper("ha3") - e4(slot).upper("ha3")) < 1e-6)
  }

  test("Eq. 20: per-slot model error equals Σ_i mean_d |λ̂_i − λ_i| (DuckDB)") {
    // independent re-computation of the ha3 model error at nSide=4 via SQL
    val m = GridCounts.rollupTo(GridCounts.at(events, 16), 16, 4)
    val got = spark.createDataFrame(
      e4.toSeq.sortBy(_._1).map { case (s, r) => (s, r.modelErr("ha3")) })
      .toDF("slot", "me")
    Oracle.assertEquivalent(
      got,
      """WITH grid AS (
        |  SELECT DISTINCT slot, cx, cy FROM m
        |), days(d) AS (VALUES (9), (10)),
        |cells AS (
        |  SELECT g.slot, g.cx, g.cy, days.d FROM grid g CROSS JOIN days
        |),
        |vals AS (
        |  SELECT c.slot, c.cx, c.cy, c.d,
        |    COALESCE((SELECT SUM(CAST(cnt AS DOUBLE)) FROM m
        |      WHERE CAST(m.day AS INT) BETWEEN c.d - 3 AND c.d - 1
        |        AND m.slot = c.slot AND m.cx = c.cx AND m.cy = c.cy), 0) / 3.0 AS pred,
        |    COALESCE((SELECT SUM(CAST(cnt AS DOUBLE)) FROM m
        |      WHERE CAST(m.day AS INT) = c.d
        |        AND m.slot = c.slot AND m.cx = c.cx AND m.cy = c.cy), 0) AS act
        |  FROM cells c
        |)
        |SELECT CAST(slot AS INT) AS slot, SUM(ABS(pred - act)) / 2.0 AS me
        |FROM vals GROUP BY 1""".stripMargin,
      "m" -> m)
  }

  test("testPredictions: dense arrays with the right shape and mass") {
    val preds = ev.testPredictions(4, tiers(2)) // ha8
    assert(preds.nonEmpty)
    assert(preds.values.forall(_.length == 16))
    assert(preds.values.forall(_.forall(_ >= 0.0)))
    val slotTotal = preds.map { case (_, a) => a.sum }.sum
    val expect = toy.dailyOrders
    assert(math.abs(slotTotal - expect) / expect < 0.2, s"pred mass=$slotTotal")
  }

  test("testActuals matches the test-day counts") {
    val act = ev.testActuals(4)
    val direct = GridCounts
      .rollupTo(GridCounts.at(events, 16), 16, 4)
      .where(col("day") === 11)
      .agg(sum("cnt")).head.getLong(0)
    assert(math.abs(act.values.map(_.sum).sum - direct) < 1e-9)
  }

  test("EvalConfig validation") {
    assertThrows[IllegalArgumentException] {
      EvalConfig(16, tiers, testDay = 5, valDays = Seq(9), trainWindow = 2)
    }
    assertThrows[IllegalArgumentException] {
      EvalConfig(16, tiers, testDay = 11, valDays = Seq.empty, trainWindow = 2)
    }
    assertThrows[IllegalArgumentException] {
      EvalConfig(16, tiers, testDay = 11, valDays = Seq(9), trainWindow = 20)
    }
  }
}
