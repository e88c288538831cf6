package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** Structural properties of the generator that the experiment protocol
  * depends on.
  */
class EventGenPropertySpec extends SparkSpec {

  private lazy val toy = CityConfig.toy

  test("day prefix stability: shortening `days` does not change earlier days") {
    // RNG is keyed by (seed, day, slot, cell), so day 0–1 events must be
    // byte-identical whether the config generates 2 or 12 days.
    val short = EventGen.eventsDf(spark, toy.copy(days = 2))
    val long = EventGen.eventsDf(spark, toy).where(col("day") < 2)
    assert(short.count() == long.count())
    assert(short.except(long).isEmpty && long.except(short).isEmpty)
  }

  test("days are i.i.d.: per-day volumes fluctuate around dailyOrders") {
    val perDay = EventGen.eventsDf(spark, toy)
      .groupBy("day").count().collect().map(_.getLong(1).toDouble)
    assert(perDay.length == toy.days)
    val mean = perDay.sum / perDay.length
    assert(math.abs(mean - toy.dailyOrders) / toy.dailyOrders < 0.1)
    // Poisson fluctuation: sd ≈ √600 ≈ 24.5, so days should not be constant
    assert(perDay.distinct.length > 1)
  }

  test("volume scales linearly with dailyOrders") {
    val n1 = EventGen.eventsDf(spark, toy.copy(days = 3)).count().toDouble
    val n2 = EventGen.eventsDf(spark, toy.copy(days = 3, dailyOrders = 1200)).count().toDouble
    assert(math.abs(n2 / n1 - 2.0) < 0.2, s"ratio=${n2 / n1}")
  }

  test("genSide only changes spatial resolution, not total volume") {
    val a = EventGen.eventsDf(spark, toy.copy(days = 3)).count().toDouble
    val b = EventGen.eventsDf(spark, toy.copy(days = 3, genSide = 32)).count().toDouble
    assert(math.abs(a - b) / a < 0.1, s"a=$a b=$b")
  }

  test("events fall inside their generation cell (homogeneity by construction)") {
    val g = toy.genSide
    // reconstruct the generation cell from coordinates; means per cell match
    // the intensity surface: correlation between share and count
    val counts = EventGen.eventsDf(spark, toy)
      .groupBy(GridCounts.cellIdx(col("x"), g).as("cx"), GridCounts.cellIdx(col("y"), g).as("cy"))
      .count().collect()
      .map(r => (r.getInt(0) * g + r.getInt(1)) -> r.getLong(2).toDouble).toMap
    val shares = toy.cellShares
    val total = counts.values.sum
    // hottest cell by share should be among the hottest by count
    val hotShare = shares.zipWithIndex.maxBy(_._1)._2
    assert(counts.getOrElse(hotShare, 0.0) > 0.5 * counts.values.max)
    // empirical share of the hottest cell ≈ configured share
    val emp = counts.getOrElse(hotShare, 0.0) / total
    assert(math.abs(emp - shares(hotShare)) < 0.3 * shares(hotShare) + 0.01)
  }
}
