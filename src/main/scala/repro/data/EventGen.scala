package repro.data

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import repro.core.Rng

/** One spatial event (taxi order): pickup at (x, y) ∈ [0,1)², trip length
  * `km`, fare in currency units.
  */
final case class Event(day: Int, slot: Int, x: Double, y: Double, km: Double, fare: Double)

/** Synthetic spatiotemporal event generator (substitutes the paper's taxi
  * trip datasets — DESIGN.md §3).
  *
  * For every (day, slot, generation cell) the event count is drawn from
  * Poisson(μ) with μ = dailyOrders · slotProfile(slot) · cellShare(cell) —
  * i.e. per-cell counts are exactly Poisson with a day-independent mean,
  * which is the distributional assumption of the paper's §III-B. Events
  * are uniformly jittered inside their generation cell, so the
  * homogeneity assumption holds at N = genSide² by construction.
  *
  * Fully deterministic in the city seed (hash RNG keyed by row identity).
  */
object EventGen {

  val FareBase = 2.5
  val FarePerKm = 1.2

  /** All events of `city` as a Dataset — cache this; everything downstream
    * (counts at any lattice, α, model training) derives from it.
    */
  def events(spark: SparkSession, city: CityConfig): Dataset[Event] = {
    import spark.implicits._
    val g = city.genSide
    val slots = CityConfig.Slots
    val profile = city.slotProfile
    val daily = city.dailyOrders
    val seed = city.seed
    val lm = city.logKmMean
    val ls = city.logKmSigma
    val cells = g.toLong * g

    spark
      .range(city.days.toLong * slots * cells)
      .mapPartitions { iter =>
        // per-day spatial shares (hotspots jitter daily); cached per task
        val shareCache = scala.collection.mutable.Map.empty[Int, Array[Double]]
        iter.flatMap { boxedId =>
          val id: Long = boxedId
          val cell = (id % cells).toInt
          val slot = ((id / cells) % slots).toInt
          val day = (id / (cells * slots)).toInt
          val shares = shareCache.getOrElseUpdate(day, city.sharesForDay(day))
          val mu = daily * profile(slot) * shares(cell)
          val k = Rng.key(seed, day, slot, cell)
          val cnt = Rng.poisson(mu, k)
          if (cnt == 0) Iterator.empty
          else {
            val cx = cell / g
            val cy = cell % g
            Iterator.tabulate(cnt) { e =>
              val ek = Rng.key(seed, day, slot, cell, 7777L + e)
              val x = (cx + Rng.uniform(ek, 0)) / g
              val y = (cy + Rng.uniform(ek, 1)) / g
              val km = math.min(60.0, math.max(0.4, math.exp(lm + ls * Rng.gaussian(ek, 2))))
              Event(day, slot, x, y, km, FareBase + FarePerKm * km)
            }
          }
        }
      }
  }

  def eventsDf(spark: SparkSession, city: CityConfig): DataFrame =
    events(spark, city).toDF()
}
