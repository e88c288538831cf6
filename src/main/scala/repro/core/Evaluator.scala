package repro.core

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.data.GridCounts
import repro.model.ModelTier

import scala.collection.mutable

/** Errors of one (grid size, time slot) configuration, summed over all
  * grids (paper §V-B: all reported errors are totals over grids).
  */
final case class SlotEval(
    slot: Int,
    exprErr: Double,
    modelErr: Map[String, Double],
    realErr: Map[String, Double],
) {
  /** Upper bound e(√n) = Σ E_m + Σ E_e (Theorem II.1 / Algorithm 3). */
  def upper(model: String): Double = exprErr + modelErr(model)
}

/** Evaluation protocol shared by all experiments.
  *
  * @param nTargetSide √N — HGrid lattice side (all errors are measured on
  *                    this fixed lattice so they are comparable across n)
  * @param models      prediction tiers to evaluate
  * @param testDay     held-out day for real error / dispatch
  * @param valDays     days whose predictions estimate MAE(f) (Eq. 20)
  * @param trainWindow α_ij estimation window (days before testDay)
  * @param computeReal also compute test-day real error (off for search
  *                    benchmarks — searches only need the upper bound)
  */
final case class EvalConfig(
    nTargetSide: Int,
    models: Seq[ModelTier],
    testDay: Int,
    valDays: Seq[Int],
    trainWindow: Int = 28,
    computeReal: Boolean = true,
) {
  require(valDays.nonEmpty && valDays.forall(d => d > 0 && d <= testDay))
  require(testDay - trainWindow >= 0, "train window precedes day 0")
}

/** Upper-bound evaluator (paper Algorithm 3), memoized per grid size.
  *
  * HGrid-lattice counts and the α surface are computed once per evaluator
  * (they do not depend on n); each new grid size then costs one Spark
  * pipeline: MGrid roll-up + model predictions + per-MGrid expression
  * error. Search algorithms pay one pipeline per *distinct* grid size they
  * visit — the cost unit of the paper's Table IV.
  */
final class Evaluator(spark: SparkSession, events: DataFrame, val cfg: EvalConfig) {

  private val cache = mutable.Map.empty[Int, Map[Int, SlotEval]]

  /** Cumulative wall time spent in cache-missing evaluations (includes the
    * one-off counts/α pass on the first evaluation).
    */
  var wallNanos: Long = 0L
  def evalCount: Int = cache.size

  /** All-slot evaluation of one grid size (memoized). */
  def apply(nSide: Int): Map[Int, SlotEval] =
    cache.getOrElseUpdate(nSide, {
      val t0 = System.nanoTime()
      val r = compute(nSide)
      wallNanos += System.nanoTime() - t0
      r
    })

  /** Objective e(√n) for one (slot, model) — what the searches minimize. */
  def objective(slot: Int, model: ModelTier): Int => Double =
    nSide => apply(nSide)(slot).upper(model.name)

  private def zero(slot: Int): SlotEval =
    SlotEval(slot,
      0.0,
      cfg.models.map(_.name -> 0.0).toMap,
      cfg.models.map(_.name -> 0.0).toMap)

  private def predCol(mt: ModelTier, d: Int): String = s"pred_${mt.name}_$d"

  // ---- n-independent state: HGrid counts and the α surface -------------
  private lazy val counts: DataFrame = {
    val c = GridCounts.at(events, cfg.nTargetSide).cache()
    c.count()
    c
  }

  private lazy val alphaDf: DataFrame = {
    val a = GridCounts
      .alpha(counts, cfg.testDay - cfg.trainWindow, cfg.testDay)
      .cache()
    a.count()
    a
  }

  /** Drop this evaluator's cached DataFrames. */
  def close(): Unit = {
    alphaDf.unpersist()
    counts.unpersist()
  }

  private def compute(nSide: Int): Map[Int, SlotEval] = {
    val spec = GridSpec(nSide, cfg.nTargetSide)
    val testDay = cfg.testDay

    // --- expression error: Alg. 2 per HGrid, grouped by MGrid ----------
    val exprBySlot: Map[Int, Double] =
      ExpressionError.totalPerSlot(spark, alphaDf, spec)
        .collect()
        .map(r => r.getInt(0) -> r.getDouble(1))
        .toMap

    // --- model predictions: one wide conditional aggregation -----------
    val mcounts = GridCounts.rollupTo(counts, spec.hSide, nSide)
    val targets = cfg.valDays :+ testDay
    val minDay = targets.map(d => d - cfg.models.map(_.k).max).min
    val actCols: Seq[Column] = targets.map(d =>
      sum(when(col("day") === d, col("cnt")).otherwise(lit(0L))).as(s"act_$d"))
    val predCols: Seq[Column] = for { mt <- cfg.models; d <- targets } yield
      (sum(when(col("day").between(d - mt.k, d - 1), col("cnt")).otherwise(lit(0L))) / mt.k)
        .as(predCol(mt, d))
    val allAgg = actCols ++ predCols
    val wide = mcounts
      .where(col("day") >= math.max(0, minDay) && col("day") <= testDay)
      .groupBy(col("slot"), col("cx"), col("cy"))
      .agg(allAgg.head, allAgg.tail: _*)
      .cache()
    try {
      // --- model error (Eq. 20): mean over valDays of Σ_i |λ̂_i − λ_i| ---
      val meCols: Seq[Column] = cfg.models.map { mt =>
        (cfg.valDays
          .map(d => sum(abs(col(predCol(mt, d)) - col(s"act_$d"))))
          .reduce(_ + _) / cfg.valDays.size).as(s"me_${mt.name}")
      }
      val meBySlot: Map[Int, Map[String, Double]] = wide
        .groupBy(col("slot"))
        .agg(meCols.head, meCols.tail: _*)
        .collect()
        .map { r =>
          r.getInt(0) -> cfg.models.map(mt => mt.name -> r.getAs[Double](s"me_${mt.name}")).toMap
        }
        .toMap

      // --- real error on the test day (Σ_ij |λ̂_i/m_i − λ_ij|) -----------
      val reBySlot: Map[Int, Map[String, Double]] =
        if (!cfg.computeReal) Map.empty
        else realError(spec, wide)

      val slots = exprBySlot.keySet ++ meBySlot.keySet ++ reBySlot.keySet
      slots.map { s =>
        s -> SlotEval(
          s,
          exprBySlot.getOrElse(s, 0.0),
          cfg.models.map(mt => mt.name -> meBySlot.getOrElse(s, Map.empty).getOrElse(mt.name, 0.0)).toMap,
          cfg.models.map(mt => mt.name -> reBySlot.getOrElse(s, Map.empty).getOrElse(mt.name, 0.0)).toMap,
        )
      }.toMap.withDefault(zero)
    } finally wide.unpersist()
  }

  /** Small per-MGrid dimension table: (mcx, mcy, m). */
  private def mDf(spec: GridSpec): DataFrame = {
    import spark.implicits._
    (for (i <- 0 until spec.nSide; j <- 0 until spec.nSide)
      yield (i, j, spec.cellsPerM(i * spec.nSide + j))).toDF("mcx", "mcy", "m")
  }

  private def realError(
      spec: GridSpec,
      wide: DataFrame): Map[Int, Map[String, Double]] = {
    val nSide = spec.nSide
    val hSide = spec.hSide
    val testDay = cfg.testDay
    val predTest = wide
      .select(
        (col("slot") +: col("cx").as("mcx") +: col("cy").as("mcy") +:
          cfg.models.map(mt => col(predCol(mt, testDay)).as(mt.name))): _*)
      .join(mDf(spec), Seq("mcx", "mcy"))
    val hTest = counts
      .where(col("day") === testDay)
      .select(
        col("slot"),
        least(lit(nSide - 1), (col("cx") * nSide / hSide).cast("int")).as("mcx"),
        least(lit(nSide - 1), (col("cy") * nSide / hSide).cast("int")).as("mcy"),
        col("cnt"))
    // per present HGrid: |λ̂_i/m_i − λ_ij|; count present HGrids per MGrid
    // m is null when the HGrid's MGrid has no prediction row; the predicted
    // share is 0 then, so any positive divisor keeps the |0 − cnt| term.
    val p1Cols: Seq[Column] = cfg.models.map(mt =>
      sum(abs(coalesce(col(mt.name), lit(0.0)) / coalesce(col("m"), lit(1)) - col("cnt")))
        .as(s"p1_${mt.name}"))
    val part1 = hTest
      .join(predTest, Seq("slot", "mcx", "mcy"), "left")
      .groupBy(col("slot"), col("mcx"), col("mcy"))
      .agg(p1Cols.head, (p1Cols.tail :+ count(lit(1)).as("present")): _*)
    // absent HGrids of each predicted MGrid contribute λ̂_i/m_i each
    val reCols: Seq[Column] = cfg.models.map { mt =>
      sum(
        coalesce(col(s"p1_${mt.name}"), lit(0.0)) +
          (coalesce(col("m"), lit(1)) - coalesce(col("present"), lit(0L))) *
          coalesce(col(mt.name), lit(0.0)) / coalesce(col("m"), lit(1))
      ).as(s"re_${mt.name}")
    }
    part1
      .join(predTest, Seq("slot", "mcx", "mcy"), "full_outer")
      .groupBy(col("slot"))
      .agg(reCols.head, reCols.tail: _*)
      .collect()
      .map { r =>
        r.getInt(0) -> cfg.models.map(mt => mt.name -> r.getAs[Double](s"re_${mt.name}")).toMap
      }
      .toMap
  }

  /** Test-day HA(k) predictions per slot as a dense per-MGrid array
    * (index = mcx·nSide + mcy) — the dispatch simulator's demand signal.
    */
  def testPredictions(nSide: Int, model: ModelTier): Map[Int, Array[Double]] = {
    val d = cfg.testDay
    denseBySlot(
      GridCounts
        .rollupTo(counts, cfg.nTargetSide, nSide)
        .where(col("day").between(d - model.k, d - 1))
        .groupBy(col("slot"), col("cx"), col("cy"))
        .agg((sum(col("cnt")) / model.k).as("v")),
      nSide)
  }

  /** Test-day *actual* per-MGrid counts — the paper's "using real order
    * data" dispatch variant (model error zero by construction).
    */
  def testActuals(nSide: Int): Map[Int, Array[Double]] = {
    denseBySlot(
      GridCounts
        .rollupTo(counts, cfg.nTargetSide, nSide)
        .where(col("day") === cfg.testDay)
        .select(col("slot"), col("cx"), col("cy"), col("cnt").cast("double").as("v")),
      nSide)
  }

  private def denseBySlot(df: DataFrame, nSide: Int): Map[Int, Array[Double]] =
    df.collect()
      .groupBy(_.getInt(0))
      .map { case (slot, rows) =>
        val arr = new Array[Double](nSide * nSide)
        rows.foreach(r => arr(r.getInt(1) * nSide + r.getInt(2)) = r.getDouble(3))
        slot -> arr
      }
}
