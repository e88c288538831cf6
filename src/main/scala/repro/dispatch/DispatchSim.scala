package repro.dispatch

import scala.collection.mutable.ArrayBuffer

/** Outcome of dispatching one time slot.
  *
  * @param demand    total order count
  * @param served    orders matched to workers (fractional fluid tail)
  * @param revenue   summed fares of served orders
  * @param travelKm  pickup travel (ring distance + half-cell approach)
  * @param shared    orders served on a shared seat (capacity > 1)
  * @param unserved  demand − served
  */
final case class SimResult(
    demand: Double,
    served: Double,
    revenue: Double,
    travelKm: Double,
    shared: Double,
    unserved: Double,
) {
  def +(o: SimResult): SimResult =
    SimResult(demand + o.demand, served + o.served, revenue + o.revenue,
      travelKm + o.travelKm, shared + o.shared, unserved + o.unserved)

  /** DAIF-style unified cost per request: travel + detour-free share is
    * already inside travelKm; unserved requests pay a penalty.
    */
  def unifiedCost(detourKm: Double, penaltyKm: Double): Double =
    if (demand <= 0) 0.0
    else (travelKm + detourKm * shared + penaltyKm * unserved) / demand
}

/** Simulator parameters.
  *
  * @param fineSide     fixed evaluation lattice (independent of n — where
  *                     orders actually land; defaults to √N)
  * @param nSide        MGrid lattice of the demand prediction in use
  * @param workers      fleet size for the slot
  * @param capacity     riders per worker (1 = taxi, 2 = ride-sharing)
  * @param farePriority serve highest-fare orders first within a cell
  *                     (LS's revenue objective) instead of arrival order
  * @param cellKm       physical size of a fine cell
  * @param maxRing      farthest Chebyshev ring a worker may be pulled from
  */
final case class SimConfig(
    fineSide: Int,
    nSide: Int,
    workers: Double,
    capacity: Int = 1,
    farePriority: Boolean = false,
    cellKm: Double = 0.4,
    maxRing: Int = 4,
)

/** Deterministic prediction-guided dispatch simulator (substitution for
  * the paper's POLAR / LS / DAIF systems — DESIGN.md §3).
  *
  * Stage 1 (the part grid size affects): workers are pre-positioned
  * proportionally to the predicted demand of each MGrid, split uniformly
  * across the MGrid's fine cells — exactly the uniformity assumption whose
  * cost the paper calls expression error. Stage 2: orders are matched to
  * workers in expanding Chebyshev rings; a worker pulled from ring r pays
  * (0.5 + r)·cellKm of pickup travel. With capacity > 1 a second matching
  * pass uses the extra seats (shared rides), flagged so the caller can
  * charge a detour.
  *
  * Mis-positioned supply — from expression error (coarse n) or model
  * error (fine n) — strands workers away from demand and loses matches,
  * which is the mechanism behind the paper's Figures 6–9.
  */
object DispatchSim {

  def run(orders: Array[(Int, Double)], preds: Array[Double], cfg: SimConfig): SimResult = {
    val f = cfg.fineSide
    val cells = f * f
    require(preds.length == cfg.nSide * cfg.nSide, "preds must be per-MGrid")

    // demand queues per fine cell
    val queues = Array.fill(cells)(new ArrayBuffer[Double]())
    orders.foreach { case (c, fare) => queues(c) += fare }
    if (cfg.farePriority) queues.foreach(q => q.sortInPlace()(Ordering.Double.TotalOrdering.reverse))
    val demandRes = queues.map(_.length.toDouble)
    val servedPos = new Array[Double](cells) // fractional pointer into queue

    // supply: predicted MGrid share, uniform within the MGrid's fine cells
    def mOf(cx: Int): Int = math.min(cfg.nSide - 1, cx * cfg.nSide / f)
    val mIdx = Array.tabulate(cells)(c => mOf(c / f) * cfg.nSide + mOf(c % f))
    val cellsPerM = new Array[Int](cfg.nSide * cfg.nSide)
    mIdx.foreach(cellsPerM(_) += 1)
    val totalPred = preds.sum
    val supply = Array.tabulate(cells) { c =>
      val m = mIdx(c)
      val share = if (totalPred > 0) preds(m) / totalPred else 1.0 / (cfg.nSide * cfg.nSide)
      cfg.workers * share / cellsPerM(m)
    }

    var served = 0.0
    var revenue = 0.0
    var travel = 0.0
    var shared = 0.0
    val demand0 = demandRes.sum

    /** Serve `q` orders from cell `c`'s queue (fare-ordered), fractionally. */
    def serveFrom(c: Int, q: Double): Unit = {
      val fares = queues(c)
      var left = q
      var pos = servedPos(c)
      while (left > 1e-12 && pos < fares.length) {
        val i = pos.toInt
        val cap = (i + 1) - pos // remaining fraction of order i
        val take = math.min(cap, left)
        revenue += take * fares(i)
        pos += take
        left -= take
      }
      servedPos(c) = pos
    }

    /** One matching sweep with the given per-cell seats; returns per-order
      * bookkeeping via the closures above. `sharedPass` charges matches to
      * the shared counter.
      */
    def sweep(seats: Array[Double], sharedPass: Boolean): Unit = {
      var r = 0
      while (r <= cfg.maxRing) {
        var c = 0
        while (c < cells) {
          if (demandRes(c) > 1e-12) {
            val cx = c / f
            val cy = c % f
            // donors at Chebyshev distance exactly r, fixed scan order
            var dx = -r
            while (dx <= r && demandRes(c) > 1e-12) {
              var dy = -r
              while (dy <= r && demandRes(c) > 1e-12) {
                if (math.max(math.abs(dx), math.abs(dy)) == r) {
                  val nx = cx + dx
                  val ny = cy + dy
                  if (nx >= 0 && nx < f && ny >= 0 && ny < f) {
                    val d = nx * f + ny
                    if (seats(d) > 1e-12) {
                      val q = math.min(demandRes(c), seats(d))
                      seats(d) -= q
                      demandRes(c) -= q
                      served += q
                      travel += q * (0.5 + r) * cfg.cellKm
                      if (sharedPass) shared += q
                      serveFrom(c, q)
                    }
                  }
                }
                dy += 1
              }
              dx += 1
            }
          }
          c += 1
        }
        r += 1
      }
    }

    sweep(supply.clone(), sharedPass = false)
    if (cfg.capacity > 1) {
      val extra = supply.map(_ * (cfg.capacity - 1))
      sweep(extra, sharedPass = true)
    }

    SimResult(demand0, served, revenue, travel, shared, demand0 - served)
  }
}
