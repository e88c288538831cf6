package repro.dispatch

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Rng

class DispatchSimSpec extends AnyFunSuite {

  private val F = 8

  private def cfg(
      nSide: Int,
      workers: Double,
      cap: Int = 1,
      farePriority: Boolean = false,
      maxRing: Int = 2) =
    SimConfig(fineSide = F, nSide = nSide, workers = workers, capacity = cap,
      farePriority = farePriority, cellKm = 0.5, maxRing = maxRing)

  private def ordersAt(cells: Seq[Int], fare: Double = 10.0): Array[(Int, Double)] =
    cells.map(c => (c, fare)).toArray

  private def uniformPreds(nSide: Int): Array[Double] = Array.fill(nSide * nSide)(1.0)

  test("no workers ⇒ nothing served") {
    val r = DispatchSim.run(ordersAt(Seq(0, 1, 2)), uniformPreds(2), cfg(2, workers = 0))
    assert(r.served == 0.0 && r.revenue == 0.0 && r.unserved == 3.0 && r.demand == 3.0)
  }

  test("no orders ⇒ zero everything") {
    val r = DispatchSim.run(Array.empty, uniformPreds(2), cfg(2, workers = 10))
    assert(r.demand == 0.0 && r.served == 0.0 && r.travelKm == 0.0)
  }

  test("conservation: served + unserved = demand; served ≤ workers·capacity") {
    val orders = ordersAt((0 until 40).map(i => (i * 7) % (F * F)))
    for (cap <- Seq(1, 2); w <- Seq(5.0, 20.0, 100.0)) {
      val r = DispatchSim.run(orders, uniformPreds(4), cfg(4, w, cap))
      assert(math.abs(r.served + r.unserved - r.demand) < 1e-9)
      assert(r.served <= w * cap + 1e-9)
      assert(r.served <= r.demand + 1e-9)
    }
  }

  test("perfect colocated supply serves everything with minimal travel") {
    // all demand in fine cell (0,0); predictions put all mass in MGrid (0,0)
    val preds = Array(1.0, 0.0, 0.0, 0.0)
    val orders = ordersAt(Seq.fill(8)(0))
    // nSide=2 over F=8 ⇒ MGrid(0,0) covers 16 fine cells; workers spread over them
    val r = DispatchSim.run(orders, preds, cfg(2, workers = 160, maxRing = 2))
    assert(math.abs(r.served - 8.0) < 1e-9)
    // ring-0 supply in cell(0,0) is 10 ⇒ everything served at half-cell travel
    assert(math.abs(r.travelKm - 8 * 0.5 * 0.5) < 1e-9)
  }

  test("misallocated prediction loses matches that ring search cannot recover") {
    // demand in cell (0,0); all predicted mass in the far MGrid
    val nSide = 2
    val preds = Array(0.0, 0.0, 0.0, 1.0)
    val orders = ordersAt(Seq.fill(10)(0))
    val far = DispatchSim.run(orders, preds, cfg(nSide, workers = 10, maxRing = 1))
    val near = DispatchSim.run(orders, Array(1.0, 0.0, 0.0, 0.0), cfg(nSide, workers = 10, maxRing = 1))
    assert(near.served > far.served, s"near=${near.served} far=${far.served}")
  }

  test("wider rings recover more matches at higher travel cost") {
    val preds = Array(0.0, 1.0, 0.0, 0.0) // supply in wrong MGrid, reachable
    val orders = ordersAt(Seq.fill(6)(3)) // cell (0,3) borders MGrid (0,1)
    val r0 = DispatchSim.run(orders, preds, cfg(2, workers = 96, maxRing = 0))
    val r1 = DispatchSim.run(orders, preds, cfg(2, workers = 96, maxRing = 1))
    assert(r1.served > r0.served)
    assert(r1.travelKm > r0.travelKm)
  }

  test("fare priority serves the expensive orders first") {
    // one cell with mixed fares, capacity for half of them
    val orders = Array((0, 5.0), (0, 50.0), (0, 20.0), (0, 1.0))
    val preds = Array(1.0, 0.0, 0.0, 0.0)
    val w = 2.0 * 16 // 2 workers land in cell 0 (MGrid 0 has 16 fine cells)
    val hi = DispatchSim.run(orders, preds, cfg(2, workers = w, farePriority = true, maxRing = 0))
    val fifo = DispatchSim.run(orders, preds, cfg(2, workers = w, farePriority = false, maxRing = 0))
    assert(math.abs(hi.served - 2.0) < 1e-9 && math.abs(fifo.served - 2.0) < 1e-9)
    assert(math.abs(hi.revenue - 70.0) < 1e-9, s"rev=${hi.revenue}")
    assert(math.abs(fifo.revenue - 55.0) < 1e-9, s"rev=${fifo.revenue}")
  }

  test("fractional supply serves fractional orders with proportional revenue") {
    val orders = Array((0, 10.0), (0, 30.0))
    val preds = Array(1.0, 0.0, 0.0, 0.0)
    val r = DispatchSim.run(orders, preds, cfg(2, workers = 1.5 * 16, maxRing = 0))
    assert(math.abs(r.served - 1.5) < 1e-9)
    assert(math.abs(r.revenue - (10.0 + 0.5 * 30.0)) < 1e-9)
  }

  test("capacity 2 doubles the effective seats and flags shared rides") {
    val orders = ordersAt(Seq.fill(10)(0))
    val preds = Array(1.0, 0.0, 0.0, 0.0)
    val c1 = DispatchSim.run(orders, preds, cfg(2, workers = 4 * 16, cap = 1, maxRing = 0))
    val c2 = DispatchSim.run(orders, preds, cfg(2, workers = 4 * 16, cap = 2, maxRing = 0))
    assert(math.abs(c1.served - 4.0) < 1e-9 && c1.shared == 0.0)
    assert(math.abs(c2.served - 8.0) < 1e-9 && math.abs(c2.shared - 4.0) < 1e-9)
  }

  test("determinism: identical inputs give identical results") {
    val orders = Array.tabulate(50)(i => ((i * 13) % (F * F), 5.0 + (i % 7)))
    val preds = Array.tabulate(16)(i => Rng.uniform(Rng.key(3, i)))
    val a = DispatchSim.run(orders, preds, cfg(4, workers = 30, cap = 2))
    val b = DispatchSim.run(orders, preds, cfg(4, workers = 30, cap = 2))
    assert(a == b)
  }

  test("zero predictions fall back to uniform placement") {
    val orders = ordersAt((0 until F * F))
    val r = DispatchSim.run(orders, Array.fill(4)(0.0), cfg(2, workers = 64.0, maxRing = 0))
    assert(math.abs(r.served - 64.0) < 1e-9) // one worker per cell, one order per cell
  }

  test("preds length must match nSide²") {
    assertThrows[IllegalArgumentException] {
      DispatchSim.run(ordersAt(Seq(0)), Array(1.0, 2.0), cfg(2, workers = 1))
    }
  }

  test("unified cost decreases when supply matches demand") {
    val orders = ordersAt(Seq.fill(20)(0) ++ Seq.fill(5)(63))
    val good = Array(20.0 / 25, 0.0, 0.0, 5.0 / 25)
    val bad = Array(5.0 / 25, 0.0, 0.0, 20.0 / 25)
    val rg = DispatchSim.run(orders, good, cfg(2, workers = 25, cap = 2))
    val rb = DispatchSim.run(orders, bad, cfg(2, workers = 25, cap = 2))
    assert(rg.unifiedCost(1.5, 8.0) < rb.unifiedCost(1.5, 8.0))
  }

  test("SimResult addition accumulates componentwise") {
    val a = SimResult(10, 5, 50, 2, 1, 5)
    val b = SimResult(3, 3, 30, 1, 0, 0)
    assert((a + b) == SimResult(13, 8, 80, 3, 1, 5))
  }
}
