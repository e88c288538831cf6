package repro.core

/** Geometry of one grid-size configuration on the unit square.
  *
  * The paper fixes a city-wide budget of N homogeneous grids (HGrids) and
  * varies the number n = nSide² of model grids (MGrids); each MGrid is
  * divided into m ≈ N/n HGrids (their ⌈√(N/n)⌉² formula). Because real and
  * expression errors are *compared across n*, they must be measured on the
  * same HGrids for every n — so the HGrid lattice here is always the fixed
  * √N × √N grid, and an MGrid is a spatial block of it: HGrid row `h`
  * belongs to MGrid row `h·nSide / √N`. When nSide ∤ √N, blocks differ by
  * one row/column and `m` varies per MGrid (exposed via [[cellsPerM]]).
  *
  * @param nSide        MGrids per axis (√n), 1 ≤ nSide ≤ √N
  * @param nTargetSide  √N — HGrid lattice side (paper: 128; bench: 64)
  */
final case class GridSpec(nSide: Int, nTargetSide: Int) {
  require(nSide >= 1, s"nSide must be >= 1, got $nSide")
  require(nTargetSide >= nSide,
    s"nSide=$nSide exceeds the HGrid budget side $nTargetSide (needs n ≤ N)")

  /** HGrid lattice side — fixed at √N for every n. */
  val hSide: Int = nTargetSide

  /** n — number of MGrids. */
  def n: Int = nSide * nSide
  /** N — number of HGrids. */
  def totalHGrids: Int = hSide * hSide
  /** Average HGrids per MGrid (the paper's m, exact when nSide | √N). */
  def mAvg: Double = totalHGrids.toDouble / n

  /** HGrid cell index (0-based, per axis) of a normalized coordinate. */
  def hCell(x: Double): Int = clamp((x * hSide).toInt, hSide)
  /** MGrid axis index owning HGrid axis index `h`. */
  def mOfH(h: Int): Int = math.min(nSide - 1, h * nSide / hSide)
  /** Flattened MGrid id from HGrid axis indices. */
  def mgridId(hx: Int, hy: Int): Int = mOfH(hx) * nSide + mOfH(hy)
  /** Flattened HGrid id. */
  def hgridId(hx: Int, hy: Int): Int = hx * hSide + hy

  /** HGrid rows per MGrid row (axis block sizes; differ by ≤ 1). */
  lazy val axisCells: Array[Int] = {
    val a = new Array[Int](nSide)
    var h = 0
    while (h < hSide) { a(mOfH(h)) += 1; h += 1 }
    a
  }

  /** m of each MGrid (flattened id → its HGrid count). */
  lazy val cellsPerM: Array[Int] =
    Array.tabulate(n)(id => axisCells(id / nSide) * axisCells(id % nSide))

  private def clamp(i: Int, side: Int): Int =
    if (i < 0) 0 else if (i >= side) side - 1 else i
}
