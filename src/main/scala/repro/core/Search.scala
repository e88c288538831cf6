package repro.core

import scala.collection.mutable

/** OGSS search algorithms over `e(√n)` (paper §IV).
  *
  * Each takes the objective as `f: Int => Double` mapping a candidate
  * `nSide = √n` to the upper bound `e(√n)`; evaluations are memoized and
  * counted, mirroring the paper's cost accounting (one evaluation = one
  * model training + expression-error pass, the dominant cost).
  */
object Search {

  /** @param nSide  chosen √n
    * @param evals  number of distinct objective evaluations performed
    */
  final case class Result(nSide: Int, evals: Int)

  private final class Memo(f: Int => Double, lo: Int, hi: Int) {
    private val cache = mutable.Map.empty[Int, Double]
    def clampEval(x: Int): Double = apply(math.max(lo, math.min(hi, x)))
    def apply(x: Int): Double = {
      require(x >= lo && x <= hi, s"nSide $x outside [$lo, $hi]")
      cache.getOrElseUpdate(x, f(x))
    }
    def evals: Int = cache.size
  }

  /** Brute-force baseline: traverse every √n in [lo, hi]. */
  def bruteForce(f: Int => Double, lo: Int, hi: Int): Result = {
    require(lo <= hi, s"empty domain [$lo, $hi]")
    val memo = new Memo(f, lo, hi)
    val best = (lo to hi).minBy(memo(_))
    Result(best, memo.evals)
  }

  /** Ternary Search (paper Algorithm 4) on [lo, hi] (paper: l=1, r=√N).
    *
    * Integer-safe third points: the paper's ⌈⅔r+⅓l⌉ can equal `r` when
    * r−l = 2, which would loop forever; we clamp the probes strictly
    * inside (l, r), preserving the drop-one-third contraction.
    */
  def ternary(f: Int => Double, lo: Int, hi: Int): Result = {
    require(lo <= hi, s"empty domain [$lo, $hi]")
    val memo = new Memo(f, lo, hi)
    var l = lo
    var r = hi
    while (r - l > 1) {
      var ml = l + (r - l) / 3
      var mr = r - (r - l) / 3
      if (ml <= l) ml = l + 1
      if (mr >= r) mr = r - 1
      if (mr <= ml) mr = ml + (if (ml < r - 1) 1 else 0)
      if (mr == ml) { // interval of width 2: compare the midpoint's sides
        if (memo(l) > memo(r)) l = ml else r = ml
      } else if (memo(ml) > memo(mr)) l = ml
      else r = mr
    }
    val best = if (memo(l) > memo(r)) r else l
    Result(best, memo.evals)
  }

  /** Iterative Method (paper Algorithm 5): local search from `p0` with
    * boundary `b`, probing offsets i = b..1 and jumping to the first
    * strictly better probe; stops when no probe within ±b improves.
    *
    * Note: the paper's line 13 reads `if e(p) < e(p−i) then p ← p−i`,
    * which would move to a *worse* point; we implement the evident intent
    * `e(p) > e(p−i)` (move downhill), matching the algorithm's
    * description in §IV-C.
    */
  def iterative(f: Int => Double, p0: Int = 16, b: Int = 4, lo: Int = 1, hi: Int = Int.MaxValue): Result = {
    require(b >= 1 && lo <= hi, s"bad parameters b=$b domain=[$lo, $hi]")
    val memo = new Memo(f, lo, hi)
    var p = math.max(lo, math.min(hi, p0))
    var improved = true
    while (improved) {
      improved = false
      var i = b
      while (i >= 1 && !improved) {
        val up = math.min(hi, p + i)
        val dn = math.max(lo, p - i)
        if (up != p && memo(p) > memo(up)) { p = up; improved = true }
        else if (dn != p && memo(p) > memo(dn)) { p = dn; improved = true }
        else i -= 1
      }
    }
    Result(p, memo.evals)
  }
}
