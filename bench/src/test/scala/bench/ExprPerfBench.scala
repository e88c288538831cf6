package bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.ExpressionError

/** Appendix D (Fig. 16): cost of computing one HGrid's expression error as
  * K grows — straightforward double sum (Alg. 1, O(mK²)) vs the fast
  * prefix-sum variant (Alg. 2, O(mK)) vs the windowed production kernel.
  */
class ExprPerfBench extends AnyFunSuite {

  private val m = 64
  private val a = 2.0
  private val b = 126.0

  private def time[T](body: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1e6)
  }

  private def med(body: => Double): (Double, Double) = {
    val runs = (1 to 5).map(_ => time(body))
    (runs.head._1, runs.map(_._2).sorted.apply(2))
  }

  private lazy val table: Seq[(Int, Double, Double, Double, Double)] = {
    val ref = ExpressionError.auto(a, b, m)
    val ks = Seq(10, 25, 50, 100, 250)
    val rows = ks.map { k =>
      val (vNaive, tNaive) = med(ExpressionError.naive(a, b, m, k))
      val (_, tFast) = med(ExpressionError.fast(a, b, m, k))
      val (_, tAuto) = med(ExpressionError.auto(a, b, m))
      (k, tNaive, tFast, tAuto, math.abs(vNaive - ref))
    }
    println("EXPRPERF | K | Alg1 naive (ms) | Alg2 fast (ms) | auto (ms) | |err| vs converged")
    rows.foreach { case (k, tn, tf, ta, err) =>
      println(f"EXPRPERF | $k%3d | $tn%10.3f | $tf%10.3f | $ta%10.3f | $err%.2e")
    }
    rows
  }

  test("Alg. 2 is asymptotically cheaper than Alg. 1 (paper Fig. 16)") {
    val k250 = table.find(_._1 == 250).get
    assert(k250._3 < k250._2, s"fast=${k250._3}ms naive=${k250._2}ms")
  }

  test("Alg. 1's cost grows superlinearly in K, Alg. 2's roughly linearly") {
    val t10 = table.find(_._1 == 10).get
    val t250 = table.find(_._1 == 250).get
    val naiveGrowth = t250._2 / math.max(1e-6, t10._2)
    val fastGrowth = t250._3 / math.max(1e-6, t10._3)
    assert(naiveGrowth > fastGrowth, s"naive x$naiveGrowth fast x$fastGrowth")
  }

  test("truncation error vanishes as K grows (Theorem III.2)") {
    val errs = table.map(_._5)
    assert(errs.last < 1e-9, s"err at K=250: ${errs.last}")
    assert(errs.last <= errs.head + 1e-12)
  }

  test("the windowed kernel stays fast regardless of K") {
    assert(table.map(_._4).max < 50.0, "auto kernel should stay in the ms range")
  }
}
