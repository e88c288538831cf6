package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.PropChecks

/** Unit tests for the expression-error kernels (paper §III-B, Alg. 1/2). */
class ExpressionErrorSpec extends AnyFunSuite with PropChecks {

  import ExpressionError._

  private val K = 60

  // Monte-Carlo estimate of E|X − (X+Y)/m|, X~Pois(a), Y~Pois(b).
  private def mc(a: Double, b: Double, m: Int, n: Int = 400000, seed: Long = 11): Double = {
    var s = 0.0
    var i = 0
    while (i < n) {
      val x = Rng.poisson(a, Rng.key(seed, i, 0))
      val y = Rng.poisson(b, Rng.key(seed, i, 1))
      s += math.abs(x - (x + y).toDouble / m)
      i += 1
    }
    s / n
  }

  test("lgamma matches known factorials") {
    for (n <- 1 to 20) {
      val exact = (1 until n).map(i => math.log(i.toDouble)).sum // log (n-1)!
      assert(math.abs(lgamma(n.toDouble) - exact) < 1e-9, s"lgamma($n)")
    }
  }

  test("lgamma half-integer value: Γ(0.5) = √π") {
    assert(math.abs(lgamma(0.5) - 0.5 * math.log(math.Pi)) < 1e-10)
  }

  test("logPoisPmf sums to ~1 over the support") {
    for (mu <- Seq(0.3, 1.0, 5.0, 20.0)) {
      val s = (0L to (mu + 15 * math.sqrt(mu) + 15).toLong).map(k => math.exp(logPoisPmf(mu, k))).sum
      assert(math.abs(s - 1.0) < 1e-9, s"mu=$mu sum=$s")
    }
  }

  test("m=1 gives zero expression error in all variants") {
    assert(naive(3.0, 0.0, 1, K) == 0.0)
    assert(fast(3.0, 0.0, 1, K) == 0.0)
    assert(auto(3.0, 0.0, 1) == 0.0)
  }

  test("empty HGrid in busy MGrid: E_e = b/m exactly") {
    for ((b, m) <- Seq((4.0, 4), (10.0, 16), (300.0, 64))) {
      assert(math.abs(auto(0.0, b, m) - b / m) < 1e-9)
    }
  }

  test("solo busy HGrid (b=0): E_e = (1−1/m)·a") {
    for ((a, m) <- Seq((2.0, 4), (5.0, 9), (1.5, 25))) {
      val expect = (1.0 - 1.0 / m) * a
      assert(math.abs(auto(a, 0.0, m) - expect) < 1e-6, s"a=$a m=$m got=${auto(a, 0.0, m)}")
      assert(math.abs(fast(a, 0.0, m, 80) - expect) < 1e-6)
    }
  }

  test("naive and fast agree (Alg. 1 ≡ Alg. 2)") {
    val cases = Seq((0.5, 2.0, 4), (1.0, 7.0, 8), (2.5, 10.0, 9), (0.1, 0.4, 16), (4.0, 4.0, 2))
    for ((a, b, m) <- cases) {
      val n = naive(a, b, m, K)
      val f = fast(a, b, m, K)
      assert(math.abs(n - f) < 1e-9, s"a=$a b=$b m=$m naive=$n fast=$f")
    }
  }

  test("auto agrees with fast on moderate parameters") {
    val cases = Seq((0.5, 2.0, 4), (1.0, 7.0, 8), (2.5, 10.0, 9), (0.1, 0.4, 16), (3.0, 30.0, 36))
    for ((a, b, m) <- cases) {
      val f = fast(a, b, m, 120)
      val w = auto(a, b, m)
      assert(math.abs(f - w) < 1e-6, s"a=$a b=$b m=$m fast=$f auto=$w")
    }
  }

  test("property: naive ≡ fast ≡ auto on random parameters") {
    val gen = for {
      a <- Gen.choose(0.0, 5.0)
      b <- Gen.choose(0.0, 20.0)
      m <- Gen.choose(2, 25)
    } yield (a, b, m)
    checkProp(Prop.forAll(gen) { case (a, b, m) =>
      val n = naive(a, b, m, K)
      val f = fast(a, b, m, K)
      val w = auto(a, b, m)
      math.abs(n - f) < 1e-8 && math.abs(f - w) < 1e-4
    }, min = 40)
  }

  test("auto survives large MGrid totals where doubles underflow (b > 745)") {
    val e = auto(5.0, 1200.0, 64)
    assert(e.isFinite && e > 0.0)
    // literal Alg. 2 underflows e^-b to 0 here and returns garbage ~0 or NaN
    val broken = fast(5.0, 1200.0, 64, 40)
    assert(broken < 1e-6 || broken.isNaN, "expected the literal algorithm to underflow")
    // sanity against the normal approximation of |(m-1)X - Y|/m
    val m = 64; val a = 5.0; val b = 1200.0
    val mu = (m - 1.0) * a - b
    val sd = math.sqrt((m - 1.0) * (m - 1.0) * a + b)
    val phi = math.exp(-mu * mu / (2 * sd * sd)) / math.sqrt(2 * math.Pi)
    val cdf = 0.5 * (1.0 + erf(mu / (sd * math.sqrt(2))))
    val approx = (sd * 2 * phi + mu * (2 * cdf - 1.0)) / m
    assert(math.abs(e - approx) / approx < 0.05, s"auto=$e normalApprox=$approx")
  }

  private def erf(x: Double): Double = {
    // Abramowitz–Stegun 7.1.26, |err| < 1.5e-7
    val t = 1.0 / (1.0 + 0.3275911 * math.abs(x))
    val y = 1.0 - (((((1.061405429 * t - 1.453152027) * t) + 1.421413741) * t - 0.284496736) * t + 0.254829592) * t * math.exp(-x * x)
    if (x >= 0) y else -y
  }

  test("Monte-Carlo agreement: auto ≈ E|X − (X+Y)/m|") {
    val cases = Seq((1.0, 3.0, 4), (2.0, 14.0, 16), (0.3, 0.9, 4), (5.0, 5.0, 2))
    for ((a, b, m) <- cases) {
      val est = mc(a, b, m)
      val ex = auto(a, b, m)
      assert(math.abs(est - ex) < 0.02 * (1 + ex), s"a=$a b=$b m=$m mc=$est exact=$ex")
    }
  }

  test("convergence in K (Theorem III.2): K=60 within 1e-6 of K=120") {
    for ((a, b, m) <- Seq((1.0, 5.0, 8), (3.0, 9.0, 4))) {
      assert(math.abs(fast(a, b, m, 60) - fast(a, b, m, 120)) < 1e-6)
    }
  }

  test("truncated sums increase monotonically in K toward the limit") {
    val (a, b, m) = (2.0, 6.0, 4)
    val vals = Seq(2, 5, 10, 20, 40).map(k => naive(a, b, m, k))
    assert(vals.zip(vals.tail).forall { case (x, y) => y >= x - 1e-12 })
    assert(math.abs(vals.last - auto(a, b, m)) < 1e-3)
  }

  test("Lemma III.1: every truncated sum is below (1−2/m)α + Σα/m") {
    val gen = for {
      a <- Gen.choose(0.1, 6.0)
      b <- Gen.choose(0.0, 25.0)
      m <- Gen.choose(3, 20)
      k <- Gen.choose(5, 80)
    } yield (a, b, m, k)
    checkProp(Prop.forAll(gen) { case (a, b, m, k) =>
      naive(a, b, m, k) <= lemmaBound(a, b, m) + 1e-9
    }, min = 40)
  }

  test("expression error increases with α beyond the fair share b/(m−1)") {
    // E_e(a) dips at the fair-share point a = b/(m−1) (the uniform split is
    // then correct in expectation) and grows past it; Lemma III.1's *bound*
    // is monotone in α everywhere.
    val m = 8
    val b = 10.0
    val fair = b / (m - 1)
    val es = Seq(1.0, 2.0, 4.0, 8.0).map(a => auto(fair * a, b, m))
    assert(es.zip(es.tail).forall { case (x, y) => y > x }, es.toString)
    val bounds = Seq(0.5, 1.0, 2.0, 4.0).map(a => lemmaBound(a, b, m))
    assert(bounds.zip(bounds.tail).forall { case (x, y) => y > x })
  }

  test("mgridTotal: uniform MGrid matches m × single-cell error") {
    val m = 9
    val alphas = Array.fill(m)(2.0)
    val single = auto(2.0, 16.0, m)
    assert(math.abs(mgridTotal(alphas, m) - m * single) < 1e-9)
  }

  test("mgridTotal accounts for absent (zero-α) HGrids exactly") {
    val m = 16
    val present = Array(3.0, 1.0)
    val full = present ++ Array.fill(m - 2)(0.0)
    val viaSparse = mgridTotal(present, m)
    val viaDense = full.map(a => auto(a, full.sum - a, m)).sum
    assert(math.abs(viaSparse - viaDense) < 1e-9)
  }

  test("mgridTotal on an empty MGrid is zero") {
    assert(mgridTotal(Array.empty[Double], 4) == 0.0)
    assert(mgridTotal(Array(0.0, 0.0), 4) == 0.0)
  }

  test("mgridTotal rejects more HGrids than m") {
    assertThrows[IllegalArgumentException](mgridTotal(Array(1.0, 2.0, 3.0), 2))
  }

  test("total expression error bound: Σ E_e ≤ 2(1−1/m) Σ α") {
    val m = 9
    val alphas = Array(5.0, 2.0, 1.0, 0.5, 0.2)
    val tot = mgridTotal(alphas, m)
    assert(tot <= 2 * (1.0 - 1.0 / m) * alphas.sum + 1e-9)
  }

  test("more even split ⇒ smaller per-MGrid expression error") {
    val m = 4
    val even = mgridTotal(Array(2.5, 2.5, 2.5, 2.5), m)
    val uneven = mgridTotal(Array(8.0, 1.0, 0.5, 0.5), m)
    assert(uneven > even, s"uneven=$uneven even=$even")
  }
}
