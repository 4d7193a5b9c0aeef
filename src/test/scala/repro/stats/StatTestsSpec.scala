package repro.stats

import repro.SparkSpec
import repro.stats.StatTests._

class StatTestsSpec extends SparkSpec {

  private def approx(a: Double, b: Double, eps: Double = 1e-4): Boolean = math.abs(a - b) < eps

  // ---- Fisher's exact test ----

  test("Fisher: lady-tasting-tea table [[3,1],[1,3]] two-tailed") {
    // classic reference value: p ≈ 0.4857
    assert(approx(fisherExactTwoTailed(3, 1, 1, 3), 0.4857, 1e-3))
  }

  test("Fisher: perfectly separated [[10,0],[0,10]]") {
    val p = fisherExactTwoTailed(10, 0, 0, 10)
    // 2 / C(20,10) ≈ 1.082e-5
    assert(approx(p, 2.0 / 184756.0, 1e-8))
  }

  test("Fisher: identical proportions give p = 1") {
    assert(approx(fisherExactTwoTailed(5, 5, 5, 5), 1.0, 1e-9))
  }

  test("Fisher: empty table") {
    assert(fisherExactTwoTailed(0, 0, 0, 0) == 1.0)
  }

  test("Fisher: degenerate margins give p = 1") {
    assert(approx(fisherExactTwoTailed(0, 10, 0, 20), 1.0, 1e-9))
  }

  test("Fisher is symmetric under row swap") {
    val a = fisherExactTwoTailed(2, 28, 20, 80)
    val b = fisherExactTwoTailed(20, 80, 2, 28)
    assert(approx(a, b, 1e-9))
  }

  test("Fisher is symmetric under column swap") {
    val a = fisherExactTwoTailed(2, 28, 20, 80)
    val b = fisherExactTwoTailed(28, 2, 80, 20)
    assert(approx(a, b, 1e-9))
  }

  test("Fisher: stronger divergence gives smaller p") {
    val weak = fisherExactTwoTailed(1, 99, 3, 97)
    val strong = fisherExactTwoTailed(1, 99, 20, 80)
    assert(strong < weak)
  }

  test("Fisher: the paper's motivating scenario (0.1% vs 5%) rejects") {
    // train: 1 bad of 1000; test: 50 bad of 1000
    assert(fisherExactTwoTailed(1, 999, 50, 950) < 0.01)
  }

  test("Fisher: a tiny increase (0.1% vs 0.11%) does not reject") {
    assert(fisherExactTwoTailed(1, 999, 2, 1798) > 0.05)
  }

  test("Fisher: negative counts rejected") {
    intercept[IllegalArgumentException](fisherExactTwoTailed(-1, 1, 1, 1))
  }

  test("Fisher p-values stay within [0, 1]") {
    for (a <- 0 to 6; b <- 0 to 6; c <- 0 to 6; d <- 0 to 6) {
      val p = fisherExactTwoTailed(a, b, c, d)
      assert(p >= 0.0 && p <= 1.0 + 1e-12, s"p=$p for [[$a,$b],[$c,$d]]")
    }
  }

  // ---- Pearson chi-squared with Yates ----

  test("chi-squared stat: known 2x2 value") {
    // [[20,80],[40,60]]: E = [[30,70],[30,70]];
    // Yates: 2·((9.5²/30) + (9.5²/70)) = 8.5952
    val s = chiSquaredYatesStat(20, 80, 40, 60)
    assert(approx(s, 8.5952, 1e-3), s"stat $s")
  }

  test("chi-squared stat is zero for identical rows") {
    assert(chiSquaredYatesStat(10, 90, 10, 90) == 0.0)
  }

  test("chi-squared stat: degenerate margins give 0") {
    assert(chiSquaredYatesStat(0, 0, 5, 5) == 0.0)
  }

  test("chi-squared p-value at the 3.841 critical point is ~0.05") {
    assert(approx(chiSquaredPValue(3.841), 0.05, 2e-3))
  }

  test("chi-squared p-value at 6.635 is ~0.01") {
    assert(approx(chiSquaredPValue(6.635), 0.01, 1e-3))
  }

  test("chi-squared p-value at 0 is 1") {
    assert(approx(chiSquaredPValue(0.0), 1.0, 1e-9))
  }

  test("chi-squared agrees with Fisher on strong divergence") {
    assert(chiSquaredYates(1, 999, 50, 950) < 0.01)
    assert(fisherExactTwoTailed(1, 999, 50, 950) < 0.01)
  }

  test("chi-squared agrees with Fisher on no divergence") {
    assert(chiSquaredYates(10, 990, 11, 989) > 0.5)
  }

  // ---- erfc / logFac ----

  test("erfc known values") {
    assert(approx(erfc(0.0), 1.0, 1e-7))
    assert(approx(erfc(1.0), 0.157299, 1e-5))
    assert(approx(erfc(-1.0), 2.0 - 0.157299, 1e-5))
    assert(erfc(5.0) < 1e-10)
  }

  test("erfc is monotone decreasing") {
    val xs = Seq(-2.0, -1.0, 0.0, 0.5, 1.0, 2.0, 3.0).map(erfc)
    assert(xs == xs.sorted.reverse)
  }

  test("logFac matches direct summation for small n") {
    for (n <- Seq(0, 1, 2, 5, 20, 100)) {
      val direct = (2 to n).map(i => math.log(i)).sum
      assert(approx(logFac(n), direct, 1e-9), s"n=$n")
    }
  }

  test("logFac Stirling tail is continuous at the table boundary") {
    val a = logFac(4096)
    val b = logFac(4097)
    assert(b > a && b - a < math.log(4097) + 1e-6 && b - a > math.log(4096) - 1e-6)
  }
}
