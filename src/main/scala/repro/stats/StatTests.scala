package repro.stats

/** Two-sample homogeneity tests of §4: given the counts of non-conforming vs
  * conforming values at train time (C) and test time (C'), decide whether the
  * non-conforming fraction changed significantly. Both tests the paper names
  * are implemented: Fisher's exact test (two-tailed) and Pearson's χ² test
  * with Yates continuity correction.
  */
object StatTests {

  // ---- log-factorial with memoized table + Stirling tail ----
  private val LogFacTable: Array[Double] = {
    val t = new Array[Double](4097)
    var i = 2
    while (i < t.length) { t(i) = t(i - 1) + math.log(i); i += 1 }
    t
  }

  private[stats] def logFac(n: Int): Double =
    if (n < LogFacTable.length) LogFacTable(n)
    else { // Stirling series, ample accuracy for p-value comparison
      val x = n.toDouble
      x * math.log(x) - x + 0.5 * math.log(2 * math.Pi * x) +
        1.0 / (12 * x) - 1.0 / (360 * x * x * x)
    }

  /** Log-probability of the 2x2 table [[a,b],[c,d]] under the hypergeometric
    * null (all margins fixed).
    */
  private def logHyper(a: Int, b: Int, c: Int, d: Int): Double = {
    val n = a + b + c + d
    logFac(a + b) + logFac(c + d) + logFac(a + c) + logFac(b + d) -
      logFac(n) - logFac(a) - logFac(b) - logFac(c) - logFac(d)
  }

  /** Two-tailed Fisher's exact test on [[a,b],[c,d]]: the sum of the
    * probabilities of all tables (with the same margins) no more likely than
    * the observed one.
    */
  def fisherExactTwoTailed(a: Int, b: Int, c: Int, d: Int): Double = {
    require(a >= 0 && b >= 0 && c >= 0 && d >= 0, "counts must be non-negative")
    val r1 = a + b; val c1 = a + c; val n = a + b + c + d
    if (n == 0) return 1.0
    val lObs = logHyper(a, b, c, d)
    val lo = math.max(0, c1 - (n - r1))
    val hi = math.min(r1, c1)
    var p = 0.0
    var x = lo
    while (x <= hi) {
      val l = logHyper(x, r1 - x, c1 - x, (n - r1) - (c1 - x))
      if (l <= lObs + 1e-9) p += math.exp(l)
      x += 1
    }
    math.min(1.0, p)
  }

  /** Pearson's χ² statistic with Yates continuity correction on the 2x2
    * table; returns 0 when any expected count is 0 (degenerate margins).
    */
  def chiSquaredYatesStat(a: Int, b: Int, c: Int, d: Int): Double = {
    val n = (a + b + c + d).toDouble
    if (n == 0) return 0.0
    val obs = Array(a, b, c, d).map(_.toDouble)
    val exp = Array(
      (a + b) * (a + c) / n, (a + b) * (b + d) / n,
      (c + d) * (a + c) / n, (c + d) * (b + d) / n)
    if (exp.exists(_ <= 0)) return 0.0
    obs.zip(exp).map { case (o, e) =>
      val dAbs = math.max(0.0, math.abs(o - e) - 0.5) // Yates correction
      dAbs * dAbs / e
    }.sum
  }

  /** Upper-tail p-value of a χ² statistic with 1 degree of freedom:
    * P(X ≥ x) = erfc(sqrt(x/2)).
    */
  def chiSquaredPValue(stat: Double): Double = erfc(math.sqrt(stat / 2.0))

  /** χ²-with-Yates p-value for the 2x2 table. */
  def chiSquaredYates(a: Int, b: Int, c: Int, d: Int): Double =
    chiSquaredPValue(chiSquaredYatesStat(a, b, c, d))

  /** Complementary error function (Abramowitz & Stegun 7.1.26, |ε| < 1.5e-7). */
  def erfc(x: Double): Double = {
    val z = math.abs(x)
    val t = 1.0 / (1.0 + 0.3275911 * z)
    val poly = t * (0.254829592 + t * (-0.284496736 + t * (1.421413741 +
      t * (-1.453152027 + t * 1.061405429))))
    val e = poly * math.exp(-z * z)
    if (x >= 0) e else 2.0 - e
  }
}
