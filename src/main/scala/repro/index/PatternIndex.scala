package repro.index

import repro.core.Pattern

/** Pre-computed corpus statistics for one pattern (§2.4 offline stage):
  * estimated false-positive rate FPR_T(p) and coverage Cov_T(p).
  */
final case class PatternStats(fpr: Double, cov: Long)

/** The offline index: pattern-key → (FPR_T, Cov_T). Orders of magnitude
  * smaller than the corpus; online inference only performs lookups here.
  */
final class PatternIndex(val entries: Map[String, PatternStats]) extends Serializable {

  def lookup(key: String): Option[PatternStats] = entries.get(key)

  def size: Int = entries.size

  /** Pattern count by token-length (Fig. 13a). */
  def byTokenLength: Map[Int, Long] =
    entries.keysIterator
      .map(Pattern.tokenLengthOfKey)
      .toSeq.groupBy(identity).map { case (l, xs) => l -> xs.size.toLong }

  /** Coverage histogram in powers of two (Fig. 13b: power-law head/tail).
    * Key = floor(log2(cov)), value = number of patterns in the bucket.
    */
  def coverageHistogram: Map[Int, Long] =
    entries.valuesIterator
      .map(s => (math.log(s.cov.toDouble.max(1.0)) / math.log(2)).toInt)
      .toSeq.groupBy(identity).map { case (b, xs) => b -> xs.size.toLong }

  /** "Head" domain patterns: high coverage, low FPR (§5.3 pattern analysis). */
  def headPatterns(minCov: Long, maxFpr: Double, k: Int): Seq[(String, PatternStats)] =
    entries.toSeq
      .filter { case (_, s) => s.cov >= minCov && s.fpr <= maxFpr }
      .sortBy { case (key, s) => (-s.cov, s.fpr, key) }
      .take(k)
}
