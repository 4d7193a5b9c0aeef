package repro.core

import repro.core.Tokens.{Cls, Tok}

/** Greedy multi-sequence alignment of coarse token sequences (§3).
  *
  * MSA with sum-of-pair scores is NP-hard; following the paper we greedily
  * align one additional sequence at a time against a running profile using
  * Needleman-Wunsch. For homogeneous machine-generated data all sequences are
  * usually identical and alignment is the identity.
  *
  * Tokens align when their classes match; symbol tokens additionally require
  * identical text (delimiters anchor the alignment).
  */
object Msa {

  /** One aligned position of the profile: class + literal text for symbols. */
  final case class Pos(cls: Cls, symText: Option[String])

  /** Alignment result: `matrix(i)(j)` is the text of value i at profile
    * position j ("" when the value has a gap there).
    */
  final case class Aligned(profile: Vector[Pos], matrix: Vector[Vector[String]]) {
    def length: Int = profile.length
    /** Sub-values spanned by profile positions [s, e] (inclusive). */
    def segmentValues(s: Int, e: Int): Vector[String] =
      matrix.map(row => row.slice(s, e + 1).mkString)
  }

  private val MatchScore = 2
  private val MismatchScore = -2
  private val GapScore = -1

  private def score(p: Pos, t: Tok): Int = (p.cls, t.cls) match {
    case (Cls.Symbol, Cls.Symbol) =>
      if (p.symText.contains(t.text)) MatchScore else MismatchScore
    case (a, b) if a == b => MatchScore
    case _                => MismatchScore
  }

  private def posOf(t: Tok): Pos =
    Pos(t.cls, if (t.cls == Cls.Symbol) Some(t.text) else None)

  /** Needleman-Wunsch of one token sequence against the current profile.
    * Returns the operation trace: for each step, (profileIdx, tokIdx) with -1
    * marking a gap on that side.
    */
  private def align(profile: Vector[Pos], toks: Vector[Tok]): Vector[(Int, Int)] = {
    val n = profile.length; val m = toks.length
    val dp = Array.ofDim[Int](n + 1, m + 1)
    for (i <- 1 to n) dp(i)(0) = i * GapScore
    for (j <- 1 to m) dp(0)(j) = j * GapScore
    for (i <- 1 to n; j <- 1 to m) {
      val diag = dp(i - 1)(j - 1) + score(profile(i - 1), toks(j - 1))
      val up = dp(i - 1)(j) + GapScore
      val left = dp(i)(j - 1) + GapScore
      dp(i)(j) = math.max(diag, math.max(up, left))
    }
    // trace back
    val trace = Vector.newBuilder[(Int, Int)]
    var i = n; var j = m
    val rev = collection.mutable.ArrayBuffer.empty[(Int, Int)]
    while (i > 0 || j > 0) {
      if (i > 0 && j > 0 && dp(i)(j) == dp(i - 1)(j - 1) + score(profile(i - 1), toks(j - 1))) {
        rev += ((i - 1, j - 1)); i -= 1; j -= 1
      } else if (i > 0 && dp(i)(j) == dp(i - 1)(j) + GapScore) {
        rev += ((i - 1, -1)); i -= 1
      } else {
        rev += ((-1, j - 1)); j -= 1
      }
    }
    trace ++= rev.reverseIterator
    trace.result()
  }

  /** Align all values greedily (longest-first seeds the profile). */
  def alignValues(values: Seq[String]): Aligned = {
    val vs = values.filter(v => v != null && v.nonEmpty).toVector
    if (vs.isEmpty) return Aligned(Vector.empty, Vector.empty)
    val tokSeqs = vs.map(Tokens.tokenize)
    val seedIdx = tokSeqs.indices.maxBy(i => tokSeqs(i).length)
    var profile = tokSeqs(seedIdx).map(posOf)
    var rows: Vector[Vector[String]] =
      Vector(tokSeqs(seedIdx).map(_.text))
    val order = tokSeqs.indices.filter(_ != seedIdx)
    for (idx <- order) {
      val toks = tokSeqs(idx)
      val trace = align(profile, toks)
      val newProfile = Vector.newBuilder[Pos]
      val newRow = Vector.newBuilder[String]
      // map from old profile position -> new position for fixing old rows
      val inserts = collection.mutable.ArrayBuffer.empty[Int] // new positions that are insertions
      var newPos = 0
      for ((pi, tj) <- trace) {
        if (pi >= 0 && tj >= 0) { newProfile += profile(pi); newRow += toks(tj).text }
        else if (pi >= 0) { newProfile += profile(pi); newRow += "" }
        else { newProfile += posOf(toks(tj)); newRow += toks(tj).text; inserts += newPos }
        newPos += 1
      }
      if (inserts.nonEmpty) {
        rows = rows.map { row =>
          val b = Vector.newBuilder[String]
          var oi = 0
          var np = 0
          val insertSet = inserts.toSet
          while (np < newPos) {
            if (insertSet.contains(np)) b += "" else { b += row(oi); oi += 1 }
            np += 1
          }
          b.result()
        }
      }
      profile = newProfile.result()
      rows = rows :+ newRow.result()
    }
    // restore original value order: seed first in rows, then `order`
    val permuted = new Array[Vector[String]](vs.length)
    permuted(seedIdx) = rows.head
    order.zipWithIndex.foreach { case (origIdx, k) => permuted(origIdx) = rows(k + 1) }
    Aligned(profile, permuted.toVector)
  }
}
