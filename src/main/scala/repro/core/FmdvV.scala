package repro.core

import repro.core.Pattern.Pat
import repro.index.PatternIndex

/** FMDV-V (§3): vertical cuts for composite domains.
  *
  * Values are tokenized, MSA-aligned, and the aligned token positions are
  * segmented by the dynamic program of Eq. 11:
  *
  *   minFPR(C[s,e]) = min( FMDV(C[s,e]) treated as one column,
  *                         min_t minFPR(C[s,t]) + minFPR(C[t+1,e]) )
  *
  * Each segment spans at most τ tokens (longer candidates cannot exist in the
  * offline index), per-segment patterns come from plain FMDV, and the overall
  * solution is feasible when Σ FPR ≤ r (Eq. 9) with per-segment coverage ≥ m
  * (Eq. 10). The segment patterns concatenate into one validation pattern.
  */
object FmdvV {

  /** A solved segmentation: per-segment solutions, in order. */
  final case class VSolution(segments: Vector[Solution]) {
    def pattern: Pat = Pattern.concat(segments.map(_.pat))
    def totalFpr: Double = segments.map(_.fpr).sum
    def minCov: Long = if (segments.isEmpty) 0L else segments.map(_.cov).min
  }

  def solve(values: Seq[String], index: PatternIndex,
            cfg: FmdvConfig = FmdvConfig()): Option[VSolution] = {
    val vs = values.filter(v => v != null && v.nonEmpty).distinct
    if (vs.isEmpty) return None
    val aligned = Msa.alignValues(vs)
    val n = aligned.length
    if (n == 0) return None

    // memo(s)(e): Some(best) / None = infeasible; null = not yet computed
    val memo = Array.ofDim[Option[(Double, List[Solution])]](n, n)

    def segmentFmdv(s: Int, e: Int): Option[Solution] = {
      val sub = aligned.segmentValues(s, e)
      if (sub.exists(_.isEmpty)) return None // a value has only gaps here
      // The segment is solvable as one column when its values fit under the
      // τ budget at either granularity (alnum-merged runs can compress an
      // aligned span far below its profile width — e.g. GUIDs, MACs).
      if (e - s + 1 > cfg.tau &&
          sub.exists(v => Tokens.effectiveTokenCount(v) > cfg.tau)) return None
      // Literal-delimiter rule: a segment of symbol tokens that is identical
      // across all values is a constant delimiter — future-safe by
      // construction (FPR 0). Real lakes index these from symbol-only
      // columns (null markers "-", separators); we shortcut the lookup so
      // the synthetic corpus does not need one column per delimiter string.
      val allSymbols = (s to e).forall(i => aligned.profile(i).cls == Tokens.Cls.Symbol)
      if (allSymbols && sub.distinct.size == 1)
        return Some(Solution(Pat(Vector(Pattern.ConstT(sub.head))), 0.0, Long.MaxValue))
      Fmdv.solve(sub, index, cfg)
    }

    def minFpr(s: Int, e: Int): Option[(Double, List[Solution])] = {
      val cached = memo(s)(e)
      if (cached != null) return cached
      var best: Option[(Double, List[Solution])] =
        segmentFmdv(s, e).map(sol => (sol.fpr, List(sol)))
      var t = s
      while (t < e) {
        (minFpr(s, t), minFpr(t + 1, e)) match {
          case (Some((f1, p1)), Some((f2, p2))) =>
            val f = f1 + f2
            if (best.forall(_._1 > f)) best = Some((f, p1 ++ p2))
          case _ => ()
        }
        t += 1
      }
      memo(s)(e) = best
      best
    }

    minFpr(0, n - 1)
      .filter { case (f, _) => f <= cfg.r }
      .map { case (_, sols) => VSolution(sols.toVector) }
  }

  /** FMDV-V as a strict validation [[Method]]. */
  final class AsMethod(index: PatternIndex, cfg: FmdvConfig = FmdvConfig(),
                       override val name: String = "FMDV-V") extends Method {
    def learn(train: Seq[String]): Option[Rule] =
      solve(train, index, cfg).map(s => StrictPatternRule(name, s.pattern))
  }
}
