package repro.core

import repro.SparkSpec
import repro.core.Pattern._
import repro.index.{PatternIndex, PatternStats}

/** Basic FMDV solver semantics against a hand-built index (no Spark). */
class FmdvSpec extends SparkSpec {

  private def pat(toks: PTok*) = Pat(toks.toVector)

  private val dPlus = pat(VarLen(GClass.Digit))
  private val d3 = pat(FixLen(GClass.Digit, 3))
  private val aPlus = pat(VarLen(GClass.Alnum))
  private val constFoo = pat(ConstT("745"))

  private def idx(entries: (Pat, PatternStats)*): PatternIndex =
    new PatternIndex(entries.map { case (p, s) => p.key -> s }.toMap)

  test("picks the minimum-FPR feasible pattern") {
    val i = idx(
      dPlus -> PatternStats(0.01, 100),
      d3 -> PatternStats(0.20, 100),
      aPlus -> PatternStats(0.03, 500))
    val sol = Fmdv.solve(Seq("745", "746"), i, FmdvConfig(r = 0.05, m = 10))
    assert(sol.get.pat == dPlus)
  }

  test("FPR constraint excludes infeasible patterns (Eq. 6)") {
    val i = idx(dPlus -> PatternStats(0.2, 100))
    assert(Fmdv.solve(Seq("745"), i, FmdvConfig(r = 0.05, m = 1)).isEmpty)
  }

  test("coverage constraint excludes rare patterns (Eq. 7)") {
    val i = idx(dPlus -> PatternStats(0.0, 3))
    assert(Fmdv.solve(Seq("745"), i, FmdvConfig(r = 0.05, m = 5)).isEmpty)
    assert(Fmdv.solve(Seq("745"), i, FmdvConfig(r = 0.05, m = 3)).isDefined)
  }

  test("hypotheses not present in the index are infeasible") {
    val i = idx(pat(VarLen(GClass.Letter)) -> PatternStats(0.0, 100))
    assert(Fmdv.solve(Seq("745"), i, FmdvConfig()).isEmpty)
  }

  test("tie on FPR breaks toward higher coverage") {
    val i = idx(
      dPlus -> PatternStats(0.01, 50),
      aPlus -> PatternStats(0.01, 500))
    val sol = Fmdv.solve(Seq("745", "7"), i, FmdvConfig(r = 0.05, m = 10))
    assert(sol.get.pat == aPlus)
  }

  test("tie on FPR and coverage breaks toward higher specificity") {
    val i = idx(
      dPlus -> PatternStats(0.01, 100),
      aPlus -> PatternStats(0.01, 100))
    val sol = Fmdv.solve(Seq("745", "7"), i, FmdvConfig(r = 0.05, m = 10))
    assert(sol.get.pat == dPlus)
  }

  test("constants can win when corpus evidence supports them") {
    val i = idx(
      constFoo -> PatternStats(0.0, 200),
      dPlus -> PatternStats(0.01, 100),
      d3 -> PatternStats(0.01, 100))
    val sol = Fmdv.solve(Seq("745", "745"), i, FmdvConfig(r = 0.05, m = 10))
    assert(sol.get.pat == constFoo)
  }

  test("empty hypothesis space yields no solution") {
    val i = idx(dPlus -> PatternStats(0.0, 100))
    assert(Fmdv.solve(Seq("745", "Booked"), i, FmdvConfig()).isEmpty)
  }

  test("solution carries the index statistics") {
    val i = idx(dPlus -> PatternStats(0.011, 42))
    val s = Fmdv.solve(Seq("7", "45"), i, FmdvConfig(r = 0.05, m = 10)).get
    assert(s.fpr == 0.011 && s.cov == 42)
  }

  test("AsMethod produces a strict rule that flags deviations") {
    val i = idx(dPlus -> PatternStats(0.0, 100))
    val m = new Fmdv.AsMethod(i, FmdvConfig(r = 0.05, m = 10))
    val rule = m.learn(Seq("745", "7")).get
    assert(!rule.flags(Seq("99", "100")))
    assert(rule.flags(Seq("99", "oops")))
  }

  test("AsMethod yields no rule when FMDV is infeasible") {
    val m = new Fmdv.AsMethod(idx(), FmdvConfig())
    assert(m.learn(Seq("745")).isEmpty)
  }

  test("best() over an explicit candidate list") {
    val i = idx(dPlus -> PatternStats(0.02, 30), d3 -> PatternStats(0.01, 30))
    val sol = Fmdv.best(Seq(dPlus, d3), i, FmdvConfig(r = 0.05, m = 10))
    assert(sol.get.pat == d3)
  }
}
