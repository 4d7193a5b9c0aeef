package repro

import repro.core._
import repro.index.OfflineIndexer
import repro.lake.{Benchmark, LakeGen}

/** End-to-end smoke: index the enterprise lake once, then check FMDV picks
  * sensible validation patterns for typical query columns.
  */
class SmokeSpec extends SparkSpec {

  lazy val index = TestFixtures.indexE

  test("index is non-trivial") {
    assert(index.size > 10000)
  }

  test("FMDV on a date_slash column finds a generalizing date pattern") {
    val train = repro.lake.Domains.dateSlashD.make(new scala.util.Random(1), 30)
    val sol = Fmdv.solve(train, index)
    Console.err.println(s"[Smoke] date_slash -> ${sol.map(s => s.pat.display + f" fpr=${s.fpr}%.4f cov=${s.cov}")}")
    assert(sol.isDefined)
    val p = sol.get.pat
    // must match unseen dates incl. 2-digit months/days
    assert(p.matches("12/31/2024"))
    assert(p.matches("1/2/2019"))
    // must not match a time or a word
    assert(!p.matches("9:07:45"))
    assert(!p.matches("Booked"))
  }

  test("FMDV-VH on a wide datetime column") {
    val train = repro.lake.Domains.dateTimeAmPmD.make(new scala.util.Random(2), 30)
    val sol = FmdvH.solveVH(train, index)
    Console.err.println(s"[Smoke] datetime_ampm -> ${sol.map(_.pat.display)}")
    assert(sol.isDefined)
    assert(sol.get.pat.matches("12/30/2024 11:59:59 PM"))
  }

  test("quick benchmark sanity: FMDV-VH beats TFDV on 30 cases") {
    val cases = Benchmark.generate(Benchmark.EnterpriseBench.copy(nCases = 50))
    val vh = repro.eval.Eval.evaluate(new FmdvH.VhMethod(index), cases)
    val tfdv = repro.eval.Eval.evaluate(new repro.baselines.Dict.Tfdv, cases)
    Console.err.println(f"[Smoke] FMDV-VH p=${vh.precision}%.3f r=${vh.recall}%.3f | TFDV p=${tfdv.precision}%.3f r=${tfdv.recall}%.3f")
    assert(vh.precision > tfdv.precision)
    assert(vh.f1 > tfdv.f1)
  }
}
