package repro.eval

import repro.{SparkSpec, TestFixtures}
import repro.core.FmdvH

class DriftSpec extends SparkSpec {

  test("eleven tasks named after the paper's Kaggle sample") {
    assert(Drift.Tasks.size == 11)
    assert(Drift.Tasks.map(_.name).contains("Titanic"))
    assert(Drift.Tasks.forall(t => t.colA.name != t.colB.name))
  }

  test("FMDV-VH detects most swaps without false alarms") {
    val res = Drift.run(new FmdvH.VhMethod(TestFixtures.indexE))
    assert(res.size == 11)
    assert(res.count(_.detected) >= 6)
    assert(res.count(_.falsePositive) == 0)
  }

  test("near-identical formats are the expected misses") {
    val res = Drift.run(new FmdvH.VhMethod(TestFixtures.indexE))
    val byName = res.map(r => r.task -> r.detected).toMap
    // T/F vs Y/N flags share the <upper>{1} shape — undetectable by pattern
    assert(!byName("WestNile"), "swap of two single-letter flags should not be detectable")
  }

  test("drift run is deterministic") {
    val m = new FmdvH.VhMethod(TestFixtures.indexE)
    assert(Drift.run(m) == Drift.run(m))
  }
}
