package repro.core

import repro.{SparkSpec, TestFixtures}
import repro.lake.Domains
import scala.util.Random

/** FMDV-V (vertical cuts) against the enterprise-lake index. */
class FmdvVSpec extends SparkSpec {
  lazy val index = TestFixtures.indexE

  test("solves an atomic column like basic FMDV") {
    val train = Domains.dateSlashD.make(new Random(7), 30)
    val v = FmdvV.solve(train, index).get
    val basic = Fmdv.solve(train, index).get
    assert(v.pattern.matches("12/31/2024"))
    assert(v.totalFpr <= basic.fpr + 1e-9, "vertical cut can only lower the FPR objective")
  }

  test("solves the Fig. 8-style wide composite column via segmentation") {
    val train = Domains.compositePipeD.make(new Random(8), 30)
    assert(Fmdv.solve(train, index).isEmpty, "too wide for full-column FMDV at tau=13")
    val v = FmdvV.solve(train, index)
    assert(v.isDefined, "vertical cuts should recover the composite domain")
    assert(v.get.segments.size > 1)
    // the composed pattern validates a fresh sample from the same domain
    val fresh = Domains.compositePipeD.make(new Random(9), 50)
    assert(fresh.forall(v.get.pattern.matches), "composed pattern must cover fresh data")
  }

  test("composite solution rejects other domains") {
    val train = Domains.compositePipeD.make(new Random(8), 30)
    val p = FmdvV.solve(train, index).get.pattern
    assert(!p.matches("9/12/2019"))
    assert(!p.matches("Booked"))
  }

  test("totalFpr is the sum of segment FPRs (Eq. 8)") {
    val train = Domains.compositePipeD.make(new Random(10), 25)
    val v = FmdvV.solve(train, index).get
    assert(math.abs(v.totalFpr - v.segments.map(_.fpr).sum) < 1e-12)
  }

  test("literal-delimiter segments carry zero FPR") {
    val train = Domains.compositePipeD.make(new Random(11), 25)
    val v = FmdvV.solve(train, index).get
    val delims = v.segments.filter(s => s.pat.toks.forall(_.isInstanceOf[Pattern.ConstT]))
    assert(delims.forall(_.fpr == 0.0))
  }

  test("sum-FPR feasibility: tiny r forces failure on composites") {
    val train = Domains.compositePipeD.make(new Random(12), 25)
    assert(FmdvV.solve(train, index, FmdvConfig(r = 0.0)).isEmpty ||
      FmdvV.solve(train, index, FmdvConfig(r = 0.0)).get.totalFpr == 0.0)
  }

  test("no solution for heterogeneous NL values") {
    val train = Domains.nlSentenceD.make(new Random(13), 30)
    assert(FmdvV.solve(train, index).isEmpty)
  }

  test("guid columns solve even though the aligned profile is wide") {
    val train = Domains.guidD.make(new Random(14), 30)
    val v = FmdvV.solve(train, index)
    assert(v.isDefined)
    assert(v.get.pattern.matches("0123abcd-0000-ffff-1234-0123456789ab"))
  }

  test("AsMethod yields a strict rule over the composed pattern") {
    val m = new FmdvV.AsMethod(index)
    val rule = m.learn(Domains.dateTimeAmPmD.make(new Random(15), 30)).get
    assert(!rule.flags(Domains.dateTimeAmPmD.make(new Random(16), 40)))
    assert(rule.flags(Seq("not a timestamp")))
  }

  test("empty input yields no solution") {
    assert(FmdvV.solve(Seq.empty, index).isEmpty)
    assert(FmdvV.solve(Seq("", null), index).isEmpty)
  }
}
