package repro.baselines

import repro.SparkSpec
import repro.baselines.Profilers._

class ProfilersSpec extends SparkSpec {

  test("SSIS picks the most specific covering pattern") {
    val rule = new Ssis().learn(Seq("1234", "5678")).get
    // max specificity over H = exact fixed length with the narrowest class
    assert(!rule.flags(Seq("0000")))
    assert(rule.flags(Seq("123")), "fixed-length profile flags shorter values")
  }

  test("SSIS keeps constants when the sample is constant — and over-fits") {
    val rule = new Ssis().learn(Seq.fill(10)("Mar")).get
    assert(rule.flags(Seq("Apr")))
  }

  test("SSIS yields nothing on hopeless mixtures") {
    assert(new Ssis().learn(Seq("a b", "1-2", "x:y", "9", "..")).isEmpty)
  }

  test("XSystem branches per value shape") {
    val rule = new XSystem().learn(Seq("12:30", "9:45", "NULL", "NULL")).get
    assert(!rule.flags(Seq("11:11", "NULL")))
    assert(rule.flags(Seq("noise")))
  }

  test("XSystem union rule flags values outside every branch") {
    val rule = new XSystem().learn(Seq("1.5", "2.25", "N/A")).get.asInstanceOf[UnionPatternRule]
    assert(rule.pats.size >= 2)
    assert(!rule.flags(Seq("3.75", "N/A")))
    assert(rule.flags(Seq("3/4")))
  }

  test("XSystem drops sub-threshold branches") {
    val vals = Seq.fill(99)("123") :+ "zz"
    val rule = new XSystem(minBranchFrac = 0.05).learn(vals).get.asInstanceOf[UnionPatternRule]
    assert(rule.pats.size == 1)
    assert(rule.flags(Seq("zz")), "the rare branch was dropped, so its value now alarms")
  }

  test("FlashProfile clusters by shape and profiles each cluster") {
    val rule = new FlashProfile().learn(Seq("1/2/2020", "11/12/2021", "en-US", "fr-FR")).get
    assert(!rule.flags(Seq("3/4/2022", "de-DE")))
    assert(rule.flags(Seq("2020-01-01")))
  }

  test("FlashProfile per-cluster patterns are MDL-chosen (more lenient than SSIS)") {
    val vals = Seq("7", "42", "137", "6", "99", "555")
    val fp = new FlashProfile().learn(vals).get
    assert(!fp.flags(Seq("8888")), "varying lengths give <digit>+ under MDL")
  }

  test("profilers return nothing on empty input") {
    assert(new Ssis().learn(Seq.empty).isEmpty)
    assert(new XSystem().learn(Seq.empty).isEmpty)
    assert(new FlashProfile().learn(Seq.empty).isEmpty)
  }
}
