package repro.lake

import repro.SparkSpec
import scala.util.Random

/** Every synthetic domain generates what it claims to generate: format
  * checks via reference regexes, determinism, and the within-domain
  * variation properties the reproduction depends on.
  */
class DomainsSpec extends SparkSpec {

  private def sample(d: Domains.Domain, n: Int = 200, seed: Long = 77): Vector[String] =
    d.make(new Random(seed), n)

  private def allMatch(d: Domains.Domain, rx: String): Unit = {
    val p = java.util.regex.Pattern.compile("^(?:" + rx + ")$")
    val bad = sample(d).filterNot(v => p.matcher(v).matches())
    assert(bad.isEmpty, s"${d.name}: unexpected values ${bad.take(3)}")
  }

  test("date_slash format") { allMatch(Domains.dateSlashD, """\d{1,2}/\d{1,2}/\d{4}""") }
  test("date_iso format") { allMatch(Domains.dateIsoD, """\d{4}-\d{2}-\d{2}""") }
  test("time_hms format") { allMatch(Domains.timeHmsD, """\d{1,2}:\d{2}:\d{2}""") }
  test("time_ampm format") { allMatch(Domains.timeAmPmD, """\d{1,2}:\d{2}:\d{2} (AM|PM)""") }
  test("datetime_ampm format") {
    allMatch(Domains.dateTimeAmPmD, """\d{1,2}/\d{1,2}/\d{4} \d{1,2}:\d{2}:\d{2} (AM|PM)""")
  }
  test("datetime_iso format") {
    allMatch(Domains.dateTimeIsoD, """\d{4}-\d{2}-\d{2} \d{2}:\d{2}:\d{2}""")
  }
  test("iso_z format") { allMatch(Domains.isoZD, """\d{4}-\d{2}-\d{2}T\d{2}:\d{2}:\d{2}Z""") }
  test("date_mon format") {
    allMatch(Domains.dateMonD, """(Jan|Feb|Mar|Apr|May|Jun|Jul|Aug|Sep|Oct|Nov|Dec) \d{2} \d{4}""")
  }
  test("guid format") {
    allMatch(Domains.guidD, """[0-9a-f]{8}-[0-9a-f]{4}-[0-9a-f]{4}-[0-9a-f]{4}-[0-9a-f]{12}""")
  }
  test("guid_braced format") {
    allMatch(Domains.guidBracedD, """\{[0-9A-F]{8}-[0-9A-F]{4}-[0-9A-F]{4}-[0-9A-F]{4}-[0-9A-F]{12}\}""")
  }
  test("ip_v4 format") { allMatch(Domains.ipD, """\d{1,3}\.\d{1,3}\.\d{1,3}\.\d{1,3}""") }
  test("kb_eid format") { allMatch(Domains.kbEidD, """/m/0[0-9a-f]{5,6}""") }
  test("hex domains format") {
    allMatch(Domains.hex8D, """[0-9a-f]{8}""")
    allMatch(Domains.hex16D, """[0-9a-f]{16}""")
    allMatch(Domains.hex32D, """[0-9a-f]{32}""")
  }
  test("int_small format and length variation") {
    allMatch(Domains.intSmallD, """\d{1,3}""")
    val lens = sample(Domains.intSmallD).map(_.length).toSet
    assert(lens == Set(1, 2, 3), "log-uniform lengths must all occur")
  }
  test("int_large format") { allMatch(Domains.intLargeD, """\d{7,10}""") }
  test("float2 format") { allMatch(Domains.float2D, """\d{1,4}\.\d{2}""") }
  test("float_signed is always signed") { allMatch(Domains.floatSignedD, """-\d{1,3}\.\d{1,4}""") }
  test("percent format") { allMatch(Domains.percentD, """\d{1,3}\.\d%""") }
  test("locale format") { allMatch(Domains.localeD, """[a-z]{2}-[A-Z]{2}""") }
  test("lang2 format") { allMatch(Domains.lang2D, """[a-z]{2}""") }
  test("country2 format") { allMatch(Domains.country2D, """[A-Z]{2}""") }
  test("month3 format") { allMatch(Domains.month3D, """[A-Z][a-z]{2}""") }
  test("status_enum format") { allMatch(Domains.statusD, """[A-Z][a-z]+""") }
  test("ads_status format") { allMatch(Domains.adsStatusD, """[A-Z]+_[A-Z]+""") }
  test("flags and bools") {
    allMatch(Domains.flagYnD, """[YN]""")
    allMatch(Domains.flagTfD, """[TF]""")
    allMatch(Domains.boolWordD, """true|false""")
  }
  test("version3 format") { allMatch(Domains.version3D, """\d{1,2}\.\d{1,2}\.\d{1,2}""") }
  test("build_tag format") { allMatch(Domains.buildTagD, """v\d\.\d{1,2}\.\d{1,2}\.\d{1,4}""") }
  test("order_id format") { allMatch(Domains.orderIdD, """ORD-\d{8}""") }
  test("cust_code format") { allMatch(Domains.custCodeD, """[A-Z]{2}\d{6}""") }
  test("zip5 format") { allMatch(Domains.zip5D, """\d{5}""") }
  test("phone_us format") { allMatch(Domains.phoneUsD, """\(\d{3}\) \d{3}-\d{4}""") }
  test("mac format") { allMatch(Domains.macD, """([0-9a-f]{2}:){5}[0-9a-f]{2}""") }
  test("email format") { allMatch(Domains.emailD, """[a-z]+\d{0,2}@(contoso|fabrikam|example)\.com""") }
  test("composite_pipe format (Fig. 8)") {
    allMatch(Domains.compositePipeD,
      """\d\.\d\|\d{1,2}/\d{1,2}/\d{4} \d{2}:\d{2}:\d{2}\|\d{1,2}/\d{1,2}/\d{4} \d{2}:\d{2}:\d{2}\|[A-Z][a-z]+""")
  }
  test("composite_id format") { allMatch(Domains.compositeIdD, """[0-9a-f]{8}_\d{1,5}""") }
  test("kv_pair format") { allMatch(Domains.kvPairD, """id=\d{1,5};ts=\d{10}""") }

  test("date columns drift across month boundaries (corpus property)") {
    val months = sample(Domains.dateSlashD, 300).map(_.split("/")(0)).toSet
    assert(months.size > 1, "a 300-value date column should span multiple months")
  }

  test("time columns mix one- and two-digit hours") {
    val hourLens = sample(Domains.timeHmsD, 200).map(_.split(":")(0).length).toSet
    assert(hourLens == Set(1, 2))
  }

  test("NL domains are flagged and machine domains are not") {
    assert(Domains.naturalLanguage.forall(_.isNL))
    assert(Domains.machineGenerated.forall(!_.isNL))
    assert(Domains.naturalLanguage.nonEmpty && Domains.machineGenerated.nonEmpty)
    assert(Domains.naturalLanguage.forall(_.name.startsWith("nl:")))
  }

  test("NL domains generate multi-token-ish values") {
    for (d <- Seq(Domains.nlNameD, Domains.nlCompanyD, Domains.nlSentenceD, Domains.nlAddressD))
      assert(sample(d, 50).exists(_.contains(" ")), s"${d.name} should contain spaces")
  }

  test("generation is deterministic in the seed") {
    for (d <- Domains.all) {
      assert(d.make(new Random(5), 20) == d.make(new Random(5), 20), d.name)
    }
  }

  test("different seeds give different data (non-constant domains)") {
    assert(sample(Domains.guidD, 10, 1) != sample(Domains.guidD, 10, 2))
  }

  test("byName resolves every domain and rejects unknowns") {
    for (d <- Domains.all) assert(Domains.byName(d.name) eq d)
    intercept[IllegalArgumentException](Domains.byName("nope"))
  }

  test("popularity weights are positive") {
    assert(Domains.all.forall(_.popularity > 0))
  }

  test("special markers come from the special-value list") {
    val r = new Random(3)
    val marks = Vector.fill(200)(Domains.pickSpecialMarker(r)).toSet
    assert(marks.subsetOf(Domains.SpecialValues.toSet))
    assert(marks.contains("-"), "dash should be the dominant marker")
  }
}
