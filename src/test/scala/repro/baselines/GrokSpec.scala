package repro.baselines

import repro.SparkSpec
import repro.lake.Domains
import scala.util.Random

class GrokSpec extends SparkSpec {

  private def learn(vals: Seq[String]) = new Grok.AsMethod().learn(vals)

  test("library regexes are anchored and valid") {
    assert(Grok.Library.size >= 20)
    val rule = Grok.GrokRule("t", Vector("INT"))
    assert(!rule.flags(Seq("123", "-5")))
    assert(rule.flags(Seq("12a")))
  }

  test("recognizes ip columns") {
    val vals = Domains.ipD.make(new Random(1), 40)
    val rule = learn(vals).get.asInstanceOf[Grok.GrokRule]
    assert(rule.grokNames.contains("IP"))
    assert(!rule.flags(Domains.ipD.make(new Random(2), 40)))
    assert(rule.flags(Seq("300.300.300.300.300")))
  }

  test("recognizes uuid columns") {
    val vals = Domains.guidD.make(new Random(3), 40)
    val rule = learn(vals).get.asInstanceOf[Grok.GrokRule]
    assert(rule.grokNames.contains("UUID"))
  }

  test("recognizes US datetime columns") {
    val vals = Domains.dateTimeAmPmD.make(new Random(4), 40)
    val rule = learn(vals).get.asInstanceOf[Grok.GrokRule]
    assert(rule.grokNames.contains("DATETIME_US"))
  }

  test("no rule for proprietary formats — the low-recall mode") {
    assert(learn(Domains.adsStatusD.make(new Random(5), 40)).isEmpty)
    assert(learn(Domains.kvPairD.make(new Random(6), 40)).isEmpty)
  }

  test("coverage threshold: a dirtied column loses its grok match") {
    val vals = Domains.ipD.make(new Random(7), 10).updated(0, "-").updated(1, "-")
    assert(learn(vals).isEmpty, "80% coverage is below the 95% threshold")
  }

  test("word enums match the WORD pattern (generic but valid)") {
    val rule = learn(Domains.statusD.make(new Random(8), 40)).get.asInstanceOf[Grok.GrokRule]
    assert(rule.grokNames.contains("WORD"))
    assert(rule.flags(Seq("two words")))
  }

  test("union semantics: any matched grok accepts a value") {
    val rule = Grok.GrokRule("t", Vector("INT", "WORD"))
    assert(!rule.flags(Seq("123", "abc")))
    assert(rule.flags(Seq("1.2.3-4")))
  }

  test("null values alarm") {
    assert(Grok.GrokRule("t", Vector("INT")).flags(Seq("1", null)))
  }

  test("empty training data yields no rule") {
    assert(learn(Seq.empty).isEmpty)
  }
}
