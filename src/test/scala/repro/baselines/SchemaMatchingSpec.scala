package repro.baselines

import repro.{SparkSpec, TestFixtures}
import repro.lake.Domains
import scala.util.Random

class SchemaMatchingSpec extends SparkSpec {

  lazy val view = new SchemaMatching.CorpusView(TestFixtures.corpusEColumns)

  test("SM-P-P: pattern-matched corpus columns rescue a narrow training window") {
    // all training dates inside one month — plain PWheel keeps the month
    // literal (paper's Fig. 2 pitfall); schema-matching augments with corpus
    // date columns spanning other months, so the profile generalizes.
    val train = (1 to 15).map(i => s"3/$i/2019")
    val plain = new PottersWheel.AsMethod().learn(train).get
    assert(plain.flags(Seq("4/1/2019")), "plain profiling over-fits the month")
    val sm = new SchemaMatching.PatternBased(view, majority = false).learn(train).get
    assert(!sm.flags(Seq("4/1/2019")), "augmented training data spans months")
  }

  test("SM-P-M: majority-pattern matching behaves like plurality on clean columns") {
    val train = (1 to 15).map(i => s"3/$i/2019")
    val m = new SchemaMatching.PatternBased(view, majority = true).learn(train)
    assert(m.isDefined)
  }

  test("SM-I-k: no overlapping instances → fall back to plain profiling") {
    // GUIDs are unique; no corpus column shares ≥1 instance
    val train = Domains.guidD.make(new Random(9), 20)
    val rule = new SchemaMatching.InstanceBased(view, 1).learn(train)
    assert(rule.isDefined)
    assert(!rule.get.flags(Domains.guidD.make(new Random(10), 20)))
  }

  test("SM-I-1 finds overlap for low-cardinality enum columns") {
    val train = Domains.country2D.make(new Random(11), 25)
    val rule = new SchemaMatching.InstanceBased(view, 1).learn(train)
    assert(rule.isDefined)
    assert(!rule.get.flags(Seq("US", "FR")))
  }

  test("SM-I-10 is stricter about relatedness than SM-I-1") {
    val train = Domains.lang2D.make(new Random(12), 25)
    assert(new SchemaMatching.InstanceBased(view, 10).learn(train).isDefined)
  }

  test("method names match the paper") {
    assert(new SchemaMatching.InstanceBased(view, 1).name == "SM-I-1")
    assert(new SchemaMatching.InstanceBased(view, 10).name == "SM-I-10")
    assert(new SchemaMatching.PatternBased(view, majority = true).name == "SM-P-M")
    assert(new SchemaMatching.PatternBased(view, majority = false).name == "SM-P-P")
  }

  test("empty training data yields no rule") {
    assert(new SchemaMatching.InstanceBased(view, 1).learn(Seq.empty).isEmpty)
    assert(new SchemaMatching.PatternBased(view, majority = false).learn(Seq.empty).isEmpty)
  }
}
