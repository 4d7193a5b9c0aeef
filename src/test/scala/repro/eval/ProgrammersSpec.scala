package repro.eval

import repro.SparkSpec
import repro.eval.Programmers._
import repro.lake.Domains
import scala.util.Random

class ProgrammersSpec extends SparkSpec {

  test("RegexRule: valid regex flags non-matching values") {
    val r = RegexRule("t", """\d+/\d+/\d{4}""")
    assert(!r.flags(Seq("1/2/2020")))
    assert(r.flags(Seq("2020-01-02")))
    assert(r.flags(Seq("1/2/2020", null)))
  }

  test("RegexRule: an ill-formed regex never flags (the failed-user mode)") {
    val r = RegexRule("t", """([0-9]+""")
    assert(!r.valid)
    assert(!r.flags(Seq("anything")))
  }

  test("Careful keeps never-varying tokens literal — the month pitfall") {
    val train = (1 to 15).map(i => s"3/$i/2019")
    val rule = new Careful().learn(train).get
    assert(!rule.flags(Seq("3/20/2019")))
    assert(rule.flags(Seq("4/1/2019")), "constant month stays literal in a human regex")
  }

  test("Careful uses observed length ranges") {
    val rule = new Careful().learn(Seq("12:30", "09:45", "11:59")).get
    assert(!rule.flags(Seq("10:00")))
    assert(rule.flags(Seq("9:00")), "1-digit hour outside the observed {2,2} range")
  }

  test("Careful gives up on messy columns") {
    assert(new Careful().learn(Seq("a-1", "b.2", "c:3", "d 4", "e5")).isEmpty)
  }

  test("Quick generalizes digits but keeps letters literal") {
    val rule = new Quick().learn(Seq("Mar 01 2019", "Mar 12 2019")).get
    assert(!rule.flags(Seq("Mar 5 2019")))
    assert(rule.flags(Seq("Apr 01 2019")))
  }

  test("Sloppy transcribes exact lengths from the first value") {
    val rule = new Sloppy().learn(Seq("9/12/2019", "10/1/2019")).get
    assert(rule.flags(Seq("10/1/2019")), "the second observed value already violates the regex")
  }

  test("three policies with distinct quality on a real domain") {
    val train = Domains.dateSlashD.make(new Random(1), 30)
    val fresh = Domains.dateSlashD.make(new Random(2), 100)
    val flagged = Programmers.all.map(_.learn(train).exists(_.flags(fresh)))
    assert(flagged.last, "the sloppy policy should false-alarm on fresh data")
  }

  test("paper timing constants recorded for the table") {
    assert(PaperSeconds("Programmer#1") == 145)
    assert(PaperSeconds.size == 3)
  }
}
