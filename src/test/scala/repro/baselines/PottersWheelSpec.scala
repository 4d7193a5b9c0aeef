package repro.baselines

import repro.SparkSpec
import repro.core.Pattern._

class PottersWheelSpec extends SparkSpec {

  test("constant column profiles to the literal (MDL prefers constants)") {
    val p = PottersWheel.profile(Seq.fill(20)("Mar")).get
    assert(p.display == "Mar")
  }

  test("the paper's C1 pitfall: one-month training data keeps the month literal") {
    val train = (1 to 20).map(i => f"Mar $i%02d 2019")
    val p = PottersWheel.profile(train).get
    assert(p.matches("Mar 21 2019"))
    assert(!p.matches("Apr 01 2019"),
      s"profiling pattern ${p.display} should over-fit the observed month — that is the point")
  }

  test("varying values generalize just enough") {
    val p = PottersWheel.profile(Seq("Mar 01 2019", "Apr 12 2019", "May 30 2019")).get
    assert(p.matches("Jun 15 2019"))
    assert(!p.matches("totally different"))
  }

  test("fixed-length runs stay fixed-length under MDL") {
    val p = PottersWheel.profile(Seq("1234", "5678", "9012")).get
    assert(p.display == "<digit>{4}")
  }

  test("profile falls back to high-coverage patterns on slightly dirty columns") {
    val vals = (1 to 19).map(i => f"$i%02d:${i % 60}%02d:${(i * 7) % 60}%02d") :+ "-"
    val p = PottersWheel.profile(vals)
    assert(p.isDefined, "a 95%-coverage pattern should still be found")
    assert(vals.init.forall(p.get.matches))
    assert(!p.get.matches("-"))
  }

  test("profile yields nothing for hopelessly mixed values") {
    assert(PottersWheel.profile(Seq("a b c", "1/2/3", "x=1", "9981", "?!")).isEmpty)
    assert(PottersWheel.profile(Seq.empty).isEmpty)
  }

  test("description length: literals encode values for free") {
    val c = Pat(Vector(ConstT("Mar")))
    val f = Pat(Vector(FixLen(GClass.Letter, 3)))
    val vals = Seq.fill(10)("Mar")
    assert(PottersWheel.descriptionLength(c, vals) < PottersWheel.descriptionLength(f, vals))
  }

  test("description length: narrow classes are cheaper than wide ones") {
    val d = Pat(Vector(FixLen(GClass.Digit, 4)))
    val a = Pat(Vector(FixLen(GClass.Alnum, 4)))
    val vals = Seq("1234", "5678")
    assert(PottersWheel.descriptionLength(d, vals) < PottersWheel.descriptionLength(a, vals))
  }

  test("uncovered values pay an escape penalty") {
    val d = Pat(Vector(FixLen(GClass.Digit, 4)))
    assert(PottersWheel.valueCost(d, "abc") == 48.0)
    assert(PottersWheel.valueCost(d, "1234") < 48.0)
  }

  test("AsMethod produces a strict validation rule") {
    val rule = new PottersWheel.AsMethod().learn(Seq("12:05", "01:44")).get
    assert(!rule.flags(Seq("09:59")))
    assert(rule.flags(Seq("9:59")), "fixed-length profile flags the unpadded hour")
  }
}
