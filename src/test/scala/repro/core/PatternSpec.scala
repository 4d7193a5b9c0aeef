package repro.core

import org.scalacheck.Gen
import repro.{PropHelpers, SparkSpec}
import repro.core.Pattern._

class PatternSpec extends SparkSpec with PropHelpers {

  private def pat(toks: PTok*) = Pat(toks.toVector)

  test("ConstT matches only its literal") {
    val p = pat(ConstT("Mar"))
    assert(p.matches("Mar"))
    assert(!p.matches("Apr"))
    assert(!p.matches("mar"))
  }

  test("ConstT quotes regex metacharacters") {
    val p = pat(ConstT("a.b(c)*"))
    assert(p.matches("a.b(c)*"))
    assert(!p.matches("aXb(c)*"))
  }

  test("FixLen digit") {
    val p = pat(FixLen(GClass.Digit, 4))
    assert(p.matches("2019"))
    assert(!p.matches("201"))
    assert(!p.matches("20199"))
    assert(!p.matches("201a"))
  }

  test("FixLen upper / lower / letter / alnum") {
    assert(pat(FixLen(GClass.Upper, 2)).matches("US"))
    assert(!pat(FixLen(GClass.Upper, 2)).matches("us"))
    assert(pat(FixLen(GClass.Lower, 2)).matches("en"))
    assert(pat(FixLen(GClass.Letter, 3)).matches("MaR"))
    assert(pat(FixLen(GClass.Alnum, 4)).matches("a1B2"))
    assert(!pat(FixLen(GClass.Alnum, 4)).matches("a1-2"))
  }

  test("VarLen requires at least one character") {
    val p = pat(VarLen(GClass.Digit))
    assert(p.matches("7"))
    assert(p.matches("123456"))
    assert(!p.matches(""))
    assert(!p.matches("a"))
  }

  test("multi-token pattern matches whole value (anchored)") {
    val p = pat(VarLen(GClass.Digit), ConstT("/"), VarLen(GClass.Digit),
      ConstT("/"), FixLen(GClass.Digit, 4))
    assert(p.matches("9/12/2019"))
    assert(p.matches("12/1/2019"))
    assert(!p.matches("9/12/2019 "))
    assert(!p.matches("x9/12/2019"))
    assert(!p.matches("9/12/19"))
  }

  test("null never matches") {
    assert(!pat(VarLen(GClass.Digit)).matches(null))
  }

  test("display uses the paper's notation") {
    assert(pat(FixLen(GClass.Digit, 2)).display == "<digit>{2}")
    assert(pat(VarLen(GClass.Letter)).display == "<letter>+")
    assert(pat(ConstT("Mar"), ConstT(" "), FixLen(GClass.Digit, 2)).display == "Mar <digit>{2}")
  }

  test("key/parse roundtrip on hand-picked patterns") {
    val ps = Seq(
      pat(ConstT("Mar"), FixLen(GClass.Digit, 2)),
      pat(VarLen(GClass.Alnum)),
      pat(ConstT("/"), ConstT("m"), ConstT("/"), VarLen(GClass.Alnum)),
      pat(FixLen(GClass.Upper, 2), ConstT("-"), VarLen(GClass.Lower)))
    for (p <- ps) assert(Pattern.parse(p.key) == p)
  }

  test("parse of an empty-const token") {
    val p = pat(ConstT(""))
    assert(Pattern.parse(p.key) == p)
  }

  test("tokenLengthOfKey avoids parsing") {
    val p = pat(ConstT("a"), VarLen(GClass.Digit), FixLen(GClass.Upper, 1))
    assert(Pattern.tokenLengthOfKey(p.key) == 3)
    assert(p.tokenLength == 3)
  }

  test("concat composes segment patterns") {
    val a = pat(VarLen(GClass.Digit))
    val b = pat(ConstT(":"), FixLen(GClass.Digit, 2))
    val c = Pattern.concat(Seq(a, b))
    assert(c.display == "<digit>+:<digit>{2}")
    assert(c.matches("9:07"))
  }

  test("specificity: Const > FixLen > VarLen") {
    assert(ConstT("x").specificity > FixLen(GClass.Digit, 1).specificity)
    assert(FixLen(GClass.Digit, 1).specificity > VarLen(GClass.Digit).specificity)
  }

  test("specificity: narrower classes are more specific") {
    assert(FixLen(GClass.Digit, 2).specificity > FixLen(GClass.Alnum, 2).specificity)
    assert(FixLen(GClass.Upper, 2).specificity > FixLen(GClass.Letter, 2).specificity)
    assert(VarLen(GClass.Lower).specificity > VarLen(GClass.Alnum).specificity)
  }

  test("GClass lookup by name") {
    assert(GClass.byName("digit") == GClass.Digit)
    assert(GClass.byName("alnum") == GClass.Alnum)
    intercept[IllegalArgumentException](GClass.byName("nope"))
  }

  private val genTok: Gen[PTok] = Gen.oneOf(
    Gen.oneOf(GClass.all).flatMap(c => Gen.choose(1, 12).map(FixLen(c, _))),
    Gen.oneOf(GClass.all).map(VarLen(_)),
    Gen.nonEmptyListOf(Gen.oneOf(('a' to 'z') ++ ('0' to '9') ++ "/-:. _#(){}"))
      .map(cs => ConstT(cs.mkString)))

  private val genPat: Gen[Pat] =
    Gen.nonEmptyListOf(genTok).map(ts => Pat(ts.take(10).toVector))

  test("property: key/parse roundtrip") {
    forSamples(genPat) { p => assert(Pattern.parse(p.key) == p) }
  }

  test("property: tokenLengthOfKey equals tokenLength") {
    forSamples(genPat) { p => assert(Pattern.tokenLengthOfKey(p.key) == p.tokenLength) }
  }

  test("property: a generated witness string matches its pattern") {
    val witness: PTok => String = {
      case ConstT(t)      => t
      case FixLen(c, n)   => Vector.fill(n)(sampleChar(c)).mkString
      case VarLen(c)      => Vector.fill(3)(sampleChar(c)).mkString
    }
    forSamples(genPat) { p =>
      val v = p.toks.map(witness).mkString
      assert(p.matches(v), s"${p.display} should match witness '$v'")
    }
  }

  private def sampleChar(c: GClass): Char = c match {
    case GClass.Digit => '7'
    case GClass.Upper => 'Q'
    case GClass.Lower => 'k'
    case GClass.Letter => 'Q'
    case GClass.Alnum => '7'
  }
}
