package repro.core

import repro.SparkSpec
import repro.core.Pattern._
import repro.core.Tokens.{Cls, Tok}

class HierarchySpec extends SparkSpec {

  test("digit run options include const, digit and alnum generalizations") {
    val opts = Hierarchy.options(Tok(Cls.Digit, "2019"))
    assert(opts.contains(ConstT("2019")))
    assert(opts.contains(FixLen(GClass.Digit, 4)))
    assert(opts.contains(VarLen(GClass.Digit)))
    assert(opts.contains(FixLen(GClass.Alnum, 4)))
    assert(opts.contains(VarLen(GClass.Alnum)))
  }

  test("upper run options include cased generalizations") {
    val opts = Hierarchy.options(Tok(Cls.Letter, "US"))
    assert(opts.contains(FixLen(GClass.Upper, 2)))
    assert(opts.contains(VarLen(GClass.Upper)))
    assert(opts.contains(FixLen(GClass.Letter, 2)))
    assert(!opts.contains(FixLen(GClass.Lower, 2)))
  }

  test("lower run options include lower generalizations") {
    val opts = Hierarchy.options(Tok(Cls.Letter, "en"))
    assert(opts.contains(FixLen(GClass.Lower, 2)))
    assert(opts.contains(VarLen(GClass.Lower)))
    assert(!opts.contains(VarLen(GClass.Upper)))
  }

  test("mixed-case run has no cased options") {
    val opts = Hierarchy.options(Tok(Cls.Letter, "Mar"))
    assert(!opts.exists { case FixLen(GClass.Upper, _) => true; case _ => false })
    assert(!opts.exists { case FixLen(GClass.Lower, _) => true; case _ => false })
    assert(opts.contains(FixLen(GClass.Letter, 3)))
    assert(opts.contains(ConstT("Mar")))
  }

  test("symbol runs stay literal") {
    assert(Hierarchy.options(Tok(Cls.Symbol, "//")) == Vector(ConstT("//")))
  }

  test("merged alnum runs have exactly fixed and variable alnum") {
    assert(Hierarchy.options(Tok(Cls.Alnum, "a1b2")) ==
      Vector(FixLen(GClass.Alnum, 4), VarLen(GClass.Alnum)))
  }

  test("pruning level 1 drops literals") {
    val o = Hierarchy.optionsPruned(Tok(Cls.Digit, "12"), 1)
    assert(!o.exists(_.isInstanceOf[ConstT]))
    assert(o.contains(VarLen(GClass.Alnum)))
  }

  test("pruning level 2 drops alnum on fine digit runs") {
    val o = Hierarchy.optionsPruned(Tok(Cls.Digit, "12"), 2)
    assert(o == Vector(FixLen(GClass.Digit, 2), VarLen(GClass.Digit)))
  }

  test("pruning level 2 keeps cased letter options") {
    val o = Hierarchy.optionsPruned(Tok(Cls.Letter, "AM"), 2)
    assert(o.contains(FixLen(GClass.Upper, 2)))
    assert(o.contains(VarLen(GClass.Upper)))
    assert(o.contains(VarLen(GClass.Letter)))
  }

  test("pruning level 3 keeps a single narrow variable token") {
    assert(Hierarchy.optionsPruned(Tok(Cls.Digit, "12"), 3) == Vector(VarLen(GClass.Digit)))
    assert(Hierarchy.optionsPruned(Tok(Cls.Letter, "en"), 3) == Vector(VarLen(GClass.Lower)))
    assert(Hierarchy.optionsPruned(Tok(Cls.Letter, "Mar"), 3) == Vector(VarLen(GClass.Letter)))
  }

  test("symbols are never pruned away") {
    for (l <- 0 to 3)
      assert(Hierarchy.optionsPruned(Tok(Cls.Symbol, "-"), l) == Vector(ConstT("-")))
  }

  test("merged alnum runs keep both options at every level") {
    for (l <- 0 to 3)
      assert(Hierarchy.optionsPruned(Tok(Cls.Alnum, "x9"), l).length == 2)
  }

  test("option counts shrink monotonically with level") {
    for (t <- Seq(Tok(Cls.Digit, "123"), Tok(Cls.Letter, "abc"), Tok(Cls.Letter, "ABC"))) {
      val sizes = (0 to 3).map(l => Hierarchy.optionsPruned(t, l).size)
      assert(sizes == sizes.sorted.reverse, s"$t sizes $sizes")
    }
  }

  test("every pruned option is drawn from the full option set (digits)") {
    val full = Hierarchy.options(Tok(Cls.Digit, "42")).toSet
    for (l <- 0 to 3)
      assert(Hierarchy.optionsPruned(Tok(Cls.Digit, "42"), l).forall(full.contains))
  }
}
