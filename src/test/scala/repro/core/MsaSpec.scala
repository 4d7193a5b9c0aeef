package repro.core

import repro.SparkSpec
import repro.core.Tokens.Cls

class MsaSpec extends SparkSpec {

  test("empty input aligns to nothing") {
    val a = Msa.alignValues(Seq.empty)
    assert(a.length == 0 && a.matrix.isEmpty)
  }

  test("identical token structures align trivially") {
    val a = Msa.alignValues(Seq("9/12/2019", "10/1/2020"))
    assert(a.length == 5)
    assert(a.matrix == Vector(
      Vector("9", "/", "12", "/", "2019"),
      Vector("10", "/", "1", "/", "2020")))
  }

  test("profile records classes and symbol texts") {
    val a = Msa.alignValues(Seq("9:07"))
    assert(a.profile.map(_.cls) == Vector(Cls.Digit, Cls.Symbol, Cls.Digit))
    assert(a.profile(1).symText.contains(":"))
  }

  test("a missing trailing token becomes a gap") {
    val a = Msa.alignValues(Seq("1:02:03", "1:02"))
    assert(a.length == 5)
    val short = a.matrix(1)
    assert(short.count(_ == "") == 2)
    assert(short.mkString == "1:02")
  }

  test("a missing middle token becomes a gap") {
    val a = Msa.alignValues(Seq("a-1-b", "a--b"))
    // the shorter value lacks the middle digit; symbols anchor the alignment
    assert(a.matrix(0).mkString == "a-1-b")
    assert(a.matrix(1).mkString == "a--b")
  }

  test("rows preserve original value order") {
    val vals = Seq("1:02", "1:02:03", "4:05")
    val a = Msa.alignValues(vals)
    assert(a.matrix.map(_.mkString) == vals.toVector.map(identity))
  }

  test("segmentValues extracts sub-values by position range") {
    val a = Msa.alignValues(Seq("9/12/2019 9:07:45", "10/1/2020 10:08:46"))
    val dates = a.segmentValues(0, 4)
    assert(dates == Vector("9/12/2019", "10/1/2020"))
    val times = a.segmentValues(6, a.length - 1)
    assert(times == Vector("9:07:45", "10:08:46"))
  }

  test("null and empty values are dropped before alignment") {
    val a = Msa.alignValues(Seq("12", null, "", "34"))
    assert(a.matrix.size == 2)
  }

  test("profile length never shrinks below the longest sequence") {
    val a = Msa.alignValues(Seq("1:2:3:4:5", "1:2"))
    assert(a.length >= 9)
  }

  test("alignment of many homogeneous values stays gap-free") {
    val vals = (1 to 30).map(i => s"$i/0${i % 9 + 1}/2021")
    val a = Msa.alignValues(vals)
    assert(a.matrix.forall(row => !row.contains("")))
    assert(a.length == 5)
  }

  test("different symbol classes are not aligned together") {
    val a = Msa.alignValues(Seq("1-2", "3.4"))
    // '-' and '.' mismatch; alignment still reconstructs both values
    assert(a.matrix(0).mkString == "1-2")
    assert(a.matrix(1).mkString == "3.4")
  }
}
