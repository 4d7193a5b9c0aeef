package repro.baselines

import repro.{SparkSpec, TestFixtures}
import repro.lake.Benchmark.BenchCase

class UpperBoundsSpec extends SparkSpec {

  private def mkCase(id: String, vals: Vector[String], sib: Option[Vector[String]] = None,
                     domain: String = "d", nl: Boolean = false) =
    BenchCase(id, domain, nl, "", vals, Set.empty, sib)

  test("nonTrivialFd: functional with duplicate LHS holds") {
    assert(UpperBounds.nonTrivialFd(Seq("a", "b", "a"), Seq("1", "2", "1")))
  }

  test("nonTrivialFd: violated functionality fails") {
    assert(!UpperBounds.nonTrivialFd(Seq("a", "a"), Seq("1", "2")))
  }

  test("nonTrivialFd: unique LHS is trivial and rejected") {
    assert(!UpperBounds.nonTrivialFd(Seq("a", "b", "c"), Seq("1", "1", "2")))
  }

  test("nonTrivialFd: size mismatch and empty input fail") {
    assert(!UpperBounds.nonTrivialFd(Seq("a"), Seq("1", "2")))
    assert(!UpperBounds.nonTrivialFd(Seq.empty, Seq.empty))
  }

  test("fdUpperBoundRecall counts only covered cases") {
    val covered = mkCase("1", Vector("x", "y", "x"), Some(Vector("K0", "K1", "K0")))
    val keyLike = mkCase("2", Vector("a", "b", "c"), Some(Vector("K0", "K1", "K2")))
    val noSib = mkCase("3", Vector("x", "x"))
    assert(UpperBounds.fdUpperBoundRecall(Seq(covered, keyLike, noSib)) == 1.0 / 3.0)
    assert(UpperBounds.fdUpperBoundRecall(Seq.empty) == 0.0)
  }

  test("adUpperBoundRecall: common signatures are coverable") {
    val dateCase = mkCase("1", Vector("1/2/2020", "3/4/2021", "5/6/2022"))
    val weird = mkCase("2", Vector("§§±±", "¶¶©©", "∆∆∆"))
    val rec = UpperBounds.adUpperBoundRecall(Seq(dateCase, weird), TestFixtures.corpusEColumns, minColumns = 5)
    assert(rec == 0.5, s"got $rec")
  }

  test("adUpperBoundRecall: threshold controls coverage") {
    val dateCase = mkCase("1", Vector("1/2/2020", "3/4/2021"))
    val loose = UpperBounds.adUpperBoundRecall(Seq(dateCase), TestFixtures.corpusEColumns, minColumns = 1)
    val absurd = UpperBounds.adUpperBoundRecall(Seq(dateCase), TestFixtures.corpusEColumns, minColumns = 100000)
    assert(loose == 1.0)
    assert(absurd == 0.0)
  }

  test("adUpperBoundRecall: empty inputs") {
    assert(UpperBounds.adUpperBoundRecall(Seq.empty, TestFixtures.corpusEColumns) == 0.0)
  }
}
