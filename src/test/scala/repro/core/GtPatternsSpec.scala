package repro.core

import repro.{SparkSpec, TestFixtures}
import repro.lake.Domains
import scala.util.Random

/** Integration: FMDV-VH recovers a correct validation pattern for every core
  * machine-generated domain — it must accept fresh same-domain data and
  * reject data from a different domain.
  */
class GtPatternsSpec extends SparkSpec {
  lazy val index = TestFixtures.indexE

  private val domains = Seq(
    Domains.dateSlashD, Domains.dateIsoD, Domains.timeHmsD, Domains.timeAmPmD,
    Domains.dateTimeAmPmD, Domains.dateTimeIsoD, Domains.dateMonD,
    Domains.guidD, Domains.ipD, Domains.kbEidD, Domains.hex16D, Domains.hex8D,
    Domains.intSmallD, Domains.intLargeD, Domains.float2D, Domains.floatSignedD,
    Domains.localeD, Domains.lang2D, Domains.country2D, Domains.statusD,
    Domains.adsStatusD, Domains.boolWordD, Domains.version3D, Domains.orderIdD,
    Domains.custCodeD, Domains.zip5D, Domains.phoneUsD, Domains.macD,
    Domains.emailD, Domains.compositePipeD, Domains.compositeIdD, Domains.kvPairD)

  for (d <- domains) {
    test(s"FMDV-VH learns a valid pattern for ${d.name}") {
      val train = d.make(new Random(1000 + d.name.hashCode % 100), 30)
      val sol = FmdvH.solveVH(train, index)
      assert(sol.isDefined, s"${d.name}: no pattern found")
      val p = sol.get.pat
      val fresh = d.make(new Random(2000 + d.name.hashCode % 100), 100)
      val misses = fresh.filterNot(p.matches)
      assert(misses.size <= 2,
        s"${d.name}: pattern ${p.display} misses fresh values ${misses.take(3)}")
    }
  }

  test("learned patterns discriminate across domains") {
    val datePat = FmdvH.solveVH(Domains.dateSlashD.make(new Random(1), 30), index).get.pat
    val guidPat = FmdvH.solveVH(Domains.guidD.make(new Random(2), 30), index).get.pat
    assert(!datePat.matches(Domains.guidD.make(new Random(3), 1).head))
    assert(!guidPat.matches("9/12/2019"))
  }

  test("variable-shape NL domains produce no pattern") {
    // nl:name is deliberately absent: a fixed two-word shape legitimately
    // decomposes under vertical cuts into <letter>+ <letter>+; the paper's
    // pattern-less subset likewise holds only columns without consistent
    // syntactic structure.
    for (d <- Seq(Domains.nlSentenceD, Domains.nlAddressD, Domains.nlCompanyD)) {
      val sol = FmdvH.solveVH(d.make(new Random(4), 30), index)
      assert(sol.isEmpty, s"${d.name} should not yield a syntactic pattern, got ${sol.map(_.pat.display)}")
    }
  }
}
