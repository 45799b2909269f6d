package repro.bench

import repro.SparkSpec
import repro.expts.Table4Exp

/** Bench for Tables IV/V: the scaled ACM-election case study. Assertions
  * capture the paper's qualitative findings (§VIII-B):
  *   - seeding flips the overall vote massively (paper: 21.8% -> 72.7%);
  *   - domains that start pro-competitor gain the most;
  *   - every domain's vote count is non-decreasing.
  */
class Table4Bench extends SparkSpec {

  test("Table IV case study: seeds flip the electorate toward the target") {
    val out = Table4Exp.run(spark)
    println(out.text)
    assert(out.rows.size == 7, "seven domains as in the paper")
    // Massive overall flip (paper: 3.3x increase; require at least 1.5x and majority).
    assert(out.afterTotal > out.beforeTotal * 1.5,
      s"seeding should lift voters substantially: ${out.beforeTotal} -> ${out.afterTotal}")
    assert(out.afterTotal * 2 > out.n, "target should reach a majority after seeding")
    // Monotonicity per domain.
    out.rows.foreach(r => assert(r.afterVotes >= r.beforeVotes, s"domain ${r.domain}"))
    // Pro-competitor domains (negative bias) start with lower vote shares than
    // pro-target domains, mirroring the paper's HCI/ML/CN vs SW contrast.
    val proTgt = out.rows.filter(_.bias > 0.05)
    val proCmp = out.rows.filter(_.bias < -0.05)
    if (proTgt.nonEmpty && proCmp.nonEmpty) {
      def share(rs: Seq[Table4Exp.DomainRow]) =
        rs.map(_.beforeVotes).sum.toDouble / math.max(1L, rs.map(_.total).sum)
      assert(share(proTgt) > share(proCmp),
        "pro-target domains must start with a higher vote share")
    }
    assert(out.topSeeds.size == 10)
  }
}
