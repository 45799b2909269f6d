package repro

import org.apache.spark.sql.functions._
import repro.core.GraphOps

class SynthSocialSpec extends SparkSpec {

  test("rawEdges produces m distinct non-self edges within range") {
    val e = SynthSocial.rawEdges(spark, n = 200, m = 800, seed = 1).localCheckpoint(true)
    assert(e.count() == 800)
    assert(e.filter(col("src") === col("dst")).count() == 0)
    assert(e.filter(col("src") < 0 || col("src") >= 200 ||
                    col("dst") < 0 || col("dst") >= 200).count() == 0)
    assert(e.select("src", "dst").distinct().count() == 800)
  }

  test("rawEdges weights are in (0, 1)") {
    val e = SynthSocial.rawEdges(spark, 100, 400, seed = 2)
    assert(e.filter(col("w") <= 0 || col("w") >= 1).count() == 0)
  }

  test("rawEdges is deterministic in the seed") {
    def sig(s: Long) = SynthSocial.rawEdges(spark, 100, 300, seed = s)
      .agg(sum(col("src") * 31 + col("dst"))).head.getLong(0)
    assert(sig(5) == sig(5))
    assert(sig(5) != sig(6))
  }

  test("out-degree distribution is skewed (influencer hubs exist)") {
    val e = SynthSocial.rawEdges(spark, 300, 3000, seed = 3)
    val outdeg = e.groupBy("src").count().agg(max("count"), avg("count")).head
    assert(outdeg.getLong(0) > 3 * outdeg.getDouble(1),
      s"max out-degree ${outdeg.getLong(0)} not >> avg ${outdeg.getDouble(1)}")
  }

  test("hub sources carry larger raw weights than fringe sources") {
    val e = SynthSocial.rawEdges(spark, 300, 3000, seed = 3).localCheckpoint(true)
    val hub = e.filter(col("src") < 15).agg(avg("w")).head.getDouble(0)
    val fringe = e.filter(col("src") > 150).agg(avg("w")).head.getDouble(0)
    assert(hub > fringe, s"hub avg weight $hub should exceed fringe $fringe")
  }

  test("normalized synthetic graph is column-stochastic") {
    val e = GraphOps.normalize(spark, SynthSocial.rawEdges(spark, 150, 600, 4), 150)
    assert(GraphOps.isColumnStochastic(e, 150))
  }

  test("initialOpinions covers all (node, cand) pairs in [0,1]") {
    val b = SynthSocial.initialOpinions(spark, 50, 4, seed = 5)
    assert(b.count() == 200)
    assert(b.filter(col("b0") < 0 || col("b0") > 1).count() == 0)
    assert(b.select("node", "cand").distinct().count() == 200)
  }

  test("stubbornness covers all pairs in [0,1]") {
    val d = SynthSocial.stubbornness(spark, 50, 3, seed = 6)
    assert(d.count() == 150)
    assert(d.filter(col("d") < 0 || col("d") > 1).count() == 0)
  }

  test("profile joins opinions and stubbornness per (node, cand)") {
    val p = SynthSocial.profile(spark, 40, 2, seed = 7)
    assert(p.count() == 80)
    assert(p.columns.toSeq == Seq("node", "cand", "b0", "d"))
  }

  test("domains assigns 1..3 domains per node") {
    val d = SynthSocial.domains(spark, 500, nDomains = 7, seed = 8).localCheckpoint(true)
    val per = d.groupBy("node").count()
    assert(per.count() == 500)
    assert(per.filter(col("count") > 3).count() == 0)
    assert(d.filter(col("domain") < 0 || col("domain") >= 7).count() == 0)
  }

  test("domain sizes are skewed (popular home domains exist)") {
    val d = SynthSocial.domains(spark, 1000, 7, seed = 9)
    val sizes = d.groupBy("domain").count().collect().map(_.getLong(1))
    assert(sizes.max > 2 * sizes.min)
  }

  test("domainBiasedProfile: near-neutral users, moderate stubbornness") {
    val dom = SynthSocial.domains(spark, 300, 7, seed = 10)
    val p = SynthSocial.domainBiasedProfile(spark, 300, dom, seed = 11).localCheckpoint(true)
    assert(p.filter(col("b0") < 0 || col("b0") > 1).count() == 0)
    assert(p.count() == 600)
    assert(p.filter(col("d") < 0.3 - 1e-9 || col("d") > 0.7 + 1e-9).count() == 0)
    // Competitor opinions are unbiased around 0.5.
    val compMean = p.filter(col("cand") === 1).agg(avg("b0")).head.getDouble(0)
    assert(math.abs(compMean - 0.5) < 0.05)
    // The target is biased per domain: members of negative-bias domains
    // prefer the competitor on average.
    val negNodes = dom.filter(col("domain") % 3 === 0).select("node").distinct()
    val tgtNeg = p.filter(col("cand") === 0).join(negNodes, Seq("node"))
      .agg(avg("b0")).head.getDouble(0)
    assert(tgtNeg < compMean - 0.05, s"neg-domain target mean $tgtNeg vs comp $compMean")
  }
}
