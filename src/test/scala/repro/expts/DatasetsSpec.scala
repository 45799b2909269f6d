package repro.expts

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.GraphOps

class DatasetsSpec extends SparkSpec {

  test("registry mirrors the five Table III datasets") {
    assert(Datasets.all.map(_.paperName) == Seq(
      "DBLP", "Yelp", "Twitter_US_Election", "Twitter_Social_Distancing", "Twitter_Mask"))
    assert(Datasets.all.map(_.r) == Seq(2, 10, 4, 2, 2)) // Table III candidate counts
  }

  test("scaled sizes preserve the paper's edge/node ratios within 15%") {
    for (s <- Datasets.all) {
      val paperRatio = s.paperEdges.toDouble / s.paperNodes
      val ourRatio = s.m.toDouble / s.n
      assert(math.abs(ourRatio - paperRatio) / paperRatio < 0.15,
        s"${s.name}: ratio $ourRatio vs paper $paperRatio")
    }
  }

  test("a materialized instance is well-formed (smallest dataset)") {
    val spec = Datasets.twitterSdSmall
    val inst = Datasets.instance(spark, spec, t = 5)
    assert(inst.n == spec.n && inst.r == spec.r)
    assert(GraphOps.isColumnStochastic(inst.edges, spec.n))
    assert(inst.profile.count() == spec.n * spec.r)
    assert(inst.profile.filter(
      col("b0") < 0 || col("b0") > 1 || col("d") < 0 || col("d") > 1).count() == 0)
  }

  test("instance materialization is deterministic") {
    val a = Datasets.instance(spark, Datasets.twitterSdSmall, t = 3)
    val b = Datasets.instance(spark, Datasets.twitterSdSmall, t = 3)
    val sa = a.edges.agg(round(sum(col("w") * col("src")), 6)).head.getDouble(0)
    val sb = b.edges.agg(round(sum(col("w") * col("src")), 6)).head.getDouble(0)
    assert(sa == sb)
    assert(a.profile.agg(round(sum("b0"), 6)).head.getDouble(0) ==
           b.profile.agg(round(sum("b0"), 6)).head.getDouble(0))
  }

  test("edge counts land close to spec (generation may dedupe a few)") {
    val spec = Datasets.twitterSdSmall
    val inst = Datasets.instance(spark, spec, t = 3)
    val nonLoop = inst.edges.filter(col("src") =!= col("dst")).count()
    assert(nonLoop >= (spec.m * 0.95).toLong && nonLoop <= spec.m,
      s"got $nonLoop edges for spec ${spec.m}")
  }
}
