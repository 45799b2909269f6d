package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class GraphOpsSpec extends SparkSpec {
  import spark.implicits._

  private def raw = Seq(
    (0L, 1L, 2.0), (2L, 1L, 2.0),             // node 1: two in-edges, equal raw weight
    (1L, 2L, 1.0),                             // node 2: single in-edge
    (0L, 3L, 1.0), (1L, 3L, 3.0),              // node 3: skewed in-weights
  ).toDF("src", "dst", "w")

  private lazy val edges = GraphOps.normalize(spark, raw, 5).localCheckpoint(true)

  test("normalize yields a column-stochastic matrix") {
    assert(GraphOps.isColumnStochastic(edges, 5))
  }

  test("normalize scales parallel in-weights proportionally") {
    val m = edges.filter(col("dst") === 3).collect()
      .map(r => r.getLong(0) -> r.getDouble(2)).toMap
    assert(math.abs(m(0L) - 0.25) < 1e-12)
    assert(math.abs(m(1L) - 0.75) < 1e-12)
  }

  test("normalize combines duplicate (src,dst) pairs before scaling") {
    val dup = Seq((0L, 1L, 1.0), (0L, 1L, 1.0), (2L, 1L, 2.0)).toDF("src", "dst", "w")
    val e = GraphOps.normalize(spark, dup, 3)
    val m = e.filter(col("dst") === 1).collect().map(r => r.getLong(0) -> r.getDouble(2)).toMap
    assert(math.abs(m(0L) - 0.5) < 1e-12 && math.abs(m(2L) - 0.5) < 1e-12)
  }

  test("normalize drops non-positive weights") {
    val e = GraphOps.normalize(spark, Seq((0L, 1L, -1.0), (2L, 1L, 1.0)).toDF("src", "dst", "w"), 3)
    assert(e.filter(col("dst") === 1 && col("src") === 0).isEmpty)
  }

  test("nodes with no in-edges (0 and 4) get weight-1 self-loops") {
    val loops = edges.filter(col("src") === col("dst")).collect()
    assert(loops.map(_.getLong(0)).toSet == Set(0L, 4L))
    assert(loops.forall(_.getDouble(2) == 1.0))
  }

  test("isColumnStochastic rejects an unnormalized graph") {
    assert(!GraphOps.isColumnStochastic(raw, 5))
  }

  test("inEdgeCdf tiles [0,1) per destination") {
    val cdf = GraphOps.inEdgeCdf(edges)
    val byDst = cdf.collect().groupBy(_.getLong(1))
    byDst.foreach { case (_, rows) =>
      val sorted = rows.sortBy(_.getDouble(3))
      assert(math.abs(sorted.head.getDouble(3)) < 1e-12)           // first lo = 0
      assert(math.abs(sorted.last.getDouble(4) - 1.0) < 1e-12)     // last hi = 1
      sorted.sliding(2).foreach {
        case Array(a, b) => assert(math.abs(a.getDouble(4) - b.getDouble(3)) < 1e-12)
        case _           =>
      }
    }
  }

  test("inEdgeCdf intervals have width equal to the edge weight") {
    val bad = GraphOps.inEdgeCdf(edges)
      .filter(abs(col("hi") - col("lo") - col("w")) > 1e-12).count()
    assert(bad == 0)
  }

  test("reachWithin at t=0 is the identity relation") {
    val r = GraphOps.reachWithin(spark, edges, 5, 0).collect()
    assert(r.length == 5 && r.forall(x => x.getLong(0) == x.getLong(1)))
  }

  test("reachWithin follows directed edges hop by hop") {
    // 0 -> 1 -> {2,3}, 2 -> 1: reach(0, t=1) = {0,1,3}; reach(0, t=2) adds 2.
    val r1 = GraphOps.reachWithin(spark, edges, 5, 1)
      .filter(col("root") === 0).collect().map(_.getLong(1)).toSet
    assert(r1 == Set(0L, 1L, 3L))
    val r2 = GraphOps.reachWithin(spark, edges, 5, 2)
      .filter(col("root") === 0).collect().map(_.getLong(1)).toSet
    assert(r2 == Set(0L, 1L, 2L, 3L))
  }

  test("reachWithin is monotone in t") {
    val c2 = GraphOps.reachWithin(spark, edges, 5, 2).count()
    val c3 = GraphOps.reachWithin(spark, edges, 5, 3).count()
    assert(c3 >= c2)
  }

  test("reachWithin stops early when the frontier empties") {
    // With t far beyond the diameter the result must equal transitive closure.
    val r10 = GraphOps.reachWithin(spark, edges, 5, 10).count()
    val r4 = GraphOps.reachWithin(spark, edges, 5, 4).count()
    assert(r10 == r4)
  }

  test("weightedOutDegree excludes self-loops and defaults to 0") {
    val deg = GraphOps.weightedOutDegree(spark, edges, 5).collect()
      .map(r => r.getLong(0) -> r.getDouble(1)).toMap
    assert(deg(4L) == 0.0)               // isolated node: only a self-loop
    assert(deg(0L) > 0 && deg(1L) > 0)
    assert(deg.size == 5)
  }

  test("weightedOutDegree matches DuckDB") {
    val got = GraphOps.weightedOutDegree(spark, edges, 5)
      .select(col("node").cast("long").as("node"), round(col("outdeg"), 6).as("outdeg"))
    Oracle.assertEquivalent(
      got,
      """SELECT CAST(n.node AS BIGINT) AS node,
        |       ROUND(COALESCE(SUM(CAST(e.w AS DOUBLE)), 0), 6) AS outdeg
        |FROM nodes n LEFT JOIN edges e
        |  ON CAST(e.src AS BIGINT) = CAST(n.node AS BIGINT) AND e.src <> e.dst
        |GROUP BY n.node""".stripMargin,
      "edges" -> edges,
      "nodes" -> spark.range(5).toDF("node"),
    )
  }
}
