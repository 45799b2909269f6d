package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.expts.RunningExample

class OpinionDiffusionSpec extends SparkSpec {
  import spark.implicits._

  private lazy val inst = RunningExample.instance(spark)

  private def opinionMap(ops: org.apache.spark.sql.DataFrame, cand: Int): Map[Long, Double] =
    ops.filter(col("cand") === cand).collect().map(r => r.getLong(0) -> r.getDouble(2)).toMap

  test("t=0 returns the initial opinions") {
    val got = opinionMap(OpinionDiffusion.diffuse(inst.edges, inst.profile, 0), 0)
    assert(got == Map(0L -> 0.40, 1L -> 0.80, 2L -> 0.60, 3L -> 0.90))
  }

  test("horizon t rejects negative values") {
    intercept[IllegalArgumentException] {
      OpinionDiffusion.diffuse(inst.edges, inst.profile, -1)
    }
  }

  test("one FJ step matches the closed-form update of Example 1") {
    val got = opinionMap(OpinionDiffusion.diffuse(inst.edges, inst.profile, 1), 0)
    // b3' = 1/2[b3 + (b1+b2)/2], b4' = 1/2[b3 + b4] at t=1 (d=0.5, b = b0).
    assert(math.abs(got(2L) - 0.5 * (0.60 + 0.5 * (0.40 + 0.80))) < 1e-12)
    assert(math.abs(got(3L) - 0.5 * (0.60 + 0.90)) < 1e-12)
  }

  test("two FJ steps anchor to the *initial* opinion (FJ, not self-loop DeGroot)") {
    val got = opinionMap(OpinionDiffusion.diffuse(inst.edges, inst.profile, 2), 0)
    // b3'' = (1-d3)(b1'+b2')/2 + d3*b3^(0) with b' from t=1.
    val b3t2 = 0.5 * (0.40 + 0.80) / 2 * 1.0 + 0.5 * 0.60
    val b4t2 = 0.5 * 0.60 /* b3 at t=1 */ + 0.5 * 0.90
    assert(math.abs(got(2L) - b3t2) < 1e-12)
    assert(math.abs(got(3L) - b4t2) < 1e-12)
  }

  test("fully stubborn users never move (candidate 1 in the example)") {
    val got = opinionMap(OpinionDiffusion.diffuse(inst.edges, inst.profile, 7), 1)
    RunningExample.competitorOpinions.zipWithIndex.foreach {
      case (e, i) => assert(math.abs(got(i.toLong) - e) < 1e-12)
    }
  }

  test("nodes with no in-neighbors retain their initial opinions at any horizon") {
    val got = opinionMap(OpinionDiffusion.diffuse(inst.edges, inst.profile, 9), 0)
    assert(got(0L) == 0.40 && got(1L) == 0.80)
  }

  test("DeGroot special case: zero stubbornness adopts the in-neighbor average") {
    val prof = inst.profile.select(col("node"), col("cand"), col("b0"),
      when(col("cand") === 0, 0.0).otherwise(col("d")).as("d"))
    val got = opinionMap(OpinionDiffusion.diffuse(inst.edges, prof, 1), 0)
    assert(math.abs(got(2L) - 0.5 * (0.40 + 0.80)) < 1e-12)
    assert(math.abs(got(3L) - 0.60) < 1e-12)
  }

  test("opinions stay in [0,1] over a long horizon") {
    val ops = OpinionDiffusion.diffuse(inst.edges, inst.profile, 25)
    val bad = ops.filter(col("b") < -1e-12 || col("b") > 1 + 1e-12).count()
    assert(bad == 0)
  }

  test("applySeeds pins b0 and d to 1 for the target only") {
    val p = OpinionDiffusion.applySeeds(inst.profile, q = 0, seeds = Seq(2L)).collect()
      .map(r => (r.getLong(0), r.getInt(1)) -> (r.getDouble(2), r.getDouble(3))).toMap
    assert(p((2L, 0)) == ((1.0, 1.0)))
    assert(p((2L, 1)) == ((0.78, 1.0))) // competitor row untouched
    assert(p((0L, 0)) == ((0.40, 0.0)))
  }

  test("a seeded node stays at opinion 1 for all horizons") {
    for (t <- Seq(1, 3, 8)) {
      val got = opinionMap(inst.copy(t = t).opinions(Seq(2L)), 0)
      assert(got(2L) == 1.0, s"t=$t")
    }
  }

  test("opinions are non-decreasing in the seed set (monotonicity, §III-B)") {
    val base = opinionMap(inst.opinions(Nil), 0)
    val withSeed = opinionMap(inst.opinions(Seq(0L)), 0)
    (0L until 4L).foreach(v => assert(withSeed(v) >= base(v) - 1e-12))
    val bigger = opinionMap(inst.opinions(Seq(0L, 1L)), 0)
    (0L until 4L).foreach(v => assert(bigger(v) >= withSeed(v) - 1e-12))
  }

  test("scenario-vectorized diffusion equals one-at-a-time diffusion") {
    val scen = Seq(0L, 1L, 2L, 3L).toDF("scen")
    val vect = OpinionDiffusion.diffuseScenarios(inst.edges, inst.targetProfile(Nil), scen, 1)
      .collect().map(r => (r.getLong(0), r.getLong(1)) -> r.getDouble(2)).toMap
    for (s <- 0L until 4L) {
      val solo = opinionMap(inst.opinions(Seq(s)), 0)
      for (v <- 0L until 4L)
        assert(math.abs(vect((s, v)) - solo(v)) < 1e-12, s"scenario $s node $v")
    }
  }

  test("scenario diffusion stacks on top of an existing seed set") {
    val scen = Seq(1L).toDF("scen")
    val vect = OpinionDiffusion.diffuseScenarios(inst.edges, inst.targetProfile(Seq(0L)), scen, 1)
      .collect().map(r => r.getLong(1) -> r.getDouble(2)).toMap
    val expected = opinionMap(inst.opinions(Seq(0L, 1L)), 0)
    (0L until 4L).foreach(v => assert(math.abs(vect(v) - expected(v)) < 1e-12))
  }

  test("one FJ step matches DuckDB SQL") {
    val prof = inst.profile.filter(col("cand") === 0).select("node", "b0", "d")
    val got = OpinionDiffusion.diffuse(inst.edges, inst.profile, 1)
      .filter(col("cand") === 0)
      .select(col("node").cast("long").as("node"), round(col("b"), 6).as("b"))
    Oracle.assertEquivalent(
      got,
      """SELECT CAST(p.node AS BIGINT) AS node,
        |       ROUND((1 - CAST(p.d AS DOUBLE)) * SUM(CAST(e.w AS DOUBLE) * CAST(p2.b0 AS DOUBLE))
        |             + CAST(p.d AS DOUBLE) * CAST(p.b0 AS DOUBLE), 6) AS b
        |FROM prof p
        |JOIN edges e ON CAST(e.dst AS BIGINT) = CAST(p.node AS BIGINT)
        |JOIN prof p2 ON CAST(p2.node AS BIGINT) = CAST(e.src AS BIGINT)
        |GROUP BY p.node, p.d, p.b0""".stripMargin,
      "edges" -> inst.edges,
      "prof" -> prof,
    )
  }
}
