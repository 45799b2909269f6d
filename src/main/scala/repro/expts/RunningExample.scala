package repro.expts

import org.apache.spark.sql.SparkSession
import repro.core.{GraphOps, Instance}

/** The paper's running example (Fig 1, Table I): 4 users, 3 edges, two
  * candidates, FJ model, horizon t = 1.
  *
  * Paper user `i` is node `i-1`. Target candidate c1 is candidate 0.
  * Initial opinions about c1 are (0.40, 0.80, 0.60, 0.90) — these are the
  * unique in-range values that generate Table I's seedless t=1 row
  * (0.40, 0.80, 0.60, 0.75) under the stated FJ dynamics
  * (d = 1/2 for users 3 and 4; users 1 and 2 have no in-edges and keep
  * their opinions).
  *
  * Candidate c2's t=1 opinions are stated by the paper as
  * (0.35, 0.75, 0.78, 0.90); no in-range *initial* opinions generate 0.78
  * at t=1 under the same matrices (it would need b3^(0) = 1.01), so we make
  * c2's users fully stubborn at those values — legal because D is
  * per-candidate (§II-A) and Table I depends only on c2's opinions *at*
  * t=1. Every Table I cell then reproduces exactly (see DESIGN.md §3).
  */
object RunningExample {

  /** c1 opinions at t=1 per Table I, keyed by paper seed set. */
  val expectedOpinions: Map[Set[Int], Seq[Double]] = Map(
    Set.empty[Int] -> Seq(0.40, 0.80, 0.60, 0.75),
    Set(1)         -> Seq(1.00, 0.80, 0.75, 0.75),
    Set(2)         -> Seq(0.40, 1.00, 0.65, 0.75),
    Set(3)         -> Seq(0.40, 0.80, 1.00, 0.95),
    Set(4)         -> Seq(0.40, 0.80, 0.60, 1.00),
    Set(1, 2)      -> Seq(1.00, 1.00, 0.80, 0.75),
  )

  /** (cumulative, plurality, copeland) per Table I, keyed by paper seed set. */
  val expectedScores: Map[Set[Int], (Double, Double, Double)] = Map(
    Set.empty[Int] -> (2.55, 2, 0),
    Set(1)         -> (3.30, 2, 0),
    Set(2)         -> (2.80, 2, 0),
    Set(3)         -> (3.15, 4, 1),
    Set(4)         -> (2.80, 3, 1),
    Set(1, 2)      -> (3.55, 3, 1),
  )

  /** c2 opinions at t=1 (stated in Table I's caption). */
  val competitorOpinions: Seq[Double] = Seq(0.35, 0.75, 0.78, 0.90)

  /** Convert a paper seed set (users 1..4) to node ids (0..3). */
  def seedsOf(paperSeeds: Set[Int]): Seq[Long] = paperSeeds.toSeq.sorted.map(u => (u - 1).toLong)

  def instance(spark: SparkSession, t: Int = 1): Instance = {
    import spark.implicits._
    val raw = Seq(
      (0L, 2L, 0.5), (1L, 2L, 0.5), (2L, 3L, 1.0),
    ).toDF("src", "dst", "w")
    val edges = GraphOps.normalize(spark, raw, 4).localCheckpoint(true)
    val b0c1 = Seq(0.40, 0.80, 0.60, 0.90)
    val dc1 = Seq(0.0, 0.0, 0.5, 0.5)
    val profile = (
      (0 until 4).map(i => (i.toLong, 0, b0c1(i), dc1(i))) ++
      (0 until 4).map(i => (i.toLong, 1, competitorOpinions(i), 1.0))
    ).toDF("node", "cand", "b0", "d")
    Instance(edges, profile.localCheckpoint(true), n = 4, r = 2, q = 0, t = t)
  }
}
