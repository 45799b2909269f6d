package repro.walks

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType
import repro.core.{GraphOps, Instance}

/** t-step reverse random walks (Direct Generation, §V-A) as an iterative
  * DataFrame job.
  *
  * A walk currently at `v` terminates there with probability `d_qv`
  * (stubbornness of the *seedless* profile — Post-Generation Truncation,
  * Thm 9, re-weights for any later seed set), otherwise moves to an
  * in-neighbor `u` with probability `w_uv` (well-defined because `W_q` is
  * column-stochastic). The walk also ends after `t` steps. The full visited
  * path is retained so any seed set can truncate the walk afterwards: the
  * walk's estimate for seed set `S` is 1 if its path intersects `S`
  * (truncation ends on a seed, whose initial opinion is 1), otherwise the
  * target's initial opinion of the end node.
  *
  * Walk schema: `(wid, start, path: Array[Long], end)`.
  */
object WalkGen {

  /** Generate one walk per row of `starts` (`(wid, start)`), horizon `t`.
    *
    * Walks at a node whose only in-edge is the normalization self-loop are
    * ended immediately — such a node's opinion never changes (§II-A).
    */
  def generate(spark: SparkSession, edges: DataFrame, targetStubbornness: DataFrame,
               starts: DataFrame, t: Int, seed: Long): DataFrame = {
    val cdf = GraphOps.inEdgeCdf(edges).localCheckpoint(true)
    val d = targetStubbornness.select(col("node"), col("d"))
    var state = starts.select(
      col("wid"), col("start"), col("start").as("cur"),
      array(col("start")).as("path"), lit(false).as("done"),
    ).localCheckpoint(true)

    for (step <- 1 to t) {
      val s1 = seed * 7919 + 2 * step
      val s2 = seed * 7919 + 2 * step + 1
      val decided = state.join(d, state("cur") === d("node"))
        .select(col("wid"), col("start"), col("cur"), col("path"),
          (col("done") || rand(s1) < col("d")).as("done"),
          rand(s2).as("r2"))
      val finished = decided.filter(col("done"))
        .select(col("wid"), col("start"), col("cur"), col("path"), lit(true).as("done"))
      val stepped = decided.filter(!col("done"))
        .join(cdf, decided("cur") === cdf("dst") &&
                   col("r2") >= cdf("lo") && col("r2") < cdf("hi"))
        .select(col("wid"), col("start"),
          cdf("src").as("cur"),
          // A full-weight self-loop marks an in-degree-0 node: its opinion
          // is frozen, so the walk is over (no need to append the repeat).
          when(cdf("src") === decided("cur"), col("path"))
            .otherwise(concat(col("path"), array(cdf("src")))).as("path"),
          (cdf("src") === decided("cur") && cdf("w") >= 1.0 - 1e-12).as("done"))
      state = finished.unionByName(stepped).localCheckpoint(true)
    }
    state.select(col("wid"), col("start"), col("path"), col("cur").as("end"))
  }

  /** RW starts: `lambda(v)` walk rows per node `v`. `lambdas` is
    * `(node, lam)`; walk ids are unique.
    */
  def startsPerNode(spark: SparkSession, lambdas: DataFrame): DataFrame =
    lambdas
      .select(col("node").as("start"), explode(sequence(lit(1), col("lam").cast("int"))).as("rep"))
      .select(monotonically_increasing_id().as("wid"), col("start"))

  /** RW starts with a uniform walk count per node. */
  def uniformStarts(spark: SparkSession, n: Long, lambda: Int): DataFrame =
    startsPerNode(spark, spark.range(n).select(col("id").as("node"), lit(lambda).as("lam")))

  /** RS starts (Alg 5): `theta` start nodes sampled uniformly at random with
    * replacement; each sample is one observation with a single walk.
    */
  def sketchStarts(spark: SparkSession, n: Long, theta: Long, seed: Long): DataFrame =
    spark.range(theta).select(
      col("id").as("wid"),
      (rand(seed) * n).cast(LongType).as("start"),
    ).localCheckpoint(true)

  /** Annotate generated walks with the target candidate's initial opinion of
    * each walk's end node, producing the greedy working set
    * `(wid, obs, start, path, b0end, covered=false)`.
    *
    * @param obsIsWalk RS keys observations by walk id (λ=1 per sample);
    *                  RW keys them by start node (λ_v walks averaged).
    */
  def annotate(walks: DataFrame, inst: Instance, obsIsWalk: Boolean): DataFrame = {
    val b0 = inst.profile.filter(col("cand") === inst.q).select(col("node"), col("b0"))
    walks.join(b0, walks("end") === b0("node"))
      .select(col("wid"),
        (if (obsIsWalk) col("wid") else col("start")).as("obs"),
        col("start"), col("path"), col("b0").as("b0end"), lit(false).as("covered"))
      .localCheckpoint(true)
  }
}
