package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic social-network substrate for the opinion-maximization paper.
  *
  * The paper evaluates on DBLP, Yelp and three Twitter graphs, none of which
  * ship with this image; we substitute seeded synthetic directed graphs with
  * Zipf-skewed degrees and `1 - e^{-a/mu}` interaction weights (the same
  * functional form the paper uses for its real edge weights, §VIII-A).
  * All generators are deterministic in their `seed`.
  */
object SynthSocial {

  /** Raw weighted directed edges `(src, dst, w)` over node ids `0 until n`.
    *
    * Sources are strongly power-skewed (low ids are influencer hubs with
    * huge out-degree, like prolific co-authors / retweeted accounts) and
    * destinations mildly skewed. Raw weight is `1 - exp(-a/mu)` [74] with
    * interaction count `a` larger for hub sources — a hub edge keeps a big
    * share of its destination's attention even after column-stochastic
    * normalization, which is the structure the paper's seed selection
    * exploits. Self-loops and duplicate pairs are removed; pass the result
    * through [[repro.core.GraphOps.normalize]] before any diffusion.
    */
  def rawEdges(spark: SparkSession, n: Long, m: Long, seed: Long = 7,
               srcSkew: Double = 2.5, dstSkew: Double = 1.3,
               mu: Double = 10.0): DataFrame = {
    // Oversample to survive self-loop removal and dedup (skewed sources
    // collide often), then cap at m.
    val draws = m * 3 + 64
    spark.range(draws).select(
      least(lit(n - 1), (pow(rand(seed), lit(srcSkew)) * n).cast(LongType)).as("src"),
      least(lit(n - 1), (pow(rand(seed + 1), lit(dstSkew)) * n).cast(LongType)).as("dst"),
      rand(seed + 2).as("u"),
    )
      // Interaction count: baseline 1..5, plus up to ~15 for hub sources.
      .withColumn("a", lit(1.0) + col("u") *
        (lit(4.0) + lit(15.0) * pow(lit(1.0) - col("src") / lit(n.toDouble), lit(8.0))))
      .withColumn("w", lit(1.0) - exp(-col("a") / mu))
      .select("src", "dst", "w")
      .filter(col("src") =!= col("dst"))
      .dropDuplicates("src", "dst")
      .limit(m.toInt)
  }

  /** Initial opinions `(node, cand, b0)` for candidates `0 until r`,
    * uniform in [0, 1] (the paper's Twitter setup also randomizes user
    * attitudes; scores only depend on relative opinion values).
    */
  def initialOpinions(spark: SparkSession, n: Long, r: Int, seed: Long = 11): DataFrame = {
    spark.range(n).toDF("node")
      .crossJoin(spark.range(r).select(col("id").cast(IntegerType).as("cand")))
      .select(col("node"), col("cand"),
        rand(seed).as("b0"))
  }

  /** Stubbornness `(node, cand, d)`, uniform in [0, 1] (paper: Twitter
    * datasets assign stubbornness uniformly at random, §VIII-A).
    */
  def stubbornness(spark: SparkSession, n: Long, r: Int, seed: Long = 13): DataFrame = {
    spark.range(n).toDF("node")
      .crossJoin(spark.range(r).select(col("id").cast(IntegerType).as("cand")))
      .select(col("node"), col("cand"), rand(seed).as("d"))
  }

  /** Combined per-candidate node profile `(node, cand, b0, d)`. */
  def profile(spark: SparkSession, n: Long, r: Int, seed: Long = 17): DataFrame =
    initialOpinions(spark, n, r, seed)
      .join(stubbornness(spark, n, r, seed + 1), Seq("node", "cand"))

  /** Case-study domains (Table IV/V stand-in): each node belongs to 1..3 of
    * `nDomains` domains with Zipf-skewed domain popularity. Rows
    * `(node, domain)`.
    */
  def domains(spark: SparkSession, n: Long, nDomains: Int = 7, seed: Long = 19): DataFrame = {
    def draw(s: Long) =
      least(lit(nDomains - 1),
        (pow(rand(s), lit(2.0)) * nDomains).cast(IntegerType)).as("domain")
    val base = spark.range(n).toDF("node")
    val d1 = base.select(col("node"), draw(seed))
    val d2 = base.filter(rand(seed + 10) < 0.5).select(col("node"), draw(seed + 1))
    val d3 = base.filter(rand(seed + 11) < 0.2).select(col("node"), draw(seed + 2))
    d1.unionByName(d2).unionByName(d3).distinct()
  }

  /** Case-study opinions: mostly *neutral* users (both candidates near 0.5
    * with ±0.15 noise) whose target-candidate preference is biased per
    * domain — some domains start pro-competitor, the structure Table IV
    * relies on ("our solution focuses on affecting the neutral users").
    * Stubbornness is moderate (0.3..0.7): users keep part of their own
    * preference yet can be persuaded. Two candidates (target = 0).
    */
  def domainBiasedProfile(spark: SparkSession, n: Long, domainDf: DataFrame,
                          seed: Long = 23): DataFrame = {
    val bias = domainDf.select(col("node"), col("domain"))
      .withColumn("bias", (col("domain") % 3 - 1) * lit(0.25))
      .groupBy("node").agg(avg("bias").as("bias"))
    spark.range(n).toDF("node")
      .crossJoin(spark.range(2).select(col("id").cast("int").as("cand")))
      .join(bias, Seq("node"), "left")
      .select(col("node"), col("cand"),
        least(lit(1.0), greatest(lit(0.0),
          lit(0.5) + (rand(seed) - 0.5) * 0.3 +
            when(col("cand") === 0, coalesce(col("bias"), lit(0.0))).otherwise(lit(0.0))
        )).as("b0"),
        (lit(0.3) + rand(seed + 1) * 0.4).as("d"))
  }
}
