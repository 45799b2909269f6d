package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** The five voting-based scores of §II-B.
  *
  * Every score is computed from the horizon-`t` opinion DataFrame
  * `(node, cand, b)`. `exact` evaluates the score of a candidate;
  * `byScenario` evaluates it per greedy scenario given scenario-vectorized
  * target opinions `(scen, node, b)` and exact competitor opinions
  * `(node, cand, b)` (restricted to `cand != target` by the caller).
  */
sealed trait VoteScore extends Serializable {
  def name: String
  def exact(ops: DataFrame, cand: Int): Double
  def byScenario(targetOps: DataFrame, compOps: DataFrame): DataFrame
}

object VoteScore {
  /** Rank `beta` of the target for a user: 1 + number of competitors whose
    * opinion is >= the target's (§II-B) — `beta = 1` means strictly top.
    */
  private[core] def betaCol(bq: Column, bx: Column): Column = bx >= bq

  /** Per-user contribution of a positional-p-approval score given the
    * user's rank column `beta` (1-based): `w[beta] * 1[beta <= p]`.
    */
  private[repro] def positionalContrib(beta: Column, p: Int, weights: Seq[Double]): Column = {
    val wArr = array(weights.map(lit): _*)
    when(beta <= p, element_at(wArr, beta.cast("int"))).otherwise(lit(0.0))
  }

  /** All-ones weights used by plurality / p-approval. */
  private[repro] def onesWeights(r: Int): Seq[Double] = Seq.fill(r)(1.0)
}

/** Cumulative score (Eq 3): sum of all users' opinions about the candidate. */
case object Cumulative extends VoteScore {
  val name = "cumulative"

  def exact(ops: DataFrame, cand: Int): Double =
    ops.filter(col("cand") === cand).agg(sum("b")).head.getDouble(0)

  def byScenario(targetOps: DataFrame, compOps: DataFrame): DataFrame =
    targetOps.groupBy("scen").agg(sum("b").as("score"))
}

/** Positional-p-approval score (Eq 6); plurality (Eq 4) and p-approval
  * (Eq 5) are the all-ones-weight special cases below.
  */
final case class PositionalPApproval(p: Int, weights: Seq[Double]) extends VoteScore {
  require(p >= 1, s"p must be >= 1, got $p")
  require(weights.nonEmpty && weights.forall(w => w >= 0 && w <= 1),
    "position weights must lie in [0,1]")
  require(weights.zip(weights.tail).forall { case (a, b) => b <= a },
    "position weights must be non-increasing")

  val name = s"positional-$p-approval"

  def exact(ops: DataFrame, cand: Int): Double = {
    val tgt = ops.filter(col("cand") === cand).select(col("node"), col("b").as("bq"))
    val comp = ops.filter(col("cand") =!= cand).select(col("node"), col("b").as("bx"))
    val beta = tgt.join(comp, Seq("node"))
      .groupBy("node")
      .agg((sum(when(VoteScore.betaCol(col("bq"), col("bx")), 1).otherwise(0)) + 1).as("beta"))
    beta.agg(sum(VoteScore.positionalContrib(col("beta"), p, weights))).head.getDouble(0)
  }

  def byScenario(targetOps: DataFrame, compOps: DataFrame): DataFrame = {
    val comp = compOps.select(col("node"), col("b").as("bx"))
    targetOps.join(comp, Seq("node"))
      .groupBy("scen", "node")
      .agg((sum(when(VoteScore.betaCol(col("b"), col("bx")), 1).otherwise(0)) + 1).as("beta"))
      .groupBy("scen")
      .agg(sum(VoteScore.positionalContrib(col("beta"), p, weights)).as("score"))
  }
}

object Plurality {
  /** Plurality score (Eq 4) for an `r`-candidate election. */
  def apply(r: Int): PositionalPApproval = PositionalPApproval(1, VoteScore.onesWeights(r))
}

object PApproval {
  /** p-approval score (Eq 5) for an `r`-candidate election. */
  def apply(p: Int, r: Int): PositionalPApproval = PositionalPApproval(p, VoteScore.onesWeights(r))
}

/** Cumulative opinion restricted to a node subset, times a constant —
  * the sandwich lower-bound objective of Def 3:
  * `LB(S) = w[p] * sum_{v in favorable} b_qv[S]`. Submodular (Thm 5), so
  * the plain greedy is (1-1/e)-approximate for it.
  */
final case class RestrictedCumulative(nodes: DataFrame, factor: Double) extends VoteScore {
  val name = "restricted-cumulative"

  def exact(ops: DataFrame, cand: Int): Double = {
    val row = ops.filter(col("cand") === cand)
      .join(nodes, Seq("node"))
      .agg(sum("b")).head
    (if (row.isNullAt(0)) 0.0 else row.getDouble(0)) * factor
  }

  def byScenario(targetOps: DataFrame, compOps: DataFrame): DataFrame =
    targetOps.join(nodes, Seq("node"))
      .groupBy("scen").agg((sum("b") * factor).as("score"))
}

/** Copeland score (Eq 7): number of one-on-one competitions the candidate
  * wins (strictly more users prefer it than prefer the opponent).
  */
case object Copeland extends VoteScore {
  val name = "copeland"

  def exact(ops: DataFrame, cand: Int): Double = {
    val tgt = ops.filter(col("cand") === cand).select(col("node"), col("b").as("bq"))
    val comp = ops.filter(col("cand") =!= cand)
      .select(col("node"), col("cand").as("x"), col("b").as("bx"))
    tgt.join(comp, Seq("node"))
      .groupBy("x")
      .agg(sum(when(col("bq") > col("bx"), 1).otherwise(0)).as("wins"),
           sum(when(col("bq") < col("bx"), 1).otherwise(0)).as("losses"))
      .filter(col("wins") > col("losses"))
      .count().toDouble
  }

  def byScenario(targetOps: DataFrame, compOps: DataFrame): DataFrame = {
    val comp = compOps.select(col("node"), col("cand").as("x"), col("b").as("bx"))
    targetOps.join(comp, Seq("node"))
      .groupBy("scen", "x")
      .agg(sum(when(col("b") > col("bx"), 1).otherwise(0)).as("wins"),
           sum(when(col("b") < col("bx"), 1).otherwise(0)).as("losses"))
      .groupBy("scen")
      .agg(sum(when(col("wins") > col("losses"), 1.0).otherwise(0.0)).as("score"))
  }
}
