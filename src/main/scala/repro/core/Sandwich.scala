package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Sandwich approximation (Algorithm 3, §IV) for the non-submodular scores.
  *
  * Plurality variants: lower bound `LB(S) = w[p] * sum_{v in Vq} b_qv[S]`
  * (Def 3, submodular by Thm 5) and upper bound
  * `UB(S) = w[1] * |N_S ∪ Vq|` (Def 4, submodular by Thm 6), where `Vq` is
  * the favorable users set (Def 1) and `N_S` the t-hop reachable set (Def 2).
  *
  * Copeland: upper bound `UB(S) = (r-1)/(floor(n/2)+1) * |N_S ∪ Uq|`
  * (Def 6) with the weakly favorable users set `Uq` (Def 5); the paper
  * derives no useful lower bound, so only `S_U` and `S_F` are compared.
  */
object Sandwich {

  /** @param seeds     the returned seed set `S#`
    * @param pickedFrom which of S_U / S_L / S_F won the final comparison
    * @param fValue    exact `F(S#)`
    * @param ratioU    the empirical factor `F(S_U)/UB(S_U)` of §IV-D; the
    *                  sandwich guarantee is `ratioU * (1 - 1/e)` (Eq 20)
    */
  final case class Result(seeds: Seq[Long], pickedFrom: String, fValue: Double,
                          sU: Seq[Long], sL: Option[Seq[Long]], sF: Seq[Long],
                          ratioU: Double)

  /** Favorable users set `Vq` (Def 1): users ranking the target within the
    * top `p` at the horizon with no seeds. Single-column `(node)`.
    */
  def favorableUsers(inst: Instance, p: Int): DataFrame = {
    val ops = inst.opinions(Nil)
    val tgt = ops.filter(col("cand") === inst.q).select(col("node"), col("b").as("bq"))
    val comp = ops.filter(col("cand") =!= inst.q).select(col("node"), col("b").as("bx"))
    tgt.join(comp, Seq("node"))
      .groupBy("node")
      .agg((sum(when(col("bx") >= col("bq"), 1).otherwise(0)) + 1).as("beta"))
      .filter(col("beta") <= p)
      .select("node")
  }

  /** Weakly favorable users set `Uq` (Def 5): users preferring the target to
    * at least one other candidate at the horizon with no seeds.
    */
  def weaklyFavorableUsers(inst: Instance): DataFrame = {
    val ops = inst.opinions(Nil)
    val tgt = ops.filter(col("cand") === inst.q).select(col("node"), col("b").as("bq"))
    val comp = ops.filter(col("cand") =!= inst.q).select(col("node"), col("b").as("bx"))
    tgt.join(comp, Seq("node"))
      .groupBy("node")
      .agg(min("bx").as("minx"), first("bq").as("bq"))
      .filter(col("bq") > col("minx"))
      .select("node")
  }

  /** Greedy maximization of `factor * |N_S ∪ fixed|` — submodular coverage,
    * so greedy is (1-1/e)-approximate. Returns the seeds and the exact UB
    * value of the returned set.
    */
  def coverageGreedy(inst: Instance, fixed: DataFrame, k: Int, factor: Double): (Seq[Long], Double) = {
    val spark = inst.edges.sparkSession
    val reach = GraphOps.reachWithin(spark, inst.edges, inst.n, inst.t).localCheckpoint(true)
    var covered = fixed.select("node").distinct().localCheckpoint(true)
    var seeds = Vector.empty[Long]
    for (_ <- 1 to k) {
      val candidates =
        if (seeds.isEmpty) reach else reach.filter(!col("root").isInCollection(seeds))
      val gains = candidates
        .join(covered, Seq("node"), "left_anti")
        .groupBy("root").agg(count(lit(1)).as("g"))
        .orderBy(col("g").desc, col("root"))
        .limit(1).collect()
      val pick =
        if (gains.nonEmpty) gains.head.getLong(0)
        else (0L until inst.n).filterNot(seeds.contains).head // everything covered
      seeds :+= pick
      covered = covered
        .unionByName(reach.filter(col("root") === pick).select("node"))
        .distinct().localCheckpoint(true)
    }
    (seeds, covered.count() * factor)
  }

  /** Algorithm 3 for a plurality-variant score. */
  def run(inst: Instance, score: PositionalPApproval, k: Int): Result = {
    val vq = favorableUsers(inst, score.p).localCheckpoint(true)
    val omega1 = score.weights.head
    val omegaP = score.weights(score.p - 1)
    val (sU, ubU) = coverageGreedy(inst, vq, k, omega1)
    val sL =
      if (vq.isEmpty) (0L until k.toLong).toVector // LB ≡ 0: any feasible set
      else GreedyDM.select(inst, RestrictedCumulative(vq, omegaP), k, celf = true).seeds
    val sF = GreedyDM.select(inst, score, k).seeds
    finish(inst, score, Seq("S_U" -> sU, "S_L" -> sL, "S_F" -> sF), sU, Some(sL), sF, ubU)
  }

  /** Algorithm 3 for the Copeland score (upper bound only, §IV-C). */
  def runCopeland(inst: Instance, k: Int): Result = {
    val uq = weaklyFavorableUsers(inst).localCheckpoint(true)
    val factor = (inst.r - 1).toDouble / (inst.n / 2 + 1).toDouble
    val (sU, ubU) = coverageGreedy(inst, uq, k, factor)
    val sF = GreedyDM.select(inst, Copeland, k).seeds
    finish(inst, Copeland, Seq("S_U" -> sU, "S_F" -> sF), sU, None, sF, ubU)
  }

  private def finish(inst: Instance, score: VoteScore,
                     options: Seq[(String, Seq[Long])],
                     sU: Seq[Long], sL: Option[Seq[Long]], sF: Seq[Long],
                     ubU: Double): Result = {
    val scored = options.map { case (nm, s) => (nm, s, inst.targetScore(score, s)) }
    val (nm, s, f) = scored.maxBy(_._3)
    val fU = scored.find(_._1 == "S_U").get._3
    Result(s, nm, f, sU, sL, sF, if (ubU > 0) fU / ubU else 1.0)
  }
}
