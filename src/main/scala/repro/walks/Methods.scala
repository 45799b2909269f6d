package repro.walks

import org.apache.spark.sql.functions._
import repro.core._

/** Front-ends for the paper's two efficient methods.
  *
  * RW (Algorithm 4): λ_v reverse walks from *every* node — λ from Thm 10
  * for the cumulative score and from Thms 11/12 (per-node γ heuristic) for
  * the ranked scores.
  *
  * RS (Algorithm 5): one reverse walk from each of θ uniformly sampled
  * start nodes — θ from Eq 40 (cumulative, with the deterministic OPT lower
  * bound) or caller-supplied (ranked scores use the §VI-E heuristic).
  */
object Methods {

  /** RW seed selection. `lambdaOverride` forces a uniform per-node walk
    * count (tests and benches use it to trade accuracy for speed exactly
    * like the paper trades via ρ/δ).
    */
  def rw(inst: Instance, score: VoteScore, k: Int,
         rho: Double = 0.9, delta: Double = 0.1, seed: Long = 42,
         lambdaOverride: Option[Int] = None, lambdaCap: Int = 2000): WalkGreedy.Result = {
    val spark = inst.edges.sparkSession
    val lambdas = lambdaOverride match {
      case Some(lam) => spark.range(inst.n).select(col("id").as("node"), lit(lam).as("lam"))
      case None => score match {
        case Cumulative =>
          val lam = math.min(lambdaCap, Bounds.lambdaCumulative(delta, rho))
          spark.range(inst.n).select(col("id").as("node"), lit(lam).as("lam"))
        case _ => Bounds.lambdaPerNode(inst, rho, lambdaCap = lambdaCap)
      }
    }
    val starts = WalkGen.startsPerNode(spark, lambdas)
    val walks = WalkGen.generate(spark, inst.edges, targetStubbornness(inst), starts, inst.t, seed)
    val annotated = WalkGen.annotate(walks, inst, obsIsWalk = false)
    WalkGreedy.select(inst, score, k, annotated, scale = 1.0)
  }

  /** RS seed selection. θ defaults to Eq 40 for the cumulative score and to
    * `thetaCap` otherwise (callers pick the §VI-E heuristic value).
    */
  def rs(inst: Instance, score: VoteScore, k: Int,
         eps: Double = 0.1, l: Double = 1.0, seed: Long = 43,
         thetaOverride: Option[Long] = None, thetaCap: Long = 200000L): WalkGreedy.Result = {
    val spark = inst.edges.sparkSession
    val theta = thetaOverride.getOrElse {
      score match {
        case Cumulative =>
          val optLb = Bounds.optLowerBoundCumulative(inst, k)
          math.min(thetaCap, Bounds.thetaCumulative(inst.n, k, eps, l, optLb))
        case _ => thetaCap
      }
    }
    val starts = WalkGen.sketchStarts(spark, inst.n, theta, seed)
    val walks = WalkGen.generate(spark, inst.edges, targetStubbornness(inst), starts, inst.t, seed + 1)
    val annotated = WalkGen.annotate(walks, inst, obsIsWalk = true)
    WalkGreedy.select(inst, score, k, annotated, scale = inst.n.toDouble / theta)
  }

  /** Target candidate's stubbornness `(node, d)` with no seeds applied —
    * walk termination probabilities of Direct Generation (§V-A).
    */
  def targetStubbornness(inst: Instance): org.apache.spark.sql.DataFrame =
    inst.profile.filter(col("cand") === inst.q).select(col("node"), col("d"))
}
