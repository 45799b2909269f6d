package repro.expts

import org.apache.spark.sql.SparkSession
import repro.core._

/** Accuracy/efficiency comparison of all nine methods (the shape of
  * Figs 6–8, recorded as a table since figures are out of scope): exact
  * cumulative / plurality / Copeland score of each method's seeds, plus
  * seed-selection wall time.
  *
  * Paper claims encoded here (checked in the bench and EXPERIMENTS.md):
  *   1. DM/RW/RS beat IC/LT/PR/RWR/DC on every voting score;
  *   2. GED-T ties DM on cumulative (same algorithm) but trails on
  *      plurality/Copeland;
  *   3. RS is the fastest of DM/RW/RS.
  */
object ComparisonExp {

  final case class Row(score: String, method: String, value: Double, millis: Long)

  val ours: Set[String] = Set("DM", "RW", "RS")
  val baselines: Set[String] = Set("IC", "LT", "GED-T", "PR", "RWR", "DC")

  def run(spark: SparkSession, n: Long = 320, m: Long = 1920, r: Int = 4,
          t: Int = 8, k: Int = 10, rwLambda: Int = 120, rsTheta: Long = 6000L,
          seed: Long = 801): (String, Seq[Row]) = {
    val spec = Datasets.Spec("comparison", "synthetic", n, m, r, 0, 0, seed)
    val inst = Datasets.instance(spark, spec, t)
    val methods = Seq("DM", "RW", "RS", "IC", "LT", "GED-T", "PR", "RWR", "DC")
    val scores: Seq[(String, VoteScore)] = Seq(
      "cumulative" -> Cumulative,
      "plurality" -> Plurality(r),
      "copeland" -> Copeland)

    // Score-independent methods select once; DM/RW/RS re-select per score.
    val fixedRuns = Harness.runMethods(inst, Cumulative, k,
      methods.filterNot(ours.contains), rwLambda, rsTheta, rrTheta = 4000L, seed)

    val rows = scores.flatMap { case (nm, sc) =>
      val ourRuns = Harness.runMethods(inst, sc, k, methods.filter(ours.contains),
        rwLambda, rsTheta, rrTheta = 4000L, seed)
      val all = (ourRuns ++ fixedRuns).sortBy(r => methods.indexOf(r.method))
      Harness.evaluate(inst, all, sc).map { case (meth, v, ms) => Row(nm, meth, v, ms) }
    }

    val text = Harness.render(
      s"Figs 6-8 shape - exact scores of each method's k=$k seeds (n=$n, r=$r, t=$t)",
      Seq("Score", "Method", "Exact score", "Select ms"),
      rows.map(r => Seq(r.score, r.method, f"${r.value}%.2f", r.millis.toString)))
    (text, rows)
  }
}
