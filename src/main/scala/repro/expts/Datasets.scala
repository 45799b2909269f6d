package repro.expts

import org.apache.spark.sql.SparkSession
import repro.core.{GraphOps, Instance}
import repro.SynthSocial

/** Synthetic stand-ins for the paper's five datasets (Table III),
  * scaled to laptop size with the node/edge *ratios* preserved
  * (see DESIGN.md §3 for the substitution rationale). Generation is
  * deterministic per spec.
  */
object Datasets {

  /** @param paperNodes/@param paperEdges Table III values, recorded so the
    *  Table III bench can print paper vs ours side by side.
    */
  final case class Spec(name: String, paperName: String,
                        n: Long, m: Long, r: Int,
                        paperNodes: Long, paperEdges: Long, seed: Long)

  val dblp = Spec("synth-dblp", "DBLP", 1600, 71178, 2, 63910, 2847120, 101)
  val yelp = Spec("synth-yelp", "Yelp", 2416, 22039, 10, 966240, 8815788, 103)
  val twitterElection = Spec("synth-twitter-us-election", "Twitter_US_Election",
    2808, 5339, 4, 2246604, 4270918, 107)
  val twitterSd = Spec("synth-twitter-social-distancing", "Twitter_Social_Distancing",
    4056, 5253, 2, 3244762, 4202083, 109)
  val twitterMask = Spec("synth-twitter-mask", "Twitter_Mask",
    2927, 4051, 2, 2341769, 3241153, 113)

  /** Small variant used where exact DM greedy appears (its cost is
    * O(n · t · m) per greedy round even when scenario-vectorized).
    */
  val twitterSdSmall = Spec("synth-twitter-sd-small", "Twitter_Social_Distancing (scaled)",
    400, 2400, 2, 3244762, 4202083, 109)

  val all: Seq[Spec] = Seq(dblp, yelp, twitterElection, twitterSd, twitterMask)

  /** Materialize a problem instance for a spec (target candidate 0). */
  def instance(spark: SparkSession, spec: Spec, t: Int = 20, q: Int = 0): Instance = {
    val raw = SynthSocial.rawEdges(spark, spec.n, spec.m, spec.seed)
    val edges = GraphOps.normalize(spark, raw, spec.n).localCheckpoint(true)
    val profile = SynthSocial.profile(spark, spec.n, spec.r, spec.seed + 1)
      .localCheckpoint(true)
    Instance(edges, profile, spec.n, spec.r, q, t)
  }
}
