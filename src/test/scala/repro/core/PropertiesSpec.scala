package repro.core

import org.scalacheck.{Gen, Prop, Test => SCTest}
import repro.SparkSpec
import repro.expts.Datasets

/** Empirical validation of the Table II properties (plus ScalaCheck
  * randomized monotonicity / submodularity checks on a small random
  * instance): non-negativity and monotonicity for all five scores,
  * submodularity of per-node opinions (Thm 3) and of the cumulative score.
  */
class PropertiesSpec extends SparkSpec {

  private lazy val inst = Datasets.instance(spark,
    Datasets.Spec("tiny-prop", "tiny", 16, 56, 3, 0, 0, 307), t = 2)

  private val allScores: Seq[(String, VoteScore)] = Seq(
    "cumulative" -> Cumulative,
    "plurality" -> Plurality(3),
    "p-approval" -> PApproval(2, 3),
    "positional" -> PositionalPApproval(2, Seq(1.0, 0.5, 0.0)),
    "copeland" -> Copeland,
  )

  private def check(p: Prop, n: Int = 6): Unit = {
    val res = SCTest.check(
      SCTest.Parameters.default.withMinSuccessfulTests(n).withInitialSeed(7L), p)
    assert(res.passed, res.status.toString)
  }

  private val genSeedSet: Gen[Seq[Long]] = for {
    k <- Gen.choose(0, 5)
    s <- Gen.pick(k, 0L until inst.n)
  } yield s.toSeq.sorted

  private val genNode: Gen[Long] = Gen.choose(0L, inst.n - 1)

  /** (A, B, s) with s outside A ∪ B — discard-free submodularity inputs
    * (X = A ∩ B ⊆ Y = A ∪ B).
    */
  private val genSubmodInputs: Gen[(Seq[Long], Seq[Long], Long)] = for {
    ka <- Gen.choose(0, 4)
    kb <- Gen.choose(0, 4)
    a <- Gen.pick(ka, 0L until inst.n)
    b <- Gen.pick(kb, 0L until inst.n)
    y = (a ++ b).distinct
    s <- Gen.oneOf((0L until inst.n).filterNot(y.contains))
  } yield (a.toSeq.sorted, b.toSeq.sorted, s)

  for ((nm, s) <- allScores) {
    test(s"Table II: $nm is non-negative on random seed sets") {
      check(Prop.forAll(genSeedSet)(seeds => inst.targetScore(s, seeds) >= 0.0), 4)
    }
  }

  for ((nm, s) <- allScores) {
    test(s"Table II: $nm is non-decreasing in the seed set") {
      check(Prop.forAll(genSeedSet, genNode) { (seeds, v) =>
        val f0 = inst.targetScore(s, seeds)
        val f1 = inst.targetScore(s, (seeds :+ v).distinct)
        f1 >= f0 - 1e-9
      }, 4)
    }
  }

  test("Thm 3: per-node opinions are submodular in the seed set") {
    import org.apache.spark.sql.functions._
    def opinions(seeds: Seq[Long]): Map[Long, Double] =
      inst.opinions(seeds).filter(col("cand") === inst.q)
        .collect().map(r => r.getLong(0) -> r.getDouble(2)).toMap
    check(Prop.forAll(genSubmodInputs) { case (a, b, sNode) =>
      val x = a.intersect(b)          // X ⊆ Y by construction
      val y = (a ++ b).distinct.sorted
      val oX = opinions(x)
      val oXs = opinions((x :+ sNode).distinct)
      val oY = opinions(y)
      val oYs = opinions((y :+ sNode).distinct)
      Prop(oY.keys.forall(v => oXs(v) - oX(v) >= oYs(v) - oY(v) - 1e-9))
    }, 4)
  }

  test("Table II: cumulative is submodular (random X ⊆ Y, s)") {
    check(Prop.forAll(genSubmodInputs) { case (a, b, sNode) =>
      val x = a.intersect(b)
      val y = (a ++ b).distinct.sorted
      val gX = inst.targetScore(Cumulative, (x :+ sNode).distinct) -
        inst.targetScore(Cumulative, x)
      val gY = inst.targetScore(Cumulative, (y :+ sNode).distinct) -
        inst.targetScore(Cumulative, y)
      Prop(gX >= gY - 1e-9)
    }, 4)
  }

  test("Table II: plurality and Copeland are NOT submodular (paper counterexample)") {
    // Delegated to RunningExampleSpec's Example 3 tests; assert here that the
    // counterexample instance violates the submodularity inequality.
    val ex = repro.expts.RunningExample.instance(spark)
    val plu = Plurality(2)
    val gEmpty = ex.targetScore(plu, Seq(1L)) - ex.targetScore(plu, Nil)
    val gAfter = ex.targetScore(plu, Seq(0L, 1L)) - ex.targetScore(plu, Seq(0L))
    assert(gEmpty < gAfter)
    val cEmpty = ex.targetScore(Copeland, Seq(1L)) - ex.targetScore(Copeland, Nil)
    val cAfter = ex.targetScore(Copeland, Seq(0L, 1L)) - ex.targetScore(Copeland, Seq(0L))
    assert(cEmpty < cAfter)
  }
}
