package repro.walks

import repro.SparkSpec
import repro.core._
import repro.expts.{Datasets, RunningExample}

class WalkGreedySpec extends SparkSpec {

  private lazy val inst = RunningExample.instance(spark)
  private lazy val rnd = Datasets.instance(spark,
    Datasets.Spec("tiny-wg", "tiny", 25, 90, 3, 0, 0, 419), t = 3)

  test("RW greedy k=1 reproduces Example 2 for the cumulative score (user 1)") {
    val r = Methods.rw(inst, Cumulative, 1, seed = 21, lambdaOverride = Some(3000))
    assert(r.seeds == Seq(0L))
  }

  test("RW greedy k=1 reproduces Example 2 for the plurality score (user 3)") {
    val r = Methods.rw(inst, Plurality(2), 1, seed = 22, lambdaOverride = Some(3000))
    assert(r.seeds == Seq(2L))
  }

  test("RW greedy k=1 reproduces Example 2 for the Copeland score (user 3 or 4)") {
    val r = Methods.rw(inst, Copeland, 1, seed = 23, lambdaOverride = Some(3000))
    assert(r.seeds == Seq(2L) || r.seeds == Seq(3L))
    assert(inst.targetScore(Copeland, r.seeds) == 1.0)
  }

  test("RS greedy k=1 finds the optimal cumulative seed with enough sketches") {
    val r = Methods.rs(inst, Cumulative, 1, seed = 24, thetaOverride = Some(20000L))
    assert(r.seeds == Seq(0L))
  }

  test("RS greedy k=1 finds the optimal plurality seed with enough sketches") {
    val r = Methods.rs(inst, Plurality(2), 1, seed = 25, thetaOverride = Some(20000L))
    assert(r.seeds == Seq(2L))
  }

  test("RW returns k distinct valid seeds on a random instance") {
    val r = Methods.rw(rnd, Cumulative, 5, seed = 26, lambdaOverride = Some(30))
    assert(r.seeds.length == 5 && r.seeds.distinct.length == 5)
    assert(r.seeds.forall(s => s >= 0 && s < rnd.n))
  }

  test("RS returns k distinct valid seeds on a random instance") {
    val r = Methods.rs(rnd, Plurality(3), 3, seed = 27, thetaOverride = Some(2000L))
    assert(r.seeds.length == 3 && r.seeds.distinct.length == 3)
  }

  test("RW estimated score trajectory is non-decreasing") {
    val r = Methods.rw(rnd, Cumulative, 5, seed = 28, lambdaOverride = Some(50))
    r.estScores.sliding(2).foreach {
      case Seq(a, b) => assert(b >= a - 1e-9)
      case _         =>
    }
  }

  test("RW cumulative seed quality approaches exact greedy (within 10%)") {
    val dm = GreedyDM.select(rnd, Cumulative, 3, celf = true)
    val rw = Methods.rw(rnd, Cumulative, 3, seed = 29, lambdaOverride = Some(400))
    val fRw = rnd.targetScore(Cumulative, rw.seeds)
    assert(fRw >= 0.9 * dm.scores.last, s"RW $fRw vs DM ${dm.scores.last}")
  }

  test("RW plurality seed quality approaches exact greedy (within 25%)") {
    val dm = GreedyDM.select(rnd, Plurality(3), 3)
    val rw = Methods.rw(rnd, Plurality(3), 3, seed = 30, lambdaOverride = Some(400))
    val fRw = rnd.targetScore(Plurality(3), rw.seeds)
    assert(fRw >= 0.75 * dm.scores.last, s"RW $fRw vs DM ${dm.scores.last}")
  }

  test("RW Copeland gains are consistent: picked seeds never lower the score") {
    val rw = Methods.rw(rnd, Copeland, 2, seed = 31, lambdaOverride = Some(200))
    val f0 = rnd.targetScore(Copeland, Nil)
    assert(rnd.targetScore(Copeland, rw.seeds) >= f0 - 1e-9)
  }

  test("walk greedy rejects unknown scores") {
    import org.apache.spark.sql.functions.lit
    val state = WalkGen.annotate(
      WalkGen.generate(spark, inst.edges, Methods.targetStubbornness(inst),
        WalkGen.uniformStarts(spark, inst.n, 2), inst.t, 1),
      inst, obsIsWalk = false)
    val fake = RestrictedCumulative(spark.range(1).toDF("node"), 1.0)
    intercept[IllegalArgumentException] {
      WalkGreedy.select(inst, fake, 1, state, 1.0)
    }
  }

  test("k validation") {
    val state = WalkGen.annotate(
      WalkGen.generate(spark, inst.edges, Methods.targetStubbornness(inst),
        WalkGen.uniformStarts(spark, inst.n, 2), inst.t, 1),
      inst, obsIsWalk = false)
    intercept[IllegalArgumentException](WalkGreedy.select(inst, Cumulative, 0, state, 1.0))
  }
}
