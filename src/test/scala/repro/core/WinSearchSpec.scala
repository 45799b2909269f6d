package repro.core

import repro.SparkSpec
import repro.expts.RunningExample

class WinSearchSpec extends SparkSpec {

  private lazy val inst = RunningExample.instance(spark)

  test("wins: plurality on the running example with no seeds is a tie, not a win") {
    // target plurality 2, competitor plurality 2 (users 3,4 prefer c2).
    assert(!inst.wins(Plurality(2), Nil))
  }

  test("wins: seeding user 3 makes the target the plurality winner") {
    assert(inst.wins(Plurality(2), Seq(2L)))
  }

  test("minSeedsToWin finds k*=1 for plurality via the greedy sequence") {
    val seq = GreedyDM.select(inst, Plurality(2), 3).seeds
    val res = WinSearch.minSeedsToWin(inst, Plurality(2), seq)
    assert(res.isDefined)
    val (k, s) = res.get
    assert(k == 1 && s == Seq(seq.head))
  }

  test("minSeedsToWin returns k*=0 when the target already wins") {
    // Cumulative: target 2.55 vs competitor 0.35+0.75+0.78+0.90 = 2.78 — target loses;
    // flip the target to candidate 1 which wins with no seeds.
    val flipped = inst.copy(q = 1)
    val res = WinSearch.minSeedsToWin(flipped, Cumulative, Seq(0L, 1L))
    assert(res.contains((0, Nil)))
  }

  test("minSeedsToWin for cumulative on the default target") {
    val seq = GreedyDM.select(inst, Cumulative, 4).seeds
    val res = WinSearch.minSeedsToWin(inst, Cumulative, seq)
    assert(res.isDefined)
    val (k, s) = res.get
    // k* is minimal: the prefix one shorter must lose.
    assert(inst.wins(Cumulative, s))
    if (k > 0) assert(!inst.wins(Cumulative, s.dropRight(1)))
  }

  test("minSeedsToWin returns None when even the full sequence loses") {
    // An unbeatable fully-stubborn competitor at opinion 1 everywhere.
    import spark.implicits._
    val prof = inst.profile.collect().map { r =>
      if (r.getInt(1) == 1) (r.getLong(0), 1, 1.0, 1.0)
      else (r.getLong(0), r.getInt(1), r.getDouble(2), r.getDouble(3))
    }.toSeq.toDF("node", "cand", "b0", "d")
    val hard = inst.copy(profile = prof)
    // Cumulative maxes at 4.0 for the target = competitor's 4.0: never strictly more.
    assert(WinSearch.minSeedsToWin(hard, Cumulative, Seq(0L, 1L, 2L, 3L)).isEmpty)
  }

  test("literal Algorithm 2 binary search agrees with the prefix search") {
    val seq = GreedyDM.select(inst, Plurality(2), 4).seeds
    val prefix = WinSearch.minSeedsToWin(inst, Plurality(2), seq)
    val alg2 = WinSearch.binarySearch(inst, Plurality(2), 4, k => seq.take(k))
    assert(prefix.map(_._1) == alg2.map(_._1))
  }

  test("binary search validates with a non-nested selector too") {
    // Selector returning the k highest-degree nodes (not nested w.r.t. quality,
    // but still monotone in k for the win predicate on this instance).
    val res = WinSearch.binarySearch(inst, Plurality(2), 4,
      k => Seq(2L, 3L, 0L, 1L).take(k))
    assert(res.isDefined && res.get._1 == 1)
  }
}
