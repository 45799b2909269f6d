package repro.expts

import repro.SparkSpec
import repro.core.{Cumulative, Plurality}

class HarnessSpec extends SparkSpec {

  private lazy val inst = Datasets.instance(spark,
    Datasets.Spec("tiny-harness", "tiny", 18, 60, 2, 0, 0, 457), t = 2)

  test("runMethods executes the full roster and returns k seeds each") {
    val methods = Seq("DM", "RW", "RS", "IC", "LT", "GED-T", "PR", "RWR", "DC")
    val runs = Harness.runMethods(inst, Cumulative, k = 2, methods,
      rwLambda = 10, rsTheta = 500L, rrTheta = 300L)
    assert(runs.map(_.method) == methods)
    runs.foreach { r =>
      assert(r.seeds.length == 2 && r.seeds.distinct.length == 2, r.method)
      assert(r.millis >= 0)
    }
  }

  test("unknown methods are rejected") {
    intercept[IllegalArgumentException] {
      Harness.runMethods(inst, Cumulative, 1, Seq("XX"))
    }
  }

  test("evaluate reports exact target scores per method") {
    val runs = Harness.runMethods(inst, Plurality(2), 2, Seq("DC", "RW"), rwLambda = 20)
    val ev = Harness.evaluate(inst, runs, Plurality(2))
    assert(ev.map(_._1) == Seq("DC", "RW"))
    ev.foreach { case (m, f, _) =>
      assert(f >= 0 && f <= inst.n, m)
      val direct = inst.targetScore(Plurality(2), runs.find(_.method == m).get.seeds)
      assert(math.abs(f - direct) < 1e-9)
    }
  }

  test("render produces an aligned table") {
    val out = Harness.render("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
    assert(out.contains("== T =="))
    assert(out.linesIterator.count(_.startsWith("|")) == 4)
    val widths = out.linesIterator.filter(_.startsWith("|")).map(_.length).toSeq
    assert(widths.distinct.size == 1, s"ragged table: $widths")
  }

  test("timed measures and passes the value through") {
    val (v, ms) = Harness.timed { Thread.sleep(5); 42 }
    assert(v == 42 && ms >= 4)
  }
}
