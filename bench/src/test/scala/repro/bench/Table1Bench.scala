package repro.bench

import repro.SparkSpec
import repro.expts.Table1Exp

/** Bench for Table I: every cell of the running-example score table must
  * reproduce the paper exactly. The rendered table goes to stdout (captured
  * in bench_output.txt and diffed in EXPERIMENTS.md).
  */
class Table1Bench extends SparkSpec {

  test("Table I reproduces the paper cell-for-cell") {
    val (text, rows) = Table1Exp.run(spark)
    println(text)
    assert(rows.size == 6)
    rows.foreach(r => assert(r.matchesPaper, s"mismatch for seed set ${r.seedSet}"))
  }
}
