package repro.bench

import repro.SparkSpec
import repro.expts.Table6Exp

/** Bench for Table VI: minimum seeds to win under DM / RW / RS. The paper's
  * stated shape (§VIII-C): more approximate methods need more seeds, i.e.
  * k*(DM) <= k*(RW) and k*(DM) <= k*(RS), modulo sampling noise (we allow
  * +2 slack on a ~30-seed scale).
  */
class Table6Bench extends SparkSpec {

  test("Table VI: every method finds a winning seed set; DM needs the fewest") {
    val (text, rows) = Table6Exp.run(spark)
    println(text)
    assert(rows.size == 6)
    rows.foreach(r => assert(r.kStar.isDefined,
      s"${r.method}/${r.score} never won within the budget"))
    for (score <- Seq("cumulative", "plurality")) {
      val k = rows.filter(_.score == score).map(r => r.method -> r.kStar.get).toMap
      assert(k("DM") <= k("RW") + 2, s"$score: DM ${k("DM")} vs RW ${k("RW")}")
      assert(k("DM") <= k("RS") + 2, s"$score: DM ${k("DM")} vs RS ${k("RS")}")
    }
  }
}
