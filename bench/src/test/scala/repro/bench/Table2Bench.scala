package repro.bench

import repro.SparkSpec
import repro.expts.Table2Exp

/** Bench for Table II: empirical validation of the claimed score
  * properties — non-negativity and monotonicity hold for all five scores;
  * cumulative survives randomized submodularity testing; plurality and
  * Copeland are falsified by the paper's own Example 3 counterexample.
  */
class Table2Bench extends SparkSpec {

  test("Table II properties hold empirically") {
    val (text, rows) = Table2Exp.run(spark)
    println(text)
    assert(rows.map(_.score) == Seq("Cumulative", "Plurality", "p-Approval", "Pos-p-Appr.", "Copeland"))
    rows.foreach { r =>
      assert(r.nonNegative, s"${r.score} produced a negative value")
      assert(r.nonDecreasing, s"${r.score} decreased when adding a seed")
    }
    assert(rows.find(_.score == "Cumulative").get.submodularEmpirical.contains(true),
      "cumulative must not be falsified (it is provably submodular, Thm 3)")
    assert(rows.find(_.score == "Plurality").get.submodularEmpirical.contains(false),
      "plurality must be falsified by Example 3")
    assert(rows.find(_.score == "Copeland").get.submodularEmpirical.contains(false),
      "Copeland must be falsified by Example 3")
  }
}
