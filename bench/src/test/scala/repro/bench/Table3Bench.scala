package repro.bench

import repro.SparkSpec
import repro.expts.Table3Exp

/** Bench for Table III: materialize all five synthetic stand-in datasets
  * and print their sizes next to the paper's real-dataset sizes.
  */
class Table3Bench extends SparkSpec {

  test("Table III stand-ins materialize at the declared scale") {
    val (text, rows) = Table3Exp.run(spark)
    println(text)
    assert(rows.size == 5)
    rows.foreach { r =>
      assert(r.columnStochastic, s"${r.spec.name} is not column-stochastic")
      assert(r.nodes == r.spec.n)
      // Dedup during generation may shave a few edges; stay within 5%.
      assert(r.edges >= (r.spec.m * 0.95).toLong && r.edges <= r.spec.m,
        s"${r.spec.name}: ${r.edges} edges vs spec ${r.spec.m}")
      // Scaled edge/node ratio tracks the paper's within 15%.
      val paperRatio = r.spec.paperEdges.toDouble / r.spec.paperNodes
      val ourRatio = r.edges.toDouble / r.nodes
      assert(math.abs(ourRatio - paperRatio) / paperRatio < 0.15, r.spec.name)
    }
  }
}
