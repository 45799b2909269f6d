package repro.expts

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.core.GraphOps

/** Table III reproduction: characteristics of the (synthetic stand-in)
  * datasets next to the paper's real-dataset sizes. The substitution and
  * the ~1/40–1/800 scaling are documented in DESIGN.md §3.
  */
object Table3Exp {

  final case class Row(spec: Datasets.Spec, nodes: Long, edges: Long,
                       columnStochastic: Boolean)

  def run(spark: SparkSession): (String, Seq[Row]) = {
    val rows = Datasets.all.map { spec =>
      val inst = Datasets.instance(spark, spec, t = 1)
      val m = inst.edges.filter(col("src") =!= col("dst")).count()
      Row(spec, spec.n, m, GraphOps.isColumnStochastic(inst.edges, spec.n))
    }
    val text = Harness.render(
      "Table III - dataset characteristics (synthetic stand-ins vs paper)",
      Seq("Name", "#Nodes", "#Edges", "#Cand", "paper name", "paper #Nodes", "paper #Edges", "W col-stochastic"),
      rows.map(r => Seq(
        r.spec.name, r.nodes.toString, r.edges.toString, r.spec.r.toString,
        r.spec.paperName, r.spec.paperNodes.toString, r.spec.paperEdges.toString,
        if (r.columnStochastic) "yes" else "NO")))
    (text, rows)
  }
}
