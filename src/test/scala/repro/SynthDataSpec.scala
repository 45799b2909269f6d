package repro

import org.apache.spark.sql.functions._

/** Sanity of the provided TPC-H-lite generators (kept alongside the paper's
  * social substrate) plus a DuckDB Oracle round-trip that exercises the
  * correctness-checking harness on a real aggregation.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
  }

  test("lineitem columns are within TPC-H-ish domains") {
    val li = SynthData.lineitem(spark, sf = 0.001).localCheckpoint(true)
    assert(li.filter(col("l_quantity") < 1 || col("l_quantity") > 51).count() == 0)
    assert(li.filter(!col("l_returnflag").isin("N", "R", "A")).count() == 0)
    assert(li.filter(col("l_discount") < 0 || col("l_discount") > 0.10).count() == 0)
  }

  test("orders keys are dense 1..n") {
    val o = SynthData.orders(spark, sf = 0.001)
    assert(o.count() == 1500L)
    assert(o.agg(min("o_orderkey"), max("o_orderkey")).head.toSeq == Seq(1L, 1500L))
  }

  test("customer and part scale too") {
    assert(SynthData.customer(spark, sf = 0.001).count() == 150L)
    assert(SynthData.part(spark, sf = 0.001).count() == 200L)
  }

  test("zipfKeys is skewed toward small keys") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 100, seed = 3)
    val top = z.groupBy("k").count().orderBy(col("count").desc).limit(1).head
    assert(top.getLong(0) <= 3, s"most frequent key should be small, got ${top.getLong(0)}")
  }

  test("uniformKeys covers the key space roughly evenly") {
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.max < 2 * counts.min)
  }

  test("Oracle validates a Spark aggregation over lineitem against DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001).localCheckpoint(true)
    val got = li.groupBy("l_returnflag")
      .agg(round(sum("l_quantity"), 4).as("sum_qty"),
           count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      got,
      """SELECT l_returnflag, ROUND(SUM(CAST(l_quantity AS DOUBLE)), 4) AS sum_qty,
        |       COUNT(*) AS cnt
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("Oracle rejects a wrong aggregation (the oracle actually bites)") {
    val li = SynthData.lineitem(spark, sf = 0.001).localCheckpoint(true)
    val wrong = li.groupBy("l_returnflag")
      .agg((count(lit(1)) + 1).as("cnt")) // off by one
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("Oracle rejects mismatched column sets") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(10).localCheckpoint(true)
    val df = li.select(col("l_orderkey").as("a"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT l_orderkey AS b FROM lineitem", "lineitem" -> li)
    }
  }
}
