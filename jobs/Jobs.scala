package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.expts._

/** spark-submit entrypoints, one per reproduced table. Example:
  *
  *   spark-submit --class repro.jobs.Table1Job target/scala-2.13/repro_2.13-*.jar
  *
  * Each prints the same rendered table as the corresponding bench suite.
  */
private[jobs] object JobSession {
  def local(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
}

/** Table I: running-example scores (exact reproduction). */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table1")
    try println(Table1Exp.run(spark)._1) finally spark.stop()
  }
}

/** Table II: empirical score-property validation. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table2")
    try println(Table2Exp.run(spark)._1) finally spark.stop()
  }
}

/** Table III: synthetic stand-in dataset characteristics. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table3")
    try println(Table3Exp.run(spark)._1) finally spark.stop()
  }
}

/** Tables IV/V: scaled ACM-election case study. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table4")
    try println(Table4Exp.run(spark).text) finally spark.stop()
  }
}

/** Table VI: minimum seeds to win per method. */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("table6")
    try println(Table6Exp.run(spark)._1) finally spark.stop()
  }
}

/** Figs 6-8 shape: method comparison across voting scores. */
object CompareJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.local("compare")
    try println(ComparisonExp.run(spark)._1) finally spark.stop()
  }
}
