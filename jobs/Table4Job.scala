package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.algos.Algorithms
import repro.core.Harness

/** spark-submit entrypoint reproducing Table 4 (error detection and repair
  * performance on the four real-world-profile datasets).
  *
  * Usage: Table4Job [budgetSeconds]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val budgetMs = args.headOption.map(_.toLong * 1000).getOrElse(120000L)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-table4")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.sql.shuffle.partitions", "16")
      .getOrCreate()
    try {
      val outcomes = Harness.table4(spark, Algorithms.all, budgetMs)
      println("==== Table 4: error detection and repair performance ====")
      println(Harness.renderTable4(outcomes))
    } finally spark.stop()
  }
}
