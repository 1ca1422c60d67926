package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.algos.Algorithms
import repro.core.Harness

/** spark-submit entrypoint reproducing Table 6 (runtime scaling on nested
  * Tax subsets; "n/a" = budget exceeded, "n/a*" = simulated OOM).
  *
  * Usage: Table6Job [budgetSeconds [size1,size2,...]]
  */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val budgetMs = args.headOption.map(_.toLong * 1000).getOrElse(60000L)
    val sizes = args.lift(1)
      .map(_.split(",").map(_.trim.toInt).toSeq)
      .getOrElse(Seq(5000, 10000, 20000, 30000, 40000))
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-table6")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.sql.shuffle.partitions", "16")
      .getOrCreate()
    try {
      val outcomes = Harness.table6(spark, Algorithms.all, sizes, budgetMs,
        holoCleanMaxCells = 2_000_000_000L)
      println("==== Table 6: runtime scaling on Tax subsets ====")
      println(Harness.renderTable6(outcomes))
    } finally spark.stop()
  }
}
