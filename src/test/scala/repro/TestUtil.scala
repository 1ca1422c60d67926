package repro

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types.{LongType, StringType, StructField, StructType}
import repro.core.Cells

/** Base trait for this repo's suites: shares the SparkSession and dials
  * shuffle parallelism down for the tiny unit-test inputs.
  */
trait ReproSpec extends SparkSpec {
  override def beforeAll(): Unit = {
    super.beforeAll()
    spark.conf.set("spark.sql.shuffle.partitions", "8")
  }
}

/** Hand-crafted relations for unit tests. */
object TestUtil {

  /** Build a `__tid` + string-attrs DataFrame from rows of values. */
  def mkDf(spark: SparkSession, attrs: Seq[String])(rows: Seq[String]*): DataFrame = {
    require(rows.forall(_.size == attrs.size), "row arity mismatch")
    val schema = StructType(
      StructField(Cells.Tid, LongType, nullable = false) +:
        attrs.map(a => StructField(a, StringType, nullable = false)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(
        rows.zipWithIndex.map { case (r, i) => Row.fromSeq(i.toLong +: r) }, 2),
      schema)
  }

  /** Collect a relation back to a tid-sorted map for easy assertions. */
  def toMap(df: DataFrame, attrs: Seq[String]): Map[Long, Seq[String]] =
    df.collect().map { r =>
      r.getLong(r.fieldIndex(Cells.Tid)) -> attrs.map(a => r.getString(r.fieldIndex(a)))
    }.toMap

  /** Value of one cell. */
  def cell(df: DataFrame, attrs: Seq[String], tid: Long, attr: String): String =
    toMap(df, attrs)(tid)(attrs.indexOf(attr))

  /** The classic inhabitants example from the paper's Table 2. */
  val inhabitantAttrs: Seq[String] = Seq("FirstName", "LastName", "Gender", "City", "State")

  def inhabitants(spark: SparkSession): DataFrame = mkDf(spark, inhabitantAttrs)(
    Seq("Paul", "Smith", "Male", "New York", "New York"),
    Seq("Mark", "White", "Male", "New York", "New York"),
    Seq("Anne", "Nash", "Female", "Los Angeles", "California"),
    Seq("Anne", "Nash", "Male", "Detroit", "Michigan"),
    Seq("Andy", "Black", "Female", "Austin", "Texas"),
  )
}
