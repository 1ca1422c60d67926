package repro.data

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types.{LongType, StringType, StructField, StructType}
import scala.util.Random
import repro.core.{Cells, ErrorGen, Rule}

/** A generated benchmark dataset: clean + dirty DataFrames, rules and
  * metadata, mirroring one row of the paper's Table 5.
  */
final case class GeneratedDataset(
    name: String,
    attrs: Seq[String],
    numericAttrs: Set[String],
    rules: Seq[Rule],
    clean: DataFrame,
    dirty: DataFrame,
    /** Nominal error rate of the default dirty version (Table 5). */
    nominalErrorRate: Double,
    /** Error-type labels of the default dirty version (Table 5). */
    errorTypes: Seq[String],
    /** Label column for downstream/model-driven experiments. */
    classTarget: String,
    /** Tuple ids of the 20 labeled tuples (Hyper-parameter Settings). */
    labeledTids: Seq[Long],
    /** Clean values of the labeled tuples, keyed by (tid, attr). */
    labeled: Map[(Long, String), String],
) {
  /** Drop cached DataFrames (benchmarks iterate over many variants). */
  def unpersist(): Unit = { clean.unpersist(); dirty.unpersist() }
}

/** Base for driver-side deterministic dataset generators.
  *
  * Generators build clean rows in memory (the paper's datasets are
  * 1 k – 200 k tuples), inject errors via [[ErrorGen]], and publish both
  * versions as cached DataFrames with a `__tid` column.
  */
trait DataGen {
  /** Dataset display name (Table 5). */
  def name: String
  /** Attribute names, in schema order. */
  def attrs: Seq[String]
  /** Attributes holding numeric content (as strings). */
  def numericAttrs: Set[String]
  /** Rules that hold on the clean data. */
  def rules: Seq[Rule]
  /** Table 5 nominal error rate. */
  def nominalErrorRate: Double
  /** Table 5 error-type labels. */
  def errorTypes: Seq[String]
  /** Downstream classification target column. */
  def classTarget: String
  /** Default error profile reproducing Table 5's rate and types. */
  def defaultSpec(seed: Long): ErrorGen.ErrorSpec

  /** Clean rows (row-major, attrs order), deterministic in `seed`. */
  def cleanRows(n: Int, seed: Long): Array[Array[String]]

  /** Native tuple count (Table 5). */
  def defaultRows: Int

  /** Number of labeled tuples handed to label-hungry algorithms. */
  def nLabeled: Int = 20

  /** Generate at the native size with the default error profile. */
  def generate(spark: SparkSession, seed: Long = 7): GeneratedDataset =
    generate(spark, defaultRows, defaultSpec(seed), seed)

  /** Generate `n` tuples under an explicit error profile. */
  def generate(spark: SparkSession, n: Int, spec: ErrorGen.ErrorSpec,
               seed: Long): GeneratedDataset = {
    val clean = cleanRows(n, seed)
    val dirty = ErrorGen.inject(clean, attrs, numericAttrs, spec)
    val schema = StructType(
      StructField(Cells.Tid, LongType, nullable = false) +:
        attrs.map(a => StructField(a, StringType, nullable = false)))
    def toDf(rows: Array[Array[String]]): DataFrame = spark
      .createDataFrame(
        spark.sparkContext.parallelize(
          rows.zipWithIndex.map { case (r, i) => Row.fromSeq(i.toLong +: r.toSeq) }.toSeq,
          math.max(1, math.min(16, n / 2000))),
        schema)
      .cache()
    val rnd = new Random(seed * 31 + 17)
    val tids = rnd.shuffle((0 until n).toList).take(math.min(nLabeled, n)).map(_.toLong).sorted
    val labeledMap = (for {
      tid <- tids
      (a, j) <- attrs.zipWithIndex
    } yield (tid, a) -> clean(tid.toInt)(j)).toMap
    GeneratedDataset(name, attrs, numericAttrs, rules, toDf(clean), toDf(dirty),
      nominalErrorRate, errorTypes, classTarget, tids, labeledMap)
  }

  // ----- shared vocabulary helpers -----

  protected val StateNames: Vector[String] = Vector(
    "Alabama", "Alaska", "Arizona", "Arkansas", "California", "Colorado",
    "Connecticut", "Delaware", "Florida", "Georgia", "Hawaii", "Idaho",
    "Illinois", "Indiana", "Iowa", "Kansas", "Kentucky", "Louisiana",
    "Maine", "Maryland", "Massachusetts", "Michigan", "Minnesota",
    "Mississippi", "Missouri", "Montana", "Nebraska", "Nevada",
    "New Hampshire", "New Jersey", "New Mexico", "New York",
    "North Carolina", "North Dakota", "Ohio", "Oklahoma", "Oregon",
    "Pennsylvania", "Rhode Island", "South Carolina", "South Dakota",
    "Tennessee", "Texas", "Utah", "Vermont", "Virginia", "Washington",
    "West Virginia", "Wisconsin", "Wyoming")

  protected val FirstNames: Vector[String] = Vector(
    "James", "Mary", "Robert", "Patricia", "John", "Jennifer", "Michael",
    "Linda", "David", "Elizabeth", "William", "Barbara", "Richard", "Susan",
    "Joseph", "Jessica", "Thomas", "Sarah", "Charles", "Karen", "Anna",
    "Mark", "Paula", "Steven", "Laura", "Kevin", "Nancy", "Brian", "Lisa",
    "Edward", "Betty", "Ronald", "Margaret", "Anthony", "Sandra")

  protected val LastNames: Vector[String] = Vector(
    "Smith", "Johnson", "Williams", "Brown", "Jones", "Garcia", "Miller",
    "Davis", "Rodriguez", "Martinez", "Hernandez", "Lopez", "Gonzalez",
    "Wilson", "Anderson", "Thomas", "Taylor", "Moore", "Jackson", "Martin",
    "Lee", "Perez", "Thompson", "White", "Harris", "Sanchez", "Clark",
    "Ramirez", "Lewis", "Robinson", "Walker", "Young", "Allen", "King")

  protected val CityStems: Vector[String] = Vector(
    "Spring", "River", "Oak", "Maple", "Cedar", "Pine", "Lake", "Hill",
    "Green", "Fair", "Clear", "Stone", "Bridge", "North", "South", "East",
    "West", "Center", "Union", "Liberty", "Franklin", "Madison", "Clinton",
    "Georgetown", "Salem", "Ash", "Birch", "Elm", "Grand", "Silver")

  protected val CitySuffixes: Vector[String] =
    Vector("field", "town", "ville", "burg", "port", "wood", "dale", "ford")

  /** Deterministic synthetic city name for index `i`. */
  protected def cityName(i: Int): String =
    CityStems(i % CityStems.size) + CitySuffixes((i / CityStems.size) % CitySuffixes.size) +
      (if (i >= CityStems.size * CitySuffixes.size) s" ${i / (CityStems.size * CitySuffixes.size)}" else "")

  /** Zero-padded numeric code. */
  protected def code(prefix: String, i: Int, width: Int): String =
    prefix + i.toString.reverse.padTo(width, '0').reverse
}
