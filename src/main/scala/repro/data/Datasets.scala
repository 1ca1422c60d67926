package repro.data

import org.apache.spark.sql.SparkSession
import repro.core.ErrorGen

/** Facade over the five benchmark dataset generators (Table 5). */
object Datasets {

  /** The four real-world-profile datasets used in Table 4. */
  val realWorld: Seq[DataGen] = Seq(HospitalGen, FlightsGen, BeersGen, RayyanGen)

  /** All five generators, including the Tax scalability dataset. */
  val all: Seq[DataGen] = realWorld :+ TaxGen

  /** Lookup by Table 5 name. */
  def byName(name: String): DataGen =
    all.find(_.name.equalsIgnoreCase(name))
      .getOrElse(throw new IllegalArgumentException(
        s"unknown dataset $name; known: ${all.map(_.name).mkString(", ")}"))

  /** Generate every Table 4 dataset at native size and default errors. */
  def generateRealWorld(spark: SparkSession, seed: Long = 7): Seq[GeneratedDataset] =
    realWorld.map(_.generate(spark, seed))

  /** Tax subset of `n` tuples (Table 6); subsets are nested by prefix. */
  def taxSubset(spark: SparkSession, n: Int, seed: Long = 7): GeneratedDataset =
    TaxGen.generate(spark, n, TaxGen.defaultSpec(seed), seed)

  /** A dataset variant at an explicit rate with the Section 4.3 error mix
    * (inner : outer = 1 : 4).
    */
  def withMixedErrors(spark: SparkSession, gen: DataGen, rate: Double,
                      seed: Long = 7): GeneratedDataset =
    gen.generate(spark, gen.defaultRows, ErrorGen.mixedSpec(rate, seed), seed)
}
