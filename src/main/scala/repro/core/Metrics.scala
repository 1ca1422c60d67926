package repro.core

import org.apache.spark.sql.{DataFrame, functions => F}

/** Evaluation of one repair run (Section 4.1 of the paper).
  *
  * - OEC: original error count (cells where dirty != clean)
  * - DEC: decreased error count (errors turned into their clean value)
  * - IEC: introduced error count (correct cells turned wrong)
  * - EDR = (DEC - IEC) / OEC — the paper's Error Drop Rate
  * - ER_*: repair precision/recall/F1 over *changed* cells
  * - ED_*: detection precision/recall/F1 over *flagged* cells
  */
final case class RepairEval(
    oec: Long,
    dec: Long,
    iec: Long,
    changed: Long,
    edr: Double,
    erPrecision: Double,
    erRecall: Double,
    erF1: Double,
    edPrecision: Double,
    edRecall: Double,
    edF1: Double,
)

object Metrics {
  import Cells.Tid

  private def f1(p: Double, r: Double): Double = if (p + r == 0) 0.0 else 2 * p * r / (p + r)

  private def ratio(n: Long, d: Long): Double = if (d == 0) 0.0 else n.toDouble / d

  /** Joined cell view `(tid, attr, dirtyV, repV, cleanV)`. */
  private def cellJoin(dirty: DataFrame, repaired: DataFrame, clean: DataFrame,
                       attrs: Seq[String]): DataFrame = {
    val d = Cells.melt(dirty, attrs).withColumnRenamed("value", "dirtyV")
    val r = Cells.melt(repaired, attrs).withColumnRenamed("value", "repV")
    val c = Cells.melt(clean, attrs).withColumnRenamed("value", "cleanV")
    d.join(r, Seq(Tid, "attr")).join(c, Seq(Tid, "attr"))
  }

  /** Evaluate a repair. `detections` defaults to the changed cells when the
    * algorithm reports no explicit detection result (the paper's "consistent
    * evaluation approach based on the disparities between repaired and
    * original cells").
    */
  def evaluate(dirty: DataFrame, repaired: DataFrame, clean: DataFrame,
               attrs: Seq[String], detections: Option[DataFrame] = None): RepairEval = {
    val j = cellJoin(dirty, repaired, clean, attrs).cache()
    try {
      val agg = j.agg(
        F.sum(F.when(F.col("dirtyV") =!= F.col("cleanV"), 1L).otherwise(0L)).as("oec"),
        F.sum(F.when(F.col("dirtyV") =!= F.col("cleanV") && F.col("repV") === F.col("cleanV"), 1L)
          .otherwise(0L)).as("dec"),
        F.sum(F.when(F.col("dirtyV") === F.col("cleanV") && F.col("repV") =!= F.col("cleanV"), 1L)
          .otherwise(0L)).as("iec"),
        F.sum(F.when(F.col("repV") =!= F.col("dirtyV"), 1L).otherwise(0L)).as("changed"),
      ).collect()(0)
      val oec = agg.getLong(0); val dec = agg.getLong(1)
      val iec = agg.getLong(2); val changed = agg.getLong(3)

      val erP = ratio(dec, changed)
      val erR = ratio(dec, oec)

      val det = detections
        .map(_.select(F.col(Tid), F.col("attr")).distinct())
        .getOrElse(j.where(F.col("repV") =!= F.col("dirtyV")).select(F.col(Tid), F.col("attr")))
      val errCells = j.where(F.col("dirtyV") =!= F.col("cleanV")).select(F.col(Tid), F.col("attr"))
      val nDet = det.count()
      val hit  = det.join(errCells, Seq(Tid, "attr")).count()
      val edP  = ratio(hit, nDet)
      val edR  = ratio(hit, oec)

      RepairEval(oec, dec, iec, changed,
        edr = if (oec == 0) 0.0 else (dec - iec).toDouble / oec,
        erPrecision = erP, erRecall = erR, erF1 = f1(erP, erR),
        edPrecision = edP, edRecall = edR, edF1 = f1(edP, edR))
    } finally j.unpersist()
  }

  /** Measured error rate of `dirty` against `clean` (Table 5). */
  def errorRate(dirty: DataFrame, clean: DataFrame, attrs: Seq[String]): Double = {
    val d = Cells.melt(dirty, attrs).withColumnRenamed("value", "dirtyV")
    val c = Cells.melt(clean, attrs).withColumnRenamed("value", "cleanV")
    val j = d.join(c, Seq(Tid, "attr"))
    val row = j.agg(
      F.sum(F.when(F.col("dirtyV") =!= F.col("cleanV"), 1L).otherwise(0L)).as("err"),
      F.count(F.lit(1)).as("n")).collect()(0)
    ratio(row.getLong(0), row.getLong(1))
  }
}
