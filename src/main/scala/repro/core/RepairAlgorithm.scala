package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Everything a repair algorithm may consume (Table 3's "Input" column).
  *
  * - `dirty`: the observed relation (`__tid` + string attrs) — OD
  * - `rules`: FDs/DCs that held on the clean data — R
  * - `detections`: cells flagged by an external detector (Raha) — ADR/PDR
  * - `labeled`: clean values of the 20 labeled tuples — LD
  * - `classTarget`: label column for the downstream model — DM
  */
final case class RepairInput(
    spark: SparkSession,
    name: String,
    dirty: DataFrame,
    attrs: Seq[String],
    rules: Seq[Rule],
    numericAttrs: Set[String] = Set.empty,
    detections: Option[DataFrame] = None,
    labeled: Map[(Long, String), String] = Map.empty,
    classTarget: Option[String] = None,
    budget: Budget = Budget.unlimited,
) {
  /** FDs available to FD-only algorithms (DC-encoded FDs included). */
  def fds: Seq[FD] = Rule.asFds(rules)
}

/** Output of a repair run: the repaired relation plus, when the algorithm
  * has an explicit detection stage, the cells it flagged (`(__tid, attr)`).
  * When `detections` is None the harness scores detection on changed cells.
  */
final case class RepairResult(repaired: DataFrame, detections: Option[DataFrame] = None)

/** A data repair algorithm from the paper's taxonomy (Section 3). */
trait RepairAlgorithm {
  /** Display name used in tables. */
  def name: String
  /** Taxonomy category: Rule-Driven, Data-Driven, Rule&Data-Driven, Model-Driven. */
  def category: String
  /** Run the repair. Must not mutate the input. */
  def repair(in: RepairInput): RepairResult
}
