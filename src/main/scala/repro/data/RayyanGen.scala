package repro.data

import scala.util.Random
import repro.core._

/** Synthetic stand-in for the Rayyan dataset (Table 5: 1000 tuples,
  * 11 attrs, 9% errors, types MV + T + FI + VAD).
  *
  * Structural profile: bibliographic records with long, near-unique titles
  * and author lists, journals appearing only ~2.5 times — the "complex and
  * lengthy data" on which the paper reports the worst repair outcomes.
  */
object RayyanGen extends DataGen {
  override val name = "Rayyan"
  override val defaultRows = 1000

  override val attrs: Seq[String] = Seq(
    "id", "article_title", "journal_abbrev", "journal_title", "issn",
    "volume", "issue", "pagination", "year", "language", "authors")

  override val numericAttrs: Set[String] = Set("volume", "issue", "year")

  override val rules: Seq[Rule] = Seq(
    FD(Seq("journal_abbrev"), "journal_title"),
    FD(Seq("issn"), "journal_title"),
    FD(Seq("journal_title"), "issn"),
    FD(Seq("journal_title"), "journal_abbrev"),
  )

  override val nominalErrorRate = 0.09
  override val errorTypes: Seq[String] = Seq("MV", "T", "FI", "VAD")
  override val classTarget = "language"

  override def defaultSpec(seed: Long): ErrorGen.ErrorSpec = ErrorGen.ErrorSpec(
    nominalErrorRate,
    Seq(ErrorGen.ExplicitMV -> 1.0, ErrorGen.ImplicitMV -> 0.5,
        ErrorGen.Typo -> 1.0, ErrorGen.Format -> 1.0, ErrorGen.InnerSwap -> 1.0),
    seed)

  private val Topics = Vector(
    "sepsis", "hypertension", "type 2 diabetes", "migraine", "asthma",
    "chronic pain", "depression", "obesity", "stroke rehabilitation",
    "wound healing", "sleep apnea", "osteoporosis")

  private val Interventions = Vector(
    "cognitive behavioral therapy", "low-dose aspirin", "interval training",
    "mindfulness programs", "telemedicine follow-up", "dietary intervention",
    "statin therapy", "acupuncture", "vitamin D supplementation",
    "resistance exercise")

  private val Designs = Vector(
    "a randomized controlled trial", "a systematic review",
    "a cohort study", "a meta-analysis", "a cross-sectional survey",
    "a double-blind pilot study")

  private val Languages = Vector("eng", "fre", "ger", "spa", "por")

  private val JournalFields = Vector(
    "Medicine", "Cardiology", "Neurology", "Epidemiology", "Public Health",
    "Internal Medicine", "Clinical Research", "Psychiatry", "Nutrition",
    "Rehabilitation")

  override def cleanRows(n: Int, seed: Long): Array[Array[String]] = {
    val rnd = new Random(seed)
    val nJournals = math.max(1, (n / 2.5).toInt)
    val journals = (0 until nJournals).map { j =>
      val field = JournalFields(j % JournalFields.size)
      val kind  = Vector("Journal of", "Annals of", "Archives of", "International Journal of")(j % 4)
      // (j % 10, j % 4) has period 20, so j / 20 makes the title injective
      // in j — required for the journal_title -> issn/abbrev FDs to hold.
      val title = s"$kind $field ${j / 20 + 1}".trim
      val abbrev = s"${kind.split(' ').map(_.take(1)).mkString}. ${field.split(' ').map(_.take(4)).mkString(". ")}. ${j % 97}"
      val issn = f"${1000 + (j * 53) % 9000}%04d-${1000 + (j * 97) % 9000}%04d"
      (title, abbrev, issn)
    }
    Array.tabulate(n) { i =>
      val j = i % nJournals
      val (jt, ja, issn) = journals(j)
      val title = s"Effects of ${Interventions((i * 7) % Interventions.size)} on ${Topics((i * 11) % Topics.size)} in adults: ${Designs(i % Designs.size)} (part ${i + 1})"
      val nAuthors = 2 + i % 4
      val authors = (0 until nAuthors).map { a =>
        s"${LastNames((i * 3 + a * 5) % LastNames.size)} ${FirstNames((i + a * 7) % FirstNames.size).take(1)}."
      }.mkString("; ")
      Array(code("", 500000 + i, 6), title, ja, jt, issn,
        (1 + (i * 13) % 40).toString, (1 + (i * 7) % 12).toString,
        s"${100 + (i * 17) % 800}-${110 + (i * 17) % 800 + rnd.nextInt(12)}",
        (1995 + (i * 3) % 29).toString, Languages(i % Languages.size), authors)
    }
  }
}
