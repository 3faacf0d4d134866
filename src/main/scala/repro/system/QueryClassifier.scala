package repro.system

import repro.data.VoiceData
import repro.data.VoiceData.DatasetSpec

/** Voice-request categories of Table III. */
sealed abstract class RequestType(val label: String)
object RequestType {
  case object Help extends RequestType("Help")
  case object Repeat extends RequestType("Repeat")
  case object SQuery extends RequestType("S-Query")
  case object UQuery extends RequestType("U-Query")
  case object Other extends RequestType("Other")
  val all: Seq[RequestType] = Seq(Help, Repeat, SQuery, UQuery, Other)
}

/** What the text-to-query extractor knows (§III): spoken synonyms for each
  * target column plus the dimension values predicates may bind.
  */
final case class Vocabulary(
    targetSynonyms: Map[String, Seq[String]],
    dimValues: Map[String, Seq[String]])

object Vocabulary {

  /** Vocabulary for one of the public deployments. Synonyms are the phrases
    * the Google-Assistant extractor would be trained on.
    */
  def forDataset(spec: DatasetSpec): Vocabulary = {
    val synonyms: Map[String, Seq[String]] = Map(
      "delay" -> Seq("delay", "delays", "late"),
      "cancelled" -> Seq("cancellation", "cancellations", "cancelled"),
      "hearing" -> Seq("hearing loss", "hearing impairment", "hearing"),
      "visual" -> Seq("visual impairment", "visually impaired", "blindness"),
      "cognitive" -> Seq("cognitive impairment", "cognitive"),
      "ambulatory" -> Seq("ambulatory difficulty", "walking difficulty"),
      "selfcare" -> Seq("self care difficulty", "self care"),
      "independent" -> Seq("independent living difficulty", "independent living"),
      "competence" -> Seq("competence", "confidence"),
      "optimism" -> Seq("optimism"),
      "job_sat" -> Seq("job satisfaction", "satisfaction"),
      "salary" -> Seq("salary", "pay", "income"),
      "years_code" -> Seq("coding experience", "years of coding"),
      "work_week" -> Seq("working hours", "work week"),
      "pct" -> Seq("poll share", "support", "polling"),
    )
    val dimVals: Map[String, Seq[String]] = spec.name match {
      case "Flights" => Map(
        "airline" -> VoiceData.airlines, "season" -> VoiceData.seasons,
        "day_part" -> VoiceData.dayParts, "month" -> VoiceData.months,
        "origin_region" -> VoiceData.regions,
        "carrier_class" -> VoiceData.carrierClasses)
      case "ACS NY" => Map(
        "borough" -> VoiceData.boroughs, "age_group" -> VoiceData.ageGroups,
        "sex" -> VoiceData.sexes)
      case "Stack Overflow" => Map(
        "country" -> VoiceData.countries, "ed_level" -> VoiceData.edLevels,
        "dev_type" -> VoiceData.devTypes, "gender" -> VoiceData.genders,
        "age_group" -> VoiceData.soAges, "org_size" -> VoiceData.orgSizes,
        "employment" -> VoiceData.employments)
      case "Primaries" => Map(
        "candidate" -> VoiceData.candidates, "state" -> VoiceData.states,
        "poll_month" -> VoiceData.pollMonths,
        "pollster_grade" -> VoiceData.pollsterGrades,
        "population" -> VoiceData.populations)
      case _ => Map.empty
    }
    Vocabulary(synonyms.view.filterKeys(spec.targets.contains).toMap, dimVals)
  }
}

/** A parsed supported query. */
final case class ParsedQuery(target: String, predicates: Map[String, String])

/** Rule-based request classification and query extraction — the run-time
  * analog of the trained intent extractor (§III), used to produce Table III
  * and to route look-ups in [[QueryEngine]].
  */
object QueryClassifier {

  private val helpWords = Seq("help", "what can i ask", "how do i use", "instructions")
  private val repeatWords = Seq("repeat", "say that again", "once more", "come again")
  private val unsupportedWords = Seq(
    "highest", "lowest", "maximum", "minimum", " max ", " min ", "most ",
    "least ", "best", "worst", "compare", "comparison", "versus", " vs ",
    "difference between", "flight number", "specific flight")

  private def normalize(text: String): String =
    " " + text.toLowerCase.replaceAll("[^a-z0-9 ]", " ").replaceAll("\\s+", " ").trim + " "

  /** Extract target + predicates, if the text maps to a supported query. */
  def parse(text: String, vocab: Vocabulary, maxQueryLen: Int = 2): Option[ParsedQuery] = {
    val norm = normalize(text)
    val target = vocab.targetSynonyms
      .flatMap { case (t, syns) =>
        syns.filter(s => norm.contains(" " + s.toLowerCase + " ") ||
          norm.contains(" " + s.toLowerCase + "s ")).map(s => (t, s.length))
      }
      .toSeq.sortBy(-_._2).headOption.map(_._1)
    // Single-character values (e.g. pollster grades "A".."D") collide with
    // ordinary words ("a") and are never reliable speech evidence.
    val preds = vocab.dimValues.toSeq.sortBy(_._1).flatMap { case (d, vals) =>
      vals.filter(v => v.length >= 2 &&
        norm.contains(" " + v.toLowerCase + " ")).map(d -> _)
    }.groupBy(_._1).map { case (d, vs) => d -> vs.head._2 }
    target match {
      case Some(t) if preds.size <= maxQueryLen => Some(ParsedQuery(t, preds))
      case _ => None
    }
  }

  def classify(text: String, vocab: Vocabulary, maxQueryLen: Int = 2): RequestType = {
    val norm = normalize(text)
    if (helpWords.exists(norm.contains)) RequestType.Help
    else if (repeatWords.exists(norm.contains)) RequestType.Repeat
    else {
      val unsupported = unsupportedWords.exists(w =>
        norm.contains(if (w.startsWith(" ")) w else " " + w))
      parse(text, vocab, maxQueryLen) match {
        case Some(_) if !unsupported => RequestType.SQuery
        case Some(_) => RequestType.UQuery
        case None =>
          val mentionsData = vocab.dimValues.values.flatten
            .exists(v => v.length >= 2 &&
              norm.contains(" " + v.toLowerCase + " ")) || unsupported
          if (mentionsData) RequestType.UQuery else RequestType.Other
      }
    }
  }
}
