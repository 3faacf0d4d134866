package repro.exp

import repro.data.VoiceData
import repro.system._

/** Table III: classification of the last 50 voice requests of the three
  * public deployments into Help / Repeat / S-Query / U-Query / Other.
  *
  * The deployment logs are not available; `QueryLogGen` synthesizes 50
  * requests per deployment with the paper's observed mixture, and the real
  * run-time classifier labels them — the reproduced numbers are the
  * classifier's counts, which should recover the generating mixture.
  */
object TableIII {

  import RequestType._

  /** Paper's Table III counts per deployment. */
  val paper: Map[String, Map[RequestType, Int]] = Map(
    "Primaries" -> Map(Help -> 17, Repeat -> 3, SQuery -> 16, UQuery -> 1, Other -> 13),
    "Flights" -> Map(Help -> 9, Repeat -> 0, SQuery -> 12, UQuery -> 5, Other -> 24),
    "Developers" -> Map(Help -> 4, Repeat -> 0, SQuery -> 13, UQuery -> 16, Other -> 17))

  private val specs = Map(
    "Primaries" -> VoiceData.Primaries,
    "Flights" -> VoiceData.Flights,
    "Developers" -> VoiceData.StackOverflow)

  final case class Result(counts: Map[String, Map[RequestType, Int]],
                          logs: Map[String, Seq[(String, RequestType, RequestType)]])

  def compute(seed: Long = 11): Result = {
    val perDeployment = specs.map { case (name, spec) =>
      val vocab = Vocabulary.forDataset(spec)
      val log = QueryLogGen.generate(vocab, paper(name), seed + name.hashCode)
      val labeled = log.map { case (text, trueCat) =>
        (text, trueCat, QueryClassifier.classify(text, vocab))
      }
      name -> labeled
    }
    val counts = perDeployment.map { case (name, labeled) =>
      name -> RequestType.all.map(c => c -> labeled.count(_._3 == c)).toMap
    }
    Result(counts, perDeployment)
  }

  def render(r: Result): String = {
    val deployments = Seq("Primaries", "Flights", "Developers")
    val header = f"${"Request Type"}%-14s" +
      deployments.map(d => f"$d%12s (paper)").mkString
    val rows = RequestType.all.map { c =>
      f"${c.label}%-14s" + deployments.map { d =>
        f"${r.counts(d)(c)}%12d (${paper(d)(c)}%2d)  "
      }.mkString
    }
    (header +: rows).mkString("\n")
  }
}
