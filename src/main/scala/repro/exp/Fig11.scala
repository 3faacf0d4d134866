package repro.exp

import scala.util.Random
import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.VoiceData
import repro.system._
import repro.vocalize.SamplingBaseline

/** Fig. 11 (supplementary, model-proxy for the AMT study): quality of our
  * pre-computed speeches vs. the sampling baseline vs. random fact picks on
  * the three flights queries of §VIII-E (all flights; flights in the
  * Northeast; flights in the Northeast in Winter). AMT workers are replaced
  * by the §II utility model, which the paper's user studies validated
  * against human preference; utilities are scaled by the greedy optimum.
  */
object Fig11 {

  final case class Row(query: String, greedyScaled: Double,
                       baselineScaled: Double, randomScaled: Double)

  def run(spark: SparkSession, sf: Double = 0.01, m: Int = 3,
          seed: Long = 23): Seq[Row] = {
    val spec = VoiceData.Flights
    val table = Encoding.fromDataFrame(spec.df(spark, sf), spec.dims, spec.targets)
    val queries = Seq(
      "all flights" -> Seq.empty[(String, String)],
      "Northeast" -> Seq("origin_region" -> "Northeast"),
      "Northeast+Winter" -> Seq("origin_region" -> "Northeast", "season" -> "Winter"))
    val rnd = new Random(seed)
    // Delay (continuous) rather than cancellation (0/1): under absolute
    // error, the deviation-optimal typical value of a skewed 0/1 column is
    // its median, so CI-midpoints near zero would outscore any mean-valued
    // fact — an artifact of the utility model, not of speech quality.
    queries.map { case (label, preds) =>
      val rel = table.relationFor("delay", preds)
      val maxDims = math.min(2, rel.numDims)
      val index = FactGen.build(rel, maxDims)
      val prior = rel.targetMean
      val greedy = GreedySummarizer.summarize(index, m, prior)
      val scale = math.max(greedy.speech.utility, 1e-12)
      val baseline = SamplingBaseline.summarize(rel, maxDims, m, 200, seed)
      val randomU = (1 to 20).map { _ =>
        val facts = rnd.shuffle(index.facts.indices.toList).take(m)
          .map(index.facts).toIndexedSeq
        Eval.utility(rel, facts, prior)
      }.sum / 20
      Row(label, 1.0, baseline.utility(rel, prior) / scale, randomU / scale)
    }
  }

  def render(rows: Seq[Row]): String = {
    val header = f"${"Query"}%-18s ${"greedy"}%8s ${"baseline"}%9s ${"random"}%8s  (scaled utility)"
    val body = rows.map(r =>
      f"${r.query}%-18s ${r.greedyScaled}%8.3f ${r.baselineScaled}%9.3f ${r.randomScaled}%8.3f")
    (header +: body).mkString("\n")
  }
}
