package repro.exp

import org.apache.spark.sql.SparkSession
import repro.data.VoiceData
import repro.system._

/** Fig. 4 (supplementary): scalability of G-B vs G-O in the speech length m
  * and in the maximal number of dimensions per fact, on the flights
  * scenario. The paper finds scaling is more graceful in m than in fact
  * dimensions, with G-O below G-B throughout.
  */
object Fig4 {

  final case class Point(param: String, value: Int, gbSec: Double, goSec: Double)

  def run(spark: SparkSession, sf: Double = 0.01,
          target: String = "delay",
          speechLengths: Seq[Int] = Seq(1, 2, 3, 4, 5),
          factDims: Seq[Int] = Seq(1, 2, 3),
          seed: Long = 17): Seq[Point] = {
    val spec = VoiceData.Flights
    val table = Encoding.fromDataFrame(spec.df(spark, sf), spec.dims, spec.targets)
    // One-predicate queries keep the sweep tractable while still covering
    // every data subset once per configuration.
    val config = SummarizationConfig(spec, maxQueryLen = 1)
    val probs = ProblemGenerator.problems(table, config).filter(_.target == target)

    def time(algo: String, m: Int, extraDims: Int): Double = {
      val start = System.nanoTime()
      probs.foreach(p => Preprocessor.solve(table, p, extraDims, m, algo))
      (System.nanoTime() - start) / 1e9
    }

    val byM = speechLengths.map { m =>
      Point("speechLength", m, time("gb", m, 2), time("go", m, 2))
    }
    val byDims = factDims.map { d =>
      Point("factDims", d, time("gb", 3, d), time("go", 3, d))
    }
    byM ++ byDims
  }

  def render(ps: Seq[Point]): String = {
    val header = f"${"Param"}%-14s ${"Value"}%6s ${"G-B s"}%8s ${"G-O s"}%8s"
    val body = ps.map(p => f"${p.param}%-14s ${p.value}%6d ${p.gbSec}%8.2f ${p.goSec}%8.2f")
    (header +: body).mkString("\n")
  }
}
