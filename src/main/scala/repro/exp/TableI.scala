package repro.exp

import java.nio.file.{Files, Path}
import org.apache.spark.sql.SparkSession
import repro.data.VoiceData

/** Table I: overview of the data sets (size, #dims, #targets).
  *
  * Our sizes are the Parquet footprint of the synthetic stand-ins at the
  * bench scale factor; the paper's CSV byte sizes cannot be matched (the
  * originals carry text columns), so the contract is the *ordering*
  * Flights ≫ Stack Overflow ≫ Primaries > ACS plus exact dims/targets.
  */
object TableI {

  final case class Row(name: String, sizeMB: Double, rows: Long, dims: Int, targets: Int)

  /** Paper numbers: size (MB), #dims, #targets. */
  val paper: Map[String, (Int, Int, Int)] = Map(
    "ACS NY" -> (2, 3, 6),
    "Stack Overflow" -> (197, 7, 6),
    "Flights" -> (565, 6, 1),
    "Primaries" -> (6, 5, 1))

  def compute(spark: SparkSession, sf: Double,
              outDir: Option[Path] = None): Seq[Row] = {
    val dir = outDir.getOrElse(Files.createTempDirectory("tableI"))
    VoiceData.all.map { spec =>
      val df = spec.df(spark, sf)
      val path = dir.resolve(spec.name.replaceAll("\\s", "_")).toString
      df.write.mode("overwrite").parquet(path)
      val bytes = Files.walk(java.nio.file.Paths.get(path)).toArray
        .map(_.asInstanceOf[Path].toFile)
        .filter(f => f.isFile && f.getName.endsWith(".parquet"))
        .map(_.length).sum
      val rows = spark.read.parquet(path).count()
      Row(spec.name, bytes / 1e6, rows, spec.dims.length, spec.targets.length)
    }
  }

  def render(rows: Seq[Row]): String = {
    val header = f"${"Data Set"}%-16s ${"SizeMB"}%8s ${"Rows"}%9s ${"#Dims"}%6s ${"#Targets"}%9s   paper(MB,dims,targets)"
    val body = rows.map { r =>
      val p = paper.get(r.name).map { case (mb, d, t) => s"($mb, $d, $t)" }.getOrElse("-")
      f"${r.name}%-16s ${r.sizeMB}%8.2f ${r.rows}%9d ${r.dims}%6d ${r.targets}%9d   $p"
    }
    (header +: body).mkString("\n")
  }
}
