package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{PRF, ZeroEDConfig}
import repro.data.Datasets
import repro.llm.ModelProfiles

/** Table V: ZeroED with different LLM profiles (the model-quality axis). */
object TableV {

  val models: Seq[String] = ModelProfiles.tableV.map(_.name)

  def run(spark: SparkSession,
          datasets: Seq[String] = Datasets.comparisonNames,
          sc: Double = Runner.scale): Map[(String, String), PRF] =
    (for {
      m <- models
      d <- datasets
    } yield (m, d) ->
      Runner.zeroed(spark, d, ZeroEDConfig(profile = ModelProfiles.byName(m)), sc)
        .metrics).toMap

  def render(res: Map[(String, String), PRF],
             datasets: Seq[String] = Datasets.comparisonNames): String =
    Fmt.table(
      "LLM" +: datasets.map(d => s"$d P/R/F1 (paper)"),
      models.map { m =>
        m +: datasets.map { d =>
          Fmt.prfWithPaper(res((m, d)), PaperNumbers.tableV(m)(d))
        }
      })
}
