package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{PRF, ZeroEDConfig}
import repro.data.Datasets

/** Table IV: ablation study — disable one LLM-enhanced component at a time
  * (guideline generation, criteria reasoning, correlated attributes,
  * training-data verification + error generation).
  */
object TableIV {

  val ablations: Seq[(String, ZeroEDConfig)] = Seq(
    "w/o Guid." -> ZeroEDConfig(useGuidelines = false),
    "w/o Crit." -> ZeroEDConfig(useCriteria = false),
    "w/o Corr." -> ZeroEDConfig(useCorr = false),
    "w/o Veri." -> ZeroEDConfig(useVerify = false),
    "ZeroED"    -> ZeroEDConfig(),
  )

  def run(spark: SparkSession,
          datasets: Seq[String] = Datasets.comparisonNames,
          sc: Double = Runner.scale): Map[(String, String), PRF] =
    (for {
      (label, cfg) <- ablations
      d <- datasets
    } yield (label, d) -> Runner.zeroed(spark, d, cfg, sc).metrics).toMap

  def render(res: Map[(String, String), PRF],
             datasets: Seq[String] = Datasets.comparisonNames): String =
    Fmt.table(
      "Ablation" +: datasets.map(d => s"$d P/R/F1 (paper)"),
      ablations.map(_._1).map { label =>
        label +: datasets.map { d =>
          Fmt.prfWithPaper(res((label, d)), PaperNumbers.tableIV(label)(d))
        }
      })
}
