package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.PRF
import repro.data.Datasets

/** Table III: precision/recall/F1 of all seven methods on the six
  * comparison datasets, plus the FM_ED-vs-ZeroED token totals (auxiliary
  * evidence for the paper's token-reduction claim, Section IV-C).
  */
object TableIII {

  val methods: Seq[String] =
    Seq("dboost", "nadeef", "katara", "activeclean", "raha", "fm_ed", "zeroed")

  final case class Result(prf: Map[(String, String), PRF],
                          tokens: Map[(String, String), (Long, Long)])

  def run(spark: SparkSession,
          datasets: Seq[String] = Datasets.comparisonNames,
          sc: Double = Runner.scale): Result = {
    val prf = Map.newBuilder[(String, String), PRF]
    val tok = Map.newBuilder[(String, String), (Long, Long)]
    for (d <- datasets) {
      for (m <- methods if m != "zeroed") {
        prf += (m, d) -> Runner.baseline(spark, m, d, sc)
        if (m == "fm_ed") Runner.fmedTokens(d).foreach(t => tok += (m, d) -> t)
      }
      val z = Runner.zeroed(spark, d, sc = sc)
      prf += ("zeroed", d) -> z.metrics
      tok += ("zeroed", d) -> (z.inputTokens, z.outputTokens)
    }
    Result(prf.result(), tok.result())
  }

  def render(res: Result, datasets: Seq[String] = Datasets.comparisonNames): String = {
    val main = Fmt.table(
      "Method" +: datasets.map(d => s"$d P/R/F1 (paper)"),
      methods.map { m =>
        m +: datasets.map { d =>
          val mine = res.prf((m, d))
          val paper = PaperNumbers.tableIII(m).get(d)
          paper.map(p => Fmt.prfWithPaper(mine, p)).getOrElse(Fmt.prfCell(mine))
        }
      })
    val tokens = Fmt.table(
      Seq("Dataset", "FM_ED tokens (in+out)", "ZeroED tokens (in+out)", "reduction"),
      datasets.flatMap { d =>
        for {
          f <- res.tokens.get(("fm_ed", d))
          z <- res.tokens.get(("zeroed", d))
        } yield {
          val ft = f._1 + f._2; val zt = z._1 + z._2
          Seq(d, ft.toString, zt.toString,
              f"${100.0 * (ft - zt) / math.max(1L, ft)}%.1f%%")
        }
      })
    main + "\nToken consumption (Section IV-C evidence):\n" + tokens
  }
}
