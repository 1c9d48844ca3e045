package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.{PRF, ZeroEDConfig}

/** Table VI: sampling strategy comparison (random / agglomerative / k-means)
  * on Flights, Billionaire, Movies.
  */
object TableVI {

  val methods: Seq[String] = Seq("random", "agc", "kmeans")
  val datasets: Seq[String] = Seq("flights", "billionaire", "movies")

  def run(spark: SparkSession, sc: Double = Runner.scale): Map[(String, String), PRF] =
    (for {
      m <- methods
      d <- datasets
    } yield (m, d) ->
      Runner.zeroed(spark, d, ZeroEDConfig(clusterMethod = m), sc).metrics).toMap

  def render(res: Map[(String, String), PRF]): String =
    Fmt.table(
      "Clustering" +: datasets.map(d => s"$d P/R/F1 (paper)"),
      methods.map { m =>
        m +: datasets.map { d =>
          Fmt.prfWithPaper(res((m, d)), PaperNumbers.tableVI(m)(d))
        }
      })
}
