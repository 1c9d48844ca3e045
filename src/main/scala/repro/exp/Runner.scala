package repro.exp

import org.apache.spark.sql.SparkSession
import repro.baselines._
import repro.core.{Metrics, PRF, ZeroED, ZeroEDConfig, ZeroEDResult}
import repro.data.{Datasets, EDataset}

/** Shared experiment runner: dataset and ZeroED-result caching so the table
  * harnesses can overlap (the full configuration appears in Tables III, IV,
  * V and VI) without recomputing, plus baseline dispatch.
  */
object Runner {

  /** Global scale knob (fraction of the paper's tuple counts); REPRO_SCALE
    * lets the bench trade fidelity for wall-clock without code changes.
    */
  def scale: Double = sys.env.getOrElse("REPRO_SCALE", "1.0").toDouble

  private val dsCache = scala.collection.mutable.Map.empty[(String, Double), EDataset]
  private val zedCache = scala.collection.mutable.Map.empty[String, ZeroEDResult]

  def dataset(spark: SparkSession, name: String, sc: Double = scale): EDataset =
    synchronized {
      dsCache.getOrElseUpdate((name, sc), {
        val ds = Datasets.load(spark, name, sc)
        ds.dirty.cache(); ds.mask.cache()
        ds.dirty.count()
        ds
      })
    }

  private def cfgKey(name: String, sc: Double, cfg: ZeroEDConfig): String =
    s"$name@$sc:${cfg.profile.name}:${cfg.labelRate}:${cfg.corrK}:" +
      s"${cfg.useGuidelines}:${cfg.useCriteria}:${cfg.useCorr}:${cfg.useVerify}:" +
      s"${cfg.clusterMethod}:${cfg.seed}"

  def zeroed(spark: SparkSession, name: String,
             cfg: ZeroEDConfig = ZeroEDConfig(),
             sc: Double = scale): ZeroEDResult = {
    val key = cfgKey(name, sc, cfg)
    synchronized(zedCache.get(key)) match {
      case Some(r) => r
      case None =>
        val r = ZeroED.run(spark, dataset(spark, name, sc), cfg)
        synchronized(zedCache.put(key, r))
        r
    }
  }

  /** Baseline dispatch; FM_ED's token counts are surfaced via `fmedTokens`. */
  def baseline(spark: SparkSession, method: String, name: String,
               sc: Double = scale): PRF = {
    val ds = dataset(spark, name, sc)
    val pred = method match {
      case "dboost"      => DBoost.detect(spark, ds)
      case "nadeef"      => Nadeef.detect(spark, ds)
      case "katara"      => Katara.detect(spark, ds)
      case "activeclean" => ActiveClean.detect(spark, ds)
      case "raha"        => Raha.detect(spark, ds)
      case "fm_ed" =>
        val r = FMED.detect(spark, ds)
        fmedTok.synchronized { fmedTok(name) = (r.inputTokens, r.outputTokens) }
        r.pred
      case other => throw new IllegalArgumentException(s"unknown baseline $other")
    }
    Metrics.evaluate(pred, ds.mask)
  }

  private val fmedTok = scala.collection.mutable.Map.empty[String, (Long, Long)]
  def fmedTokens(name: String): Option[(Long, Long)] = fmedTok.synchronized(fmedTok.get(name))
}
