package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Patterns
import repro.data.{CellTable, EDataset}
import repro.llm.Criteria

/** dBoost [16]: statistical outlier detection with manually configured
  * models — Gaussian fences on numeric attributes plus histogram rarity on
  * value and generalized-pattern distributions. Per Table I it catches
  * pattern violations and outliers but not missing values (empty is just a
  * frequent histogram bin) and only structure-changing typos.
  */
object DBoost {

  val ZThreshold = 3.0
  val PatternRarity = 0.02
  val ValueRarity = 0.002
  /** Histogram rarity only applies to attributes whose domain is closed
    * enough for per-value statistics to mean something.
    */
  val MaxHistogramCardinality = 250

  def detect(spark: SparkSession, ds: EDataset): DataFrame = {
    import spark.implicits._
    val cells = CellTable.cells(ds.dirty, ds.attrs).cache()
    val n = ds.dirty.count().toDouble

    val l2u = udf((v: String) => Patterns.l2(v))
    val patCounts = cells.select($"attr", l2u($"value").as("pat"))
      .groupBy("attr", "pat").count()
      .as[(String, String, Long)].collect()
      .map { case (a, p, c) => (a, p) -> c }.toMap
    val valCounts = cells.groupBy("attr", "value").count()
      .as[(String, String, Long)].collect()
      .map { case (a, v, c) => (a, v) -> c }.toMap
    val distinctPerAttr = valCounts.keys.groupBy(_._1).view.mapValues(_.size).toMap

    // Gaussian model per numeric attribute.
    val gauss: Map[String, (Double, Double)] = ds.spec.numericAttrs.map { a =>
      val nums = valCounts.collect { case ((`a`, v), c) =>
        Criteria.parseNumber(v).map(x => (x * c, x * x * c, c.toLong))
      }.flatten
      val cnt = nums.map(_._3).sum.toDouble
      val mean = if (cnt == 0) 0.0 else nums.map(_._1).sum / cnt
      val varr = if (cnt == 0) 1.0 else math.max(1e-9, nums.map(_._2).sum / cnt - mean * mean)
      a -> (mean, math.sqrt(varr))
    }.toMap

    val numericAttrs = ds.spec.numericAttrs
    val flag = udf { (attr: String, v: String) =>
      if (v.isEmpty) false // missing values are not dBoost's model
      else {
        val patRare = patCounts.getOrElse((attr, Patterns.l2(v)), 0L) / n < PatternRarity
        val lowCard = distinctPerAttr.getOrElse(attr, Int.MaxValue) <= MaxHistogramCardinality
        val valRare = lowCard && valCounts.getOrElse((attr, v), 0L) / n < ValueRarity
        val zOut = numericAttrs.contains(attr) && {
          val (m, s) = gauss(attr)
          Criteria.parseNumber(v).exists(x => math.abs(x - m) > ZThreshold * s)
        }
        patRare || valRare || zOut
      }
    }
    val out = cells.select($"tid", $"attr", flag($"attr", $"value").as("pred"))
    cells.unpersist()
    out
  }
}
