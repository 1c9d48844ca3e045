package repro.baselines

import org.apache.spark.ml.classification.LogisticRegression
import org.apache.spark.ml.linalg.{Vector, Vectors}
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Patterns
import repro.data.{CellTable, EDataset}
import repro.util.Rng

/** ActiveClean [48]: detection through a downstream convex model over simple
  * featurization, trained from a minimal labeled sample (2 tuples, the
  * paper's minimal-human-effort setting). Its shallow features cannot
  * separate errors well — on several datasets it degenerates to flagging
  * almost everything (paper: recall ≈ 1, precision ≈ error rate).
  */
object ActiveClean {

  val LabeledTuples = 2

  def detect(spark: SparkSession, ds: EDataset): DataFrame = {
    import spark.implicits._
    val cells = CellTable.cells(ds.dirty, ds.attrs).cache()
    val n = ds.dirty.count().toDouble

    val valCounts = cells.groupBy("attr", "value").count()
      .as[(String, String, Long)].collect()
      .map { case (a, v, c) => (a, v) -> c }.toMap
    val l2u = udf((v: String) => Patterns.l2(v))
    val patCounts = cells.select($"attr", l2u($"value").as("p"))
      .groupBy("attr", "p").count()
      .as[(String, String, Long)].collect()
      .map { case (a, p, c) => (a, p) -> c }.toMap

    val featUdf = udf { (attr: String, v: String) =>
      Vectors.dense(
        valCounts.getOrElse((attr, v), 0L) / n,
        patCounts.getOrElse((attr, Patterns.l2(v)), 0L) / n,
        math.min(1.0, v.length / 20.0),
        if (v.isEmpty) 1.0 else 0.0): Vector
    }
    val feats = cells.select($"tid", $"attr", featUdf($"attr", $"value").as("features"))
      .cache()

    // Two manually labeled tuples (ground truth on those cells only).
    val tids = (0 until LabeledTuples).map(i => Rng.int(n.toInt, ds.name, "acLab", i).toLong)
    val labeled = feats.join(ds.mask.where($"tid".isin(tids: _*)), Seq("tid", "attr"))
      .select($"features", when($"is_error", 1.0).otherwise(0.0).as("label"))
      .collect()

    val pred =
      if (labeled.map(_.getDouble(1)).distinct.length < 2) {
        // Degenerate labeled set: fall back to flagging below-average
        // frequency cells (ActiveClean's "everything suspicious" regime).
        val meanVf = valCounts.values.sum / math.max(1.0, valCounts.size.toDouble) / n
        val flag = udf((attr: String, v: String) =>
          valCounts.getOrElse((attr, v), 0L) / n < meanVf)
        cells.select($"tid", $"attr", flag($"attr", $"value").as("pred"))
      } else {
        val nErr = labeled.count(_.getDouble(1) == 1.0).toDouble
        val w = (labeled.length - nErr) / math.max(1.0, nErr)
        val train = labeled.toSeq.map(r => (r.getAs[Vector](0), r.getDouble(1),
          if (r.getDouble(1) == 1.0) w else 1.0)).toDF("features", "label", "w")
        val lr = new LogisticRegression().setWeightCol("w").setMaxIter(50)
        val m = lr.fit(train)
        m.transform(feats).select($"tid", $"attr", ($"prediction" === 1.0).as("pred"))
      }
    cells.unpersist()
    pred
  }
}
