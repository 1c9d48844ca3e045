package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{LocalKMeans, Patterns}
import repro.data.{CellTable, EDataset}
import repro.llm.Criteria
import repro.util.Rng

/** Raha [10]: a configuration-free ensemble — run a battery of cheap
  * detection strategies per cell, cluster cells per attribute in the
  * resulting feature space, and propagate a few human labels (2 tuples, the
  * paper's minimal-label setting; Fig. 6 shows Raha needs ~20+ tuples to be
  * competitive) to the clusters that contain them. Unlabeled clusters
  * default to clean, which caps recall at a low label budget.
  */
object Raha {

  val LabeledTuples = 2
  val ClustersPerAttr = 4

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

    // FD-violation strategy (shared with Nadeef's constraint set).
    val fdFlagged: Set[(Long, String)] = ds.spec.fds.flatMap { fd =>
      val bad = ds.dirty.groupBy(col(fd.lhs))
        .agg(countDistinct(col(fd.rhs)).as("nrhs")).where(col("nrhs") > 1)
        .select(col(fd.lhs))
      ds.dirty.join(bad, Seq(fd.lhs)).select($"tid").as[Long].collect()
        .flatMap(t => Seq((t, fd.lhs), (t, fd.rhs)))
    }.toSet

    val numericAttrs = ds.spec.numericAttrs
    def battery(tid: Long, attr: String, v: String): Array[Double] = Array(
      if (v.isEmpty) 1.0 else 0.0,
      if (patCounts.getOrElse((attr, Patterns.l2(v)), 0L) / n < 0.02) 1.0 else 0.0,
      if (valCounts.getOrElse((attr, v), 0L) / n < 0.01) 1.0 else 0.0,
      if (numericAttrs.contains(attr) && Criteria.parseNumber(v).isEmpty) 1.0 else 0.0,
      if (fdFlagged.contains((tid, attr))) 1.0 else 0.0,
    )

    // Ground-truth labels on the two sampled tuples.
    val labTids = (0 until LabeledTuples)
      .map(i => Rng.int(n.toInt, ds.name, "rahaLab", i).toLong).toSet
    val truth: Map[(Long, String), Boolean] = ds.mask
      .where($"tid".isin(labTids.toSeq: _*))
      .select($"tid", $"attr", $"is_error").as[(Long, String, Boolean)]
      .collect().map { case (t, a, e) => (t, a) -> e }.toMap

    val collected = cells.select($"tid", $"attr", $"value")
      .as[(Long, String, String)].collect().groupBy(_._2)

    // Strategy-profile propagation across attributes: a labeled erroneous
    // cell's battery signature marks every cell sharing it as dirty (Raha's
    // "same strategies fired" reasoning), complemented by per-attribute
    // in-cluster propagation. Non-firing signatures stay clean.
    val errSignatures: Set[Seq[Double]] = truth.collect {
      case ((t, a), true) =>
        ds.dirty.where($"tid" === t).collect().headOption
          .map(r => battery(t, a, r.getAs[String](a)).toSeq)
    }.flatten.filter(_.exists(_ > 0)).toSet

    val preds = ds.attrs.flatMap { a =>
      val rows = collected.getOrElse(a, Array.empty)
      val feats = rows.map { case (t, _, v) => battery(t, a, v) }
      if (feats.isEmpty) Seq.empty
      else {
        val res = LocalKMeans.fit(feats, math.min(ClustersPerAttr, feats.length),
                                  s"raha:${ds.name}:$a")
        // cluster → majority label of the labeled cells it contains
        val clusterLabels: Map[Int, Boolean] = rows.indices
          .filter(i => labTids.contains(rows(i)._1))
          .groupBy(i => res.assignments(i))
          .map { case (c, is) =>
            val errs = is.count(i => truth.getOrElse((rows(i)._1, a), false))
            c -> (errs * 2 > is.size)
          }
        rows.indices.map { i =>
          val inDirtyCluster = clusterLabels.getOrElse(res.assignments(i), false)
          val sigMatch = errSignatures.contains(feats(i).toSeq)
          (rows(i)._1, a, inDirtyCluster || sigMatch)
        }
      }
    }
    cells.unpersist()
    preds.toDF("tid", "attr", "pred")
  }
}
