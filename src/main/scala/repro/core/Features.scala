package repro.core

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.ml.linalg.{Vector, Vectors}
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.data.EDataset
import repro.llm.{AttrDist, Criteria, Criterion, LLMProfile, SimLLM}
import repro.util.{Rng, TokenMeter}

/** Feature-construction options (the ablation switches of Table IV). */
final case class FeatureOpts(
    corrK: Int = 2,
    useCriteria: Boolean = true,
    useCorr: Boolean = true,
    criteriaSampleSize: Int = 40,
)

/** The fitted per-dataset feature statistics (Section III-B), computed with
  * Spark aggregations and broadcast for cell-level featurization:
  *
  *  f_base(cell) = [valueFreq, vicinityFreq] ⊕ [patFreq L1..L3] ⊕ f_sem ⊕ f_cri
  *  Feat(cell)   = f_base(cell) ⊕ f_base(correlated cells of the same tuple)
  */
final class FeatureModel(
    val dsName: String,
    val attrs: IndexedSeq[String],
    val corr: Map[String, Seq[String]],
    val valueCounts: Map[(String, String), Long],
    val patCounts: Map[(String, Int, String), Long],
    val coCounts: Map[(String, String, String, String), Long],
    val criteria: Map[String, Seq[Criterion]],
    val dists: Map[String, AttrDist],
    val n: Long,
    val opts: FeatureOpts,
) extends Serializable {

  val baseDim: Int = 2 + 3 + Embedding.Dim + Criteria.MaxPerAttr
  val corrBlocks: Int = if (opts.useCorr) math.min(opts.corrK, attrs.size - 1) else 0
  val totalDim: Int = baseDim * (1 + corrBlocks)

  def valueFreq(attr: String, v: String): Double =
    valueCounts.getOrElse((attr, v), 0L).toDouble / n

  def patternFreq(attr: String, level: Int, v: String): Double = {
    val p = level match {
      case 1 => Patterns.l1(v); case 2 => Patterns.l2(v); case _ => Patterns.l3(v)
    }
    patCounts.getOrElse((attr, level, p), 0L).toDouble / n
  }

  /** Mean conditional frequency of `v` given the tuple's correlated values. */
  def vicinityFreq(attr: String, v: String, row: Map[String, String]): Double = {
    val others = corr.getOrElse(attr, Seq.empty)
    if (others.isEmpty) 0.0
    else {
      val fs = others.map { q =>
        val w = row.getOrElse(q, "")
        val denom = valueCounts.getOrElse((q, w), 0L)
        if (denom == 0L) 0.0
        else coCounts.getOrElse((attr, v, q, w), 0L).toDouble / denom
      }
      fs.sum / fs.size
    }
  }

  /** f_cri: binary adherence to the attribute's criteria, padded to width. */
  def criteriaVec(attr: String, v: String, row: Map[String, String]): Array[Double] = {
    val out = new Array[Double](Criteria.MaxPerAttr)
    if (!opts.useCriteria) return out
    val cs = criteria.getOrElse(attr, Seq.empty)
    var i = 0
    while (i < Criteria.MaxPerAttr) {
      out(i) = if (i < cs.size) { if (cs(i).eval(v, row)) 1.0 else 0.0 } else 1.0
      i += 1
    }
    out
  }

  def baseVec(attr: String, row: Map[String, String]): Array[Double] = {
    val v = row.getOrElse(attr, "")
    val out = new Array[Double](baseDim)
    out(0) = valueFreq(attr, v)
    out(1) = vicinityFreq(attr, v, row)
    out(2) = patternFreq(attr, 1, v)
    out(3) = patternFreq(attr, 2, v)
    out(4) = patternFreq(attr, 3, v)
    // The 16-dim semantic block would dominate Euclidean distances over the
    // frequency/criteria signals in clustering; scale it so each block
    // contributes comparably (standard practice when concatenating feature
    // families of different dimensionality).
    val sem = Embedding.valueVec(v)
    var d = 0
    while (d < Embedding.Dim) { out(5 + d) = sem(d) * SemScale; d += 1 }
    System.arraycopy(criteriaVec(attr, v, row), 0, out, 5 + Embedding.Dim,
                     Criteria.MaxPerAttr)
    out
  }

  private val SemScale = 0.25

  /** The unified representation Feat(D[i,j]) = f_base ⊕ correlated f_base. */
  def finalVec(attr: String, row: Map[String, String]): Array[Double] = {
    val out = new Array[Double](totalDim)
    System.arraycopy(baseVec(attr, row), 0, out, 0, baseDim)
    if (corrBlocks > 0) {
      val others = corr.getOrElse(attr, Seq.empty).take(corrBlocks)
      others.zipWithIndex.foreach { case (q, b) =>
        System.arraycopy(baseVec(q, row), 0, out, baseDim * (1 + b), baseDim)
      }
    }
    out
  }
}

object FeatureModel {

  /** Fit all statistics with Spark aggregations and reason the initial
    * criteria from a random tuple sample (metered LLM calls).
    */
  def fit(spark: SparkSession, ds: EDataset, corr: Map[String, Seq[String]],
          profile: LLMProfile, meter: TokenMeter, opts: FeatureOpts): FeatureModel = {
    import spark.implicits._
    val attrs = ds.attrs
    val cells = repro.data.CellTable.cells(ds.dirty, attrs).cache()
    val n = ds.dirty.count()

    val valueCounts = cells.groupBy("attr", "value").count()
      .as[(String, String, Long)].collect()
      .map { case (a, v, c) => (a, v) -> c }.toMap

    val l1u = udf((v: String) => Patterns.l1(v))
    val l2u = udf((v: String) => Patterns.l2(v))
    val l3u = udf((v: String) => Patterns.l3(v))
    val patCounts = cells.select($"attr", explode(array(
        struct(lit(1).as("lvl"), l1u($"value").as("pat")),
        struct(lit(2).as("lvl"), l2u($"value").as("pat")),
        struct(lit(3).as("lvl"), l3u($"value").as("pat")))).as("lp"))
      .select($"attr", $"lp.lvl".as("lvl"), $"lp.pat".as("pat"))
      .groupBy("attr", "lvl", "pat").count()
      .as[(String, Int, String, Long)].collect()
      .map { case (a, l, p, c) => (a, l, p) -> c }.toMap

    // Co-occurrence counts only for the (attr, correlated attr) pairs the
    // vicinity feature reads.
    val pairs: Seq[(String, String)] =
      if (!opts.useCorr) Seq.empty
      else corr.toSeq.flatMap { case (a, qs) => qs.take(opts.corrK).map(a -> _) }
    val coCounts: Map[(String, String, String, String), Long] =
      if (pairs.isEmpty) Map.empty
      else pairs.map { case (a, q) =>
        ds.dirty.select(lit(a).as("attr"), col(a).as("value"),
                        lit(q).as("other"), col(q).as("otherValue"))
      }.reduce(_.unionAll(_))
        .groupBy("attr", "value", "other", "otherValue").count()
        .as[(String, String, String, String, Long)].collect()
        .map { case (a, v, q, w, c) => (a, v, q, w) -> c }.toMap

    // Distribution analysis (the executed "analysis functions" of Fig. 5).
    val dists = attrs.map { a =>
      val vc = valueCounts.collect { case ((`a`, v), c) => (v, c) }.toSeq
      val pc = patCounts.collect { case ((`a`, 2, p), c) => (p, c) }.toSeq
      val nums = vc.flatMap { case (v, c) => Criteria.parseNumber(v).map(_ -> c) }
      val numRange =
        if (nums.map(_._2).sum >= 0.8 * n) Some((nums.map(_._1).min, nums.map(_._1).max))
        else None
      a -> AttrDist(a, n,
        vc.sortBy { case (v, c) => (-c, v) }.take(10),
        pc.sortBy { case (p, c) => (-c, p) }.take(10),
        numRange,
        vc.count(_._2 == 1L))
    }.toMap

    // Criteria reasoning from a deterministic random tuple sample.
    val sampleRows = sampleTuples(ds, opts.criteriaSampleSize)
    val criteria: Map[String, Seq[Criterion]] =
      if (!opts.useCriteria) Map.empty
      else attrs.map { a =>
        val samples = sampleRows.map(r => Criteria.Sample(r.getOrElse(a, ""), r))
        a -> SimLLM.reasonCriteria(profile, meter, ds.name, a, samples,
                                   corr.getOrElse(a, Seq.empty).take(opts.corrK))
      }.toMap

    cells.unpersist()
    new FeatureModel(ds.name, attrs, corr, valueCounts, patCounts, coCounts,
                     criteria, dists, n, opts)
  }

  /** Deterministic random sample of tuples as attr→value maps. */
  def sampleTuples(ds: EDataset, size: Int): Seq[Map[String, String]] = {
    val n = ds.dirty.count()
    val frac = math.min(1.0, size * 3.0 / math.max(1L, n))
    val dsName = ds.name
    val keep = udf((tid: Long) => Rng.bool(frac, dsName, "critSample", tid))
    val rows = ds.dirty.where(keep(col("tid"))).limit(size).collect()
    rows.toSeq.map(r => ds.attrs.map(a => a -> r.getAs[String](a)).toMap)
  }

  /** Featurize every cell: (tid, attr, value, features) with the unified
    * vector built by a UDF over the broadcast model.
    */
  def transform(spark: SparkSession, ds: EDataset, model: FeatureModel): DataFrame = {
    val bc: Broadcast[FeatureModel] = spark.sparkContext.broadcast(model)
    val attrs = ds.attrs
    val featUdf = udf { (attr: String, vals: Seq[String]) =>
      val row = attrs.zip(vals).toMap
      Vectors.dense(bc.value.finalVec(attr, row)): Vector
    }
    val allVals = array(attrs.map(col): _*)
    attrs.map { a =>
      ds.dirty.select(col("tid"), lit(a).as("attr"), col(a).as("value"),
                      featUdf(lit(a), allVals).as("features"))
    }.reduce(_.unionAll(_))
  }
}
