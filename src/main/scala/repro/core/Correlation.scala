package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col

/** Correlated-attribute selection via normalized mutual information
  * (Section III-B, "Unified Feature Representation").
  *
  * NMI(a_x, a_y) = I(x;y) / sqrt(H(x)·H(y)), probabilities estimated from
  * value (co-)occurrence frequencies. Estimated over a deterministic tuple
  * sample (tid stride) so high-cardinality attributes don't require
  * collecting full pair distributions.
  */
object Correlation {

  val MaxSampleTuples = 5000

  /** Mutual information of two aligned string columns (natural log). */
  def mutualInformation(xs: Seq[String], ys: Seq[String]): Double = {
    require(xs.size == ys.size && xs.nonEmpty)
    val n = xs.size.toDouble
    val px  = xs.groupBy(identity).view.mapValues(_.size / n).toMap
    val py  = ys.groupBy(identity).view.mapValues(_.size / n).toMap
    val pxy = xs.zip(ys).groupBy(identity).view.mapValues(_.size / n).toMap
    pxy.iterator.map { case ((x, y), p) =>
      p * math.log(p / (px(x) * py(y)))
    }.sum
  }

  def entropy(xs: Seq[String]): Double = {
    val n = xs.size.toDouble
    xs.groupBy(identity).values.map { g =>
      val p = g.size / n
      -p * math.log(p)
    }.sum
  }

  /** NMI in [0,1]; 0 when either attribute is constant. */
  def nmi(xs: Seq[String], ys: Seq[String]): Double = {
    val hx = entropy(xs); val hy = entropy(ys)
    if (hx == 0.0 || hy == 0.0) 0.0
    else math.min(1.0, mutualInformation(xs, ys) / math.sqrt(hx * hy))
  }

  /** Top-k correlated attributes per attribute, from a strided tuple sample
    * of the dirty data.
    */
  def topK(dirty: DataFrame, attrs: Seq[String], k: Int): Map[String, Seq[String]] = {
    val n = dirty.count()
    val stride = math.max(1L, n / MaxSampleTuples)
    val rows = dirty.where(col("tid") % stride === 0L)
      .select(attrs.map(col): _*).collect()
    val cols: Map[String, Seq[String]] =
      attrs.zipWithIndex.map { case (a, i) => a -> rows.toSeq.map(_.getString(i)) }.toMap

    val pairs = for {
      i <- attrs.indices
      j <- (i + 1) until attrs.size
    } yield ((attrs(i), attrs(j)), nmi(cols(attrs(i)), cols(attrs(j))))
    val score = pairs.toMap

    def nmiOf(a: String, b: String): Double =
      score.getOrElse((a, b), score.getOrElse((b, a), 0.0))

    attrs.map { a =>
      val ranked = attrs.filterNot(_ == a)
        .sortBy(b => (-nmiOf(a, b), b)) // deterministic tie-break by name
      a -> ranked.take(math.min(k, attrs.size - 1))
    }.toMap
  }
}
