package repro.data

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** One materialized evaluation dataset: the dirty table the detectors see,
  * the clean ground truth, and the per-cell error mask derived from injection.
  *
  * All three are plain DataFrames keyed by `tid`; every attribute cell is a
  * string (ED literature convention — detectors must not rely on typed
  * schemas the dirty data would not have).
  */
final case class EDataset(spec: DatasetSpec, dirty: DataFrame,
                          clean: DataFrame, mask: DataFrame) {
  def name: String = spec.name
  def attrs: IndexedSeq[String] = spec.attrNames
  def nTuples: Long = dirty.count()
}

object Datasets {

  val byName: Map[String, DatasetSpec] = CleanGen.all.map(s => s.name -> s).toMap

  /** The six datasets of the comparison tables (Tax is stats/scalability only). */
  val comparisonNames: Seq[String] =
    Seq("hospital", "flights", "beers", "rayyan", "billionaire", "movies")

  /** Generate a dataset. `scale` multiplies the paper's tuple count (1.0 =
    * paper size); generation is a single distributed deterministic pass that
    * emits clean values, dirty values and error types together.
    */
  def load(spark: SparkSession, name: String, scale: Double = 1.0): EDataset =
    generate(spark, byName.getOrElse(name,
      throw new IllegalArgumentException(s"unknown dataset $name; known: ${byName.keys}")), scale)

  def generate(spark: SparkSession, spec: DatasetSpec, scale: Double = 1.0): EDataset = {
    val n = math.max(50L, math.round(spec.nTuples * scale))
    val rvDomains = Schema.fdRhsDomains(spec)
    val elig      = ErrorInjector.eligible(spec)
    val attrs     = spec.attrNames

    val rowRdd = spark.range(n).rdd.map { i =>
      val clean = Schema.genRow(spec, i)
      val (dirty, etypes) = ErrorInjector.injectRow(spec, i, clean, rvDomains, elig)
      Row.fromSeq(i +: (clean ++ dirty ++ etypes))
    }
    val fields = StructField("tid", LongType, nullable = false) +:
      (attrs.map(a => StructField(s"c_$a", StringType, nullable = false)) ++
       attrs.map(a => StructField(s"d_$a", StringType, nullable = false)) ++
       attrs.map(a => StructField(s"e_$a", StringType, nullable = false)))
    val wide = spark.createDataFrame(rowRdd, StructType(fields)).cache()

    val clean = wide.select(col("tid") +: attrs.map(a => col(s"c_$a").as(a)): _*)
    val dirty = wide.select(col("tid") +: attrs.map(a => col(s"d_$a").as(a)): _*)
    val stackArgs = attrs.map(a => s"'$a', e_$a").mkString(", ")
    val mask = wide
      .selectExpr("tid", s"stack(${attrs.size}, $stackArgs) as (attr, err_type)")
      .withColumn("is_error", col("err_type") =!= lit(""))
    EDataset(spec, dirty, clean, mask)
  }
}
