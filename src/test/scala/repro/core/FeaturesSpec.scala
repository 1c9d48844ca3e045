package repro.core

import org.apache.spark.ml.linalg.DenseVector
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestData}
import repro.data.CellTable
import repro.llm.ModelProfiles
import repro.util.TokenMeter

class FeaturesSpec extends SparkSpec {

  private lazy val ds = TestData.hospitalSmall(spark)
  private lazy val corr = Correlation.topK(ds.dirty, ds.attrs, 2)
  private lazy val meter = TokenMeter.local()
  private lazy val model =
    FeatureModel.fit(spark, ds, corr, ModelProfiles.qwen72b, meter, FeatureOpts())

  test("dimensions follow dim(f_base) x (1 + k)") {
    assert(model.baseDim == 2 + 3 + Embedding.Dim + repro.llm.Criteria.MaxPerAttr)
    assert(model.totalDim == model.baseDim * 3)
  }

  test("value frequency matches the dataset") {
    val city = ds.dirty.select("city").collect().map(_.getString(0))
    val top = city.groupBy(identity).maxBy(_._2.size)
    assert(math.abs(model.valueFreq("city", top._1) -
                    top._2.size.toDouble / city.length) < 1e-9)
    assert(model.valueFreq("city", "no-such-city") == 0.0)
  }

  test("oracle: fitted value counts match DuckDB") {
    val cells = CellTable.cells(ds.dirty, ds.attrs)
    val vc = cells.groupBy("attr", "value").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(vc,
      "SELECT attr, value, count(1) AS n FROM cells GROUP BY attr, value",
      "cells" -> cells)
    // and the model's map is exactly that aggregation
    val fromDf = vc.collect().map(r => (r.getString(0), r.getString(1)) -> r.getLong(2)).toMap
    assert(model.valueCounts == fromDf)
  }

  test("pattern frequency reflects the dominant format") {
    // clean zips are 5 digits: the D[5] pattern dominates
    assert(model.patternFreq("zip", 2, "12345") > 0.8)
    assert(model.patternFreq("zip", 2, "1234x") < 0.2)
  }

  test("pattern counts cover all three levels") {
    assert(Seq(1, 2, 3).forall(l => model.patCounts.keys.exists(_._2 == l)))
  }

  test("vicinity frequency is high for consistent FD pairs") {
    val row = ds.dirty.where(col("tid") === 1L).collect()(0)
    val rowMap = ds.attrs.map(a => a -> row.getAs[String](a)).toMap
    // state given city should be deterministic in mostly-clean data
    if (corr("state").contains("city")) {
      val vf = model.vicinityFreq("state", rowMap("state"), rowMap)
      assert(vf >= 0.0 && vf <= 1.0)
    }
  }

  test("criteria vector is binary, padded with passes") {
    val row = ds.dirty.where(col("tid") === 2L).collect()(0)
    val rowMap = ds.attrs.map(a => a -> row.getAs[String](a)).toMap
    val cv = model.criteriaVec("zip", rowMap("zip"), rowMap)
    assert(cv.length == repro.llm.Criteria.MaxPerAttr)
    assert(cv.forall(x => x == 0.0 || x == 1.0))
    val nCrit = model.criteria("zip").size
    (nCrit until cv.length).foreach(i => assert(cv(i) == 1.0))
  }

  test("criteria disabled yields an all-zero criteria block") {
    val m2 = new FeatureModel(model.dsName, model.attrs, model.corr,
      model.valueCounts, model.patCounts, model.coCounts, model.criteria,
      model.dists, model.n, FeatureOpts(useCriteria = false))
    assert(m2.criteriaVec("zip", "12345", Map.empty).forall(_ == 0.0))
  }

  test("useCorr=false removes the correlated blocks") {
    val m2 = new FeatureModel(model.dsName, model.attrs,
      model.attrs.map(_ -> Seq.empty[String]).toMap,
      model.valueCounts, model.patCounts, Map.empty, model.criteria,
      model.dists, model.n, FeatureOpts(useCorr = false))
    assert(m2.totalDim == m2.baseDim)
    assert(m2.vicinityFreq("zip", "12345", Map.empty) == 0.0)
  }

  test("finalVec embeds the base vector as its first block") {
    val row = ds.dirty.where(col("tid") === 3L).collect()(0)
    val rowMap = ds.attrs.map(a => a -> row.getAs[String](a)).toMap
    val fv = model.finalVec("city", rowMap)
    val bv = model.baseVec("city", rowMap)
    assert(fv.take(model.baseDim).toSeq == bv.toSeq)
    assert(fv.length == model.totalDim)
  }

  test("transform produces one featurized row per cell") {
    val cellsF = FeatureModel.transform(spark, ds, model)
    assert(cellsF.count() == ds.dirty.count() * ds.attrs.size)
    val v = cellsF.where(col("attr") === "city" && col("tid") === 0L)
      .select("features").collect()(0).getAs[DenseVector](0)
    assert(v.size == model.totalDim)
  }

  test("transform agrees with driver-side finalVec") {
    val cellsF = FeatureModel.transform(spark, ds, model)
    val got = cellsF.where(col("attr") === "state" && col("tid") === 5L)
      .select("features").collect()(0).getAs[DenseVector](0).toArray
    val row = ds.dirty.where(col("tid") === 5L).collect()(0)
    val rowMap = ds.attrs.map(a => a -> row.getAs[String](a)).toMap
    assert(got.toSeq == model.finalVec("state", rowMap).toSeq)
  }

  test("distribution analysis exposes top values and rare counts") {
    val d = model.dists("measure_code")
    assert(d.n == ds.dirty.count())
    assert(d.topValues.nonEmpty)
    assert(d.topValues.head._2 >= d.topValues.last._2)
    val sc = model.dists("score")
    assert(sc.numericRange.isDefined)
  }

  test("criteria reasoning consumed tokens") {
    model // force
    assert(meter.inputTokens > 0 && meter.outputTokens > 0)
  }

  test("sampleTuples returns full attr maps") {
    val s = FeatureModel.sampleTuples(ds, 10)
    assert(s.nonEmpty && s.size <= 10)
    s.foreach(m => assert(m.keySet == ds.attrs.toSet))
  }
}
