package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestData}

class DatasetsSpec extends SparkSpec {

  private lazy val ds = TestData.hospitalSmall(spark)

  test("unknown dataset name is rejected") {
    intercept[IllegalArgumentException](Datasets.load(spark, "nope"))
  }

  test("scale controls tuple count") {
    assert(ds.dirty.count() == 200) // hospital @0.2
  }

  test("dirty, clean and mask share the same tid domain") {
    assert(ds.dirty.select("tid").distinct().count() == 200)
    assert(ds.clean.select("tid").distinct().count() == 200)
    assert(ds.mask.select("tid").distinct().count() == 200)
  }

  test("mask has one row per cell") {
    assert(ds.mask.count() == 200L * ds.attrs.size)
  }

  test("mask err flags exactly the cells where dirty differs from clean") {
    val dirtyCells = CellTable.cells(ds.dirty, ds.attrs)
      .withColumnRenamed("value", "dv")
    val cleanCells = CellTable.cells(ds.clean, ds.attrs)
      .withColumnRenamed("value", "cv")
    val joined = dirtyCells.join(cleanCells, Seq("tid", "attr"))
      .join(ds.mask, Seq("tid", "attr"))
    val bad = joined.where((col("dv") =!= col("cv")) =!= col("is_error")).count()
    assert(bad == 0L)
  }

  test("error rate is near the spec target") {
    val errs = ds.mask.where(col("is_error")).count()
    val rate = 100.0 * errs / ds.mask.count()
    assert(math.abs(rate - ds.spec.rates.values.sum) < 2.0, s"rate=$rate")
  }

  test("every injected error type appears at reasonable proportion") {
    val byType = ds.mask.where(col("is_error"))
      .groupBy("err_type").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(byType.keySet.subsetOf(Set("MV", "T", "PV", "O", "RV")))
    // Hospital injects PV/T/O/RV (MV rate 0).
    assert(!byType.contains("MV"))
    Seq("PV", "T", "O", "RV").foreach(t => assert(byType.getOrElse(t, 0L) > 0, t))
  }

  test("generation is deterministic across loads") {
    val again = Datasets.load(spark, "hospital", 0.2)
    assert(again.dirty.orderBy("tid").collect().toSeq ==
           ds.dirty.orderBy("tid").collect().toSeq)
  }

  test("oracle: per-type error counts match DuckDB over the mask") {
    val agg = ds.mask.groupBy("err_type").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(agg,
      "SELECT err_type, count(1) AS n FROM mask GROUP BY err_type",
      "mask" -> ds.mask)
  }

  test("oracle: dirty-vs-clean diff count matches DuckDB") {
    val dirtyCells = CellTable.cells(ds.dirty, ds.attrs).withColumnRenamed("value", "dv")
    val cleanCells = CellTable.cells(ds.clean, ds.attrs).withColumnRenamed("value", "cv")
    val spark2 = dirtyCells.join(cleanCells, Seq("tid", "attr"))
      .where(col("dv") =!= col("cv"))
      .agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(spark2,
      """SELECT count(1) AS n
        |FROM d JOIN c ON d.tid = c.tid AND d.attr = c.attr
        |WHERE d.dv <> c.cv""".stripMargin,
      "d" -> dirtyCells, "c" -> cleanCells)
  }

  test("comparison registry excludes tax") {
    assert(Datasets.comparisonNames.size == 6)
    assert(!Datasets.comparisonNames.contains("tax"))
  }
}
