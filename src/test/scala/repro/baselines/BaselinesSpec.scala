package repro.baselines

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestData}
import repro.core.Metrics
import repro.data.Datasets

class BaselinesSpec extends SparkSpec {

  private lazy val hospital = TestData.hospitalSmall(spark)
  private lazy val flights  = TestData.flightsSmall(spark)

  // ------------------------------------------------------------------ dBoost
  test("dBoost predicts for every cell") {
    val pred = DBoost.detect(spark, hospital)
    assert(pred.count() == hospital.dirty.count() * hospital.attrs.size)
  }

  test("dBoost never flags empty values (no missing-value model)") {
    val pred = DBoost.detect(spark, flights).withColumnRenamed("pred", "p")
    val cells = repro.data.CellTable.cells(flights.dirty, flights.attrs)
    val flaggedEmpties = cells.where(col("value") === "")
      .join(pred, Seq("tid", "attr")).where(col("p")).count()
    assert(flaggedEmpties == 0L)
  }

  test("dBoost catches injected numeric outliers on hospital") {
    val pred = DBoost.detect(spark, hospital)
    val outliers = hospital.mask.where(col("err_type") === "O")
    val m = Metrics.evaluate(pred, outliers.withColumn("is_error", lit(true)))
    assert(m.recall > 0.5, s"outlier recall ${m.recall}")
  }

  // ------------------------------------------------------------------ Nadeef
  test("Nadeef flags every empty cell (not-null rules)") {
    val pred = Nadeef.detect(spark, flights).withColumnRenamed("pred", "p")
    val cells = repro.data.CellTable.cells(flights.dirty, flights.attrs)
    val empties = cells.where(col("value") === "")
    val missed = empties.join(pred, Seq("tid", "attr"), "left")
      .where(coalesce(col("p"), lit(false)) === false).count()
    assert(missed == 0L)
  }

  test("Nadeef flags both sides of violated FD groups") {
    val pred = Nadeef.detect(spark, hospital)
    val attrsFlagged = pred.where(col("pred")).select("attr").distinct()
      .collect().map(_.getString(0)).toSet
    // city→state violations must flag both attributes somewhere
    assert(attrsFlagged.contains("state") || attrsFlagged.contains("condition"))
  }

  test("Nadeef recall on rule violations is substantial") {
    val pred = Nadeef.detect(spark, hospital)
    val rv = hospital.mask.where(col("err_type") === "RV" || col("err_type") === "")
    val m = Metrics.evaluate(pred, rv)
    assert(m.recall > 0.4, s"RV recall ${m.recall}")
  }

  // ------------------------------------------------------------------ Katara
  test("Katara finds nothing without a knowledge base (flights)") {
    val pred = Katara.detect(spark, flights)
    assert(pred.where(col("pred")).count() == 0L)
  }

  test("Katara flags KB-contradicting states on hospital with decent precision") {
    val pred = Katara.detect(spark, hospital)
    val m = Metrics.evaluate(pred, hospital.mask)
    assert(pred.where(col("pred")).count() > 0)
    assert(m.precision > 0.3, s"katara precision ${m.precision}")
    assert(m.recall < 0.4, s"katara recall should stay low: ${m.recall}")
  }

  test("Katara only ever flags KB rhs attributes") {
    val pred = Katara.detect(spark, hospital)
    val flagged = pred.where(col("pred")).select("attr").distinct()
      .collect().map(_.getString(0)).toSet
    assert(flagged.subsetOf(hospital.spec.kb.map(_.rhsAttr).toSet))
  }

  // ------------------------------------------------------------- ActiveClean
  test("ActiveClean produces predictions for every cell") {
    val pred = ActiveClean.detect(spark, flights)
    assert(pred.count() == flights.dirty.count() * flights.attrs.size)
  }

  test("ActiveClean with its shallow features stays low-precision") {
    val m = Metrics.evaluate(ActiveClean.detect(spark, hospital), hospital.mask)
    assert(m.precision < 0.6, s"ActiveClean precision suspiciously high: $m")
  }

  // -------------------------------------------------------------------- Raha
  test("Raha predicts for every cell and is deterministic") {
    val p1 = Raha.detect(spark, hospital).orderBy("tid", "attr").collect()
    val p2 = Raha.detect(spark, hospital).orderBy("tid", "attr").collect()
    assert(p1.length == hospital.dirty.count() * hospital.attrs.size)
    assert(p1.toSeq == p2.toSeq)
  }

  test("Raha with 2 labeled tuples has bounded recall (paper Fig. 6)") {
    val m = Metrics.evaluate(Raha.detect(spark, flights), flights.mask)
    assert(m.recall < 0.9, s"Raha recall too high for 2 labels: $m")
  }

  // ------------------------------------------------------------------- FM_ED
  test("FM_ED covers all cells and meters tokens") {
    val r = FMED.detect(spark, flights)
    assert(r.pred.count() == flights.dirty.count() * flights.attrs.size)
    assert(r.inputTokens > 0 && r.outputTokens > 0)
  }

  test("FM_ED catches missing values but misses rule violations") {
    val r = FMED.detect(spark, flights)
    val byType = Metrics.evaluateByType(r.pred, flights.mask)
    assert(byType("MV").recall > 0.8, s"MV ${byType("MV")}")
    assert(byType("RV").recall < 0.4, s"RV ${byType("RV")}")
  }

  test("FM_ED input tokens scale with dataset size") {
    val small = FMED.detect(spark, Datasets.load(spark, "flights", 0.05))
    val big   = FMED.detect(spark, flights) // 0.1
    assert(big.inputTokens > small.inputTokens)
  }
}
