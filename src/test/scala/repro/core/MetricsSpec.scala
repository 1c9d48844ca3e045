package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class MetricsSpec extends SparkSpec {

  test("PRF arithmetic") {
    val m = PRF(tp = 8, fp = 2, fn = 4, tn = 86)
    assert(math.abs(m.precision - 0.8) < 1e-9)
    assert(math.abs(m.recall - 8.0 / 12) < 1e-9)
    assert(math.abs(m.f1 - 2 * 0.8 * (8.0 / 12) / (0.8 + 8.0 / 12)) < 1e-9)
  }

  test("PRF degenerate cases are 0, not NaN") {
    assert(PRF(0, 0, 0, 10).precision == 0.0)
    assert(PRF(0, 0, 0, 10).recall == 0.0)
    assert(PRF(0, 0, 0, 10).f1 == 0.0)
  }

  private def maskDf(rows: Seq[(Long, String, Boolean, String)]) = {
    import spark.implicits._
    rows.toDF("tid", "attr", "is_error", "err_type")
  }
  private def predDf(rows: Seq[(Long, String, Boolean)]) = {
    import spark.implicits._
    rows.toDF("tid", "attr", "pred")
  }

  test("evaluate counts the confusion matrix") {
    val mask = maskDf(Seq((0L, "a", true, "T"), (0L, "b", false, ""),
                          (1L, "a", false, ""), (1L, "b", true, "MV")))
    val pred = predDf(Seq((0L, "a", true), (0L, "b", true),
                          (1L, "a", false), (1L, "b", false)))
    val m = Metrics.evaluate(pred, mask)
    assert(m == PRF(tp = 1, fp = 1, fn = 1, tn = 1))
  }

  test("missing predictions default to clean") {
    val mask = maskDf(Seq((0L, "a", true, "T"), (1L, "a", false, "")))
    val pred = predDf(Seq.empty)
    val m = Metrics.evaluate(pred, mask)
    assert(m == PRF(tp = 0, fp = 0, fn = 1, tn = 1))
  }

  test("perfect prediction yields F1 = 1") {
    val rows = (0L until 50L).map(i => (i, "a", i % 5 == 0, if (i % 5 == 0) "T" else ""))
    val mask = maskDf(rows)
    val pred = predDf(rows.map { case (t, a, e, _) => (t, a, e) })
    assert(Metrics.evaluate(pred, mask).f1 == 1.0)
  }

  test("oracle: confusion counts match DuckDB") {
    val rows = (0L until 200L).map { i =>
      (i, "a", repro.util.Rng.bool(0.2, "me", i), "")
    }
    val preds = (0L until 200L).map { i => (i, "a", repro.util.Rng.bool(0.3, "mp", i)) }
    val mask = maskDf(rows.map { case (t, a, e, _) => (t, a, e, if (e) "T" else "") })
    val pred = predDf(preds)
    val m = Metrics.evaluate(pred, mask)
    import spark.implicits._
    val sparkCounts = Seq((m.tp, m.fp, m.fn, m.tn)).toDF("tp", "fp", "fn", "tn")
    Oracle.assertEquivalent(sparkCounts,
      """SELECT
        |  sum(CASE WHEN m.is_error='true'  AND p.pred='true'  THEN 1 ELSE 0 END) AS tp,
        |  sum(CASE WHEN m.is_error='false' AND p.pred='true'  THEN 1 ELSE 0 END) AS fp,
        |  sum(CASE WHEN m.is_error='true'  AND p.pred='false' THEN 1 ELSE 0 END) AS fn,
        |  sum(CASE WHEN m.is_error='false' AND p.pred='false' THEN 1 ELSE 0 END) AS tn
        |FROM m JOIN p ON m.tid = p.tid AND m.attr = p.attr""".stripMargin,
      "m" -> mask, "p" -> pred)
  }

  test("evaluateByType restricts negatives to clean cells plus the type") {
    val mask = maskDf(Seq((0L, "a", true, "T"), (1L, "a", true, "MV"),
                          (2L, "a", false, "")))
    val pred = predDf(Seq((0L, "a", true), (1L, "a", false), (2L, "a", false)))
    val byType = Metrics.evaluateByType(pred, mask)
    assert(byType("T").tp == 1 && byType("T").fn == 0)
    assert(byType("MV").tp == 0 && byType("MV").fn == 1)
  }
}
