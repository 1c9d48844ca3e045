package repro.core

import org.apache.spark.ml.linalg.Vectors
import org.apache.spark.sql.functions._
import repro.SparkSpec

class DetectorSpec extends SparkSpec {

  private def featRow(i: Int, err: Boolean) = {
    val base = if (err) 0.9 else 0.1
    Vectors.dense(base + 0.05 * repro.util.Rng.unif("det", i, 0),
                  base + 0.05 * repro.util.Rng.unif("det", i, 1))
  }

  test("learns a separable concept and predicts all cells") {
    import spark.implicits._
    val train = (0 until 400).map { i =>
      val err = i % 4 == 0
      (featRow(i, err), if (err) 1.0 else 0.0)
    }.toDF("features", "label")
    val cells = (0 until 100).map { i =>
      val err = i % 4 == 0
      (i.toLong, "a", s"v$i", featRow(i + 1000, err))
    }.toDF("tid", "attr", "value", "features")
    val pred = Detector.trainPredict(spark, train, cells, 2, seed = 1L)
    assert(pred.count() == 100)
    val wrong = pred.withColumn("want", (col("tid") % 4 === 0))
      .where(col("pred") =!= col("want")).count()
    assert(wrong <= 5, s"$wrong misclassified")
  }

  test("single-class training predicts the constant class") {
    import spark.implicits._
    val train = (0 until 50).map(i => (featRow(i, err = false), 0.0))
      .toDF("features", "label")
    val cells = (0 until 10).map(i => (i.toLong, "a", "v", featRow(i, err = true)))
      .toDF("tid", "attr", "value", "features")
    val pred = Detector.trainPredict(spark, train, cells, 2, seed = 1L)
    assert(pred.where(col("pred")).count() == 0)
  }

  test("single-class all-error training predicts everything as error") {
    import spark.implicits._
    val train = (0 until 50).map(i => (featRow(i, err = true), 1.0))
      .toDF("features", "label")
    val cells = (0 until 10).map(i => (i.toLong, "a", "v", featRow(i, err = false)))
      .toDF("tid", "attr", "value", "features")
    val pred = Detector.trainPredict(spark, train, cells, 2, seed = 1L)
    assert(pred.where(col("pred")).count() == 10)
  }

  test("deterministic under a fixed seed") {
    import spark.implicits._
    val train = (0 until 200).map { i =>
      val err = i % 3 == 0
      (featRow(i, err), if (err) 1.0 else 0.0)
    }.toDF("features", "label")
    val cells = (0 until 50).map(i => (i.toLong, "a", "v", featRow(i + 500, i % 3 == 0)))
      .toDF("tid", "attr", "value", "features")
    val p1 = Detector.trainPredict(spark, train, cells, 2, 7L).orderBy("tid").collect()
    val p2 = Detector.trainPredict(spark, train, cells, 2, 7L).orderBy("tid").collect()
    assert(p1.toSeq == p2.toSeq)
  }
}
