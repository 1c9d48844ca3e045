package repro.core

import org.apache.spark.ml.classification.MultilayerPerceptronClassifier
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** The final ED classifier (Section III-D): a two-layer MLP trained with
  * cross-entropy over the unified cell features, predicting clean/dirty for
  * every cell of the dataset. Implemented as a Spark MLlib DataFrame pipeline.
  */
object Detector {

  val HiddenUnits = 32
  val MaxIter = 60

  /** Train on (features, label) and predict every cell of `cellsF`
    * (tid, attr, value, features). Returns (tid, attr, pred).
    *
    * Degenerate single-class training data short-circuits to the constant
    * prediction (an MLP cannot be fit on one class).
    */
  def trainPredict(spark: SparkSession, train: DataFrame, cellsF: DataFrame,
                   dim: Int, seed: Long): DataFrame = {
    val classes = train.select("label").distinct().collect().map(_.getDouble(0)).sorted
    if (classes.length < 2) {
      val only = classes.headOption.getOrElse(0.0) == 1.0
      return cellsF.select(col("tid"), col("attr"), lit(only).as("pred"))
    }
    val mlp = new MultilayerPerceptronClassifier()
      .setLayers(Array(dim, HiddenUnits, 2))
      .setMaxIter(MaxIter)
      .setSeed(seed)
      .setBlockSize(64)
      .setFeaturesCol("features")
      .setLabelCol("label")
    val fitted = mlp.fit(train)
    fitted.transform(cellsF)
      .select(col("tid"), col("attr"), (col("prediction") === 1.0).as("pred"))
  }
}
