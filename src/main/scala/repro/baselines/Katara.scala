package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.data.EDataset

/** Katara [14]: knowledge-base powered detection. For each KB relation
  * (lhsAttr → rhsAttr), any tuple whose lhs value the KB covers but whose
  * rhs value disagrees with the KB is flagged on the rhs cell. Datasets
  * without an applicable KB get no detections — exactly the paper's zeros on
  * Flights/Beers/Rayyan/Movies.
  */
object Katara {

  def detect(spark: SparkSession, ds: EDataset): DataFrame = {
    import spark.implicits._
    if (ds.spec.kb.isEmpty)
      return Seq.empty[(Long, String, Boolean)].toDF("tid", "attr", "pred")

    val perRelation = ds.spec.kb.map { rel =>
      val mapping = rel.mapping
      val flag = udf { (lhs: String, rhs: String) =>
        mapping.get(lhs).exists(_ != rhs)
      }
      ds.dirty.select($"tid", lit(rel.rhsAttr).as("attr"),
                      flag(col(rel.lhsAttr), col(rel.rhsAttr)).as("pred"))
    }
    perRelation.reduce(_.unionAll(_)).groupBy("tid", "attr").agg(max("pred").as("pred"))
  }
}
