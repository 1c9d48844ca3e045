package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp._

/** Shared spark-submit bootstrap for the table jobs. */
object Jobs {
  def session(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}

/** spark-submit --class repro.jobs.TableII <jar> — dataset statistics. */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("zeroed-table2")
    println(TableII.render(TableII.run(spark)))
    spark.stop()
  }
}

/** spark-submit --class repro.jobs.TableIIIJob <jar> — method comparison. */
object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("zeroed-table3")
    println(TableIII.render(TableIII.run(spark)))
    spark.stop()
  }
}

/** spark-submit --class repro.jobs.TableIVJob <jar> — ablation study. */
object TableIVJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("zeroed-table4")
    println(TableIV.render(TableIV.run(spark)))
    spark.stop()
  }
}

/** spark-submit --class repro.jobs.TableVJob <jar> — LLM comparison. */
object TableVJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("zeroed-table5")
    println(TableV.render(TableV.run(spark)))
    spark.stop()
  }
}

/** spark-submit --class repro.jobs.TableVIJob <jar> — clustering methods. */
object TableVIJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("zeroed-table6")
    println(TableVI.render(TableVI.run(spark)))
    spark.stop()
  }
}
