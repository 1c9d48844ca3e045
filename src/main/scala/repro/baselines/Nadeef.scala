package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.data.{CellTable, EDataset}

/** Nadeef [13]: violations of manually predefined rules — not-null checks,
  * per-attribute regex patterns, and FD denial constraints. As in the real
  * system, *every* cell participating in a violated FD group is flagged
  * (both sides), which is what drives its low precision in Table III.
  */
object Nadeef {

  def detect(spark: SparkSession, ds: EDataset): DataFrame = {
    val cells = CellTable.cells(ds.dirty, ds.attrs)

    // Not-null rules + regex pattern rules (the dataset's "manual criteria").
    val patterns = ds.spec.nadeefPatterns
    val ruleFlag = udf { (attr: String, v: String) =>
      if (v.isEmpty) true
      else patterns.get(attr).exists(re => !v.matches(re))
    }
    val ruleViol = cells.select(col("tid"), col("attr"),
                                ruleFlag(col("attr"), col("value")).as("pred"))

    // FD denial constraints: a lhs group with >1 distinct rhs is violated;
    // flag lhs and rhs cells of every tuple in the group.
    val fdViols: Seq[DataFrame] = ds.spec.fds.map { fd =>
      val bad = ds.dirty.groupBy(col(fd.lhs))
        .agg(countDistinct(col(fd.rhs)).as("nrhs"))
        .where(col("nrhs") > 1).select(col(fd.lhs))
      val tuples = ds.dirty.join(bad, Seq(fd.lhs)).select(col("tid"))
      tuples.select(col("tid"), lit(fd.lhs).as("attr"), lit(true).as("pred"))
        .unionAll(tuples.select(col("tid"), lit(fd.rhs).as("attr"), lit(true).as("pred")))
    }

    val all = (ruleViol +: fdViols).reduce(_.unionAll(_))
    all.groupBy("tid", "attr").agg(max("pred").as("pred"))
  }
}
