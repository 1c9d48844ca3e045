package repro.bench

import repro.SparkSpec
import repro.exp.{PaperNumbers, TableII}

/** Table II: dataset statistics at paper scale (Tax at its full 200k). */
class TableIIBench extends SparkSpec {

  test("Table II — dataset statistics (paper vs measured)") {
    val rows = TableII.run(spark, sc = 1.0)
    println("\n==== Table II: evaluation dataset statistics ====")
    println(TableII.render(rows))

    rows.foreach { r =>
      val p = PaperNumbers.tableII(r.name)
      assert(r.tuples == p._1, s"${r.name}: tuples ${r.tuples} != ${p._1}")
      assert(r.attrs == p._2, s"${r.name}: attrs ${r.attrs} != ${p._2}")
      // overall error rate within 1.5 percentage points of the paper
      assert(math.abs(r.err - p._3) < 1.5, s"${r.name}: err ${r.err} vs ${p._3}")
    }
    // Movies has no rule violations, Hospital no missing values (Table II).
    assert(rows.find(_.name == "movies").get.rv == 0.0)
    assert(rows.find(_.name == "hospital").get.mv == 0.0)
  }
}
