package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.exp.TableIII

/** Table III: the main comparison — 7 methods × 6 datasets, P/R/F1. */
class TableIIIBench extends SparkSpec {

  test("Table III — method comparison (paper vs measured)") {
    val res = TableIII.run(spark)
    println("\n==== Table III: error detection comparison ====")
    println(TableIII.render(res))

    val datasets = Datasets.comparisonNames
    def f1(m: String, d: String) = res.prf((m, d)).f1

    // Headline claim: ZeroED has the best F1 on (almost) all datasets.
    datasets.foreach { d =>
      val others = TableIII.methods.filterNot(_ == "zeroed").map(m => f1(m, d)).max
      assert(f1("zeroed", d) > others - 0.05,
             s"$d: zeroed ${f1("zeroed", d)} far below best baseline $others")
    }
    val wins = datasets.count { d =>
      f1("zeroed", d) >= TableIII.methods.filterNot(_ == "zeroed").map(m => f1(m, d)).max
    }
    assert(wins >= 4, s"ZeroED wins only $wins/6 datasets")

    // ZeroED is strong in absolute terms everywhere.
    datasets.foreach(d => assert(f1("zeroed", d) > 0.5, s"$d: ${f1("zeroed", d)}"))

    // Katara has no KB for flights/beers/rayyan/movies (paper zeros).
    Seq("flights", "beers", "rayyan", "movies").foreach { d =>
      assert(f1("katara", d) == 0.0, s"katara on $d: ${f1("katara", d)}")
    }

    // Token claim: ZeroED uses fewer total tokens than FM_ED on the larger
    // datasets (paper: up to 90% reduction, growing with data size).
    Seq("movies", "billionaire", "beers").foreach { d =>
      val fm = res.tokens(("fm_ed", d)); val ze = res.tokens(("zeroed", d))
      assert(ze._1 + ze._2 < fm._1 + fm._2,
             s"$d: zeroed tokens ${ze} not below fm_ed ${fm}")
    }
  }
}
