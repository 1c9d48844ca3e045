package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.exp.TableIV

/** Table IV: ablations — every removed component should cost F1 on average. */
class TableIVBench extends SparkSpec {

  test("Table IV — ablation study (paper vs measured)") {
    val res = TableIV.run(spark)
    println("\n==== Table IV: ablation study ====")
    println(TableIV.render(res))

    val datasets = Datasets.comparisonNames
    def meanF1(label: String) =
      datasets.map(d => res((label, d)).f1).sum / datasets.size

    val full = meanF1("ZeroED")
    Seq("w/o Guid.", "w/o Crit.", "w/o Corr.", "w/o Veri.").foreach { ab =>
      assert(meanF1(ab) <= full + 0.01,
             s"$ab mean F1 ${meanF1(ab)} above full $full")
    }
    // The three structural components hurt clearly when removed (paper:
    // guidelines/criteria/correlation are the crucial ones).
    Seq("w/o Guid.", "w/o Crit.", "w/o Corr.").foreach { ab =>
      assert(meanF1(ab) < full - 0.01, s"$ab did not hurt: ${meanF1(ab)} vs $full")
    }
  }
}
