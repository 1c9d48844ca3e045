package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.exp.TableV

/** Table V: LLM quality axis — bigger/better models dominate. */
class TableVBench extends SparkSpec {

  test("Table V — ZeroED with different LLMs (paper vs measured)") {
    val res = TableV.run(spark)
    println("\n==== Table V: detection performance with different LLMs ====")
    println(TableV.render(res))

    val datasets = Datasets.comparisonNames
    def meanF1(m: String) = datasets.map(d => res((m, d)).f1).sum / datasets.size
    def meanP(m: String) = datasets.map(d => res((m, d)).precision).sum / datasets.size

    // Qwen2.5-72b is the best overall (paper: highest F1 on most datasets).
    TableV.models.filterNot(_ == "qwen2.5-72b").foreach { m =>
      assert(meanF1("qwen2.5-72b") >= meanF1(m), s"$m beats qwen72b")
    }
    // Larger models beat their smaller siblings.
    assert(meanF1("llama3.1-70b") >= meanF1("qwen2.5-7b"))
    // GPT-4o-mini's precision collapse (paper Section IV-E2).
    assert(meanP("gpt-4o-mini") == TableV.models.map(meanP).min,
           "gpt-4o-mini should have the lowest precision")
  }
}
