package repro.bench

import repro.SparkSpec
import repro.exp.TableVI

/** Table VI: sampling strategies — clustering beats random sampling. */
class TableVIBench extends SparkSpec {

  test("Table VI — clustering methods (paper vs measured)") {
    val res = TableVI.run(spark)
    println("\n==== Table VI: performance with different clustering methods ====")
    println(TableVI.render(res))

    def meanF1(m: String) = TableVI.datasets.map(d => res((m, d)).f1).sum / 3

    // k-means is the most robust strategy overall (paper's conclusion).
    assert(meanF1("kmeans") > meanF1("random"),
           s"kmeans ${meanF1("kmeans")} vs random ${meanF1("random")}")
    assert(meanF1("kmeans") >= meanF1("agc") - 0.02,
           s"kmeans ${meanF1("kmeans")} vs agc ${meanF1("agc")}")
    // AGC should at least be competitive with random. NOTE: the paper's
    // 15–25 point random-sampling penalty is muted here — the simulated
    // labeler's accuracy does not depend on sample representativeness the way
    // a real LLM's does (documented in EXPERIMENTS.md).
    assert(meanF1("agc") > meanF1("random") - 0.05,
           s"agc ${meanF1("agc")} far below random ${meanF1("random")}")
    // Paper: the gap is small on Flights (simple errors) …
    assert(math.abs(res(("kmeans", "flights")).f1 - res(("random", "flights")).f1) < 0.12)
    // … and k-means clearly wins on the complex datasets.
    assert(res(("kmeans", "billionaire")).f1 > res(("random", "billionaire")).f1)
    assert(res(("kmeans", "movies")).f1 > res(("random", "movies")).f1)
  }
}
