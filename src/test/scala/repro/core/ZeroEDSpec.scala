package repro.core

import repro.{SparkSpec, TestData}
import repro.llm.ModelProfiles

/** Pipeline-level behavior beyond the smoke run (small scales for speed). */
class ZeroEDSpec extends SparkSpec {

  private lazy val ds = TestData.hospitalSmall(spark)

  test("full config beats the no-criteria ablation on noisy hospital") {
    val full = ZeroED.run(spark, ds)
    val noCrit = ZeroED.run(spark, ds, ZeroEDConfig(useCriteria = false))
    info(s"full=${full.metrics} noCrit=${noCrit.metrics}")
    // loose shape check at small scale (200 tuples is noisy); the faithful
    // comparison is TableIVBench at paper scale
    assert(full.metrics.f1 + 0.15 > noCrit.metrics.f1,
           s"w/o Crit. unexpectedly much better: ${noCrit.metrics} vs ${full.metrics}")
  }

  test("w/o Corr. uses base-dim features only and still runs") {
    val r = ZeroED.run(spark, ds, ZeroEDConfig(useCorr = false))
    assert(r.metrics.f1 > 0.1)
  }

  test("label rate controls the number of sampled cells") {
    val r1 = ZeroED.run(spark, ds, ZeroEDConfig(labelRate = 0.01))
    val r5 = ZeroED.run(spark, ds, ZeroEDConfig(labelRate = 0.05))
    assert(r5.nSampledCells > r1.nSampledCells)
  }

  test("a weaker LLM profile yields lower precision") {
    val strong = ZeroED.run(spark, ds)
    val weak = ZeroED.run(spark, ds, ZeroEDConfig(profile = ModelProfiles.gpt4oMini))
    info(s"strong=${strong.metrics} weak=${weak.metrics}")
    assert(weak.metrics.precision < strong.metrics.precision + 0.05)
  }

  test("token accounting is populated and result is deterministic-ish") {
    val r = ZeroED.run(spark, ds)
    assert(r.inputTokens > 0 && r.outputTokens > 0)
    val r2 = ZeroED.run(spark, ds)
    assert(r.metrics == r2.metrics, s"${r.metrics} vs ${r2.metrics}")
  }
}
