package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.llm.ModelProfiles
import repro.util.TokenMeter

class LabelingSpec extends AnyFunSuite {

  private val cells = Labeling.AttrCells("a",
    tids = Array(0L, 1L, 2L, 3L),
    values = Array("x", "", "y", "z"),
    feats = Array.fill(4)(Array(0.0)))

  private val clusters = Map("a" ->
    Sampling.AttrClusters("a", Array(0, 1, 0, 1), Array(0, 1)))
  private val rowCtx = (0L to 3L).map(t => t -> Map("a" -> "v", "b" -> "w")).toMap
  private val errTypes = Map((1L, "a") -> "MV")

  test("labels exactly the sampled representatives") {
    val out = Labeling.labelSamples(ModelProfiles.qwen72b, TokenMeter.local(), "t",
      Map("a" -> cells), clusters, rowCtx, errTypes,
      corr = Map("a" -> Seq("b")), guidelines = Map.empty,
      useCtx = true)
    assert(out.keySet == Set(("a", 0L), ("a", 1L)))
  }

  test("the missing-value representative is flagged") {
    val out = Labeling.labelSamples(ModelProfiles.qwen72b, TokenMeter.local(), "t",
      Map("a" -> cells), clusters, rowCtx, errTypes,
      corr = Map.empty, guidelines = Map.empty, useCtx = false)
    assert(out(("a", 1L))) // MV detect prob 0.95+, deterministic draw
  }

  test("token cost grows with batch count") {
    val m1 = TokenMeter.local()
    Labeling.labelSamples(ModelProfiles.qwen72b, m1, "t",
      Map("a" -> cells), clusters, rowCtx, errTypes, Map.empty, Map.empty,
      useCtx = false, batchSize = 1)
    val m2 = TokenMeter.local()
    Labeling.labelSamples(ModelProfiles.qwen72b, m2, "t",
      Map("a" -> cells), clusters, rowCtx, errTypes, Map.empty, Map.empty,
      useCtx = false, batchSize = 20)
    assert(m1.inputTokens >= m2.inputTokens) // per-batch overhead repeated
  }

  test("deterministic labels across invocations") {
    def run() = Labeling.labelSamples(ModelProfiles.llama8b, TokenMeter.local(), "t",
      Map("a" -> cells), clusters, rowCtx, errTypes, Map.empty, Map.empty, useCtx = true)
    assert(run() == run())
  }
}
