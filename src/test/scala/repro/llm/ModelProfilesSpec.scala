package repro.llm

import org.scalatest.funsuite.AnyFunSuite

class ModelProfilesSpec extends AnyFunSuite {

  private val all = ModelProfiles.tableV :+ ModelProfiles.fmEd

  test("all probabilities are valid") {
    all.foreach { p =>
      (p.detect.values ++ p.detectNoGuide.values ++
        Seq(p.cleanFp, p.cleanFpNoGuide, p.rvNoCtxFactor,
            p.critQuality, p.augQuality)).foreach { x =>
        assert(x >= 0.0 && x <= 1.0, s"${p.name}: $x")
      }
    }
  }

  test("every profile covers the five error types in both modes") {
    val types = Set("MV", "T", "PV", "O", "RV")
    all.foreach { p =>
      assert(p.detect.keySet == types, p.name)
      assert(p.detectNoGuide.keySet == types, p.name)
    }
  }

  test("guidelines never hurt detection") {
    all.foreach { p =>
      p.detect.foreach { case (t, withG) =>
        assert(withG >= p.detectNoGuide(t), s"${p.name}/$t")
      }
      assert(p.cleanFp <= p.cleanFpNoGuide, p.name)
    }
  }

  test("qwen72b dominates the other Table V profiles in mean detection") {
    def meanDet(p: LLMProfile) = p.detect.values.sum / p.detect.size
    val best = ModelProfiles.qwen72b
    ModelProfiles.tableV.filterNot(_ == best).foreach { p =>
      assert(meanDet(best) >= meanDet(p), p.name)
      assert(best.cleanFp <= p.cleanFp, p.name)
    }
  }

  test("gpt-4o-mini has the precision-collapsing false-positive rate") {
    assert(ModelProfiles.gpt4oMini.cleanFp >=
      ModelProfiles.tableV.map(_.cleanFp).max)
  }

  test("detectProb applies the no-context RV penalty") {
    val p = ModelProfiles.qwen72b
    assert(p.detectProb("RV", useGuide = true, useCtx = false) <
           p.detectProb("RV", useGuide = true, useCtx = true))
    assert(p.detectProb("MV", useGuide = true, useCtx = false) ==
           p.detectProb("MV", useGuide = true, useCtx = true))
  }

  test("fpProb switches on guideline presence") {
    val p = ModelProfiles.llama8b
    assert(p.fpProb(useGuide = true) == p.cleanFp)
    assert(p.fpProb(useGuide = false) == p.cleanFpNoGuide)
  }

  test("byName resolves every profile") {
    all.foreach(p => assert(ModelProfiles.byName(p.name) == p))
  }

  test("fm_ed ignores guidelines by construction") {
    val p = ModelProfiles.fmEd
    assert(p.detect == p.detectNoGuide)
    assert(p.cleanFp == p.cleanFpNoGuide)
  }
}
