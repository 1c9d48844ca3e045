package repro.llm

import org.scalatest.funsuite.AnyFunSuite

class GuidelinesSpec extends AnyFunSuite {

  private val dist = AttrDist("score", 1000,
    topValues = Seq(("85%", 40L), ("90%", 30L)),
    topPatterns = Seq(("D[2]S[1]", 900L)),
    numericRange = Some((1.0, 100.0)),
    rareValueCount = 12)

  test("distribution summary mentions the key statistics") {
    val s = dist.summary
    assert(s.contains("score"))
    assert(s.contains("85%"))
    assert(s.contains("D[2]S[1]"))
    assert(s.contains("12 rare"))
  }

  test("compose grounds error examples in sampled values") {
    val g = Guidelines.compose("score", dist, Seq("85%", "90%", "85%"))
    assert(g.errorExamples.nonEmpty)
    assert(g.errorExamples.head.contains("85%"))
  }

  test("compose covers all five error types in detection notes") {
    val g = Guidelines.compose("score", dist, Seq("85%"))
    val text = g.detectionNotes.mkString(" ")
    Seq("missing", "pattern", "outlier", "typo", "rule").foreach { t =>
      assert(text.contains(t), s"missing note about $t")
    }
  }

  test("numeric range lands in the outlier note when available") {
    val g = Guidelines.compose("score", dist, Seq("85%"))
    assert(g.detectionNotes.exists(_.contains("[1.00, 100.00]")))
    val g2 = Guidelines.compose("city", dist.copy(numericRange = None), Seq("x"))
    assert(g2.detectionNotes.exists(_.contains("1% frequency")))
  }

  test("render produces a non-trivial guideline text") {
    val g = Guidelines.compose("score", dist, Seq("85%"))
    assert(g.render.length > 200)
    assert(g.render.contains("Guideline for 'score'"))
  }
}
