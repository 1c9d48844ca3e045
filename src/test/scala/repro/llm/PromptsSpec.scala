package repro.llm

import org.scalatest.funsuite.AnyFunSuite
import repro.util.Tokens

class PromptsSpec extends AnyFunSuite {

  test("tuple serialization is attribute: value pairs") {
    assert(Prompts.serializeTuple(Seq("a", "b"), Seq("1", "")) == "a: 1, b: ")
  }

  test("criteria prompt embeds the attribute and samples") {
    val p = Prompts.criteriaPrompt("city", Seq("a: 1", "a: 2"))
    assert(p.contains("'city'"))
    assert(p.contains("a: 2"))
    assert(p.contains("missing values"))
  }

  test("guideline prompt includes distribution summary") {
    val p = Prompts.guidelinePrompt("x", "TOP VALUES ...", Seq("t1"))
    assert(p.contains("TOP VALUES"))
  }

  test("label prompt works with and without guidelines") {
    assert(Prompts.labelPrompt("a", None, Seq("v")).contains("(no guidelines)"))
    assert(Prompts.labelPrompt("a", Some("G!"), Seq("v")).contains("G!"))
  }

  test("fmed prompt carries the serialized tuple") {
    assert(Prompts.fmedPrompt("a: 1, b: 2").contains("a: 1, b: 2"))
  }

  test("responses render and are token-countable") {
    val r = Prompts.labelResponse(Seq("x" -> 1, "y" -> 0))
    assert(r == "x -> 1\ny -> 0")
    assert(Tokens.estimate(r) > 0)
    assert(Prompts.codeResponse(Seq("l1", "l2")).contains("def check"))
    assert(Prompts.listResponse(Seq("a", "b")) == "a\nb")
  }

  test("longer batches cost more input tokens") {
    val short = Prompts.labelPrompt("a", None, Seq("v1"))
    val long = Prompts.labelPrompt("a", None, (1 to 50).map(i => s"value number $i"))
    assert(Tokens.estimate(long) > Tokens.estimate(short))
  }
}
