package repro.llm

import org.scalatest.funsuite.AnyFunSuite

class CriteriaSpec extends AnyFunSuite {

  private def s(v: String, ctx: (String, String)*) = Criteria.Sample(v, ctx.toMap)

  test("NotEmpty fails only on empty values") {
    assert(NotEmpty().eval("x", Map.empty))
    assert(!NotEmpty().eval("", Map.empty))
  }

  test("PatternIn accepts listed patterns only") {
    val c = PatternIn(2, Set("D[5]"))
    assert(c.eval("12345", Map.empty))
    assert(!c.eval("1234x", Map.empty))
  }

  test("DomainIn is plain membership") {
    val c = DomainIn(Set("yes", "no"))
    assert(c.eval("yes", Map.empty))
    assert(!c.eval("maybe", Map.empty))
  }

  test("NumericRange parses affixed numbers and bounds them") {
    val c = NumericRange(0, 100)
    assert(c.eval("85%", Map.empty))
    assert(!c.eval("99985%", Map.empty))
    assert(!c.eval("no-number", Map.empty))
  }

  test("LengthIn bounds string length") {
    val c = LengthIn(2, 4)
    assert(c.eval("abc", Map.empty))
    assert(!c.eval("a", Map.empty))
    assert(!c.eval("abcde", Map.empty))
  }

  test("FDConsistent flags mapped mismatches, passes unseen lhs") {
    val c = FDConsistent("city", Map("boston" -> "ma"))
    assert(c.eval("ma", Map("city" -> "boston")))
    assert(!c.eval("tx", Map("city" -> "boston")))
    assert(c.eval("anything", Map("city" -> "unknown")))
    assert(c.eval("anything", Map.empty))
  }

  test("parseNumber extracts the first number") {
    assert(Criteria.parseNumber("85%").contains(85.0))
    assert(Criteria.parseNumber("-3.5 billion").contains(-3.5))
    assert(Criteria.parseNumber("abc").isEmpty)
  }

  test("infer on clean numeric samples yields a numeric range") {
    val samples = (1 to 60).map(i => s((50 + i % 10).toString))
    val cs = Criteria.infer("score", samples, Seq.empty, 1.0, "t")
    assert(cs.exists(_.isInstanceOf[NumericRange]))
    val nr = cs.collectFirst { case c: NumericRange => c }.get
    assert(nr.eval("55", Map.empty))
    assert(!nr.eval("5000", Map.empty))
  }

  test("infer on low-cardinality samples yields a domain criterion") {
    val samples = (1 to 60).map(i => s(if (i % 2 == 0) "yes" else "no"))
    val cs = Criteria.infer("flag", samples, Seq.empty, 1.0, "t")
    assert(cs.exists(_.isInstanceOf[DomainIn]))
  }

  test("infer yields a pattern criterion covering the dominant format") {
    val samples = (1 to 60).map(i => s(f"${i % 10}%d${i % 10}%d345"))
    val cs = Criteria.infer("zip", samples, Seq.empty, 1.0, "t")
    val pat = cs.collectFirst { case c: PatternIn => c }.get
    assert(pat.eval("98765", Map.empty))
    assert(!pat.eval("9876x", Map.empty))
  }

  test("infer derives FD criteria from consistent context") {
    val cities = Vector("boston", "austin", "denver")
    val st = Map("boston" -> "ma", "austin" -> "tx", "denver" -> "co")
    val samples = (0 until 60).map { i =>
      val c = cities(i % 3); s(st(c), "city" -> c)
    }
    val cs = Criteria.infer("state", samples, Seq("city"), 1.0, "t")
    val fd = cs.collectFirst { case c: FDConsistent => c }.get
    assert(fd.otherAttr == "city")
    assert(!fd.eval("tx", Map("city" -> "boston")))
  }

  test("infer on empty samples degrades to NotEmpty") {
    assert(Criteria.infer("a", Seq(s(""), s("")), Seq.empty, 1.0, "t") == Seq(NotEmpty()))
  }

  test("infer caps the criteria count") {
    val samples = (1 to 60).map(i => s((i % 7).toString, "x" -> (i % 7).toString))
    assert(Criteria.infer("a", samples, Seq("x"), 1.0, "t").size <= Criteria.MaxPerAttr)
  }

  test("low quality drops criteria relative to high quality") {
    val samples = (1 to 80).map(i => s(f"v${i % 9}%d", "x" -> s"${i % 9}"))
    val counts = (0 until 20).map { r =>
      (Criteria.infer("a", samples, Seq("x"), 1.0, s"hq$r").size,
       Criteria.infer("a", samples, Seq("x"), 0.2, s"lq$r").size)
    }
    assert(counts.map(_._1).sum > counts.map(_._2).sum)
  }

  test("fdMapping needs enough consistent pairs") {
    assert(Criteria.fdMapping(Seq(s("a", "x" -> "1")), "x").isEmpty)
    val consistent = (0 until 20).map(i => s(s"v${i % 3}", "x" -> s"${i % 3}"))
    assert(Criteria.fdMapping(consistent, "x").isDefined)
    val noisy = (0 until 20).map(i => s(s"v${i % 5}", "x" -> s"${i % 2}"))
    assert(Criteria.fdMapping(noisy, "x").isEmpty)
  }

  test("refine prefers criteria that separate labeled errors") {
    val clean = (1 to 40).map(i => s((50 + i % 10).toString))
    val err = Seq(s(""), s("99999"))
    val cs = Criteria.refine("score", clean, err, Seq.empty, 0.8, "t")
    assert(cs.nonEmpty)
    // the first criterion must reject at least one known error
    assert(err.exists(e => !cs.head.eval(e.value, e.ctx)))
  }

  test("render emits one pseudo-code line per criterion") {
    val cs = Seq(NotEmpty(), DomainIn(Set("a")), NumericRange(0, 1),
                 LengthIn(1, 2), PatternIn(2, Set("D[1]")),
                 FDConsistent("x", Map("1" -> "a")))
    assert(Criteria.render(cs).size == cs.size)
  }
}
