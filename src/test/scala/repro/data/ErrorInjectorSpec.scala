package repro.data

import org.scalatest.funsuite.AnyFunSuite

class ErrorInjectorSpec extends AnyFunSuite {

  private val spec = CleanGen.hospital
  private val rvDoms = Schema.fdRhsDomains(spec)
  private val elig = ErrorInjector.eligible(spec)

  test("MV corruption empties the value") {
    assert(ErrorInjector.corrupt("MV", "hello", "city", spec, 1L, rvDoms) == "")
  }

  test("typo stays within a small edit distance") {
    (0 until 200).foreach { i =>
      val v = "birmingham"
      val t = ErrorInjector.typo(v, "t", i)
      // ≤ 2 edit ops; a transposition costs 2 in plain Levenshtein → ≤ 4.
      assert(editDistance(v, t) <= 4, s"'$t' too far from '$v'")
    }
  }

  test("typo on empty string is a no-op") {
    assert(ErrorInjector.typo("") == "")
  }

  test("typo substitution preserves character class") {
    // digits stay digits under substitution-only inputs often; check via many draws
    val results = (0 until 100).map(i => ErrorInjector.typo("12345", "digit", i))
    results.foreach { r =>
      assert(r.length >= 3 && r.length <= 7) // ≤2 inserts/deletes around length 5
      assert(r.forall(_.isDigit), s"'$r' left the digit class")
    }
  }

  test("pattern violation changes the L2 pattern for spaced values") {
    val v = "dave green"
    val pv = ErrorInjector.patternViolation(v)
    assert(pv == "DaveGreen")
    assert(repro.core.Patterns.l2(pv) != repro.core.Patterns.l2(v))
  }

  test("pattern violation strips separators in times") {
    assert(ErrorInjector.patternViolation("7:10 a.m.") == "710Am" ||
           ErrorInjector.patternViolation("7:10 a.m.").nonEmpty)
    assert(ErrorInjector.patternViolation("12:30") == "1230")
  }

  test("pattern violation uppercases plain lowercase words") {
    assert(ErrorInjector.patternViolation("pneumonia") == "PNEUMONIA")
  }

  test("pattern violation prefixes zero to plain digits") {
    assert(ErrorInjector.patternViolation("12345") == "012345")
  }

  test("outlier on numeric attr is an extreme number") {
    val o = ErrorInjector.corrupt("O", "85%", "score", spec, 1L, rvDoms)
    assert(o == "99985%")
  }

  test("outlier on non-numeric attr is a rare token") {
    val o = ErrorInjector.corrupt("O", "birmingham", "city", spec, 1L, rvDoms)
    assert(o.startsWith("anomaly"))
  }

  test("rule violation picks a different valid rhs value") {
    (0L until 50L).foreach { i =>
      val clean = Vocab.stateOf("birmingham")
      val rv = ErrorInjector.corrupt("RV", clean, "state", spec, i, rvDoms)
      assert(rv != clean)
      assert(rvDoms("state").contains(rv))
    }
  }

  test("RV is only eligible on FD rhs attrs") {
    assert(elig("RV") == Set("hospital_name", "state", "zip", "county",
                             "condition", "measure_name"))
  }

  test("O eligibility falls back to all attrs when no numeric attrs exist") {
    val fe = ErrorInjector.eligible(CleanGen.flights)
    assert(fe("O") == CleanGen.flights.attrNames.toSet)
  }

  test("cellProb scales rate by eligibility") {
    val p = ErrorInjector.cellProb(spec, elig, "MV")
    assert(p == 0.0) // hospital MV rate is 0
    val pt = ErrorInjector.cellProb(spec, elig, "T")
    assert(math.abs(pt - 0.0125) < 1e-9) // all attrs eligible → rate/100
  }

  test("injectRow marks exactly the changed cells") {
    (0L until 100L).foreach { i =>
      val clean = Schema.genRow(spec, i)
      val (dirty, types) = ErrorInjector.injectRow(spec, i, clean, rvDoms, elig)
      clean.indices.foreach { j =>
        if (types(j).isEmpty) assert(dirty(j) == clean(j))
        else assert(dirty(j) != clean(j), s"type=${types(j)} attr=${spec.attrNames(j)}")
      }
    }
  }

  test("injection is deterministic") {
    val clean = Schema.genRow(spec, 5L)
    assert(ErrorInjector.injectRow(spec, 5L, clean, rvDoms, elig) ==
           ErrorInjector.injectRow(spec, 5L, clean, rvDoms, elig))
  }

  test("overall injected rate approximates the spec target") {
    val n = 2000
    var errs = 0
    var cells = 0
    (0L until n.toLong).foreach { i =>
      val clean = Schema.genRow(spec, i)
      val (_, types) = ErrorInjector.injectRow(spec, i, clean, rvDoms, elig)
      errs += types.count(_.nonEmpty)
      cells += types.size
    }
    val rate = 100.0 * errs / cells
    val target = spec.rates.values.sum
    assert(math.abs(rate - target) < 1.2, s"rate=$rate target=$target")
  }

  test("unknown error type is rejected") {
    intercept[IllegalArgumentException] {
      ErrorInjector.corrupt("XX", "v", "city", spec, 1L, rvDoms)
    }
  }

  private def editDistance(a: String, b: String): Int = {
    val d = Array.tabulate(a.length + 1, b.length + 1) { (i, j) =>
      if (i == 0) j else if (j == 0) i else 0
    }
    for (i <- 1 to a.length; j <- 1 to b.length) {
      d(i)(j) = math.min(math.min(d(i - 1)(j) + 1, d(i)(j - 1) + 1),
        d(i - 1)(j - 1) + (if (a(i - 1) == b(j - 1)) 0 else 1))
    }
    d(a.length)(b.length)
  }
}
