package repro.data

import org.scalatest.funsuite.AnyFunSuite

class CleanGenSpec extends AnyFunSuite {

  test("all seven datasets are registered") {
    assert(CleanGen.all.map(_.name) ==
      Seq("hospital", "flights", "beers", "rayyan", "billionaire", "movies", "tax"))
  }

  // Attribute counts must match Table II's #A. column.
  for ((name, attrs) <- Seq("hospital" -> 20, "flights" -> 7, "beers" -> 11,
                            "rayyan" -> 11, "billionaire" -> 22, "movies" -> 17,
                            "tax" -> 22)) {
    test(s"$name has $attrs attributes (Table II)") {
      assert(CleanGen.all.find(_.name == name).get.attrs.size == attrs)
    }
  }

  // Tuple counts must match Table II's #Tuples column.
  for ((name, n) <- Seq("hospital" -> 1000, "flights" -> 2376, "beers" -> 2410,
                        "rayyan" -> 1000, "billionaire" -> 2615,
                        "movies" -> 7390, "tax" -> 200000)) {
    test(s"$name targets $n tuples (Table II)") {
      assert(CleanGen.all.find(_.name == name).get.nTuples == n)
    }
  }

  // Summed injection rates must approximate Table II's overall Err%.
  for ((name, err) <- Seq("hospital" -> 4.82, "flights" -> 34.51, "beers" -> 12.98,
                          "rayyan" -> 29.19, "billionaire" -> 9.84,
                          "movies" -> 4.97, "tax" -> 0.11)) {
    test(s"$name injection rates sum to ~$err% (Table II)") {
      val spec = CleanGen.all.find(_.name == name).get
      assert(math.abs(spec.rates.values.sum - err) < 0.05,
             s"rates=${spec.rates} sum=${spec.rates.values.sum}")
    }
  }

  // Every declared FD must hold in clean data.
  for (spec <- CleanGen.all; fd <- spec.fds) {
    test(s"${spec.name}: FD ${fd.lhs} -> ${fd.rhs} holds in clean tuples") {
      val li = spec.attrNames.indexOf(fd.lhs)
      val ri = spec.attrNames.indexOf(fd.rhs)
      assert(li >= 0 && ri >= 0, s"FD refers to unknown attrs in ${spec.name}")
      val pairs = (0L until 300L).map { i =>
        val row = Schema.genRow(spec, i); (row(li), row(ri))
      }
      val violations = pairs.groupBy(_._1).filter(_._2.map(_._2).distinct.size > 1)
      assert(violations.isEmpty, s"FD violated for lhs=${violations.keys.take(3)}")
    }
  }

  test("movies declares no FDs (Table II: RV = 0)") {
    assert(CleanGen.movies.fds.isEmpty)
    assert(CleanGen.movies.rates("RV") == 0.0)
  }

  test("KB relations are partial and mostly correct") {
    val kb = CleanGen.hospital.kb.head
    assert(kb.lhsAttr == "city" && kb.rhsAttr == "state")
    val cov = kb.mapping.size.toDouble / Vocab.cities.size
    assert(cov > 0.4 && cov < 0.8, s"coverage=$cov")
    val correct = kb.mapping.count { case (c, s) => Vocab.stateOf(c) == s }
    assert(correct.toDouble / kb.mapping.size > 0.85)
  }

  test("flights/beers/rayyan/movies have no KB (paper: Katara finds nothing)") {
    Seq(CleanGen.flights, CleanGen.beers, CleanGen.rayyan, CleanGen.movies)
      .foreach(s => assert(s.kb.isEmpty, s.name))
  }

  test("nadeef patterns accept clean values") {
    for (spec <- CleanGen.all; (attr, re) <- spec.nadeefPatterns) {
      val ai = spec.attrNames.indexOf(attr)
      (0L until 100L).foreach { i =>
        val v = Schema.genRow(spec, i)(ai)
        assert(v.matches(re), s"${spec.name}.$attr clean value '$v' fails /$re/")
      }
    }
  }
}
