package repro.data

import org.scalatest.funsuite.AnyFunSuite

class SchemaSpec extends AnyFunSuite {

  private val spec = CleanGen.hospital

  test("genRow is deterministic") {
    assert(Schema.genRow(spec, 17L) == Schema.genRow(spec, 17L))
  }

  test("genRow yields one value per attribute") {
    assert(Schema.genRow(spec, 3L).size == spec.attrs.size)
  }

  test("different tuples differ somewhere") {
    assert(Schema.genRow(spec, 1L) != Schema.genRow(spec, 2L))
  }

  test("Cat values come from the vocabulary") {
    val cityIdx = spec.attrNames.indexOf("city")
    (0L until 50L).foreach { i =>
      assert(Vocab.cities.contains(Schema.genRow(spec, i)(cityIdx)))
    }
  }

  test("Dep attributes respect their functional dependency") {
    val ci = spec.attrNames.indexOf("city")
    val si = spec.attrNames.indexOf("state")
    (0L until 50L).foreach { i =>
      val row = Schema.genRow(spec, i)
      assert(row(si) == Vocab.stateOf(row(ci)))
    }
  }

  test("Dep2 combines both sources") {
    val si = spec.attrNames.indexOf("state")
    val mi = spec.attrNames.indexOf("measure_code")
    val ai = spec.attrNames.indexOf("stateavg")
    val row = Schema.genRow(spec, 9L)
    assert(row(ai) == row(si) + "_" + row(mi))
  }

  test("IdG is unique per tuple and padded") {
    val movies = CleanGen.movies
    val pi = movies.attrNames.indexOf("id")
    val ids = (0L until 100L).map(i => Schema.genRow(movies, i)(pi))
    assert(ids.distinct.size == 100)
    assert(ids.forall(_.startsWith("tt")))
  }

  test("provider attributes repeat across tuples (entity structure)") {
    val ni = spec.attrNames.indexOf("hospital_name")
    val names = (0L until 400L).map(i => Schema.genRow(spec, i)(ni))
    assert(names.distinct.size < 120, s"${names.distinct.size} distinct names")
  }

  test("Num rendering honors decimals and suffix") {
    val sc = spec.attrNames.indexOf("score")
    (0L until 20L).foreach { i =>
      val v = Schema.genRow(spec, i)(sc)
      assert(v.matches("\\d+%"), v)
    }
  }

  test("Patt rendering matches its template classes") {
    val ph = spec.attrNames.indexOf("phone")
    (0L until 20L).foreach { i =>
      assert(Schema.genRow(spec, i)(ph).matches("\\d{10}"))
    }
  }

  test("renderPattern handles all placeholder classes") {
    val s = Schema.renderPattern("##-@@-^^.x", "k")
    assert(s.matches("\\d\\d-[a-z][a-z]-[A-Z][A-Z]\\.x"), s)
  }

  test("fdRhsDomains exposes rhs domains transitively through Dep chains") {
    val doms = Schema.fdRhsDomains(spec)
    assert(doms.contains("state"))
    assert(doms("state").toSet.subsetOf(Vocab.cities.map(Vocab.stateOf).toSet))
    assert(doms("state").size > 1)
    assert(doms.contains("condition"))
    assert(doms("condition").toSet ==
      Set("surgical infection prevention", "heart attack", "pneumonia", "heart failure"))
    // every domain value must actually be producible by the clean generator
    val cityDom = Schema.attrDomains(spec)("city").toSet
    assert(doms("zip").toSet == cityDom.map(Vocab.zipOf))
  }

  test("duplicate attribute names are rejected") {
    intercept[IllegalArgumentException] {
      DatasetSpec("bad", Vector(AttrSpec("a", Cat(Vector("x"))),
                                AttrSpec("a", Cat(Vector("y")))),
                  10, Seq.empty, Map.empty)
    }
  }

  test("numericAttrs derive from Num generators") {
    assert(CleanGen.hospital.numericAttrs == Set("score", "sample", "rating"))
    assert(CleanGen.flights.numericAttrs.isEmpty)
  }
}
