package repro.core

import org.scalatest.funsuite.AnyFunSuite

class PatternsSpec extends AnyFunSuite {

  test("paper example DOe123. at L1") {
    assert(Patterns.l1("DOe123.") == "A[6].")
  }

  test("paper example DOe123. at L2") {
    assert(Patterns.l2("DOe123.") == "L[3]D[3]S[1]")
  }

  test("paper example DOe123. at L3") {
    assert(Patterns.l3("DOe123.") == "U[2]u[1]D[3]S[1]")
  }

  test("empty value gets the empty marker at all levels") {
    assert(Patterns.all("") == Seq("∅", "∅", "∅"))
  }

  test("pure digits") {
    assert(Patterns.l1("2024") == "A[4]")
    assert(Patterns.l2("2024") == "D[4]")
    assert(Patterns.l3("2024") == "D[4]")
  }

  test("mixed separators keep literal symbols at L1") {
    assert(Patterns.l1("12-34") == "A[2]-A[2]")
  }

  test("repeated symbols are run-length collapsed at L2") {
    assert(Patterns.l2("a--b") == "L[1]S[2]L[1]")
  }

  test("same-pattern strings collide, different structure does not") {
    assert(Patterns.l2("abc12") == Patterns.l2("xyz99"))
    assert(Patterns.l2("abc12") != Patterns.l2("ab c12"))
  }

  test("case distinction appears only at L3") {
    assert(Patterns.l2("Abc") == Patterns.l2("abc"))
    assert(Patterns.l3("Abc") != Patterns.l3("abc"))
  }

  test("all returns the three levels in order") {
    val v = "x1"
    assert(Patterns.all(v) == Seq(Patterns.l1(v), Patterns.l2(v), Patterns.l3(v)))
  }
}
