package repro.util

import org.scalatest.funsuite.AnyFunSuite

class RngSpec extends AnyFunSuite {

  test("h64 is deterministic") {
    assert(Rng.h64("a", 1, 2.5) == Rng.h64("a", 1, 2.5))
  }

  test("h64 distinguishes part boundaries") {
    assert(Rng.h64("ab", "c") != Rng.h64("a", "bc"))
  }

  test("h64 differs on different inputs") {
    assert(Rng.h64("x") != Rng.h64("y"))
  }

  test("unif is within [0,1)") {
    (0 until 1000).foreach { i =>
      val u = Rng.unif("range", i)
      assert(u >= 0.0 && u < 1.0)
    }
  }

  test("unif is roughly uniform") {
    val n = 20000
    val mean = (0 until n).map(i => Rng.unif("uniformity", i)).sum / n
    assert(math.abs(mean - 0.5) < 0.02, s"mean=$mean")
  }

  test("int stays in range") {
    (0 until 1000).foreach { i =>
      val x = Rng.int(7, "intRange", i)
      assert(x >= 0 && x < 7)
    }
  }

  test("int rejects non-positive n") {
    intercept[IllegalArgumentException](Rng.int(0, "k"))
  }

  test("pick returns an element deterministically") {
    val xs = Vector("a", "b", "c")
    (0 until 200).foreach { i =>
      assert(xs.contains(Rng.pick(xs, "pick", i)))
      assert(Rng.pick(xs, "pick", i) == Rng.pick(xs, "pick", i))
    }
  }

  test("pick rejects empty input") {
    intercept[IllegalArgumentException](Rng.pick(Vector.empty[Int], "k"))
  }

  test("bool respects probability roughly") {
    val n = 20000
    val hits = (0 until n).count(i => Rng.bool(0.3, "boolcal", i))
    assert(math.abs(hits.toDouble / n - 0.3) < 0.02)
  }

  test("bool(0) never fires, bool(1) always fires") {
    (0 until 100).foreach { i =>
      assert(!Rng.bool(0.0, "b0", i))
      assert(Rng.bool(1.0, "b1", i))
    }
  }

  test("zipfIdx skews toward small indices") {
    val n = 10000
    val draws = (0 until n).map(i => Rng.zipfIdx(100, 1.0, "zipf", i))
    assert(draws.forall(d => d >= 0 && d < 100))
    val lowHalf = draws.count(_ < 50)
    assert(lowHalf > 0.6 * n, s"lowHalf=$lowHalf")
  }

  test("zipfIdx with skew 0 is roughly uniform") {
    val n = 10000
    val draws = (0 until n).map(i => Rng.zipfIdx(100, 0.0, "zipf0", i))
    val lowHalf = draws.count(_ < 50)
    assert(math.abs(lowHalf.toDouble / n - 0.5) < 0.05)
  }
}
