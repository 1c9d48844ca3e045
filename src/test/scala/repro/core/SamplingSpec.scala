package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SamplingSpec extends AnyFunSuite {

  private val pts = Array.tabulate(100) { i =>
    Array(repro.util.Rng.unif("sp", i, 0) * 10, repro.util.Rng.unif("sp", i, 1) * 10)
  }

  for (m <- Seq("kmeans", "agc", "random")) {
    test(s"$m: assignments and reps are consistent") {
      val c = Sampling.cluster(m, "a", pts, 10, "s1")
      assert(c.assignments.length == pts.length)
      val k = c.reps.length
      assert(c.assignments.forall(x => x >= 0 && x < k))
      c.reps.zipWithIndex.foreach { case (r, cl) =>
        if (r >= 0) assert(c.assignments(r) == cl, s"rep $r not in cluster $cl")
      }
      // every non-empty cluster has its representative
      c.assignments.distinct.foreach(cl => assert(c.reps(cl) >= 0))
    }

    test(s"$m: sampledIdx are distinct valid indices") {
      val c = Sampling.cluster(m, "a", pts, 10, "s2")
      val s = c.sampledIdx
      assert(s.distinct.length == s.length)
      assert(s.forall(i => i >= 0 && i < pts.length))
      assert(s.nonEmpty && s.length <= 10)
    }
  }

  test("random sampling is deterministic") {
    val a = Sampling.cluster("random", "x", pts, 7, "same")
    val b = Sampling.cluster("random", "x", pts, 7, "same")
    assert(a.sampledIdx.toSeq == b.sampledIdx.toSeq)
  }

  test("unknown method is rejected") {
    intercept[IllegalArgumentException](Sampling.cluster("dbscan", "a", pts, 3, "s"))
  }

  test("clusterCount = ceil(n * rate), minimum 1") {
    assert(Sampling.clusterCount(1000, 0.05) == 50)
    assert(Sampling.clusterCount(1001, 0.05) == 51)
    assert(Sampling.clusterCount(3, 0.01) == 1)
  }
}
