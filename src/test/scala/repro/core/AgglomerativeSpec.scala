package repro.core

import org.scalatest.funsuite.AnyFunSuite

class AgglomerativeSpec extends AnyFunSuite {

  private def blobs(n: Int, centers: Seq[Double]): Array[Array[Double]] =
    Array.tabulate(n) { i =>
      val c = centers(i % centers.size)
      Array(c + 0.2 * repro.util.Rng.unif("agc", i, 0),
            c + 0.2 * repro.util.Rng.unif("agc", i, 1))
    }

  test("merges into the requested number of clusters") {
    val res = Agglomerative.fit(blobs(90, Seq(0, 10, 20)), 3, "a1")
    assert(res.centroids.length == 3)
    assert(res.assignments.forall(c => c >= 0 && c < 3))
  }

  test("recovers well-separated blobs") {
    val pts = blobs(90, Seq(0, 10, 20))
    val res = Agglomerative.fit(pts, 3, "a2")
    (0 until 3).foreach { b =>
      val labels = (b until 90 by 3).map(res.assignments).distinct
      assert(labels.size == 1, s"blob $b split into $labels")
    }
  }

  test("k >= n yields one cluster per point") {
    val pts = blobs(4, Seq(0, 5, 10, 15))
    val res = Agglomerative.fit(pts, 10, "a3")
    assert(res.centroids.length == 4)
  }

  test("large inputs are subsampled but everyone is assigned") {
    val pts = blobs(Agglomerative.MaxPoints + 300, Seq(0, 10))
    val res = Agglomerative.fit(pts, 2, "a4")
    assert(res.assignments.length == pts.length)
    assert(res.centroids.length == 2)
  }

  test("deterministic under the same seed key") {
    val pts = blobs(120, Seq(0, 8))
    assert(Agglomerative.fit(pts, 4, "same").assignments.toSeq ==
           Agglomerative.fit(pts, 4, "same").assignments.toSeq)
  }
}
