package repro.core

import org.scalatest.funsuite.AnyFunSuite

class EmbeddingSpec extends AnyFunSuite {

  test("tokenization lowercases, splits, and drops stop words") {
    assert(Embedding.tokens("The Quick-Brown fox") == Seq("quick", "brown", "fox"))
  }

  test("value vector has the configured dimension") {
    assert(Embedding.valueVec("hello world").length == Embedding.Dim)
  }

  test("empty value embeds to the zero vector") {
    assert(Embedding.valueVec("").forall(_ == 0.0))
    assert(Embedding.valueVec("the of").forall(_ == 0.0)) // all stop words
  }

  test("embedding is deterministic") {
    assert(Embedding.valueVec("pneumonia").toSeq == Embedding.valueVec("pneumonia").toSeq)
  }

  test("token vectors are unit-normalized") {
    val n = math.sqrt(Embedding.tokenVec("hospital").map(x => x * x).sum)
    assert(math.abs(n - 1.0) < 1e-9)
  }

  test("a typo'd string stays closer to its source than an unrelated string") {
    val base = Embedding.valueVec("birmingham")
    val typo = Embedding.valueVec("birmingam")
    val other = Embedding.valueVec("pneumonia")
    assert(Embedding.cosine(base, typo) > Embedding.cosine(base, other))
  }

  test("identical strings have cosine 1") {
    val v = Embedding.valueVec("measure code")
    assert(math.abs(Embedding.cosine(v, v) - 1.0) < 1e-9)
  }

  test("cosine with the zero vector is 0") {
    assert(Embedding.cosine(Embedding.valueVec("x"), new Array[Double](Embedding.Dim)) == 0.0)
  }

  test("multi-token values average their tokens") {
    val a = Embedding.valueVec("alpha")
    val b = Embedding.valueVec("beta")
    val ab = Embedding.valueVec("alpha beta")
    ab.indices.foreach { i =>
      assert(math.abs(ab(i) - (a(i) + b(i)) / 2) < 1e-9)
    }
  }
}
