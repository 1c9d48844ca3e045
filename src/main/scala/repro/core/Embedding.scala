package repro.core

import repro.util.Rng

/** Semantic value embeddings (Section III-B, f_sem).
  *
  * The paper averages pre-trained FastText token vectors. Offline we
  * substitute FastText's own subword mechanism: each token is embedded as the
  * normalized sum of hashed character-3-gram vectors (deterministic random
  * projections), and a value's embedding is the average over its tokens.
  * This preserves the property the pipeline relies on — lexically/semantically
  * close strings map to nearby vectors, typo'd strings stay near their source,
  * while unrelated strings are far apart.
  */
object Embedding {

  val Dim = 16

  /** Tokenize: lowercase, split on non-alphanumerics, drop stop words. */
  def tokens(v: String): Seq[String] =
    v.toLowerCase.split("[^a-z0-9]+").filter(_.nonEmpty).filterNot(StopWords).toSeq

  private val StopWords = Set("a", "an", "the", "of", "in", "on", "and", "or",
    "to", "for", "is", "at", "by", "with")

  // Token vectors are pure functions of the token; cache them per-JVM since
  // featurization touches the same small vocabulary millions of times.
  private val tokenCache =
    new java.util.concurrent.ConcurrentHashMap[String, Array[Double]]()
  private val MaxCache = 200000

  /** Embed one token from its padded character 3-grams (cached). */
  def tokenVec(tok: String): Array[Double] = {
    val hit = tokenCache.get(tok)
    if (hit != null) return hit
    val v = computeTokenVec(tok)
    if (tokenCache.size < MaxCache) tokenCache.put(tok, v)
    v
  }

  private def computeTokenVec(tok: String): Array[Double] = {
    val padded = s"<$tok>"
    val acc = new Array[Double](Dim)
    var i = 0
    while (i + 3 <= padded.length) {
      val g = padded.substring(i, i + 3)
      var d = 0
      while (d < Dim) {
        acc(d) += Rng.unif("emb", g, d) * 2.0 - 1.0
        d += 1
      }
      i += 1
    }
    normalize(acc)
  }

  /** f_sem: average of token embeddings; the zero vector for empty values. */
  def valueVec(v: String): Array[Double] = {
    val ts = tokens(v)
    if (ts.isEmpty) return new Array[Double](Dim)
    val acc = new Array[Double](Dim)
    ts.foreach { t =>
      val tv = tokenVec(t)
      var d = 0
      while (d < Dim) { acc(d) += tv(d); d += 1 }
    }
    var d = 0
    while (d < Dim) { acc(d) /= ts.size; d += 1 }
    acc
  }

  def cosine(a: Array[Double], b: Array[Double]): Double = {
    var dot = 0.0; var na = 0.0; var nb = 0.0; var i = 0
    while (i < a.length) { dot += a(i) * b(i); na += a(i) * a(i); nb += b(i) * b(i); i += 1 }
    if (na == 0 || nb == 0) 0.0 else dot / math.sqrt(na * nb)
  }

  private def normalize(v: Array[Double]): Array[Double] = {
    var n = 0.0; var i = 0
    while (i < v.length) { n += v(i) * v(i); i += 1 }
    if (n == 0) return v
    val inv = 1.0 / math.sqrt(n)
    i = 0
    while (i < v.length) { v(i) *= inv; i += 1 }
    v
  }
}
