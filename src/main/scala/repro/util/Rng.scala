package repro.util

/** Deterministic pseudo-randomness derived from hashing.
  *
  * Every stochastic decision in the reproduction (data generation, error
  * injection, simulated-LLM noise, clustering seeds) draws from this so that
  * runs are bit-identical in their inputs: the same (purpose, key parts)
  * always yields the same draw, independent of evaluation order, partitioning,
  * or JVM.
  */
object Rng {

  /** FNV-1a 64-bit hash over the string renderings of `parts`. */
  def h64(parts: Any*): Long = {
    var h = 0xcbf29ce484222325L
    var i = 0
    while (i < parts.length) {
      val s = String.valueOf(parts(i))
      var j = 0
      while (j < s.length) {
        h ^= s.charAt(j).toLong
        h *= 0x100000001b3L
        j += 1
      }
      h ^= 0x7c; h *= 0x100000001b3L // separator so ("ab","c") != ("a","bc")
      i += 1
    }
    // final avalanche (splitmix64 finalizer) — FNV alone is weak in low bits
    h ^= (h >>> 30); h *= 0xbf58476d1ce4e5b9L
    h ^= (h >>> 27); h *= 0x94d049bb133111ebL
    h ^ (h >>> 31)
  }

  /** Uniform draw in [0, 1). */
  def unif(parts: Any*): Double = (h64(parts: _*) >>> 11).toDouble / (1L << 53).toDouble

  /** Uniform integer in [0, n). Requires n > 0. */
  def int(n: Int, parts: Any*): Int = {
    require(n > 0, s"Rng.int needs n > 0, got $n")
    (unif(parts: _*) * n).toInt.min(n - 1)
  }

  /** Deterministic element pick. */
  def pick[T](xs: IndexedSeq[T], parts: Any*): T = {
    require(xs.nonEmpty, "Rng.pick on empty sequence")
    xs(int(xs.length, parts: _*))
  }

  /** Bernoulli draw with probability p. */
  def bool(p: Double, parts: Any*): Boolean = unif(parts: _*) < p

  /** Zipf-skewed index in [0, n): small indices are much more likely.
    * skew = 0 reduces to uniform.
    */
  def zipfIdx(n: Int, skew: Double, parts: Any*): Int = {
    require(n > 0)
    val u = unif(parts: _*)
    (math.pow(u, 1.0 + skew) * n).toInt.min(n - 1)
  }
}
