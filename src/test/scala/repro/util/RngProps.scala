package repro.util

import org.scalacheck.{Prop, Properties}
import org.scalacheck.Prop.forAll

/** ScalaCheck properties for the deterministic RNG. */
object RngProps extends Properties("Rng") {

  property("unif in [0,1)") = forAll { (s: String, i: Int) =>
    val u = Rng.unif(s, i)
    u >= 0.0 && u < 1.0
  }

  property("unif deterministic") = forAll { (s: String, i: Int) =>
    Rng.unif(s, i) == Rng.unif(s, i)
  }

  property("int within bound") = forAll { (s: String, n0: Int) =>
    val n = 1 + math.abs(n0 % 1000)
    val x = Rng.int(n, s)
    x >= 0 && x < n
  }

  property("zipfIdx within bound") = forAll { (s: String, n0: Int, skew0: Int) =>
    val n = 1 + math.abs(n0 % 500)
    val skew = math.abs(skew0 % 30) / 10.0
    val x = Rng.zipfIdx(n, skew, s)
    x >= 0 && x < n
  }

  property("pick total on non-empty") = forAll { (h: Int, t: List[Int], s: String) =>
    val xs = (h :: t).toVector
    Prop(xs.contains(Rng.pick(xs, s)))
  }
}
