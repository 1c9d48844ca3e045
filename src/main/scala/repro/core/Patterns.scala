package repro.core

/** Three-level pattern generalization of cell values (Section III-B).
  *
  * For "DOe123." the paper gives: L1 "A[6].", L2 "L[3]D[3]S[1]",
  * L3 "U[2]u[1]D[3]S[1]" — run-length encodings over progressively finer
  * character classes (A alphanumeric; L letter / D digit / S symbol;
  * U upper / u lower / D digit / S symbol).
  */
object Patterns {

  /** L1: alphanumerics collapse to A-runs, symbols stay literal. */
  def l1(v: String): String = runLength(v, c => if (c.isLetterOrDigit) "A" else c.toString)

  /** L2: letter / digit / symbol runs. */
  def l2(v: String): String = runLength(v, c =>
    if (c.isLetter) "L" else if (c.isDigit) "D" else "S")

  /** L3: uppercase / lowercase / digit / symbol runs. */
  def l3(v: String): String = runLength(v, c =>
    if (c.isUpper) "U" else if (c.isLetter) "u" else if (c.isDigit) "D" else "S")

  def all(v: String): Seq[String] = Seq(l1(v), l2(v), l3(v))

  private def runLength(v: String, cls: Char => String): String = {
    if (v.isEmpty) return "∅"
    val sb = new StringBuilder
    var i = 0
    while (i < v.length) {
      val c = cls(v.charAt(i))
      var n = 1
      while (i + n < v.length && cls(v.charAt(i + n)) == c) n += 1
      // Literal single symbols (L1) are emitted bare, class runs with counts.
      if (c.length == 1 && !c.charAt(0).isLetter) sb.append(c * n)
      else sb.append(s"$c[$n]")
      i += n
    }
    sb.toString
  }
}
