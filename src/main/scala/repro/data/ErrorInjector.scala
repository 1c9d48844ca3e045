package repro.data

import repro.util.Rng

/** Deterministic cell-level error injection for the five error types of the
  * paper (Section II): missing values (MV), typos (T), pattern violations
  * (PV), outliers (O), and rule violations (RV).
  *
  * Injection is disjoint per cell: one uniform draw decides whether the cell
  * is corrupted at all (total of the per-type weights) and, if so, which type
  * applies (categorical over the weights). The weight of type t on an
  * eligible attribute is rate_t · M / |eligible_t|, so each type's
  * dataset-level cell rate matches the spec's target without the compounding
  * loss a sequential first-match scheme would introduce.
  */
object ErrorInjector {

  val types: Seq[String] = Seq("RV", "MV", "PV", "O", "T")

  /** Attributes eligible for each error type. */
  def eligible(spec: DatasetSpec): Map[String, Set[String]] = {
    val all = spec.attrNames.toSet
    val rv  = Schema.fdRhsDomains(spec).keySet
    val o   = if (spec.numericAttrs.nonEmpty) spec.numericAttrs else all
    Map("RV" -> rv, "MV" -> all, "PV" -> all, "O" -> o, "T" -> all)
  }

  /** Per-cell injection probability of `tpe` on one of its eligible attrs. */
  def cellProb(spec: DatasetSpec, elig: Map[String, Set[String]], tpe: String): Double = {
    val e = elig(tpe)
    if (e.isEmpty) 0.0
    else math.min(0.9, spec.rates.getOrElse(tpe, 0.0) / 100.0 * spec.attrNames.size / e.size)
  }

  /** Corrupt one clean tuple. Returns (dirty values, error type per attr,
    * "" meaning the cell is clean).
    */
  def injectRow(spec: DatasetSpec, tid: Long, clean: IndexedSeq[String],
                rvDomains: Map[String, IndexedSeq[String]],
                elig: Map[String, Set[String]]): (IndexedSeq[String], IndexedSeq[String]) = {
    val dirty = Array.tabulate(clean.size)(clean)
    val etype = Array.fill(clean.size)("")
    var j = 0
    while (j < spec.attrNames.size) {
      val attr = spec.attrNames(j)
      val weights = types.map(t =>
        t -> (if (elig(t).contains(attr)) cellProb(spec, elig, t) else 0.0))
      val total = math.min(0.9, weights.map(_._2).sum)
      val u = Rng.unif(spec.seed, "inj", tid, attr)
      if (u < total) {
        // slice the cumulative weights with the same draw
        var acc = 0.0
        val t = weights.collectFirst {
          case (tt, w) if w > 0 && { acc += w; u < acc } => tt
        }.getOrElse(weights.filter(_._2 > 0).last._1)
        val corrupted = corrupt(t, clean(j), attr, spec, tid, rvDomains)
        // A corruption that leaves the value unchanged is not an error.
        if (corrupted != clean(j)) { dirty(j) = corrupted; etype(j) = t }
      }
      j += 1
    }
    (dirty.toIndexedSeq, etype.toIndexedSeq)
  }

  /** Apply one error type to a clean value. */
  def corrupt(tpe: String, v: String, attr: String, spec: DatasetSpec,
              tid: Long, rvDomains: Map[String, IndexedSeq[String]]): String = tpe match {
    case "MV" => ""
    case "T"  => typo(v, spec.seed, tid, attr)
    case "PV" => patternViolation(v)
    case "O"  =>
      if (spec.numericAttrs.contains(attr)) "999" + v
      else "anomaly" + Rng.int(50, spec.seed, "oval", tid, attr)
    case "RV" =>
      val dom = rvDomains.getOrElse(attr, IndexedSeq.empty).filterNot(_ == v)
      if (dom.isEmpty) v else Rng.pick(dom, spec.seed, "rv", tid, attr)
    case other => throw new IllegalArgumentException(s"unknown error type $other")
  }

  /** 1–2 character-level edits, staying within the character's class so the
    * result reads as a plausible human slip rather than a format change.
    * Retries with fresh draws if the edits cancel out (e.g. transposing two
    * equal characters), so a requested typo actually changes the value.
    */
  def typo(v: String, keys: Any*): String = {
    var attempt = 0
    var out = typoOnce(v, keys :+ attempt: _*)
    while (out == v && v.nonEmpty && attempt < 3) {
      attempt += 1
      out = typoOnce(v, keys :+ attempt: _*)
    }
    out
  }

  private def typoOnce(v: String, keys: Any*): String = {
    if (v.isEmpty) return v
    val nEdits = 1 + Rng.int(2, keys :+ "n": _*)
    var s = v
    var e = 0
    while (e < nEdits && s.nonEmpty) {
      val pos = Rng.int(s.length, keys ++ Seq("pos", e): _*)
      val op  = Rng.int(4, keys ++ Seq("op", e): _*)
      s = op match {
        case 0 => // substitute with same-class char
          s.updated(pos, sameClassChar(s.charAt(pos), keys ++ Seq("sub", e)))
        case 1 => // delete
          s.substring(0, pos) + s.substring(pos + 1)
        case 2 => // insert duplicate of the char at pos
          s.substring(0, pos) + s.charAt(pos) + s.substring(pos)
        case _ => // transpose with next char
          if (pos + 1 < s.length)
            s.substring(0, pos) + s.charAt(pos + 1) + s.charAt(pos) + s.substring(pos + 2)
          else s.updated(pos, sameClassChar(s.charAt(pos), keys ++ Seq("sub2", e)))
      }
      e += 1
    }
    s
  }

  private def sameClassChar(c: Char, keys: Seq[Any]): Char = {
    val repl =
      if (c.isDigit) ('0' + Rng.int(10, keys: _*)).toChar
      else if (c.isUpper) ('A' + Rng.int(26, keys: _*)).toChar
      else if (c.isLower) ('a' + Rng.int(26, keys: _*)).toChar
      else c
    if (repl == c) if (c.isDigit) (if (c == '9') '0' else (c + 1).toChar)
                   else if (c.isLetter) (if (c.toLower == 'z') (c - 1).toChar else (c + 1).toChar)
                   else c
    else repl
  }

  /** Reformat a value so its generalized pattern is unseen in clean data
    * (e.g. "dave green" → "DaveGreen", "7:10 a.m." → "710 am", "85%" → "085%").
    */
  def patternViolation(v: String): String = {
    if (v.isEmpty) v
    else if (v.contains(" "))
      v.split(" ").filter(_.nonEmpty).map(_.capitalize).mkString
    else if (v.exists(c => c == ':' || c == '-' || c == '.' || c == '/'))
      v.filterNot(c => c == ':' || c == '-' || c == '.' || c == '/')
    else if (v.exists(_.isLower)) v.toUpperCase
    else if (v.forall(_.isDigit)) "0" + v
    else v + "#"
  }
}
