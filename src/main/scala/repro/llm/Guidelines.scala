package repro.llm

/** Two-step ED-guideline generation (Section III-C, Fig. 5).
  *
  * Step 1 of the paper has the LLM write distribution-analysis functions and
  * executes them over the *whole* dataset; step 2 feeds the analysis results
  * plus representative samples back to generate per-attribute guidelines.
  * Here step 1's "generated functions" are the full-data Spark aggregations
  * the feature model already performs (top values / top patterns / numeric
  * summaries / rare occurrences) — i.e. exactly what the emitted code would
  * compute — and the guideline object carries their results.
  */
final case class AttrDist(
    attr: String,
    n: Long,
    topValues: Seq[(String, Long)],
    topPatterns: Seq[(String, Long)],
    numericRange: Option[(Double, Double)],
    rareValueCount: Long,
) extends Serializable {

  def summary: String = {
    val nr = numericRange.map { case (a, b) => f"numeric range [$a%.2f, $b%.2f]" }
      .getOrElse("non-numeric")
    s"""attribute $attr over $n cells: top values ${topValues.take(5).map { case (v, c) => s"'$v'×$c" }.mkString(", ")};
       |top L2 patterns ${topPatterns.take(5).map { case (p, c) => s"$p×$c" }.mkString(", ")};
       |$nr; $rareValueCount rare values.""".stripMargin
  }
}

/** A per-attribute error-detection guideline: the grounding that lets the
  * (simulated) LLM judge contextual error types during labeling.
  */
final case class Guideline(
    attr: String,
    dist: AttrDist,
    errorExamples: Seq[String],
    detectionNotes: Seq[String],
) extends Serializable {

  def render: String =
    s"""Guideline for '$attr'.
       |${dist.summary}
       |Error examples: ${errorExamples.mkString(" | ")}
       |Detection methods:
       |${detectionNotes.map("- " + _).mkString("\n")}""".stripMargin
}

object Guidelines {

  /** Compose a guideline from the executed distribution analysis and the
    * sampled representative tuples (the simulated step-2 call).
    */
  def compose(attr: String, dist: AttrDist, sampleValues: Seq[String]): Guideline = {
    val commonPats = dist.topPatterns.take(3).map(_._1).toSet
    val examples = sampleValues.distinct.take(4).map { v =>
      s"a value like '$v' altered in spelling, format, or emptied"
    }
    val notes = Seq(
      "missing values: flag empty strings and null placeholders",
      s"pattern violations: flag values whose L2 pattern is outside $commonPats",
      dist.numericRange.map { case (a, b) =>
        f"outliers: flag numeric values outside [$a%.2f, $b%.2f] or rare non-numeric tokens"
      }.getOrElse("outliers: flag values occurring with < 1% frequency"),
      "typos: flag low-frequency values within small edit distance of a frequent value",
      "rule violations: flag values inconsistent with the correlated attributes in context",
    )
    Guideline(attr, dist, examples, notes)
  }
}
