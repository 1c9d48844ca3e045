package repro.llm

/** Prompt/response serialization for the simulated LLM.
  *
  * Token costs are the paper's efficiency currency (Section IV-C), so every
  * simulated call builds the *actual strings* a real deployment would send
  * and receive; `TokenMeter` charges their estimated token counts. Templates
  * follow the paper's descriptions (task + role, serialized example tuples,
  * common error descriptions, expected code format, …).
  */
object Prompts {

  /** Tabular serialization from Section III-B: "a1: v1, a2: v2, …". */
  def serializeTuple(attrs: Seq[String], values: Seq[String]): String =
    attrs.zip(values).map { case (a, v) => s"$a: $v" }.mkString(", ")

  val errorDescriptions: String =
    """Common error types in tabular data:
      |- missing values: empty fields or null placeholders;
      |- typos: incorrect spellings or character substitutions;
      |- pattern violations: values not conforming to the attribute format;
      |- outliers: values deviating from the attribute distribution or domain;
      |- rule violations: inconsistencies between related attributes.""".stripMargin

  def criteriaPrompt(attr: String, sampleTuples: Seq[String]): String =
    s"""You are a data quality expert. Derive executable error-checking
       |functions (Python, one predicate per error reason) for attribute
       |'$attr' of the following table sample. Cover all plausible error
       |types from multiple perspectives.
       |$errorDescriptions
       |Sample tuples:
       |${sampleTuples.mkString("\n")}
       |Return only code.""".stripMargin

  def analysisFnPrompt(attr: String, sampleTuples: Seq[String]): String =
    s"""You are a data analyst. Write analysis functions that parse the whole
       |dataset and extract key distributions relevant for error detection on
       |attribute '$attr' (common patterns, rare occurrences, value and
       |pattern distributions). Expected format: def analyze(df): ...
       |Sample tuples:
       |${sampleTuples.mkString("\n")}""".stripMargin

  def guidelinePrompt(attr: String, distSummary: String, sampleTuples: Seq[String]): String =
    s"""Generate detailed error-detection guidelines for attribute '$attr'
       |with error examples, causes, and detection methods per error type.
       |$errorDescriptions
       |Distribution analysis results:
       |$distSummary
       |Representative samples:
       |${sampleTuples.mkString("\n")}""".stripMargin

  def labelPrompt(attr: String, guideline: Option[String],
                  batch: Seq[String]): String =
    s"""Judge each candidate value of attribute '$attr' as clean (0) or
       |erroneous (1) following the guidelines.
       |${guideline.getOrElse("(no guidelines)")}
       |Candidates (with correlated-attribute context):
       |${batch.mkString("\n")}""".stripMargin

  def contrastivePrompt(attr: String, clean: Seq[String], err: Seq[String]): String =
    s"""Refine the error-checking functions for attribute '$attr' by
       |contrasting labeled groups. Clean values: ${clean.mkString(" | ")}
       |Erroneous values: ${err.mkString(" | ")}
       |Return improved predicate code only.""".stripMargin

  def augmentPrompt(attr: String, examples: Seq[String], n: Int): String =
    s"""Given these clean values of attribute '$attr': ${examples.mkString(" | ")}
       |and these observed error reasons, generate $n additional realistic
       |erroneous variants that keep semantic similarity.""".stripMargin

  def fmedPrompt(serializedTuple: String): String =
    s"""Is there an error in this tuple? Answer per attribute with yes/no.
       |$serializedTuple""".stripMargin

  /** Response renderings (what the LLM would answer) — for output metering. */
  def labelResponse(labels: Seq[(String, Int)]): String =
    labels.map { case (v, l) => s"$v -> $l" }.mkString("\n")

  def codeResponse(lines: Seq[String]): String =
    lines.mkString("def check(row):\n    ", "\n    ", "\n")

  def listResponse(values: Seq[String]): String = values.mkString("\n")
}
