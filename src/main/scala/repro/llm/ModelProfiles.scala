package repro.llm

/** Calibration of the simulated LLM (see DESIGN.md substitution table).
  *
  * The reproduction replaces real LLM calls with a deterministic noisy
  * oracle: labeling flips ground truth with per-(model, error-type)
  * probabilities, and generation quality knobs control how good the derived
  * criteria / guidelines / augmentations are. Profiles are ordered the way
  * Table V orders the real models (Qwen2.5-72b best; GPT-4o-mini worst via
  * precision collapse from a high false-positive rate, matching the paper's
  * observation).
  *
  * `detect` / `detectNoGuide`: P(label=error | cell has error of type t),
  * with and without the generated ED guidelines in the prompt.
  * `cleanFp` / `cleanFpNoGuide`: P(label=error | cell clean).
  * `rvNoCtxFactor`: multiplier on RV detection when correlated-attribute
  * context is withheld (w/o Corr. ablation) — rule violations are invisible
  * without cross-attribute context (Example 1 in the paper).
  */
final case class LLMProfile(
    name: String,
    detect: Map[String, Double],
    detectNoGuide: Map[String, Double],
    cleanFp: Double,
    cleanFpNoGuide: Double,
    rvNoCtxFactor: Double,
    critQuality: Double,
    augQuality: Double,
) extends Serializable {

  def detectProb(errType: String, useGuide: Boolean, useCtx: Boolean): Double = {
    val base = if (useGuide) detect(errType) else detectNoGuide(errType)
    if (errType == "RV" && !useCtx) base * rvNoCtxFactor else base
  }

  def fpProb(useGuide: Boolean): Double = if (useGuide) cleanFp else cleanFpNoGuide
}

object ModelProfiles {

  val qwen72b: LLMProfile = LLMProfile(
    name = "qwen2.5-72b",
    detect        = Map("MV" -> 0.98, "T" -> 0.88, "PV" -> 0.85, "O" -> 0.82, "RV" -> 0.75),
    detectNoGuide = Map("MV" -> 0.95, "T" -> 0.82, "PV" -> 0.40, "O" -> 0.40, "RV" -> 0.30),
    cleanFp = 0.02, cleanFpNoGuide = 0.05,
    rvNoCtxFactor = 0.35, critQuality = 0.90, augQuality = 0.90)

  val llama70b: LLMProfile = LLMProfile(
    name = "llama3.1-70b",
    detect        = Map("MV" -> 0.95, "T" -> 0.82, "PV" -> 0.78, "O" -> 0.75, "RV" -> 0.62),
    detectNoGuide = Map("MV" -> 0.92, "T" -> 0.75, "PV" -> 0.35, "O" -> 0.35, "RV" -> 0.25),
    cleanFp = 0.05, cleanFpNoGuide = 0.09,
    rvNoCtxFactor = 0.35, critQuality = 0.80, augQuality = 0.80)

  val llama8b: LLMProfile = LLMProfile(
    name = "llama3.1-8b",
    detect        = Map("MV" -> 0.93, "T" -> 0.82, "PV" -> 0.72, "O" -> 0.66, "RV" -> 0.52),
    detectNoGuide = Map("MV" -> 0.90, "T" -> 0.70, "PV" -> 0.30, "O" -> 0.30, "RV" -> 0.20),
    cleanFp = 0.06, cleanFpNoGuide = 0.11,
    rvNoCtxFactor = 0.35, critQuality = 0.65, augQuality = 0.70)

  val qwen7b: LLMProfile = LLMProfile(
    name = "qwen2.5-7b",
    detect        = Map("MV" -> 0.90, "T" -> 0.68, "PV" -> 0.58, "O" -> 0.52, "RV" -> 0.38),
    detectNoGuide = Map("MV" -> 0.85, "T" -> 0.60, "PV" -> 0.25, "O" -> 0.25, "RV" -> 0.15),
    cleanFp = 0.12, cleanFpNoGuide = 0.16,
    rvNoCtxFactor = 0.35, critQuality = 0.50, augQuality = 0.55)

  val gpt4oMini: LLMProfile = LLMProfile(
    name = "gpt-4o-mini",
    detect        = Map("MV" -> 0.92, "T" -> 0.75, "PV" -> 0.65, "O" -> 0.60, "RV" -> 0.48),
    detectNoGuide = Map("MV" -> 0.88, "T" -> 0.65, "PV" -> 0.30, "O" -> 0.28, "RV" -> 0.18),
    cleanFp = 0.22, cleanFpNoGuide = 0.28, // paper: precision collapse
    rvNoCtxFactor = 0.35, critQuality = 0.55, augQuality = 0.60)

  /** FM_ED prompts tuples in isolation with no guidelines or cross-tuple
    * context (Table I: handles MV & typos, misses PV / O / RV).
    */
  val fmEd: LLMProfile = LLMProfile(
    name = "fm_ed",
    detect        = Map("MV" -> 0.95, "T" -> 0.80, "PV" -> 0.45, "O" -> 0.50, "RV" -> 0.12),
    detectNoGuide = Map("MV" -> 0.95, "T" -> 0.80, "PV" -> 0.45, "O" -> 0.50, "RV" -> 0.12),
    cleanFp = 0.02, cleanFpNoGuide = 0.02,
    rvNoCtxFactor = 1.0, critQuality = 0.0, augQuality = 0.0)

  val default: LLMProfile = qwen72b

  val tableV: Seq[LLMProfile] = Seq(gpt4oMini, llama8b, llama70b, qwen7b, qwen72b)

  val byName: Map[String, LLMProfile] =
    (tableV :+ fmEd).map(p => p.name -> p).toMap
}
