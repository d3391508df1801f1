package repro.util

/** Dollar-cost model and the Figure-3 asymptotic cost curves.
  *
  * Prices are the March-2023 OpenAI list prices the paper quotes:
  * text-davinci-003 at \$0.02 / 1k tokens (used for Table 3's \$ column)
  * and gpt-3.5 at \$0.002 / 1k tokens (used in the introduction's Wikipedia
  * estimate).
  */
object CostModel {

  /** \$ per 1k tokens by model name. */
  val pricePer1k: Map[String, Double] = Map(
    "text-davinci-003"        -> 0.02,
    "gpt-4"                   -> 0.03,
    "gpt-3.5"                 -> 0.002,
    "text-curie-001"          -> 0.002,
    "claude-v1"               -> 0.0163,
    "jurassic-jumbo-2"        -> 0.015,
  )

  def dollars(tokens: Long, model: String = "text-davinci-003"): Double =
    tokens / 1000.0 * pricePer1k.getOrElse(model, 0.02)

  /** Extrapolate a measured run to the paper's "per 10k documents" column.
    *
    * @param fixedTokens  tokens independent of lake size (schema + function
    *                     synthesis + D_eval labeling) — Code/Code+ paths
    * @param perDocTokens tokens spent per processed document — the Direct
    *                     path, measured over `measuredDocs` documents
    */
  def per10kDocs(fixedTokens: Long, perDocTokens: Long, measuredDocs: Long): Long = {
    val perDoc = if (measuredDocs == 0) 0.0 else perDocTokens.toDouble / measuredDocs
    fixedTokens + math.round(perDoc * 10000.0)
  }

  /** Token cost of Evaporate-Direct for `nDocs` documents of `docTokens`
    * tokens each (every token of every document passes through the LLM,
    * plus per-chunk prompt overhead and generation).
    */
  def directTokens(nDocs: Long, docTokens: Long, promptOverhead: Long = 900L,
                   window: Long = 2400L, genPerChunk: Long = 300L): Long = {
    val chunks = math.max(1L, math.ceil(docTokens.toDouble / window).toLong)
    nDocs * (docTokens + chunks * (promptOverhead + genPerChunk))
  }

  /** Token cost of Evaporate-Code(+) — fixed in the number of documents:
    * schema synthesis over `sampleDocs` + per-attribute function synthesis
    * (`candidates` prompts of ~`synthPrompt` tokens) + D_eval labeling.
    */
  def codeTokens(nAttrs: Long, docTokens: Long, sampleDocs: Long = 10L,
                 candidates: Long = 10L, synthPrompt: Long = 1500L,
                 evalDocs: Long = 10L, closedPrompt: Long = 500L): Long = {
    val schema = directTokens(sampleDocs, docTokens)
    val synth  = nAttrs * candidates * synthPrompt
    val eval   = nAttrs * evalDocs * (closedPrompt + math.min(docTokens, 2400L))
    schema + synth + eval
  }

  /** Smallest document count at which Code(+) is cheaper than Direct —
    * the paper reports ~40 documents at 10 attributes, 10k tokens/doc.
    */
  def crossoverDocs(nAttrs: Long, docTokens: Long): Long = {
    val fixed  = codeTokens(nAttrs, docTokens)
    val perDoc = directTokens(1, docTokens)
    math.max(1L, math.ceil(fixed.toDouble / perDoc).toLong)
  }

  /** Largest attribute count at which Code(+) is still cheaper than Direct
    * for a lake of `nDocs` documents — the paper reports ~2,500 attributes
    * at 10k documents, 10k tokens/doc.
    */
  def crossoverAttrs(nDocs: Long, docTokens: Long): Long = {
    val direct = directTokens(nDocs, docTokens)
    var lo = 1L; var hi = 1000000L
    while (lo < hi) {
      val mid = (lo + hi + 1) / 2
      if (codeTokens(mid, docTokens) <= direct) lo = mid else hi = mid - 1
    }
    lo
  }
}
