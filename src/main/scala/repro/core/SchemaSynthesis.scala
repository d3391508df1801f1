package repro.core

import repro.docs.{Naming, RenderedDoc}
import repro.llm.SimLM

/** Schema synthesis (§3.2.1): identify the output table's attributes from a
  * small document sample.
  *
  *  1. Run the open-extraction prompt over each sampled document, keeping
  *     attribute names the model surfaces (provenance is enforced upstream:
  *     the simulated LLM only reports fields actually parsed from text,
  *     plus its hallucination noise — which is exactly what the re-ranking
  *     step exists to suppress).
  *  2. Union the names and rank by extraction frequency across documents.
  *  3. Re-rank: prompt the LLM to identify the most useful attributes and
  *     upweight its picks by a constant multiplicative factor (×2).
  */
object SchemaSynthesis {

  final case class SchemaResult(ranked: Seq[String], tokens: Long)

  val RerankBoost: Double = 2.0

  def synthesize(sample: Seq[RenderedDoc], lm: SimLM): SchemaResult = {
    val extractions = sample.map(d => lm.openExtract(d.id, d.text))
    val openTokens  = extractions.map(_.tokens).sum

    val names = extractions.flatMap(_.pairs.map(p => Naming.normalize(p.attr)))
    val freq  = names.groupBy(identity).view.mapValues(_.size).toMap

    val (kept, rerankTokens) = lm.rerank(freq.keys.toSeq.sorted)
    val keptNorm             = kept.map(Naming.normalize)

    val ranked = freq.toSeq
      .map { case (n, c) => (n, c * (if (keptNorm.contains(n)) RerankBoost else 1.0)) }
      .sortBy { case (n, s) => (-s, n) }
      .map(_._1)

    SchemaResult(ranked, openTokens + rerankTokens)
  }
}
