package repro.fn

import repro.docs.{AttrSpec, RenderedDoc}
import repro.llm.{Profile, Prompts}
import repro.util.{Rng, Tokens}

/** Simulated LLM function synthesis (§3.2.2 / §3.3.1).
  *
  * Given a sample chunk that mentions the attribute, the "model" emits an
  * extractor whose quality follows the provider's outcome mix:
  *
  *   - broken       — doesn't compile / always fails (`Extractor.Broken`)
  *   - generalized  — robust to case & markup drift (the lucky generations)
  *   - narrow       — anchored on the exact formatting variant observed in
  *                    the sample chunk: correct there, blind elsewhere
  *                    (high precision / low recall, the paper's key case)
  *   - sloppy       — matches the right region but captures extra or
  *                    truncated tokens
  *
  * Style complexity raises the broken probability (`complexityPenalty`),
  * which is how weak providers (jumbo) lose the non-trivial settings in
  * Table 5 while keeping Enron. The two prompt templates P_A (regex-
  * flavored, value-shape sensitive) and P_B (library-flavored, markup-
  * stripping) yield different extractor families, reproducing the paper's
  * finding that neither prompt dominates and diversity pays.
  */
object Synthesizer {

  sealed trait PromptKind { def tokens: Long }
  case object PA extends PromptKind { val tokens: Long = Prompts.synthATokens }
  case object PB extends PromptKind { val tokens: Long = Prompts.synthBTokens }

  /** A synthesized candidate plus the tokens the LLM processed to write it. */
  final case class Synth(extractor: Extractor, tokens: Long)

  private val garbageWords = Vector(
    "submitted for review per the attached documentation provided herein",
    "see the corresponding section above for additional supporting details",
    "(details attached in the supplementary materials of this document)",
    "as listed herein together with all remaining associated metadata fields")

  /** Synthesize one candidate function for `attrName`.
    *
    * @param spec      resolved attribute spec, None when the requested name
    *                  matches nothing in the lake (hallucinated schema
    *                  entries) — keyword search finds no chunk and the
    *                  model emits a function that extracts nothing
    * @param sampleDoc the document whose keyword-bearing chunk fills the
    *                  prompt placeholder; its formatting variant anchors
    *                  narrow candidates
    */
  def synthesize(spec: Option[AttrSpec], attrName: String, sampleDoc: Option[RenderedDoc],
                 kind: PromptKind, profile: Profile, rng: Rng): Synth = {
    val promptCost = kind.tokens + 600L // template + sampled chunk
    val genCost    = 80L                // the emitted function body

    val anchored = for {
      s   <- spec
      doc <- sampleDoc
      v   <- doc.variantIdx.get(s.name)
      value <- doc.gold.get(s.name)
    } yield (s.variants(v)._1, value)

    val extractor = anchored match {
      case None =>
        // No grounding chunk: the model writes a function for a field the
        // documents don't have; it compiles but extracts nothing.
        Extractor.Broken(s"no sample chunk mentions '$attrName'")
      case Some((style, observedValue)) =>
        // Prompt-template/style mismatch (§3.3.1): the regex-flavored P_A
        // degrades as markup complexity grows, while the library-flavored
        // P_B over-engineers rigid plain-text fields. Neither prompt
        // dominates, which is why Evaporate-Code+ uses both.
        val mismatch = kind match {
          case PA => 0.30 * style.complexity
          case PB => if (style.complexity < 0.15) 0.15 else 0.0
        }
        val pBroken = math.min(0.95,
          profile.pBroken + profile.complexityPenalty * style.complexity + mismatch)
        val rest    = math.max(1e-9, 1.0 - pBroken)
        // Sloppiness also scales with complexity: any model can split a rigid
        // header line cleanly, but nested-markup values invite captures of
        // raw HTML or extra tokens.
        val wSloppy  = profile.pSloppy * (0.25 + style.complexity)
        val baseRest = math.max(1e-9, profile.pGeneral + wSloppy + profile.pNarrow)
        val pGeneral = rest * profile.pGeneral / baseRest
        val pSloppy  = rest * wSloppy / baseRest
        val pNarrow  = rest - pGeneral - pSloppy

        rng.derive("outcome").pickWeighted(Seq(
          "broken" -> pBroken, "general" -> pGeneral,
          "sloppy" -> pSloppy, "narrow"  -> pNarrow,
        )) match {
          case "broken"  => Extractor.Broken("generation error")
          case "general" => style.general
          case "narrow"  => if (kind == PA) style.narrowPA(observedValue) else style.narrowPB
          case _ =>
            val inner = if (kind == PA) style.narrowPA(observedValue) else style.narrowPB
            val mode  = rng.derive("smode").int(3)
            Extractor.Sloppy(inner, mode, rng.derive("extra").pick(garbageWords))
        }
    }
    Synth(extractor, promptCost + genCost + Tokens.count(extractor.describe))
  }

  /** Synthesize the full candidate pool for one attribute: both prompt
    * templates over up to `perPrompt` sample documents that mention the
    * attribute (simple keyword search, §3.2.2).
    */
  def candidates(spec: Option[AttrSpec], attrName: String, sampleDocs: Seq[RenderedDoc],
                 perPrompt: Int, profile: Profile, seed: Long,
                 prompts: Seq[PromptKind] = Seq(PA, PB)): (Seq[Extractor], Long) = {
    val mentioning = spec match {
      case Some(s) => sampleDocs.filter(_.gold.contains(s.name))
      case None    => Seq.empty
    }
    val rng = Rng(seed).derive("synth", attrName)
    val all = prompts.flatMap { kind =>
      (0 until perPrompt).map { i =>
        val doc = if (mentioning.isEmpty) None else Some(mentioning(i % mentioning.size))
        synthesize(spec, attrName, doc, kind, profile, rng.derive(kind.toString, i))
      }
    }
    (all.map(_.extractor), all.map(_.tokens).sum)
  }
}
