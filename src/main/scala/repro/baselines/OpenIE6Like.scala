package repro.baselines

import repro.fn.Extractor

/** Appendix-C.1 baseline: an OpenIE6-style sentence-triple extractor over
  * unstructured text.
  *
  * Reproduces the two failure modes the paper documents qualitatively:
  * (1) it only operates on well-formed sentences, so semi-structured lines
  * ("Label: value", HTML rows) yield nothing useful, and (2) on prose it
  * floods — emitting large numbers of uncurated (subject, predicate,
  * object) relations with no prioritization or cross-document consistency
  * (427 relations on a sample FDA document in the paper).
  */
object OpenIE6Like {

  final case class Relation(subject: String, predicate: String, obj: String, confidence: Double)

  private val verbs = Set(
    "is", "was", "are", "were", "has", "have", "had", "indicates", "indicate",
    "includes", "include", "describes", "describe", "provides", "provide",
    "supports", "support", "apply", "conducted", "tested", "observed")

  /** Extract relations from every sentence of a document. */
  def extract(text: String): Seq[Relation] = {
    val plain = Extractor.stripTags(text)
    val sentences = plain.split("(?<=[.!?])\\s+|\\n").toSeq.map(_.trim).filter(_.nonEmpty)

    sentences.flatMap { s =>
      val toks = s.split("\\s+").toSeq
      if (toks.size < 5) Seq.empty
      else {
        // Every verb occurrence spawns a triple (grid labeling over-generates).
        toks.indices.filter(i => verbs.contains(toks(i).toLowerCase)).flatMap { i =>
          val subj = toks.slice(math.max(0, i - 6), i).mkString(" ")
          val obj  = toks.slice(i + 1, math.min(toks.size, i + 8)).mkString(" ")
          if (subj.isEmpty || obj.isEmpty) None
          else {
            // Deterministic pseudo-confidence in [0.5, 1.0).
            val conf = 0.5 + (math.abs((subj + obj).hashCode) % 500) / 1000.0
            Some(Relation(subj, toks(i), obj, conf))
          }
        }
      }
    }
  }
}
