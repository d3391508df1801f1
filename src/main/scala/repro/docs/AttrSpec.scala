package repro.docs

import repro.util.Rng

/** Specification of one attribute of a data-lake setting.
  *
  * @param name     canonical (gold) attribute name, lowercase
  * @param aliases  alternative surface forms the simulated LLM may use when
  *                 it rewords the attribute during open extraction (the
  *                 paper observes ~4 surface forms per attribute)
  * @param coverage fraction of documents that contain the attribute — the
  *                 paper prioritizes high-coverage attributes and Algorithm 1
  *                 keys its abstention logic on this via the estimate `e`
  * @param valueGen deterministic value generator (seeded per doc+attr)
  * @param variants formatting variants with sampling weights; multiple
  *                 variants are what make single synthesized functions
  *                 narrow (high precision / low recall)
  * @param section  which document section the field is rendered in (later
  *                 sections land in later LLM context chunks, where direct
  *                 extraction misses more)
  */
final case class AttrSpec(
    name: String,
    aliases: Seq[String],
    coverage: Double,
    valueGen: Rng => String,
    variants: Seq[(Style, Double)],
    section: Int = 0,
) {
  require(variants.nonEmpty, s"attribute '$name' needs at least one variant")
  require(coverage > 0 && coverage <= 1.0, s"attribute '$name' coverage out of range")
}

/** One evaluation setting = one data lake (the paper has 16).
  *
  * @param group  reporting group used in the paper's tables
  *               ("FDA" | "Enron Emails" | "Wiki NBA" | "SWDE Movie" | "SWDE University")
  * @param topic  the subject passed to the open-extraction prompt
  * @param fillerWordsPerSection size of the non-field prose per section —
  *               controls document length, hence chunk counts and token cost
  */
final case class Setting(
    name: String,
    group: String,
    format: String, // "TXT" | "HTML"
    topic: String,
    attrs: Seq[AttrSpec],
    fillerWordsPerSection: Int,
    nSections: Int,
    htmlSiteName: String = "",
) {
  require(attrs.map(_.name).distinct.size == attrs.size, s"duplicate attribute names in $name")

  def isHtml: Boolean = format == "HTML"

  /** Gold attribute names (the `k` used for Pair-F1@k and schema F1@k). */
  def goldAttrs: Seq[String] = attrs.map(_.name)

  def attrByName(n: String): Option[AttrSpec] = {
    val norm = Naming.normalize(n)
    attrs.find(a => Naming.normalize(a.name) == norm)
      .orElse(attrs.find(_.aliases.exists(al => Naming.normalize(al) == norm)))
  }
}

/** Attribute-name normalization shared by the simulated LLM, schema
  * synthesis, and the metrics (lowercase, alphanumeric words).
  */
object Naming {
  def normalize(s: String): String =
    s.toLowerCase.replaceAll("[^a-z0-9]+", " ").trim
}
