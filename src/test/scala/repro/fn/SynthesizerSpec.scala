package repro.fn

import org.scalatest.funsuite.AnyFunSuite
import repro.docs.{Corpora, DocGen}
import repro.llm.Profile
import repro.util.Rng

class SynthesizerSpec extends AnyFunSuite {

  private val seed   = 42L
  private val fda    = Corpora.fda
  private val enron  = Corpora.enron
  private val sample = DocGen.corpus(fda, 10, seed)

  test("synthesis without a grounding chunk yields a non-functional extractor") {
    val s = Synthesizer.synthesize(None, "made up attr", None, Synthesizer.PA,
      Profile.davinci, Rng(1))
    assert(s.extractor.isInstanceOf[Extractor.Broken])
    assert(s.tokens > 0, "failed generations still cost prompt tokens")
  }

  test("synthesis is deterministic in the rng") {
    val spec = fda.attrs.find(_.name == "applicant")
    val doc  = sample.find(_.gold.contains("applicant"))
    val a = Synthesizer.synthesize(spec, "applicant", doc, Synthesizer.PB, Profile.davinci, Rng(5))
    val b = Synthesizer.synthesize(spec, "applicant", doc, Synthesizer.PB, Profile.davinci, Rng(5))
    assert(a == b)
  }

  test("candidate count is prompts x perPrompt") {
    val spec = fda.attrs.find(_.name == "applicant")
    val (cands, tokens) = Synthesizer.candidates(spec, "applicant", sample, 5, Profile.davinci, seed)
    assert(cands.size == 10)
    assert(tokens > 10 * 600, "each candidate charges at least its chunk")
  }

  test("single-prompt candidate pools are possible (diversity ablation)") {
    val spec = fda.attrs.find(_.name == "applicant")
    val (pa, _) = Synthesizer.candidates(spec, "applicant", sample, 4, Profile.davinci, seed,
      Seq(Synthesizer.PA))
    assert(pa.size == 4)
  }

  test("hallucinated attributes produce only non-functional candidates") {
    val (cands, _) = Synthesizer.candidates(None, "internal notes", sample, 5, Profile.davinci, seed)
    assert(cands.forall(_.isInstanceOf[Extractor.Broken]))
  }

  test("davinci's outcome mix matches the paper's function-quality distribution") {
    // Paper: ~40% of functions score <25 Text F1, ~51% <50. We check the
    // generator-level mix: a large minority of candidates are broken or
    // sloppy, and working candidates exist.
    val outcomes = (0 until 400).map { i =>
      val spec = fda.attrs.find(_.name == "product code")
      val doc  = sample.find(_.gold.contains("product code"))
      Synthesizer.synthesize(spec, "product code", doc, if (i % 2 == 0) Synthesizer.PA else Synthesizer.PB,
        Profile.davinci, Rng(seed).derive("mix", i)).extractor
    }
    val broken = outcomes.count(_.isInstanceOf[Extractor.Broken]) / 400.0
    val sloppy = outcomes.count(_.isInstanceOf[Extractor.Sloppy]) / 400.0
    assert(broken > 0.15 && broken < 0.45, s"broken=$broken")
    assert(sloppy > 0.10 && sloppy < 0.45, s"sloppy=$sloppy")
    assert(broken + sloppy < 0.9, "some candidates must work")
  }

  test("jumbo breaks on complex styles but handles rigid headers (Table 5's FDA vs Enron gap)") {
    def brokenRate(setting: repro.docs.Setting, attr: String): Double = {
      val spec = setting.attrs.find(_.name == attr)
      val docs = DocGen.corpus(setting, 10, seed)
      val outcomes = (0 until 200).map { i =>
        val doc = docs.find(_.gold.contains(attr))
        Synthesizer.synthesize(spec, attr, doc, Synthesizer.PB, Profile.jumbo,
          Rng(seed).derive("jumbo", attr, i)).extractor
      }
      outcomes.count(_.isInstanceOf[Extractor.Broken]) / 200.0
    }
    val enronBroken = brokenRate(enron, "from")            // complexity 0.0
    val nbaBroken   = brokenRate(Corpora.nba, "born")      // nested, complexity 0.8
    assert(enronBroken < 0.5, s"enron broken=$enronBroken")
    assert(nbaBroken > 0.8, s"nba broken=$nbaBroken")
    assert(nbaBroken > enronBroken + 0.3)
  }

  test("narrow PA candidates for inline styles are value-shape anchored") {
    val spec = fda.attrs.find(_.name == "510(k) number")
    // Find a sample doc using the inline variant (index 2) with an uppercase K.
    val docs = DocGen.corpus(fda, 200, seed)
    val doc = docs.find(d => d.variantIdx.get("510(k) number").contains(2) &&
      d.gold("510(k) number").startsWith("K"))
    assume(doc.isDefined)
    val narrow = (0 until 100).iterator.map { i =>
      Synthesizer.synthesize(spec, "510(k) number", doc, Synthesizer.PA, Profile.davinci,
        Rng(seed).derive("pa", i)).extractor
    }.collectFirst { case r: Extractor.RegexCapture => r }
    assume(narrow.isDefined)
    // It must extract the uppercase-K value it observed, and miss lowercase.
    assert(narrow.get.extract("the premarket submission number K987654 was assigned to this device") == "K987654")
    assert(narrow.get.extract("the premarket submission number k987654 was assigned to this device") == "")
  }

  test("candidates synthesized from different sample docs cover different variants") {
    val spec  = fda.attrs.find(_.name == "product code").get
    val docs  = DocGen.corpus(fda, 60, seed).filter(_.gold.contains("product code"))
    val byVariant = docs.groupBy(_.variantIdx("product code"))
    assume(byVariant.size >= 2, "need at least two variants in the sample")
    // Working (non-broken, non-sloppy) PB candidates anchored on different
    // variants extract from their own variant's rendering.
    byVariant.foreach { case (_, ds) =>
      val d = ds.head
      val candidates = (0 until 50).map(i => Synthesizer.synthesize(Some(spec), "product code",
        Some(d), Synthesizer.PB, Profile.davinci, Rng(seed).derive("cov", d.id, i)).extractor)
      val working = candidates.filterNot(c => c.isInstanceOf[Extractor.Broken])
      assert(working.exists(_.extract(d.text).nonEmpty), s"no working candidate for ${d.id}")
    }
  }

  test("P_B costs more tokens per candidate than P_A") {
    val spec = fda.attrs.find(_.name == "applicant")
    val doc  = sample.find(_.gold.contains("applicant"))
    val a = Synthesizer.synthesize(spec, "applicant", doc, Synthesizer.PA, Profile.davinci, Rng(3))
    val b = Synthesizer.synthesize(spec, "applicant", doc, Synthesizer.PB, Profile.davinci, Rng(3))
    assert(b.tokens > a.tokens)
  }
}
