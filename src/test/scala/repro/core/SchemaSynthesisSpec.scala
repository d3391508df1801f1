package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.docs.{Corpora, DocLake, Naming}
import repro.eval.Metrics
import repro.llm.{Profile, SimLM}

class SchemaSynthesisSpec extends AnyFunSuite {

  private val seed = 42L

  private def run(setting: repro.docs.Setting, profile: Profile = Profile.davinci) = {
    val lm     = SimLM(profile, setting, seed)
    val sample = DocLake.sample(setting, 10, seed)
    SchemaSynthesis.synthesize(sample, lm)
  }

  test("synthesis is deterministic") {
    assert(run(Corpora.fda).ranked == run(Corpora.fda).ranked)
  }

  test("synthesized names are normalized and deduplicated") {
    val r = run(Corpora.fda)
    assert(r.ranked == r.ranked.distinct)
    assert(r.ranked.forall(n => n == Naming.normalize(n)))
  }

  test("token cost covers the sampled documents plus the re-rank prompt") {
    val r = run(Corpora.fda)
    assert(r.tokens > 10 * repro.llm.Prompts.openTokens)
  }

  test("high-coverage attributes rank above hallucinated junk") {
    val r = run(Corpora.enron)
    val k = Corpora.enron.goldAttrs.size
    val topK = r.ranked.take(k).toSet
    val realInTop = Corpora.enron.goldAttrs.map(Naming.normalize).count(topK.contains)
    assert(realInTop >= k - 3, s"only $realInTop of $k gold attrs in top-k: ${r.ranked.take(k)}")
  }

  test("schema F1@k is in the paper's regime for davinci (paper avg: 71.9)") {
    val f1s = Corpora.all.map { s =>
      Metrics.f1AtK(run(s).ranked, s.goldAttrs, s.goldAttrs.size)
    }
    val avg = f1s.sum / f1s.size
    assert(avg > 0.55 && avg < 0.95, s"avg schema F1@k = $avg")
  }

  test("re-ranking improves the schema over raw frequency") {
    // Disable the boost by comparing against a run whose rerank keeps nothing.
    val lm     = SimLM(Profile.davinci, Corpora.fda, seed)
    val sample = DocLake.sample(Corpora.fda, 10, seed)
    val withRerank = SchemaSynthesis.synthesize(sample, lm)
    val k = Corpora.fda.goldAttrs.size
    // Raw frequency ranking (no boost): recompute from the open extractions.
    val names = sample.flatMap(d => lm.openExtract(d.id, d.text).pairs.map(p => Naming.normalize(p.attr)))
    val rawRanked = names.groupBy(identity).view.mapValues(_.size).toSeq
      .sortBy { case (n, c) => (-c, n) }.map(_._1)
    val f1With = Metrics.f1AtK(withRerank.ranked, Corpora.fda.goldAttrs, k)
    val f1Raw  = Metrics.f1AtK(rawRanked, Corpora.fda.goldAttrs, k)
    assert(f1With >= f1Raw, s"rerank $f1With vs raw $f1Raw")
  }

  test("weaker providers produce noisier schemas") {
    val strong = Corpora.all.take(6).map(s =>
      Metrics.f1AtK(run(s).ranked, s.goldAttrs, s.goldAttrs.size)).sum / 6
    val weak = Corpora.all.take(6).map(s =>
      Metrics.f1AtK(run(s, Profile.curie).ranked, s.goldAttrs, s.goldAttrs.size)).sum / 6
    assert(strong > weak, s"davinci $strong vs curie $weak")
  }
}
