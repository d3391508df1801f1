package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.docs.{Corpora, DocGen}

class OpenIE6LikeSpec extends AnyFunSuite {

  private val seed = 42L

  test("floods prose documents with relations (paper: 427 on a sample FDA doc)") {
    val d    = DocGen.render(Corpora.fda, 0, seed)
    val rels = OpenIE6Like.extract(d.text)
    assert(rels.size > 50, s"expected a flood, got ${rels.size}")
  }

  test("many relations carry high pseudo-confidence (paper: 184 at >= 0.99 conf)") {
    val d    = DocGen.render(Corpora.fda, 0, seed)
    val high = OpenIE6Like.extract(d.text).count(_.confidence > 0.9)
    assert(high > 5)
  }

  test("relations are not consistent across documents (no canonical attributes)") {
    val r0 = OpenIE6Like.extract(DocGen.render(Corpora.fda, 0, seed).text).map(_.subject).toSet
    val r1 = OpenIE6Like.extract(DocGen.render(Corpora.fda, 1, seed).text).map(_.subject).toSet
    val overlap = r0.intersect(r1).size.toDouble / math.max(1, math.min(r0.size, r1.size))
    assert(overlap < 0.8, s"subject overlap $overlap — OpenIE6 output should not align across docs")
  }

  test("misses key-value lines that are not sentences") {
    val rels = OpenIE6Like.extract("Product Code: ABC")
    assert(rels.isEmpty)
  }

  test("recovers almost none of the gold tuples (why the paper rates it qualitatively)") {
    val d    = DocGen.render(Corpora.fda, 2, seed)
    val rels = OpenIE6Like.extract(d.text)
    val goldValues = d.gold.values.toSet
    val hits = rels.count(r => goldValues.contains(r.obj))
    assert(hits < d.gold.size / 2, s"hits=$hits")
  }

  test("ignores short fragments") {
    assert(OpenIE6Like.extract("this is it").isEmpty)
  }
}
