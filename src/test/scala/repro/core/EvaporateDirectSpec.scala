package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.docs.{Corpora, DocLake, Naming}
import repro.eval.Metrics
import repro.llm.Profile

class EvaporateDirectSpec extends SparkSpec {

  private val seed = 42L
  private lazy val docs = DocLake.documents(spark, Corpora.enron, 30, seed).cache()
  private lazy val gold = DocLake.gold(spark, Corpora.enron, 30, seed).cache()

  test("open run produces the tuple schema and a ranked attribute list") {
    val v = EvaporateDirect.run(spark, Corpora.enron, docs, Profile.davinci, seed, 15)
    assert(v.table.columns.toSeq == Seq("doc_id", "attr", "value"))
    assert(v.schema.nonEmpty)
    assert(v.schema == v.schema.distinct)
  }

  test("open run restricts the table to the top-k attributes") {
    val v = EvaporateDirect.run(spark, Corpora.enron, docs, Profile.davinci, seed, 5)
    val attrs = v.table.select("attr").distinct().collect().map(_.getString(0)).toSet
    assert(attrs.size <= 5)
    assert(attrs.subsetOf(v.schema.take(5).toSet))
  }

  test("token cost is positive and linear in the number of documents") {
    val v30 = EvaporateDirect.run(spark, Corpora.enron, docs, Profile.davinci, seed, 15)
    val docs10 = docs.where(col("doc_id").isin((0 until 10).map(i => s"enron-doc-$i"): _*))
    val v10 = EvaporateDirect.run(spark, Corpora.enron, docs10, Profile.davinci, seed, 15)
    assert(v10.tokens > 0)
    val ratio = v30.tokens.toDouble / v10.tokens
    assert(ratio > 2.0 && ratio < 4.0, s"token ratio $ratio for 3x the documents")
  }

  test("run is deterministic") {
    val a = EvaporateDirect.run(spark, Corpora.enron, docs, Profile.davinci, seed, 15)
    val b = EvaporateDirect.run(spark, Corpora.enron, docs, Profile.davinci, seed, 15)
    assert(a.tokens == b.tokens)
    assert(a.table.collect().toSet == b.table.collect().toSet)
  }

  test("quality on the easy Enron setting is high (paper: 90.9)") {
    val v  = EvaporateDirect.run(spark, Corpora.enron, docs, Profile.davinci, seed, 15)
    val f1 = Metrics.pairF1(v.table, gold).f1
    assert(f1 > 0.6, s"enron direct pair F1 = $f1")
  }

  test("oracle: attribute frequency ranking agrees with DuckDB") {
    val v = EvaporateDirect.run(spark, Corpora.enron, docs, Profile.davinci, seed, 15)
    val freq = v.table.groupBy("attr").agg(countDistinct(col("doc_id")) as "freq")
    Oracle.assertEquivalent(
      freq,
      "SELECT attr, COUNT(DISTINCT doc_id) AS freq FROM t GROUP BY attr",
      "t" -> v.table)
  }

  test("closed run extracts only the requested attributes") {
    val v = EvaporateDirect.runClosed(spark, Corpora.enron, docs, Profile.davinci, seed,
      Seq("from", "subject"))
    val attrs = v.table.select("attr").distinct().collect().map(_.getString(0)).toSet
    assert(attrs.subsetOf(Set("from", "subject")))
  }

  test("closed run quality exceeds open (the attribute name is given)") {
    val closed = EvaporateDirect.runClosed(spark, Corpora.enron, docs, Profile.davinci, seed,
      Corpora.enron.goldAttrs)
    val closedF1 = Metrics.closedTextF1(spark, closed.table, gold)
    assert(closedF1 > 0.75, s"closed F1 = $closedF1")
  }

  test("hallucinated attribute names in the table never match gold attributes by accident") {
    val v = EvaporateDirect.run(spark, Corpora.enron, docs, Profile.davinci, seed, 15)
    val goldNorm = Corpora.enron.goldAttrs.map(Naming.normalize).toSet
    // All top-k attrs either match gold or are surfaced junk — assert the
    // junk is a minority for this rigid setting.
    val attrs = v.table.select("attr").distinct().collect().map(_.getString(0))
    assert(attrs.count(goldNorm.contains) >= attrs.length / 2)
  }
}
