package repro.docs

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class DocLakeSpec extends SparkSpec {

  private val seed = 42L

  test("documents DataFrame has one row per document with the right schema") {
    val df = DocLake.documents(spark, Corpora.enron, 25, seed)
    assert(df.columns.toSeq == Seq("doc_id", "text"))
    assert(df.count() == 25)
    assert(df.select("doc_id").distinct().count() == 25)
  }

  test("documents DataFrame matches driver-side rendering exactly") {
    val fromSpark  = DocLake.documents(spark, Corpora.fda, 5, seed)
      .collect().map(r => r.getString(0) -> r.getString(1)).toMap
    val fromDriver = DocGen.corpus(Corpora.fda, 5, seed).map(d => d.id -> d.text).toMap
    assert(fromSpark == fromDriver)
  }

  test("gold DataFrame matches the generator's gold maps") {
    val fromSpark = DocLake.gold(spark, Corpora.nba, 8, seed)
      .collect().map(r => (r.getString(0), r.getString(1), r.getString(2))).toSet
    val fromDriver = DocGen.corpus(Corpora.nba, 8, seed)
      .flatMap(d => d.gold.map { case (a, v) => (d.id, a, v) }).toSet
    assert(fromSpark == fromDriver)
  }

  test("gold has no empty values and no duplicate (doc, attr) slots") {
    val g = DocLake.gold(spark, Corpora.fda, 20, seed)
    assert(g.where(col("value") === "").count() == 0)
    assert(g.groupBy("doc_id", "attr").count().where(col("count") > 1).count() == 0)
  }

  test("lakes are reproducible across invocations") {
    val a = DocLake.documents(spark, Corpora.uniSites.head, 10, seed).collect().toSeq
    val b = DocLake.documents(spark, Corpora.uniSites.head, 10, seed).collect().toSeq
    assert(a == b)
  }

  test("oracle: per-attribute gold coverage counts agree with DuckDB") {
    val g = DocLake.gold(spark, Corpora.enron, 30, seed)
    val sparkCounts = g.groupBy("attr").agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(
      sparkCounts,
      "SELECT attr, COUNT(*) AS n FROM gold GROUP BY attr",
      "gold" -> g)
  }

  test("oracle: distinct document count agrees with DuckDB") {
    val g = DocLake.gold(spark, Corpora.fda, 15, seed)
    val sparkDf = g.agg(countDistinct(col("doc_id")) as "docs")
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT COUNT(DISTINCT doc_id) AS docs FROM gold",
      "gold" -> g)
  }

  test("sample returns the lake's first n documents") {
    val sample = DocLake.sample(Corpora.fda, 3, seed)
    val lake   = DocGen.corpus(Corpora.fda, 10, seed)
    assert(sample == lake.take(3))
  }
}
