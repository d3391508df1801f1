package repro.docs

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Spark DataFrame views of a synthetic data lake.
  *
  * Documents are generated *inside* Spark from `spark.range` — rendering is
  * deterministic in (setting, idx, seed), so executors regenerate identical
  * text without shipping materialized corpora, and the same calls back the
  * gold table the metrics join against.
  */
object DocLake {

  /** The document collection: (doc_id string, text string). */
  def documents(spark: SparkSession, setting: Setting, nDocs: Int, seed: Long): DataFrame = {
    val renderText = udf { (idx: Long) => DocGen.render(setting, idx, seed).text }
    val renderId   = udf { (idx: Long) => DocGen.docId(setting, idx) }
    spark.range(nDocs.toLong)
      .select(renderId(col("id")) as "doc_id", renderText(col("id")) as "text")
  }

  /** The ground-truth tuples: (doc_id, attr, value). */
  def gold(spark: SparkSession, setting: Setting, nDocs: Int, seed: Long): DataFrame = {
    val pairs = udf { (idx: Long) =>
      DocGen.render(setting, idx, seed).gold.toSeq
    }
    spark.range(nDocs.toLong)
      .select(
        udf((idx: Long) => DocGen.docId(setting, idx)).apply(col("id")) as "doc_id",
        explode(pairs(col("id"))) as "pair")
      .select(col("doc_id"), col("pair._1") as "attr", col("pair._2") as "value")
  }

  /** Driver-side corpus for sampling steps (schema synthesis, D_eval). */
  def sample(setting: Setting, nDocs: Int, seed: Long): Seq[RenderedDoc] =
    DocGen.corpus(setting, nDocs, seed)
}
