package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.CodeConfig
import repro.docs.Corpora
import repro.eval.{Harness, Metrics}
import repro.llm.Profile
import repro.ws.Aggregation

/** Quick end-to-end sanity run over a few settings — used during
  * development to inspect the emergent quality shape; not part of any
  * table. Kept as a cheap way to eyeball the pipeline.
  */
object Smoke {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.master("local[*]").appName("smoke")
      .config("spark.sql.shuffle.partitions", "16")
      .config("spark.ui.enabled", "false")
      .getOrCreate()
    spark.sparkContext.setLogLevel("ERROR")

    val seed = 42L
    val n    = 60
    for (s <- Seq(Corpora.fda, Corpora.enron, Corpora.nba, Corpora.movieSites.head, Corpora.uniSites.head)) {
      val (docs, gold) = Harness.lake(spark, s, n, seed)
      val t0 = System.nanoTime()
      val direct = Harness.directOpen(spark, s, docs, gold, Profile.davinci, seed)
      val code   = Harness.codeOpen(spark, s, docs, gold, Profile.davinci, seed,
        CodeConfig(singleFunction = true))
      val plus   = Harness.codeOpen(spark, s, docs, gold, Profile.davinci, seed)
      val mv     = Harness.codeOpen(spark, s, docs, gold, Profile.davinci, seed,
        CodeConfig(mode = Aggregation.MajorityVote))
      val (_, dClosed) = Harness.directClosed(spark, s, docs, gold, Profile.davinci, seed)
      val (_, cClosed) = Harness.codeClosed(spark, s, docs, gold, Profile.davinci, seed)
      val schemaF1 = Harness.schemaF1AtK(s, Profile.davinci, seed)
      val dt = (System.nanoTime() - t0) / 1e9
      println(f"${s.name}%-28s directOpen=${Harness.pct(direct.prf.f1)}%5.1f codeOpen=${Harness.pct(code.prf.f1)}%5.1f plusOpen=${Harness.pct(plus.prf.f1)}%5.1f mvOpen=${Harness.pct(mv.prf.f1)}%5.1f " +
        f"directClosed=${Harness.pct(dClosed)}%5.1f plusClosed=${Harness.pct(cClosed)}%5.1f schemaF1=${Harness.pct(schemaF1)}%5.1f " +
        f"P=${Harness.pct(plus.prf.precision)}%5.1f R=${Harness.pct(plus.prf.recall)}%5.1f [${dt}%4.1fs]")
      println(f"   tokens: direct=${direct.view.tokens}%,d plus=${plus.view.tokens}%,d (${direct.view.tokens.toDouble / math.max(1, plus.view.tokens)}%.1fx at n=$n)")
    }
    spark.stop()
  }
}
