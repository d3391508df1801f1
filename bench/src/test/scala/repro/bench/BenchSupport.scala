package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import repro.SparkSpec

/** Shared plumbing for the per-table bench suites: each suite computes its
  * table through `repro.eval.Tables`, prints the paper-vs-measured render,
  * writes it under `bench_results/`, and asserts the paper's *shape*
  * claims (orderings, regimes) — absolute numbers differ by construction
  * (synthetic corpora, simulated LLM) and are documented in EXPERIMENTS.md.
  */
trait BenchSupport extends SparkSpec {

  def record(name: String, rendered: String): Unit = {
    println(rendered)
    val dir = Paths.get("/root/repo/bench_results")
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), rendered.getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }
}
