package repro.bench

import repro.eval.Tables

/** §4.4.1 micro-benchmark — prompt diversity: P_A only vs P_B only vs both
  * (paper: single-prompt synthesis is 8.5 / 8.0 F1 points worse on SWDE
  * Movie / University).
  */
class PromptDiversityBench extends BenchSupport {

  private lazy val rows = Tables.promptDiversity(spark)

  test("render and record the diversity ablation") {
    record("prompt_diversity", Tables.renderDiversity(rows))
    assert(rows.size == 3)
  }

  test("using both prompts beats the weaker single-prompt variant per vertical") {
    val both = rows.find(_.prompts == "PA + PB").get
    val pa   = rows.find(_.prompts == "PA only").get
    val pb   = rows.find(_.prompts == "PB only").get
    assert(both.movieF1 >= math.min(pa.movieF1, pb.movieF1) - 1.0,
      s"movie: both=${both.movieF1} pa=${pa.movieF1} pb=${pb.movieF1}")
    assert(both.uniF1 >= math.min(pa.uniF1, pb.uniF1) - 1.0,
      s"univ: both=${both.uniF1} pa=${pa.uniF1} pb=${pb.uniF1}")
  }

  test("neither prompt dominates everywhere (the paper's 69%/45%/... split)") {
    val pa = rows.find(_.prompts == "PA only").get
    val pb = rows.find(_.prompts == "PB only").get
    // P_A and P_B must both be competitive — within 25 points of each other.
    assert(math.abs(pa.movieF1 - pb.movieF1) < 25)
    assert(math.abs(pa.uniF1 - pb.uniF1) < 25)
  }
}
