package repro.bench

import repro.eval.Tables

/** Table 2 — SWDE Movie/University: the DOM-baseline family (trained
  * in-domain, leave-one-site-out) versus the three Evaporate
  * implementations (no training).
  */
class Table2Bench extends BenchSupport {

  private lazy val rows = Tables.table2(spark)
  private def row(name: String) = rows.find(_.system == name).get

  test("render and record Table 2") {
    record("table2", Tables.renderTable2(rows))
    assert(rows.size == 7)
  }

  test("Evaporate-Code+ beats every baseline on OpenIE in both verticals (paper's headline)") {
    val plus = row("Evaporate-Code+")
    val baselines = Seq("ZeroShot Ceres", "RoBERTa-Base", "RoBERTa-Structural", "DOM-LM").map(row)
    baselines.foreach { b =>
      assert(plus.movieOpen > b.movieOpen, s"${b.system} movie: ${b.movieOpen} vs ${plus.movieOpen}")
      assert(plus.uniOpen > b.uniOpen, s"${b.system} univ: ${b.uniOpen} vs ${plus.uniOpen}")
    }
  }

  test("DOM-LM is the strongest baseline (paper: 71.9/54.1 movie)") {
    val domlm = row("DOM-LM")
    Seq("RoBERTa-Base", "RoBERTa-Structural").map(row).foreach { b =>
      assert(domlm.movieClosed >= b.movieClosed, s"${b.system}")
      assert(domlm.uniClosed >= b.uniClosed, s"${b.system}")
    }
  }

  test("trained-baseline matching-power ordering: Base <= Structural <= DOM-LM on ClosedIE") {
    val base = row("RoBERTa-Base"); val struct = row("RoBERTa-Structural"); val domlm = row("DOM-LM")
    assert(base.movieClosed <= struct.movieClosed + 2.0)
    assert(struct.movieClosed <= domlm.movieClosed + 2.0)
    assert(base.uniClosed <= struct.uniClosed + 2.0)
    assert(struct.uniClosed <= domlm.uniClosed + 2.0)
  }

  test("Evaporate-Code is the weakest Evaporate implementation (paper: 55.0/33.0)") {
    val code = row("Evaporate-Code")
    val direct = row("Evaporate-Direct"); val plus = row("Evaporate-Code+")
    assert(code.movieOpen < direct.movieOpen && code.movieOpen < plus.movieOpen)
    assert(code.uniOpen < direct.uniOpen && code.uniOpen < plus.uniOpen)
    assert(code.movieClosed < direct.movieClosed && code.movieClosed < plus.movieClosed)
  }

  test("Direct's ClosedIE is strong while its OpenIE lags Code+ (paper: 84.4 vs 37.4 on movie)") {
    val direct = row("Evaporate-Direct"); val plus = row("Evaporate-Code+")
    assert(direct.movieClosed > direct.movieOpen)
    assert(plus.movieOpen > direct.movieOpen)
    assert(plus.uniOpen > direct.uniOpen)
  }
}
