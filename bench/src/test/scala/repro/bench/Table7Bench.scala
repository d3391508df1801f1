package repro.bench

import repro.eval.Tables

/** Table 7 (Appendix C.2) — quality and per-10k-document cost of the
  * high-quality LLM F's ClosedIE extraction (the labels Algorithm 1 scores
  * candidate functions against).
  */
class Table7Bench extends BenchSupport {

  private lazy val rows = Tables.table7(spark)

  test("render and record Table 7") {
    record("table7", Tables.renderTable7(rows))
    assert(rows.size == 5)
  }

  test("F's ClosedIE labels are high quality everywhere (paper avg: 79.9)") {
    rows.foreach(r => assert(r.f1 > 60, s"${r.group}: ${r.f1}"))
  }

  test("per-attribute closed prompting is costly at lake scale (paper: 289 Mtok avg)") {
    // Orders of magnitude above Code+'s fixed cost (Table 3: ~2 Mtok).
    rows.foreach(r => assert(r.mTok > 1.0, s"${r.group}: ${r.mTok} Mtok"))
  }

  test("cost tracks attribute count x document size: NBA costs more than Enron (paper: 328 vs 140)") {
    def tok(g: String) = rows.find(_.group == g).get.mTok
    assert(tok("Wiki NBA") > tok("Enron Emails"))
  }
}
