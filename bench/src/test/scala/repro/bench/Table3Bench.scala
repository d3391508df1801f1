package repro.bench

import repro.eval.Tables

/** Table 3 — Direct vs Code+: quality on the paper's 10-document samples
  * and LLM token cost extrapolated to 10k documents, with the dollar cost
  * at davinci pricing and the token-reduction factor.
  */
class Table3Bench extends BenchSupport {

  private lazy val rows = Tables.table3(spark)

  test("render and record Table 3 (+ Figure 3 crossovers)") {
    record("table3", Tables.renderTable3(rows) + "\n" + Tables.costCurves())
    assert(rows.size == 5)
  }

  test("Code+ reduces tokens by well over an order of magnitude (paper: 110x avg)") {
    rows.foreach(r => assert(r.reduction > 15, s"${r.group}: ${r.reduction}x"))
    val avg = rows.map(_.reduction).sum / rows.size
    assert(avg > 40, s"average reduction ${avg}x")
  }

  test("Code+ cost is fixed and small (paper: ~1.9 Mtok / $39 per 10k docs)") {
    rows.foreach(r => assert(r.plusMTok < 3.0, s"${r.group}: ${r.plusMTok} Mtok"))
  }

  test("Direct cost scales with document size: NBA > FDA > Enron (paper: 650 > 146 > 21 Mtok)") {
    def tok(g: String) = rows.find(_.group == g).get.directMTok
    assert(tok("Wiki NBA") > tok("FDA"))
    assert(tok("FDA") > tok("Enron Emails"))
  }

  test("Code+ beats Direct on quality on average (paper: +12.1 F1)") {
    val avgDelta = rows.map(_.deltaF1).sum / rows.size
    assert(avgDelta > 0, s"average delta $avgDelta")
  }

  test("Code+ wins on every non-trivial source; Enron stays close (paper: -3.8)") {
    rows.filterNot(_.group == "Enron Emails").foreach { r =>
      assert(r.deltaF1 > 0, s"${r.group}: delta ${r.deltaF1}")
    }
    val enron = rows.find(_.group == "Enron Emails").get
    assert(math.abs(enron.deltaF1) < 25, s"enron delta ${enron.deltaF1}")
  }

  test("Figure 3 crossovers are in the paper's regime (~40 docs, ~2500 attrs)") {
    assert(repro.util.CostModel.crossoverDocs(10, 10000) <= 80)
    val attrs = repro.util.CostModel.crossoverAttrs(10000, 10000)
    assert(attrs >= 1000 && attrs <= 6000, attrs.toString)
  }
}
