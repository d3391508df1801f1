package repro.bench

import repro.eval.Tables

/** Table 4 — aggregation ablation: Majority Vote, off-the-shelf WS, WS with
  * LLM-score filtering, and full Algorithm 1 (filter + abstentions).
  */
class Table4Bench extends BenchSupport {

  private lazy val rows = Tables.table4(spark)

  test("render and record Table 4") {
    record("table4", Tables.renderTable4(rows))
    assert(rows.size == 5)
  }

  test("filtering is the big win over off-the-shelf WS (paper: +7.1 avg)") {
    val ws  = rows.map(_.ws).sum / rows.size
    val wsf = rows.map(_.wsFilter).sum / rows.size
    assert(wsf > ws + 2, s"ws=$ws filter=$wsf")
  }

  test("full Algorithm 1 is the best average (paper: 66.7)") {
    val avg = Seq(rows.map(_.mv).sum, rows.map(_.ws).sum,
      rows.map(_.wsFilter).sum, rows.map(_.wsFull).sum).map(_ / rows.size)
    assert(avg(3) >= avg(0) && avg(3) >= avg(1), avg.toString)
    assert(avg(3) >= avg(2) - 1.0, avg.toString)
  }

  test("abstention handling helps most where values are expressed diversely (FDA; paper +7.8)") {
    val fda = rows.find(_.group == "FDA").get
    assert(fda.wsFull >= fda.wsFilter, s"filter=${fda.wsFilter} full=${fda.wsFull}")
  }

  test("abstention handling is a no-op on rigid Enron (paper: 86.9 = 86.9)") {
    val enron = rows.find(_.group == "Enron Emails").get
    assert(math.abs(enron.wsFull - enron.wsFilter) < 6.0,
      s"filter=${enron.wsFilter} full=${enron.wsFull}")
  }

  test("MV is the weakest strategy on average (paper: 56.2)") {
    val mv = rows.map(_.mv).sum / rows.size
    val others = Seq(rows.map(_.wsFilter).sum / rows.size, rows.map(_.wsFull).sum / rows.size)
    others.foreach(o => assert(mv < o, s"mv=$mv other=$o"))
  }
}
