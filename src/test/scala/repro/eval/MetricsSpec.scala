package repro.eval

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class MetricsSpec extends SparkSpec {

  import Metrics._

  // ---------------------------------------------------------------- Text F1

  test("textF1 exact match is 1") {
    assert(textF1("June 29, 1988", "June 29, 1988") == 1.0)
  }

  test("textF1 is the SQuAD token F1 (normalization: case, punctuation, articles)") {
    assert(textF1("The Quick Fox", "quick fox!") == 1.0)
    assert(textF1("a cat", "cat") == 1.0)
  }

  test("textF1 partial overlap") {
    // pred {june, 29}, gold {june, 29, 1988}: p=1, r=2/3 -> f1=0.8
    assert(math.abs(textF1("June 29", "June 29 1988") - 0.8) < 1e-9)
  }

  test("textF1 no overlap is 0") {
    assert(textF1("alpha beta", "gamma delta") == 0.0)
  }

  test("textF1 empty handling: both empty = 1, one empty = 0") {
    assert(textF1("", "") == 1.0)
    assert(textF1("x", "") == 0.0)
    assert(textF1("", "x") == 0.0)
    assert(textF1(null, null) == 1.0)
  }

  test("textF1 multiset overlap does not double-count tokens") {
    // pred {x}, gold {x, x}: overlap 1, p=1, r=0.5 -> 2/3
    assert(math.abs(textF1("x", "x x") - 2.0 / 3.0) < 1e-9)
  }

  test("textF1 is symmetric in P/R structure") {
    assert(textF1("a b", "a b c") == textF1("a b c", "a b"))
  }

  // ---------------------------------------------------------------- Pair F1

  private def df(rows: Seq[(String, String, String)]) = {
    import spark.implicits._
    rows.toDF("doc_id", "attr", "value")
  }

  test("pairF1 perfect prediction") {
    val g = df(Seq(("d1", "a", "x"), ("d2", "a", "y")))
    val r = pairF1(g, g)
    assert(r.precision == 1.0 && r.recall == 1.0 && r.f1 == 1.0)
  }

  test("pairF1 counts exact tuple matches only — no partial value credit") {
    val gold = df(Seq(("d1", "a", "June 29, 1988")))
    val pred = df(Seq(("d1", "a", "June 29")))
    assert(pairF1(pred, gold).f1 == 0.0)
  }

  test("pairF1 hand-computed precision/recall") {
    val gold = df(Seq(("d1", "a", "x"), ("d1", "b", "y"), ("d2", "a", "z")))
    val pred = df(Seq(("d1", "a", "x"), ("d1", "b", "WRONG"), ("d3", "a", "q")))
    val r = pairF1(pred, gold)
    assert(math.abs(r.precision - 1.0 / 3.0) < 1e-9)
    assert(math.abs(r.recall - 1.0 / 3.0) < 1e-9)
    assert(math.abs(r.f1 - 1.0 / 3.0) < 1e-9)
  }

  test("pairF1 normalizes attribute names and value whitespace") {
    val gold = df(Seq(("d1", "510(k) number", "K1\n\t2")))
    val pred = df(Seq(("d1", "510 K NUMBER", "K1 2")))
    assert(pairF1(pred, gold).f1 == 1.0)
  }

  test("pairF1 ignores empty values and duplicates") {
    val gold = df(Seq(("d1", "a", "x")))
    val pred = df(Seq(("d1", "a", "x"), ("d1", "a", "x"), ("d1", "b", "")))
    assert(pairF1(pred, gold).f1 == 1.0)
  }

  test("pairF1 empty prediction set") {
    val gold = df(Seq(("d1", "a", "x")))
    val r = pairF1(df(Nil), gold)
    assert(r.precision == 0.0 && r.recall == 0.0 && r.f1 == 0.0)
  }

  test("oracle: pair-match counting agrees with DuckDB") {
    val gold = df(Seq(("d1", "a", "x"), ("d1", "b", "y"), ("d2", "a", "z"), ("d2", "c", "w")))
    val pred = df(Seq(("d1", "a", "x"), ("d1", "b", "n"), ("d2", "a", "z"), ("d4", "a", "x")))
    val matches = pred.distinct().join(gold.distinct(), Seq("doc_id", "attr", "value"))
      .agg(count(lit(1)) as "matches")
    Oracle.assertEquivalent(
      matches,
      """SELECT COUNT(*) AS matches FROM (
        |  SELECT DISTINCT p.doc_id, p.attr, p.value
        |  FROM pred p JOIN gold g
        |    ON p.doc_id = g.doc_id AND p.attr = g.attr AND p.value = g.value
        |)""".stripMargin,
      "pred" -> pred, "gold" -> gold)
  }

  // -------------------------------------------------------------- ClosedIE

  test("closedTextF1 averages per-slot token F1") {
    val gold = df(Seq(("d1", "a", "x y"), ("d1", "b", "z")))
    val pred = df(Seq(("d1", "a", "x y"), ("d1", "b", "WRONG")))
    assert(math.abs(closedTextF1(spark, pred, gold) - 0.5) < 1e-9)
  }

  test("closedTextF1 penalizes unpredicted gold slots") {
    val gold = df(Seq(("d1", "a", "x"), ("d1", "b", "y")))
    val pred = df(Seq(("d1", "a", "x")))
    assert(math.abs(closedTextF1(spark, pred, gold) - 0.5) < 1e-9)
  }

  test("closedTextF1 penalizes spurious predictions on empty gold slots") {
    val gold = df(Seq(("d1", "a", "x")))
    val pred = df(Seq(("d1", "a", "x"), ("d1", "b", "spurious")))
    assert(math.abs(closedTextF1(spark, pred, gold) - 0.5) < 1e-9)
  }

  test("closedTextF1 on empty inputs is 0") {
    assert(closedTextF1(spark, df(Nil), df(Nil)) == 0.0)
  }

  // ----------------------------------------------------------------- F1@k

  test("f1AtK perfect schema") {
    assert(f1AtK(Seq("a", "b"), Seq("a", "b"), 2) == 1.0)
  }

  test("f1AtK truncates predictions at k") {
    // top-2 of predictions = {a, x}; gold {a, b}: p=0.5, r=0.5
    assert(f1AtK(Seq("a", "x", "b"), Seq("a", "b"), 2) == 0.5)
  }

  test("f1AtK normalizes names") {
    assert(f1AtK(Seq("510(K) Number"), Seq("510 k number"), 1) == 1.0)
  }

  test("f1AtK empty prediction is 0") {
    assert(f1AtK(Nil, Seq("a"), 3) == 0.0)
  }
}
