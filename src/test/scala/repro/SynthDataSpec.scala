package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle over
  * them — they are shared repo infrastructure (DESIGN.md) even though this
  * paper's evaluation runs on document lakes, not TPC-H.
  */
class SynthDataSpec extends SparkSpec {

  private val sf = 0.002

  test("lineitem generates deterministic rows at a scale factor") {
    val a = SynthData.lineitem(spark, sf).count()
    val b = SynthData.lineitem(spark, sf).count()
    assert(a == b && a > 0)
  }

  test("orders keys are dense and unique") {
    val o = SynthData.orders(spark, sf)
    assert(o.select("o_orderkey").distinct().count() == o.count())
  }

  test("customer segments come from the five TPC-H segments") {
    val segs = SynthData.customer(spark, sf).select("c_mktsegment").distinct()
      .collect().map(_.getString(0)).toSet
    assert(segs.subsetOf(Set("BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE")))
  }

  test("zipf keys are skewed toward small ranks") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val top = z.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(0)
    assert(top <= 3, s"most frequent zipf key should be a small rank, got $top")
  }

  test("uniform keys cover the key space") {
    val u = SynthData.uniformKeys(spark, 20000, 50)
    assert(u.select("k").distinct().count() > 40)
  }

  test("oracle: pricing-summary-style aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf).select(
      col("l_returnflag"), col("l_linestatus"),
      col("l_quantity").cast("string") as "l_quantity")
    val sparkAgg = li.groupBy("l_returnflag", "l_linestatus")
      .agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT l_returnflag, l_linestatus, COUNT(*) AS n FROM li GROUP BY 1, 2",
      "li" -> li)
  }

  test("oracle: join cardinality between orders and customer matches DuckDB") {
    val o = SynthData.orders(spark, sf).select(col("o_orderkey").cast("string") as "o_orderkey",
      col("o_custkey").cast("string") as "o_custkey")
    val c = SynthData.customer(spark, sf).select(col("c_custkey").cast("string") as "c_custkey")
    val sparkJoin = o.join(c, o("o_custkey") === c("c_custkey"))
      .agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(
      sparkJoin,
      "SELECT COUNT(*) AS n FROM o JOIN c ON o.o_custkey = c.c_custkey",
      "o" -> o, "c" -> c)
  }
}
