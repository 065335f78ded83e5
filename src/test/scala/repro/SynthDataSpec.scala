package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators against the DuckDB oracle —
  * the same result-equality harness guarding the GIANT relational stages.
  */
class SynthDataSpec extends SparkSpec {
  import spark.implicits._

  // project to the columns under test — the Oracle collects rows, and
  // DateType decoding is not needed for these checks
  private lazy val li = SynthData.lineitem(spark, sf = 0.001)
    .select("l_orderkey", "l_returnflag", "l_quantity").cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.001)
    .select("o_orderkey", "o_orderstatus").cache()

  test("lineitem row count scales with sf") {
    assert(li.count() == 6000L)
  }

  test("aggregation over lineitem matches DuckDB") {
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "n", round(sum("l_quantity"), 2) as "qty")
    Oracle.assertEquivalent(got,
      """SELECT l_returnflag, COUNT(*) AS n,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("join lineitem-orders matches DuckDB") {
    val got = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(got,
      """SELECT o_orderstatus, COUNT(*) AS n
        |FROM lineitem l JOIN orders o ON l.l_orderkey = o.o_orderkey
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }

  test("zipf keys are skewed toward low ranks") {
    val df = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
    val top = df.orderBy(desc("count")).first()
    assert(top.getLong(0) <= 3, s"most frequent key ${top.getLong(0)} should be a low rank")
  }

  test("uniform keys stay within range") {
    val mm = SynthData.uniformKeys(spark, 10000, 50)
      .agg(min("k") as "lo", max("k") as "hi").first()
    assert(mm.getLong(0) >= 1 && mm.getLong(1) <= 51)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, 0.001).collect().toSeq
    val b = SynthData.customer(spark, 0.001).collect().toSeq
    assert(a == b)
  }

  test("part carries the six p_type classes") {
    val types = SynthData.part(spark, 0.01).select("p_type").distinct()
      .collect().map(_.getString(0)).toSet
    assert(types.subsetOf(Set("STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO")))
    assert(types.size >= 4)
  }
}
