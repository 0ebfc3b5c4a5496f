package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators + a DuckDB-oracle round trip. */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
  }
  test("orders keys are dense from 1") {
    val o = SynthData.orders(spark, sf = 0.001)
    assert(o.agg(min("o_orderkey"), max("o_orderkey")).collect()(0).toSeq == Seq(1L, 1500L))
  }
  test("customer segment values are from the dictionary") {
    val segs = SynthData.customer(spark, sf = 0.001).select("c_mktsegment")
      .distinct().collect().map(_.getString(0)).toSet
    assert(segs.subsetOf(Set("BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE")))
  }
  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.part(spark, sf = 0.001).collect().map(_.toString).sorted
    val b = SynthData.part(spark, sf = 0.001).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }
  test("zipf keys are skewed toward small ranks") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 100)
    val top = z.where("k = 1").count()
    val mid = z.where("k = 50").count()
    assert(top > mid * 3, s"zipf skew missing: $top vs $mid")
  }
  test("uniform keys cover the domain roughly evenly") {
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.min > 20000 / 10 * 0.7)
  }
  test("TPC-H-lite aggregation matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val out = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("n"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(
      out,
      "SELECT l_returnflag, COUNT(*) AS n, ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }
  test("TPC-H-lite join matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val out = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      out,
      "SELECT c_mktsegment, COUNT(*) AS n FROM orders o JOIN customer c " +
        "ON o.o_custkey = c.c_custkey GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c)
  }
}
