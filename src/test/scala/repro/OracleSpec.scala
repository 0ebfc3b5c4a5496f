package repro

/** Sanity of the DuckDB oracle itself. */
class OracleSpec extends SparkSpec {

  test("assertEquivalent accepts a matching aggregate") {
    import spark.implicits._
    val df = Seq(("a", 1), ("a", 2), ("b", 3)).toDF("k", "v")
    val out = df.groupBy("k").count().withColumnRenamed("count", "n")
    Oracle.assertEquivalent(out, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> df)
  }

  test("assertEquivalent rejects a wrong result") {
    import spark.implicits._
    val df = Seq(("a", 1)).toDF("k", "v")
    val wrong = Seq(("a", 99)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k, v FROM t", "t" -> df)
    }
  }

  test("assertEquivalent rejects mismatched column sets") {
    import spark.implicits._
    val df = Seq(("a", 1)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.select("k"), "SELECT k, v FROM t", "t" -> df)
    }
  }

  test("assertEquivalent canonicalises null values") {
    import spark.implicits._
    val df = Seq(("a", null.asInstanceOf[String]), ("b", "x")).toDF("k", "v")
    Oracle.assertEquivalent(df, "SELECT k, v FROM t", "t" -> df)
  }
}
