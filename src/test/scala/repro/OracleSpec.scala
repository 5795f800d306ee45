package repro

/** Sanity of the DuckDB oracle itself: it must accept matching results and
  * reject mismatches — otherwise every oracle-checked test is vacuous.
  */
class OracleSpec extends SparkSpec {

  private lazy val df = {
    import spark.implicits._
    Seq((1, "a", 10.0), (2, "b", 20.0), (3, "a", 30.0)).toDF("id", "tag", "x")
  }

  test("accepts an equivalent aggregation") {
    import spark.implicits._
    val sparkDf = df.groupBy("tag")
      .agg(org.apache.spark.sql.functions.sum("x").as("s"))
      .select($"tag", $"s")
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT tag, SUM(CAST(x AS DOUBLE)) AS s FROM t GROUP BY tag",
      "t" -> df)
  }

  test("rejects a wrong result") {
    import spark.implicits._
    val wrong = Seq(("a", 999.0), ("b", 20.0)).toDF("tag", "s")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT tag, SUM(CAST(x AS DOUBLE)) AS s FROM t GROUP BY tag",
        "t" -> df)
    }
  }

  test("rejects mismatched column sets") {
    import spark.implicits._
    val bad = Seq(("a", 40.0)).toDF("wrongname", "s")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        bad,
        "SELECT tag, SUM(CAST(x AS DOUBLE)) AS s FROM t GROUP BY tag",
        "t" -> df)
    }
  }
}
