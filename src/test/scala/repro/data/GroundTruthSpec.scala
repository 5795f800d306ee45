package repro.data

import repro.{Oracle, SparkSpec, TestData}

/** Validates the exact ground truth three ways: local scan vs Spark
  * dataflow vs the DuckDB oracle. Every bench recall is measured against
  * this ground truth, so these tests anchor the whole evaluation.
  */
class GroundTruthSpec extends SparkSpec {

  private val n = 120
  private val dim = 4
  private val vs = TestData.randomVs(n, dim, seed = 151)
  private val queries = TestData.randomQueries(6, dim, seed = 152)
  private val ranges: Array[(Int, Int)] =
    Array((0, 119), (10, 50), (100, 119), (60, 61), (0, 9), (55, 90))

  private lazy val dataDf = {
    val rows = (0 until n).map { i =>
      val v = vs.vector(i)
      (i, v(0).toDouble, v(1).toDouble, v(2).toDouble, v(3).toDouble)
    }
    spark.createDataFrame(rows).toDF("id", "v0", "v1", "v2", "v3")
  }

  private def duckDistExpr(q: Array[Float]): String =
    (0 until dim).map { j =>
      s"(CAST(v$j AS DOUBLE) - (${q(j).toDouble}))*(CAST(v$j AS DOUBLE) - (${q(j).toDouble}))"
    }.mkString(" + ")

  test("Spark ground truth equals the local scan") {
    val sparkGt = GroundTruth.computeSpark(spark, vs, queries, ranges, k = 10)
    val localGt = GroundTruth.computeLocal(vs, queries, ranges, k = 10)
    for (qi <- queries.indices)
      assert(sparkGt(qi).toSeq == localGt(qi).toSeq, s"query $qi")
  }

  for (qi <- queries.indices) {
    test(s"ground truth top-10 matches DuckDB (query $qi, range ${ranges(qi)})") {
      import spark.implicits._
      val (l, r) = ranges(qi)
      val gt = GroundTruth.computeSpark(spark, vs, queries, ranges, k = 10)(qi)
      val sparkDf = gt.toSeq.toDF("id")
      Oracle.assertEquivalent(
        sparkDf,
        s"""SELECT CAST(id AS INT) AS id FROM data
           |WHERE CAST(id AS INT) BETWEEN $l AND $r
           |ORDER BY ${duckDistExpr(queries(qi))} ASC, CAST(id AS INT) ASC
           |LIMIT 10""".stripMargin,
        "data" -> dataDf)
    }
  }

  test("in-range count matches DuckDB") {
    import spark.implicits._
    val (l, r) = (17, 93)
    val cnt = (l to r).size.toLong
    val sparkDf = Seq(cnt).toDF("cnt")
    Oracle.assertEquivalent(
      sparkDf,
      s"SELECT COUNT(*) AS cnt FROM data WHERE CAST(id AS INT) BETWEEN $l AND $r",
      "data" -> dataDf)
  }

  test("multi-attribute conjunction ground truth matches DuckDB") {
    import spark.implicits._
    // attach a second attribute rank (fixed permutation)
    val rnd = new java.util.Random(153)
    val a2 = Array.tabulate(n)(identity)
    for (i <- (1 until n).reverse) {
      val j = rnd.nextInt(i + 1); val t = a2(i); a2(i) = a2(j); a2(j) = t
    }
    val rows = (0 until n).map { i =>
      val v = vs.vector(i)
      (i, v(0).toDouble, v(1).toDouble, v(2).toDouble, v(3).toDouble, a2(i))
    }
    val df2 = spark.createDataFrame(rows).toDF("id", "v0", "v1", "v2", "v3", "a2")
    val ranges2 = Array.fill(queries.length)((20, 80))
    val gt = GroundTruth.computeSpark(spark, vs, queries, ranges, k = 10,
      attr2Rank = a2, ranges2 = ranges2)
    for (qi <- Seq(0, 1, 5)) {
      val (l, r) = ranges(qi)
      val sparkDf = gt(qi).toSeq.toDF("id")
      Oracle.assertEquivalent(
        sparkDf,
        s"""SELECT CAST(id AS INT) AS id FROM data
           |WHERE CAST(id AS INT) BETWEEN $l AND $r
           |  AND CAST(a2 AS INT) BETWEEN 20 AND 80
           |ORDER BY ${duckDistExpr(queries(qi))} ASC, CAST(id AS INT) ASC
           |LIMIT 10""".stripMargin,
        "data" -> df2)
    }
  }

  test("recall helper: exact result has recall 1, disjoint has 0") {
    assert(GroundTruth.recall(Array(1, 2, 3), Array(3, 2, 1)) == 1.0)
    assert(GroundTruth.recall(Array(1, 2, 3), Array(4, 5, 6)) == 0.0)
    assert(GroundTruth.recall(Array(1, 2, 3, 4), Array(1, 2)) == 0.5)
    assert(GroundTruth.recall(Array.empty[Int], Array.empty[Int]) == 1.0)
  }

  test("meanRecall averages per query") {
    val gt = Array(Array(1, 2), Array(3, 4))
    val got = Array(Array(1, 2), Array(3, 9))
    assert(math.abs(GroundTruth.meanRecall(gt, got) - 0.75) < 1e-9)
  }

  test("ground truth with k larger than range returns all in-range ids") {
    val gt = GroundTruth.computeSpark(spark, vs, queries, Array.fill(queries.length)((60, 61)), k = 10)
    for (qi <- queries.indices) assert(gt(qi).sorted.toSeq == Seq(60, 61))
  }
}
