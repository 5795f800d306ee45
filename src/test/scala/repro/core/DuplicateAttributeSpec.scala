package repro.core

import repro.SparkSpec
import repro.data.{AttributeIndex, VectorData}
import repro.graph.BruteForce

/** End-to-end path for duplicate attribute values (Section 3.4): quantized
  * A₁, raw value-range queries mapped to rank ranges via binary search, and
  * RFANN search over the resulting [L, R].
  */
class DuplicateAttributeSpec extends SparkSpec {

  private lazy val ds = VectorData.generate(spark, "dup", n = 400, dim = 8,
    clusters = 4, nQueries = 10, seed = 950L, attr1Cardinality = 20)
  private lazy val ai = new AttributeIndex(ds.attr1Values)
  private lazy val ir = IRangeGraph.build(ds.vs, m = 8, ef = 50)

  test("cardinality is far below n") {
    assert(ai.cardinality <= 20)
    assert(ai.cardinality > 2)
  }

  test("value ranges never split ties: boundary values are fully in or out") {
    for (lo <- Seq(0.1, 0.25, 0.4); hi <- Seq(0.6, 0.8)) {
      ai.rankRange(lo, hi) match {
        case Some((l, r)) =>
          if (l > 0) assert(ds.attr1Values(l - 1) != ds.attr1Values(l))
          if (r < ds.n - 1) assert(ds.attr1Values(r + 1) != ds.attr1Values(r))
        case None => ()
      }
    }
  }

  test("value-range RFANN query equals brute force over the mapped rank range") {
    for ((lo, hi) <- Seq((0.2, 0.7), (0.0, 1.0), (0.45, 0.55))) {
      val Some((l, r)) = ai.rankRange(lo, hi)
      for (q <- ds.queries.take(5)) {
        val got = ir.search(q, l, r, 10, 150).map(_.id)
        val exact = BruteForce.topKIds(ds.vs, q, l, r, 10)
        assert(got.intersect(exact).length >= 8,
          s"value range [$lo,$hi] -> ranks [$l,$r]: recall ${got.intersect(exact).length}/10")
      }
    }
  }

  test("every result's attribute value lies in the raw query range") {
    val (lo, hi) = (0.3, 0.65)
    val Some((l, r)) = ai.rankRange(lo, hi)
    for (q <- ds.queries.take(5); c <- ir.search(q, l, r, 10, 100))
      assert(ds.attr1Values(c.id) >= lo && ds.attr1Values(c.id) <= hi)
  }
}
