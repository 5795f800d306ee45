package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.data.GroundTruth
import repro.graph.BruteForce

class MultiAttrSpec extends AnyFunSuite {

  private val n = 512
  private val vs = TestData.clusteredVs(n, 8, clusters = 6, seed = 121)
  private val queries = TestData.nearQueries(vs, 20, seed = 122)
  private lazy val ir = IRangeGraph.build(vs, m = 8, ef = 50)

  // Independent second attribute: a fixed pseudo-random permutation of ranks.
  private val attr2Rank: Array[Int] = {
    val rnd = new java.util.Random(123)
    val a = Array.tabulate(n)(identity)
    for (i <- (1 until n).reverse) {
      val j = rnd.nextInt(i + 1); val t = a(i); a(i) = a(j); a(j) = t
    }
    a
  }

  private def gtFor(qi: Int, l1: Int, r1: Int, l2: Int, r2: Int, k: Int): Array[Int] =
    BruteForce.topKIds(vs, queries(qi), l1, r1, k,
      i => attr2Rank(i) >= l2 && attr2Rank(i) <= r2)

  private val ranges: Array[(Int, Int, Int, Int)] = {
    val rnd = new java.util.Random(124)
    Array.fill(queries.length) {
      val len = n / 3
      val l1 = rnd.nextInt(n - len); val l2 = rnd.nextInt(n - len)
      (l1, l1 + len - 1, l2, l2 + len - 1)
    }
  }

  for (strategy <- Seq[(String, MultiAttr.Strategy)](
         ("PostFilter", MultiAttr.PostFilter),
         ("Probabilistic", MultiAttr.Probabilistic(7L)))) {
    test(s"${strategy._1}: all results satisfy both predicates") {
      for (qi <- queries.indices.take(10)) {
        val (l1, r1, l2, r2) = ranges(qi)
        val got = MultiAttr.search(ir, attr2Rank, queries(qi), l1, r1, l2, r2, 10, 80, strategy._2)
        assert(got.forall(c => c.id >= l1 && c.id <= r1))
        assert(got.forall(c => attr2Rank(c.id) >= l2 && attr2Rank(c.id) <= r2))
      }
    }
  }

  test("InFilter: results satisfy both predicates") {
    for (qi <- queries.indices.take(10)) {
      val (l1, r1, l2, r2) = ranges(qi)
      val got = MultiAttr.search(ir, attr2Rank, queries(qi), l1, r1, l2, r2, 10, 80, MultiAttr.InFilter)
      assert(got.forall(c => c.id >= l1 && c.id <= r1 &&
        attr2Rank(c.id) >= l2 && attr2Rank(c.id) <= r2))
    }
  }

  test("PostFilter reaches >= 0.85 recall at beam 200 on moderate conjunctions") {
    val k = 10
    val got = queries.indices.toArray.map { qi =>
      val (l1, r1, l2, r2) = ranges(qi)
      MultiAttr.search(ir, attr2Rank, queries(qi), l1, r1, l2, r2, k, 200,
        MultiAttr.PostFilter).map(_.id)
    }
    val gt = queries.indices.toArray.map { qi =>
      val (l1, r1, l2, r2) = ranges(qi)
      gtFor(qi, l1, r1, l2, r2, k)
    }
    assert(GroundTruth.meanRecall(gt, got) >= 0.85)
  }

  test("Probabilistic recall is at least In-filtering recall at equal beam") {
    val k = 10
    def recallOf(s: MultiAttr.Strategy): Double = {
      val got = queries.indices.toArray.map { qi =>
        val (l1, r1, l2, r2) = ranges(qi)
        MultiAttr.search(ir, attr2Rank, queries(qi), l1, r1, l2, r2, k, 100, s).map(_.id)
      }
      val gt = queries.indices.toArray.map { qi =>
        val (l1, r1, l2, r2) = ranges(qi)
        gtFor(qi, l1, r1, l2, r2, k)
      }
      GroundTruth.meanRecall(gt, got)
    }
    val rIn = recallOf(MultiAttr.InFilter)
    val rProb = recallOf(MultiAttr.Probabilistic(9L))
    assert(rProb >= rIn - 0.05, s"prob=$rProb in=$rIn")
  }

  test("Probabilistic is deterministic given the seed") {
    val (l1, r1, l2, r2) = ranges(0)
    val a = MultiAttr.search(ir, attr2Rank, queries(0), l1, r1, l2, r2, 10, 80,
      MultiAttr.Probabilistic(5L)).map(_.id).toSeq
    val b = MultiAttr.search(ir, attr2Rank, queries(0), l1, r1, l2, r2, 10, 80,
      MultiAttr.Probabilistic(5L)).map(_.id).toSeq
    assert(a == b)
  }

  test("empty conjunction returns empty results") {
    // Second range matches nothing reachable.
    val got = MultiAttr.search(ir, attr2Rank, queries(0), 0, 10, n - 1, n - 1, 10, 50,
      MultiAttr.PostFilter)
    assert(got.forall(c => attr2Rank(c.id) == n - 1))
  }
}
