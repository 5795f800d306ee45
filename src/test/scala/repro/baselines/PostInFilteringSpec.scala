package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.data.GroundTruth
import repro.graph.{BruteForce, Hnsw}

class PostInFilteringSpec extends AnyFunSuite {

  private val n = 500
  private val vs = TestData.clusteredVs(n, 8, clusters = 6, seed = 171)
  private val queries = TestData.nearQueries(vs, 20, seed = 172)
  private lazy val h = Hnsw.buildAll(vs, m = 10, efConstruction = 60)

  test("post-filtering results are in-range") {
    for (q <- queries.take(5)) {
      val got = PostFiltering.search(h, q, 100, 300, 10, 80)
      assert(got.forall(c => c.id >= 100 && c.id <= 300))
    }
  }

  test("post-filtering on an unselective range reaches high recall") {
    val gt = queries.map(q => BruteForce.topKIds(vs, q, 0, n - 1, 10))
    val got = queries.map(q => PostFiltering.search(h, q, 0, n - 1, 10, 120).map(_.id))
    assert(GroundTruth.meanRecall(gt, got) >= 0.9)
  }

  test("post-filtering struggles on a very selective range at small beam (inherent issue)") {
    val (l, r) = (200, 214) // 15 of 500 objects in-range
    val gt = queries.map(q => BruteForce.topKIds(vs, q, l, r, 10))
    val got = queries.map(q => PostFiltering.search(h, q, l, r, 10, 15).map(_.id))
    val recall = GroundTruth.meanRecall(gt, got)
    assert(recall < 0.9, s"expected the documented failure mode, got recall $recall")
  }

  test("in-filtering results are in-range") {
    for (q <- queries.take(5)) {
      val got = InFiltering.search(h, q, 150, 350, 10, 80)
      assert(got.forall(c => c.id >= 150 && c.id <= 350))
    }
  }

  test("in-filtering works on unselective ranges") {
    val gt = queries.map(q => BruteForce.topKIds(vs, q, 0, n - 1, 10))
    val got = queries.map(q => InFiltering.search(h, q, 0, n - 1, 10, 120).map(_.id))
    assert(GroundTruth.meanRecall(gt, got) >= 0.85)
  }

  test("in-filtering recall collapses on short ranges (inherent issue)") {
    // With the fixed whole-set graph, nodes have few in-range neighbors.
    val rnd = new java.util.Random(173)
    val ranges = Array.fill(queries.length) { val l = rnd.nextInt(n - 20); (l, l + 19) }
    val gt = queries.indices.toArray.map(qi =>
      BruteForce.topKIds(vs, queries(qi), ranges(qi)._1, ranges(qi)._2, 10))
    val got = queries.indices.toArray.map(qi =>
      InFiltering.search(h, queries(qi), ranges(qi)._1, ranges(qi)._2, 10, 120).map(_.id))
    assert(GroundTruth.meanRecall(gt, got) < 0.9)
  }
}
