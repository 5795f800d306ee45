package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData

class BruteForceSpec extends AnyFunSuite {

  private val vs = TestData.randomVs(100, 8, seed = 21)
  private val queries = TestData.randomQueries(5, 8, seed = 22)

  private def naive(q: Array[Float], lo: Int, hi: Int, k: Int,
                    pred: Int => Boolean = _ => true): Seq[Int] =
    (lo to hi).filter(pred)
      .map(i => Candidate(i, vs.dist2(i, q)))
      .sortBy(c => (c.dist, c.id)).take(k).map(_.id)

  for ((q, qi) <- queries.zipWithIndex) {
    test(s"topK matches naive sort on full range (query $qi)") {
      assert(BruteForce.topKIds(vs, q, 0, 99, 10).toSeq == naive(q, 0, 99, 10))
    }
    test(s"topK matches naive sort on sub-range (query $qi)") {
      assert(BruteForce.topKIds(vs, q, 30, 70, 7).toSeq == naive(q, 30, 70, 7))
    }
  }

  test("topK respects the predicate") {
    val q = queries(0)
    val got = BruteForce.topKIds(vs, q, 0, 99, 10, _ % 2 == 0)
    assert(got.forall(_ % 2 == 0))
    assert(got.toSeq == naive(q, 0, 99, 10, _ % 2 == 0))
  }

  test("topK returns fewer than k when the range is small") {
    val got = BruteForce.topK(vs, queries(1), 10, 13, 10)
    assert(got.length == 4)
    assert(got.map(_.id).sorted.toSeq == Seq(10, 11, 12, 13))
  }

  test("topK results are sorted ascending by (dist, id)") {
    val got = BruteForce.topK(vs, queries(2), 0, 99, 20)
    assert(got.sliding(2).forall {
      case Array(a, b) => a.dist < b.dist || (a.dist == b.dist && a.id < b.id)
      case _ => true
    })
  }

  test("topK with empty effective range returns empty") {
    assert(BruteForce.topK(vs, queries(0), 50, 49, 5).isEmpty)
  }

  test("mergeTopK dedupes and globally sorts") {
    val a = Array(Candidate(1, 1f), Candidate(2, 3f))
    val b = Array(Candidate(2, 3f), Candidate(3, 2f))
    val got = BruteForce.mergeTopK(Seq(a, b), 10)
    assert(got.map(_.id).toSeq == Seq(1, 3, 2))
  }

  test("mergeTopK truncates to k") {
    val a = Array.tabulate(5)(i => Candidate(i, i.toFloat))
    assert(BruteForce.mergeTopK(Seq(a), 3).map(_.id).toSeq == Seq(0, 1, 2))
  }
}
