package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.graph.BruteForce

class PreFilteringSpec extends AnyFunSuite {

  private val vs = TestData.randomVs(200, 6, seed = 161)
  private val queries = TestData.randomQueries(5, 6, seed = 162)

  test("always exact: equals brute force on every range") {
    val rnd = new java.util.Random(163)
    for (q <- queries; _ <- 0 until 10) {
      val a = rnd.nextInt(200); val b = rnd.nextInt(200)
      val (l, r) = (math.min(a, b), math.max(a, b))
      assert(PreFiltering.search(vs, q, l, r, 10).map(_.id).toSeq ==
        BruteForce.topKIds(vs, q, l, r, 10).toSeq)
    }
  }

  test("supports an extra predicate (multi-attribute use)") {
    val got = PreFiltering.search(vs, queries(0), 0, 199, 10, _ % 5 == 0)
    assert(got.nonEmpty)
    assert(got.forall(_.id % 5 == 0))
  }

  test("short range returns the whole range") {
    val got = PreFiltering.search(vs, queries(1), 50, 52, 10)
    assert(got.map(_.id).sorted.toSeq == Seq(50, 51, 52))
  }

  test("results sorted ascending by (dist, id)") {
    val got = PreFiltering.search(vs, queries(2), 0, 199, 25)
    assert(got.sliding(2).forall {
      case Array(a, b) => a.dist < b.dist || (a.dist == b.dist && a.id < b.id)
      case _ => true
    })
  }
}
