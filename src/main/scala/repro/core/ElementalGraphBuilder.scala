package repro.core

import repro.graph.{BeamSearch, BruteForce, Candidate, RngPrune, VecStore}
import scala.collection.mutable

/** Bottom-up materialization of all elemental graphs (Section 3.2.2).
  *
  * For a segment [l, r] whose children graphs are already built, the
  * candidates for a node u in child [l, mid] are
  *
  *  1. u's neighbors in the child's elemental graph — any candidate from the
  *     containing child that those neighbors pruned would also be pruned in
  *     [l, r] (superset pruning argument), so copying them is sufficient; and
  *  2. approximate nearest neighbors of u searched in the *sibling* child's
  *     elemental graph (beam search with beam = EF), since nothing is known
  *     about pruning there.
  *
  * The union is then RNG-pruned (α = 1, the paper's rule) and capped at m.
  * Segments of size ≤ `bruteThreshold` take all members as candidates, which
  * is both cheaper and exact at that scale. Everything is deterministic:
  * ties break by (distance, id).
  */
object ElementalGraphBuilder {

  /** Below this size a segment's candidates are simply all its members. */
  def bruteThreshold(m: Int): Int = math.max(2 * m, 32)

  /** Fully build the subtree rooted at segment [l, r] sitting at layer
    * `lay`, writing into the shared flat `layers` arrays. Children first.
    */
  def buildInto(vs: VecStore, layers: Array[Array[Int]], m: Int, ef: Int,
                l: Int, r: Int, lay: Int): Unit = {
    if (l >= r) return
    val mid = SegmentTree.mid(l, r)
    buildInto(vs, layers, m, ef, l, mid, lay + 1)
    buildInto(vs, layers, m, ef, mid + 1, r, lay + 1)
    buildSegmentLayer(vs, layers, m, ef, l, r, lay)
  }

  /** Build just segment [l, r]'s graph at layer `lay`, assuming its
    * children's graphs at layer `lay + 1` are present in `layers`.
    */
  def buildSegmentLayer(vs: VecStore, layers: Array[Array[Int]], m: Int, ef: Int,
                        l: Int, r: Int, lay: Int): Unit = {
    val size = r - l + 1
    if (size <= 1) return
    val target = layers(lay)
    if (size <= bruteThreshold(m)) {
      var u = l
      while (u <= r) {
        val cands = new Array[Candidate](size - 1)
        var i = 0
        var v = l
        while (v <= r) {
          if (v != u) { cands(i) = Candidate(v, vs.dist2(u, v)); i += 1 }
          v += 1
        }
        writeNeighbors(target, m, u, RngPrune.prune(cands, (a, b) => vs.dist2(a, b), m))
        u += 1
      }
    } else {
      val mid = SegmentTree.mid(l, r)
      val childAdj = layers(lay + 1)
      var u = l
      while (u <= r) {
        val (siblingLo, siblingHi) =
          if (u <= mid) (mid + 1, r) else (l, mid)
        val cands = mutable.ArrayBuffer.empty[Candidate]
        val seen = mutable.HashSet.empty[Int]
        // 1. Copy u's neighbors from its containing child's graph.
        val base = u * m
        var j = 0
        while (j < m && childAdj(base + j) >= 0) {
          val v = childAdj(base + j)
          if (seen.add(v)) cands += Candidate(v, vs.dist2(u, v))
          j += 1
        }
        // 2. Search the sibling child's graph for approximate NNs of u.
        val q = vs.vector(u)
        val found =
          if (siblingHi - siblingLo + 1 <= ef)
            BruteForce.topK(vs, q, siblingLo, siblingHi, ef)
          else
            BeamSearch.search(
              q, (i: Int) => vs.dist2(i, q),
              entries = Seq(SegmentTree.mid(siblingLo, siblingHi)),
              beam = ef, k = ef,
              neighbors = (x: Int) => {
                val out = new Array[Int](m)
                val b = x * m
                var t = 0
                while (t < m) { out(t) = childAdj(b + t); t += 1 }
                out
              },
            )
        found.foreach { c => if (seen.add(c.id)) cands += c }
        writeNeighbors(target, m, u, RngPrune.prune(cands.toArray, (a, b) => vs.dist2(a, b), m))
        u += 1
      }
    }
  }

  private def writeNeighbors(flat: Array[Int], m: Int, u: Int, kept: Array[Candidate]): Unit = {
    val base = u * m
    var i = 0
    while (i < m) {
      flat(base + i) = if (i < kept.length) kept(i).id else -1
      i += 1
    }
  }

  /** Driver-local build of the full index over `vs` (ranks = ids). */
  def build(vs: VecStore, m: Int, ef: Int): ElementalGraphs = {
    val n = vs.n
    val depth = SegmentTree.depth(n)
    val layers = Array.fill(depth)(Array.fill(n * m)(-1))
    buildInto(vs, layers, m, ef, 0, n - 1, 0)
    new ElementalGraphs(n, m, layers)
  }
}
