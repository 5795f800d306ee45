package repro.core

/** Algorithm 1 — on-the-fly edge selection for the dedicated graph.
  *
  * For a node u and query range [L, R] (ranks, inclusive), walk u's branch
  * of the segment tree top-down, appending u's *in-range* neighbors from
  * each visited layer's elemental graph until m edges are collected, a
  * segment fully covered by the query range is consumed (any edge pruned
  * there is pruned by an in-range object, so deeper layers add nothing
  * RNG-valid), or the branch bottoms out.
  *
  * The skipping rule: when the child containing u has the same intersection
  * with [L, R] as the current segment, the current layer's edges have the
  * same robustness against in-range pruning as the child's, so the layer is
  * skipped without selecting — this is what turns O(m log n) into amortized
  * O(m + log n): at most two boundary-crossing segments per layer actually
  * contribute scans.
  *
  * Within a layer, neighbor lists are stored sorted by distance, so
  * insertion order implements the paper's priority (upper layers first,
  * closer neighbors first) without extra distance computations. Output is
  * written into `out` (length ≥ m + 1) and -1-terminated so the search's
  * scratch buffer can be reused across expansions.
  */
object EdgeSelection {

  /** Skipping variant (the real Algorithm 1). Returns the edge count. */
  def select(g: ElementalGraphs, u: Int, L: Int, R: Int, out: Array[Int]): Int = {
    val m = g.m
    var l = 0
    var r = g.n - 1
    var lay = 0
    var count = 0
    var done = false
    while (!done && count < m && l < r) {
      val cm = SegmentTree.mid(l, r)
      val (lc, rc) = if (u <= cm) (l, cm) else (cm + 1, r)
      if (SegmentTree.intersectLen(lc, rc, L, R) == SegmentTree.intersectLen(l, r, L, R)) {
        // Same intersection: child's edges are equally robust — skip layer.
        l = lc; r = rc; lay += 1
      } else {
        count = appendInRange(g, lay, u, L, R, out, count)
        if (L <= l && r <= R) done = true
        else { l = lc; r = rc; lay += 1 }
      }
    }
    if (count < out.length) out(count) = -1
    count
  }

  /** Ablation variant: scan every layer (no skipping) — O(m log n). Selects
    * the same way but pays the full per-layer scan; used by iRangeGraph⁻.
    */
  def selectNoSkip(g: ElementalGraphs, u: Int, L: Int, R: Int, out: Array[Int]): Int = {
    val m = g.m
    var l = 0
    var r = g.n - 1
    var lay = 0
    var count = 0
    var done = false
    while (!done && count < m && l < r) {
      count = appendInRange(g, lay, u, L, R, out, count)
      if (L <= l && r <= R) done = true
      else {
        val cm = SegmentTree.mid(l, r)
        if (u <= cm) r = cm else l = cm + 1
        lay += 1
      }
    }
    if (count < out.length) out(count) = -1
    count
  }

  /** Append u's in-range layer-`lay` neighbors to out[count..), deduped,
    * stopping at m. Neighbor lists are short (≤ m), so dedup is a linear
    * scan over `out` — no allocation on the query path.
    */
  private def appendInRange(g: ElementalGraphs, lay: Int, u: Int, L: Int, R: Int,
                            out: Array[Int], count0: Int): Int = {
    val m = g.m
    val a = g.layers(lay)
    val base = u * m
    var count = count0
    var j = 0
    while (j < m && count < m && a(base + j) >= 0) {
      val v = a(base + j)
      if (v >= L && v <= R) {
        var dup = false
        var t = 0
        while (!dup && t < count) { if (out(t) == v) dup = true; t += 1 }
        if (!dup) { out(count) = v; count += 1 }
      }
      j += 1
    }
    count
  }
}
