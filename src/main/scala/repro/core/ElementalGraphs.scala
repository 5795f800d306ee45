package repro.core

/** Storage for all elemental graphs of the segment tree (Section 3.2).
  *
  * `layers(lay)` is a flat adjacency array of length n*m: the neighbors of
  * rank u in its layer-`lay` elemental graph live at `[u*m, (u+1)*m)`,
  * sorted ascending by (distance to u, id), padded with -1. Because each
  * rank belongs to exactly one segment per layer, a single flat array per
  * layer stores every segment's graph of that layer — the O(n m log n)
  * space bound is explicit in this layout.
  */
final class ElementalGraphs(
    val n: Int,
    val m: Int,
    val layers: Array[Array[Int]],
) extends Serializable {
  require(layers.forall(_.length == n * m), "each layer must be a flat n*m array")

  def numLayers: Int = layers.length

  /** Degree of u at layer `lay`. */
  def degree(lay: Int, u: Int): Int = {
    val a = layers(lay)
    val base = u * m
    var d = 0
    while (d < m && a(base + d) >= 0) d += 1
    d
  }

  /** Neighbors of u at layer `lay` as a fresh exact-size array (tests). */
  def neighbors(lay: Int, u: Int): Array[Int] = {
    val a = layers(lay)
    val base = u * m
    val d = degree(lay, u)
    val out = new Array[Int](d)
    var i = 0
    while (i < d) { out(i) = a(base + i); i += 1 }
    out
  }

  /** Total stored directed edges. */
  def edgeCount: Long = {
    var s = 0L
    var lay = 0
    while (lay < layers.length) {
      val a = layers(lay)
      var i = 0
      while (i < a.length) { if (a(i) >= 0) s += 1; i += 1 }
      lay += 1
    }
    s
  }

  /** Index bytes: 4 per stored neighbor id (paper-style accounting). */
  def sizeBytes: Long = edgeCount * 4L
}
