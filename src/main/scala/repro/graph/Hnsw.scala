package repro.graph

import java.util.SplittableRandom
import scala.collection.mutable

/** Hierarchical Navigable Small World graph (Malkov & Yashunin) — the
  * substrate for the Milvus-like, SuperPostfiltering, Post-/In-filtering and
  * Oracle-HNSW baselines, and the reference index whose build cost Table 3
  * compares against (Theorem 3.1's "HNSW on the set of all objects").
  *
  * Faithful to hnswlib: geometric level sampling with mL = 1/ln(M), RNG
  * heuristic neighbor selection (the updated hnswlib pruning rule the paper
  * cites), bidirectional links with overflow pruning, maxM0 = 2M at the base
  * layer, greedy descent from the top level. Deterministic given (seed,
  * insertion order); ties broken by (dist, id).
  *
  * Operates over ids [lo, hi] (inclusive) of a [[VecStore]] so callers can
  * index attribute-contiguous slices without copying vectors.
  */
final class Hnsw private (
    val vs: VecStore,
    val lo: Int,
    val hi: Int,
    val m: Int,
    val efConstruction: Int,
    seed: Long,
) {
  private val maxM0 = 2 * m
  private val mL = 1.0 / math.log(m.toDouble)
  private val rnd = new SplittableRandom(seed)

  // adjacency(level) maps global id -> neighbor buffer; level 0 holds all nodes.
  private val adjacency = mutable.ArrayBuffer.empty[mutable.HashMap[Int, mutable.ArrayBuffer[Int]]]
  private var entryPoint: Int = -1
  private var entryLevel: Int = -1

  def size: Int = hi - lo + 1
  def maxLevel: Int = entryLevel
  def entry: Int = entryPoint

  private def levels(u: Int): Int = {
    var l = 0
    while (l < adjacency.length && adjacency(l).contains(u)) l += 1
    l - 1
  }

  private def neighborsAt(level: Int, u: Int): mutable.ArrayBuffer[Int] =
    adjacency(level)(u)

  /** Beam search restricted to one level of the partially built graph. */
  private def searchLevel(q: Array[Float], entriesIn: Seq[Int], ef: Int, level: Int): Array[Candidate] = {
    val adj = adjacency(level)
    BeamSearch.search(
      q, (i: Int) => vs.dist2(i, q), entriesIn, ef, ef,
      neighbors = (u: Int) => {
        val b = adj(u)
        val out = new Array[Int](b.length)
        var i = 0; while (i < b.length) { out(i) = b(i); i += 1 }
        out
      },
    )
  }

  private def selectNeighbors(u: Int, cands: Array[Candidate], cap: Int): Array[Candidate] =
    RngPrune.prune(cands.filter(_.id != u), (a, b) => vs.dist2(a, b), cap)

  private def insert(u: Int): Unit = {
    val lvl = math.min((-math.log(rnd.nextDouble()) * mL).toInt, 32)
    while (adjacency.length <= lvl) adjacency += mutable.HashMap.empty
    for (l <- 0 to lvl) adjacency(l)(u) = mutable.ArrayBuffer.empty[Int]

    if (entryPoint < 0) { entryPoint = u; entryLevel = lvl; return }

    val q = vs.vector(u)
    var ep = entryPoint
    // Greedy descent through levels above lvl.
    var l = entryLevel
    while (l > lvl) {
      val res = searchLevel(q, Seq(ep), 1, l)
      if (res.nonEmpty) ep = res(0).id
      l -= 1
    }
    // Insert at each level from min(lvl, entryLevel) down to 0.
    l = math.min(lvl, entryLevel)
    var eps: Seq[Int] = Seq(ep)
    while (l >= 0) {
      val cands = searchLevel(q, eps, efConstruction, l)
      val sel = selectNeighbors(u, cands, m)
      val buf = neighborsAt(l, u)
      sel.foreach(c => buf += c.id)
      // Bidirectional links with overflow pruning.
      val cap = if (l == 0) maxM0 else m
      for (c <- sel) {
        val nb = neighborsAt(l, c.id)
        nb += u
        if (nb.length > cap) {
          val scored = nb.toArray.map(x => Candidate(x, vs.dist2(c.id, x)))
          val kept = selectNeighbors(c.id, scored, cap)
          nb.clear()
          kept.foreach(k => nb += k.id)
        }
      }
      eps = cands.map(_.id).toSeq
      l -= 1
    }
    if (lvl > entryLevel) { entryPoint = u; entryLevel = lvl }
  }

  /** ANN search. `visit`/`admit` plug in the range-filtering strategies. */
  def search(
      q: Array[Float],
      k: Int,
      ef: Int,
      visit: Int => Boolean = _ => true,
      admit: Int => Boolean = _ => true,
      stats: SearchStats = null,
  ): Array[Candidate] = {
    if (entryPoint < 0) return Array.empty
    var ep = entryPoint
    var l = entryLevel
    while (l > 0) {
      val res = searchLevel(q, Seq(ep), 1, l)
      if (res.nonEmpty) ep = res(0).id
      l -= 1
    }
    val adj = adjacency(0)
    BeamSearch.search(
      q, (i: Int) => vs.dist2(i, q), Seq(ep), math.max(ef, k), k,
      neighbors = (u: Int) => {
        val b = adj(u)
        val out = new Array[Int](b.length)
        var i = 0; while (i < b.length) { out(i) = b(i); i += 1 }
        out
      },
      visit = visit, admit = admit, stats = stats,
    )
  }

  /** Base-layer-only search from caller-chosen entry points — used by the
    * In-filtering strategy, whose entry must itself be in-range (the greedy
    * descent from the top level would land on an arbitrary, likely
    * out-of-range node that `visit` would reject).
    */
  def searchBase(
      q: Array[Float],
      entries: Seq[Int],
      k: Int,
      ef: Int,
      visit: Int => Boolean = _ => true,
      admit: Int => Boolean = _ => true,
      stats: SearchStats = null,
  ): Array[Candidate] = {
    val adj = adjacency(0)
    BeamSearch.search(
      q, (i: Int) => vs.dist2(i, q), entries, math.max(ef, k), k,
      neighbors = (u: Int) => {
        val b = adj(u)
        val out = new Array[Int](b.length)
        var i = 0; while (i < b.length) { out(i) = b(i); i += 1 }
        out
      },
      visit = visit, admit = admit, stats = stats,
    )
  }

  /** Total directed edges across all levels. */
  def edgeCount: Long =
    adjacency.iterator.map(_.valuesIterator.map(_.length.toLong).sum).sum

  /** Index bytes: 4 bytes per stored neighbor id (as the paper accounts). */
  def sizeBytes: Long = edgeCount * 4L

  /** Base-layer degree of u (tests assert the maxM0 cap). */
  def degree0(u: Int): Int = adjacency(0)(u).length

  def baseNeighbors(u: Int): Array[Int] = adjacency(0)(u).toArray
}

object Hnsw {

  /** Build over ids [lo, hi] of `vs`, inserting in ascending id order. */
  def build(vs: VecStore, lo: Int, hi: Int, m: Int, efConstruction: Int,
            seed: Long = 42L): Hnsw = {
    require(lo <= hi, s"empty range [$lo,$hi]")
    val h = new Hnsw(vs, lo, hi, m, efConstruction, seed)
    var i = lo
    while (i <= hi) { h.insert(i); i += 1 }
    h
  }

  /** Build over the whole store. */
  def buildAll(vs: VecStore, m: Int, efConstruction: Int, seed: Long = 42L): Hnsw =
    build(vs, 0, vs.n - 1, m, efConstruction, seed)
}
