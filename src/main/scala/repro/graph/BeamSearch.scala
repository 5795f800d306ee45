package repro.graph

import scala.collection.mutable

/** A scored search result: object id + squared distance to the query. */
final case class Candidate(id: Int, dist: Float)

/** Mutable per-query counters — the paper's auxiliary metric "number of
  * distance computations" plus edge-selection work, used by tests and benches.
  */
final class SearchStats {
  var distComputations: Long = 0L
  var nodesExpanded: Long = 0L
  var edgesScanned: Long = 0L
  def reset(): Unit = { distComputations = 0; nodesExpanded = 0; edgesScanned = 0 }
}

/** Greedy beam search (Section 2.1) over an arbitrary adjacency function.
  *
  * This single kernel powers every graph method in the repo; methods differ
  * only in `neighbors` (which graph / which on-the-fly edge selection),
  * `visit` (may this node be *traversed*, i.e., entered into the beam —
  * In-filtering restricts this) and `admit` (may this node appear in the
  * *result* — Post-filtering restricts this).
  *
  * The `neighbors` function returns the adjacency of the expanded node; a
  * negative id terminates the list early, which lets callers reuse a padded
  * scratch buffer across expansions (the on-the-fly edge selection does).
  *
  * Termination follows the standard filtered-search convention: the beam is
  * the set of best *visited* nodes; the search stops when the nearest
  * unexpanded candidate is farther than the beam's worst member and the beam
  * is full. Results are the admitted nodes seen, best-first, top-k.
  */
object BeamSearch {

  def search(
      q: Array[Float],
      dist: Int => Float,
      entries: Seq[Int],
      beam: Int,
      k: Int,
      neighbors: Int => Array[Int],
      visit: Int => Boolean = _ => true,
      admit: Int => Boolean = _ => true,
      stats: SearchStats = null,
  ): Array[Candidate] = {
    val ord = BruteForce.candidateOrdering
    // Min-heap of unexpanded candidates.
    val frontier = new mutable.PriorityQueue[Candidate]()(ord.reverse)
    // Max-heap of the best `beam` visited nodes.
    val beamHeap = new mutable.PriorityQueue[Candidate]()(ord)
    // Admitted nodes, accumulated; pruned to top-k at the end.
    val admitted = new mutable.PriorityQueue[Candidate]()(ord)
    val visited = mutable.HashSet.empty[Int]

    def offer(id: Int): Unit = {
      if (visited.add(id)) {
        val d = dist(id)
        if (stats != null) stats.distComputations += 1
        val c = Candidate(id, d)
        if (beamHeap.size < beam || ord.lt(c, beamHeap.head)) {
          frontier.enqueue(c)
          beamHeap.enqueue(c)
          if (beamHeap.size > beam) beamHeap.dequeue()
        }
        if (admit(id)) {
          admitted.enqueue(c)
          if (admitted.size > math.max(k, beam)) admitted.dequeue()
        }
      }
    }

    entries.foreach { e => if (visit(e)) offer(e) }

    var done = false
    while (!done && frontier.nonEmpty) {
      val cur = frontier.dequeue()
      // Stop when the best unexpanded node can no longer improve the beam.
      if (beamHeap.size >= beam && ord.gt(cur, beamHeap.head)) done = true
      else {
        if (stats != null) stats.nodesExpanded += 1
        val nbrs = neighbors(cur.id)
        var j = 0
        while (j < nbrs.length && nbrs(j) >= 0) {
          val v = nbrs(j)
          if (stats != null) stats.edgesScanned += 1
          if (!visited.contains(v) && visit(v)) offer(v)
          j += 1
        }
      }
    }
    admitted.dequeueAll.toArray.reverse.take(k)
  }
}
