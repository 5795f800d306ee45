package repro.graph

import scala.collection.mutable

/** Exact top-k search by linear scan — the Pre-filtering substrate and the
  * reference against which graph methods are validated in unit tests.
  *
  * Ties are broken by ascending id everywhere in this repo so that exact and
  * approximate methods are comparable deterministically.
  */
object BruteForce {

  /** Candidate ordering: ascending (dist, id). */
  val candidateOrdering: Ordering[Candidate] =
    Ordering.by((c: Candidate) => (c.dist, c.id))

  /** Exact top-k over ids in [lo, hi] (inclusive) that satisfy `pred`.
    * Returns candidates sorted ascending by (dist, id); size <= k.
    */
  def topK(vs: VecStore, q: Array[Float], lo: Int, hi: Int, k: Int,
           pred: Int => Boolean = _ => true): Array[Candidate] = {
    // Bounded max-heap: keep the k smallest seen so far.
    val heap = new mutable.PriorityQueue[Candidate]()(candidateOrdering)
    var i = math.max(lo, 0)
    val end = math.min(hi, vs.n - 1)
    while (i <= end) {
      if (pred(i)) {
        val d = vs.dist2(i, q)
        if (heap.size < k) heap.enqueue(Candidate(i, d))
        else if (candidateOrdering.lt(Candidate(i, d), heap.head)) {
          heap.dequeue(); heap.enqueue(Candidate(i, d))
        }
      }
      i += 1
    }
    heap.dequeueAll.toArray.reverse
  }

  /** Exact top-k ids only. */
  def topKIds(vs: VecStore, q: Array[Float], lo: Int, hi: Int, k: Int,
              pred: Int => Boolean = _ => true): Array[Int] =
    topK(vs, q, lo, hi, k, pred).map(_.id)

  /** Merge several candidate lists (each sorted asc) into global top-k. */
  def mergeTopK(lists: Seq[Array[Candidate]], k: Int): Array[Candidate] = {
    val seen = mutable.HashSet.empty[Int]
    val all = mutable.ArrayBuffer.empty[Candidate]
    for (l <- lists; c <- l) if (seen.add(c.id)) all += c
    all.sorted(candidateOrdering).take(k).toArray
  }
}
