package repro.baselines

import java.util.SplittableRandom
import repro.graph.{BruteForce, Candidate, IncrementalGraph, SearchStats, VecStore}

/** Filtered-DiskANN adapted to range filtering exactly as the paper (and
  * SeRF before it) does: the full rank range [0, n) is divided into
  * `buckets` consecutive buckets, each assigned a label; a query's labels
  * are the buckets that overlap its range. Both variants search with the
  * filtered greedy convention — traversal restricted to nodes whose label is
  * a query label, entered from one medoid per query label, admission
  * restricted to the true range. Because a bucket is usually much longer
  * than a small range, small/mixed fractions drown in out-of-range
  * same-label objects — the failure the paper reports.
  */
object FilteredDiskann {

  def bucketOf(n: Int, buckets: Int, i: Int): Int =
    math.min(buckets - 1, (i.toLong * buckets / n).toInt)

  def bucketBounds(n: Int, buckets: Int): Array[(Int, Int)] =
    Array.tabulate(buckets) { b =>
      val lo = (n.toLong * b / buckets).toInt
      val hi = (n.toLong * (b + 1) / buckets).toInt - 1
      (lo, hi)
    }
}

/** FilteredVamana: one α-robust Vamana graph over the whole dataset (random
  * insertion order), searched with the label filter.
  */
final class FilteredVamana(
    val vs: VecStore,
    val buckets: Int,
    m: Int,
    efConstruction: Int,
    alpha: Float,
    seed: Long,
) {
  private val order: Seq[Int] = {
    val rnd = new SplittableRandom(seed)
    val a = Array.tabulate(vs.n)(identity)
    var i = a.length - 1
    while (i > 0) { val j = rnd.nextInt(i + 1); val t = a(i); a(i) = a(j); a(j) = t; i -= 1 }
    a.toSeq
  }
  val graph: IncrementalGraph = IncrementalGraph.build(vs, order, m, efConstruction, alpha)
  private val bounds = FilteredDiskann.bucketBounds(vs.n, buckets)

  def search(q: Array[Float], L: Int, R: Int, k: Int, beam: Int,
             stats: SearchStats = null): Array[Candidate] = {
    val bLo = FilteredDiskann.bucketOf(vs.n, buckets, L)
    val bHi = FilteredDiskann.bucketOf(vs.n, buckets, R)
    val entries = (bLo to bHi).map { b => val (lo, hi) = bounds(b); lo + (hi - lo) / 2 }
    val vLo = bounds(bLo)._1
    val vHi = bounds(bHi)._2
    graph.search(q, entries, k, beam,
      visit = i => i >= vLo && i <= vHi,
      admit = i => i >= L && i <= R,
      stats = stats)
  }

  def sizeBytes: Long = graph.sizeBytes
}

object FilteredVamana {
  def build(vs: VecStore, buckets: Int, m: Int, efConstruction: Int,
            alpha: Float = 1.2f, seed: Long = 19L): FilteredVamana =
    new FilteredVamana(vs, buckets, m, efConstruction, alpha, seed)
}

/** StitchedVamana: an independent Vamana graph per bucket, stitched into one
  * index (single-label points make the stitched graph block-diagonal; the
  * filtered search walks each overlapped bucket from its own entry).
  */
final class StitchedVamana(
    val vs: VecStore,
    val buckets: Int,
    m: Int,
    efConstruction: Int,
    alpha: Float,
    seed: Long,
) {
  private val bounds = FilteredDiskann.bucketBounds(vs.n, buckets)
  val graphs: Array[IncrementalGraph] = bounds.zipWithIndex.map { case ((lo, hi), b) =>
    val rnd = new SplittableRandom(seed + b)
    val a = (lo to hi).toArray
    var i = a.length - 1
    while (i > 0) { val j = rnd.nextInt(i + 1); val t = a(i); a(i) = a(j); a(j) = t; i -= 1 }
    IncrementalGraph.build(vs, a.toSeq, m, efConstruction, alpha)
  }

  def search(q: Array[Float], L: Int, R: Int, k: Int, beam: Int,
             stats: SearchStats = null): Array[Candidate] = {
    val bLo = FilteredDiskann.bucketOf(vs.n, buckets, L)
    val bHi = FilteredDiskann.bucketOf(vs.n, buckets, R)
    val lists = (bLo to bHi).map { b =>
      val (lo, hi) = bounds(b)
      graphs(b).search(q, Seq(lo + (hi - lo) / 2), k, beam,
        admit = i => i >= L && i <= R, stats = stats)
    }
    BruteForce.mergeTopK(lists, k)
  }

  def sizeBytes: Long = graphs.map(_.sizeBytes).sum
}

object StitchedVamana {
  def build(vs: VecStore, buckets: Int, m: Int, efConstruction: Int,
            alpha: Float = 1.2f, seed: Long = 23L): StitchedVamana =
    new StitchedVamana(vs, buckets, m, efConstruction, alpha, seed)
}
