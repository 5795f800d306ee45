package repro.data

/** The value→rank mapping of Section 2.2: given the ascending attribute
  * values of the (sorted) dataset, a raw query range [lo, hi] maps by binary
  * search to the rank range [L, R] of in-range objects. Duplicate values are
  * handled exactly as the paper prescribes — all objects sharing a value
  * fall inside [L, R] together, so query semantics are unaffected by ties.
  */
final class AttributeIndex(val values: Array[Double]) {
  require(values.length > 0)
  require(isSorted, "attribute values must be ascending")

  private def isSorted: Boolean = {
    var i = 1
    while (i < values.length) { if (values(i - 1) > values(i)) return false; i += 1 }
    true
  }

  /** First rank with value >= x (lower bound), in [0, n]. */
  def lowerBound(x: Double): Int = {
    var lo = 0; var hi = values.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (values(mid) < x) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** First rank with value > x (upper bound), in [0, n]. */
  def upperBound(x: Double): Int = {
    var lo = 0; var hi = values.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (values(mid) <= x) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** Rank range [L, R] (inclusive) of objects with value in [lo, hi];
    * None when no object qualifies.
    */
  def rankRange(lo: Double, hi: Double): Option[(Int, Int)] = {
    val l = lowerBound(lo)
    val r = upperBound(hi) - 1
    if (l <= r) Some((l, r)) else None
  }

  /** Number of distinct values (the attribute cardinality c of Section 3.4). */
  def cardinality: Int = {
    var c = 1; var i = 1
    while (i < values.length) { if (values(i) != values(i - 1)) c += 1; i += 1 }
    c
  }
}
