package repro.core

/** Brute-force reference implementations used only by tests.
  *
  * Everything here is O(V(q)) or worse by design: the production code is
  * validated against these on small grids.
  */
object TestRefs {

  /** All curve values of the cells of `q`, sorted ascending. */
  def sortedValues(q: Rect, curve: SpaceFillingCurve): Array[Long] = {
    val out = Rect.cells(q).map(curve.value).toArray
    java.util.Arrays.sort(out)
    out
  }

  /** Exact E_σ(q): consecutive-value pairs with both cells inside q. */
  def exactEdges(q: Rect, curve: SpaceFillingCurve): Long = {
    val vs = sortedValues(q, curve)
    var e = 0L
    var i = 1
    while (i < vs.length) {
      if (vs(i) == vs(i - 1) + 1) e += 1
      i += 1
    }
    e
  }

  /** Exact S_σ(q): maximal runs of consecutive values inside q. */
  def exactSections(q: Rect, curve: SpaceFillingCurve): Long =
    q.volume - exactEdges(q, curve)

  /** Exact rise-pattern count by enumeration over the coordinate range. */
  def exactRiseCount(s: Long, e: Long, k: Int): Long = {
    var count = 0L
    var x = s
    while (x < e) {
      // x -> x+1 is a rise of order k iff the k-1 low bits of x are all 1,
      // bit k-1 of x is 0, and the carry stops there.
      val low = x & ((1L << k) - 1)
      if (low == (1L << (k - 1)) - 1) count += 1
      x += 1
    }
    count
  }

  /** Exact drop-pattern count by enumerating prefixes `a`: pairs
    * `(a·2^k + 2^k − 1, a·2^k)` with both ends inside `[s, e]`.
    */
  def exactDropCount(s: Long, e: Long, k: Int): Long = {
    if (k == 0) return e - s + 1
    val p = 1L << k
    (0L to (e >> k)).count(a => a * p >= s && a * p + p - 1 <= e).toLong
  }
}
