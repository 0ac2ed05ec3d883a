package repro.core

/** Global cost of range queries under a BMC (Section 4.1).
  *
  * The global cost of a query is the curve-value span between its corner
  * cells, `F_σ(p_e) − F_σ(p_s) + 1` (Definition 2, Eq. 5). Costs are exact
  * `BigInt`s: with many queries and large bit budgets the sum exceeds a
  * `Long`.
  */
object GlobalCost {

  /** NGC: the naive baseline — Eq. 5 evaluated per query, `O(n·d·ℓ)` per
    * candidate BMC.
    */
  def naive(queries: Seq[Rect], bmc: BMC): BigInt = {
    var total = BigInt(0)
    for (q <- queries) {
      var span = BigInt(0)
      var j = 0
      while (j < bmc.d) {
        var k = 0
        val lj = bmc.bitsPerDim(j)
        while (k < lj) {
          val diff = ((q.hi(j) >>> k) & 1L) - ((q.lo(j) >>> k) & 1L)
          if (diff != 0) span += BigInt(diff) << bmc.ranks(j)(k)
          k += 1
        }
        j += 1
      }
      total += span + 1
    }
    total
  }

  /** GC: the closed-form estimator (Eq. 6).
    *
    * Construction performs the O(n) initialization scan (IGC) computing the
    * BMC-independent table `A[j][k] = Σ_q (bit_k(hi_j) − bit_k(lo_j))`;
    * [[cost]] then evaluates any BMC in `O(d·ℓ)` time.
    *
    * @param queries     the workload Q
    * @param d           dimensionality
    * @param bitsPerDim  ℓ_j for each dimension (uniform ℓ in the paper)
    */
  final class Estimator(queries: Seq[Rect], val d: Int, val bitsPerDim: Array[Int]) {
    require(queries.nonEmpty, "empty workload")

    /** Number of queries n (the `+ n` term of Eq. 6). */
    val n: Int = queries.size

    /** A_j^k of Eq. 6, computed once during the initialization scan. */
    val A: Array[Array[Long]] = {
      val a = Array.tabulate(d)(j => new Array[Long](bitsPerDim(j)))
      for (q <- queries) {
        require(q.d == d, s"query dim ${q.d} != $d")
        var j = 0
        while (j < d) {
          var k = 0
          while (k < bitsPerDim(j)) {
            a(j)(k) += ((q.hi(j) >>> k) & 1L) - ((q.lo(j) >>> k) & 1L)
            k += 1
          }
          j += 1
        }
      }
      a
    }

    /** Total global cost of the workload under `bmc` — `O(d·ℓ)` = O(1). */
    def cost(bmc: BMC): BigInt = {
      require(bmc.d == d && java.util.Arrays.equals(bmc.bitsPerDim, bitsPerDim),
        "BMC shape does not match the estimator's (d, ℓ)")
      var total = BigInt(n)
      var j = 0
      while (j < d) {
        var k = 0
        while (k < bitsPerDim(j)) {
          val a = A(j)(k)
          if (a != 0) total += BigInt(a) << bmc.ranks(j)(k)
          k += 1
        }
        j += 1
      }
      total
    }
  }

  object Estimator {
    /** Uniform-ℓ convenience constructor. */
    def apply(queries: Seq[Rect], d: Int, bits: Int): Estimator =
      new Estimator(queries, d, Array.fill(d)(bits))
  }
}
