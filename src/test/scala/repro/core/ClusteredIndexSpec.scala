package repro.core

import java.util.Random
import repro.SparkSpec

/** Block-access simulation of an SFC-clustered B⁺-tree (DESIGN.md § 4). */
class ClusteredIndexSpec extends SparkSpec {

  private def bruteForce(points: Array[Array[Long]], curve: SpaceFillingCurve,
                         b: Int, q: Rect): Long = {
    val sorted = points.zipWithIndex
      .sortBy { case (p, i) => (curve.value(p), i) }
      .map(_._1)
    sorted.zipWithIndex.collect { case (p, i) if q.contains(p) => i / b }.distinct.length
  }

  test("block accesses match an independent brute-force computation") {
    val rng = new Random(1)
    val pts = Array.fill(500)(Array(rng.nextInt(16).toLong, rng.nextInt(16).toLong))
    val curve = BMC.zOrder(2, 4)
    val idx = ClusteredIndex.build(pts, curve, 16)
    for (_ <- 1 to 30) {
      val x0 = rng.nextInt(12).toLong; val y0 = rng.nextInt(12).toLong
      val q = Rect.of2d(x0, x0 + 3, y0, y0 + 3)
      assert(idx.blockAccesses(q) == bruteForce(pts, curve, 16, q), q.show)
    }
  }

  test("a query matching nothing touches zero blocks") {
    val pts = Array(Array(0L, 0L), Array(1L, 1L))
    val idx = ClusteredIndex.build(pts, BMC.zOrder(2, 2), 4)
    assert(idx.blockAccesses(Rect.of2d(2, 3, 2, 3)) == 0)
  }

  test("a query matching everything touches ceil(N/B) blocks") {
    val rng = new Random(2)
    val pts = Array.fill(103)(Array(rng.nextInt(8).toLong, rng.nextInt(8).toLong))
    val idx = ClusteredIndex.build(pts, BMC.zOrder(2, 3), 10)
    assert(idx.blockAccesses(Rect.of2d(0, 7, 0, 7)) == 11) // ceil(103/10)
  }

  test("block size 1: accesses equal the number of matching points") {
    val pts = Array(Array(0L, 0L), Array(1L, 0L), Array(5L, 5L), Array(1L, 1L))
    val idx = ClusteredIndex.build(pts, BMC.zOrder(2, 3), 1)
    assert(idx.blockAccesses(Rect.of2d(0, 1, 0, 1)) == 3)
  }

  test("fewer sections means fewer block accesses (paper Example 3)") {
    // Points along one row; a curve storing the row contiguously beats a
    // curve that scatters it.
    val pts = (0L until 64L).map(x => Array(x, 3L)).toArray
    val rowQuery = Rect.of2d(0, 63, 3, 3)
    val contiguous = BMC.fromString("YYYYYYXXXXXX") // x varies fastest
    val scattered = BMC.fromString("XXXXXXYYYYYY") // y varies fastest
    val a = ClusteredIndex.build(pts, contiguous, 8).blockAccesses(rowQuery)
    val b = ClusteredIndex.build(pts, scattered, 8).blockAccesses(rowQuery)
    assert(a == 8) // 64 points / 8 per block, all contiguous
    assert(a <= b)
  }

  test("avgBlockAccesses averages over the workload") {
    val pts = (0L until 32L).map(x => Array(x, 0L)).toArray
    val idx = ClusteredIndex.build(pts, BMC.lexicographic(2, 5, 0), 8)
    val qs = Seq(Rect.of2d(0, 31, 0, 0), Rect.of2d(0, 7, 0, 0))
    assert(idx.avgBlockAccesses(qs) == (4 + 1) / 2.0)
  }

  test("identical coordinates are handled (duplicate curve values)") {
    val pts = Array.fill(20)(Array(3L, 3L)) ++ Array.fill(5)(Array(1L, 1L))
    val idx = ClusteredIndex.build(pts, BMC.zOrder(2, 2), 8)
    // 5 points at (1,1) occupy block 0; 20 at (3,3) span blocks 0..3.
    assert(idx.blockAccesses(Rect.of2d(1, 1, 1, 1)) == 1)
    assert(idx.blockAccesses(Rect.of2d(3, 3, 3, 3)) == 4)
  }

  test("buildWithValues matches build for precomputed values") {
    val rng = new Random(3)
    val pts = Array.fill(100)(Array(rng.nextInt(8).toLong, rng.nextInt(8).toLong))
    val curve = new Hilbert(2, 3)
    val a = ClusteredIndex.build(pts, curve, 7)
    val b = ClusteredIndex.buildWithValues(pts, pts.map(curve.value), 7)
    for (_ <- 1 to 10) {
      val x0 = rng.nextInt(6).toLong
      val q = Rect.of2d(x0, x0 + 2, 0, 7)
      assert(a.blockAccesses(q) == b.blockAccesses(q))
    }
  }

  test("invalid block sizes are rejected") {
    intercept[IllegalArgumentException](
      ClusteredIndex.build(Array(Array(0L, 0L)), BMC.zOrder(2, 1), 0))
  }

  test("dimensionality mismatches are rejected") {
    val idx = ClusteredIndex.build(Array(Array(0L, 0L)), BMC.zOrder(2, 2), 4)
    intercept[IllegalArgumentException](idx.blockAccesses(Rect(Array(0L), Array(1L))))
  }
}
