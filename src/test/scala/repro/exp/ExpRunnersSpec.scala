package repro.exp

import repro.SparkSpec
import repro.core._
import repro.learn.BMTree

/** Smoke + invariant tests for the experiment runners the benches use. */
class ExpRunnersSpec extends SparkSpec {

  test("TableFmt renders aligned tables") {
    val s = TableFmt.render("cap", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    assert(s.contains("== cap =="))
    assert(s.linesIterator.count(_.startsWith("|")) == 4)
  }

  test("TableFmt.timed measures elapsed time") {
    val (v, t) = TableFmt.timed { Thread.sleep(5); 42 }
    assert(v == 42 && t >= 5_000_000L)
  }

  test("global efficiency row: GC beats NGC at n=64") {
    val row = CostEfficiencyExp.global(n = 64, m = 20)
    assert(row.fastNanosPerEval > 0 && row.naiveNanosPerEval > 0)
    assert(row.gain > 1.0, s"expected speedup, got ${row.gain}")
  }

  test("local efficiency row: LC beats NLC at n=16") {
    val row = CostEfficiencyExp.local(n = 16, m = 20, mNaive = 1)
    assert(row.gain > 10.0, s"expected large speedup, got ${row.gain}")
  }

  test("GC evaluation time is roughly constant in n (Fig. 9a claim)") {
    val small = CostEfficiencyExp.global(n = 4, m = 30)
    val large = CostEfficiencyExp.global(n = 256, m = 30)
    // Naive grows ~64x; fast must grow far less (allow generous jitter).
    val naiveGrowth = large.naiveNanosPerEval / small.naiveNanosPerEval
    val fastGrowth = large.fastNanosPerEval / math.max(1.0, small.fastNanosPerEval)
    assert(naiveGrowth > 8.0, s"naive growth $naiveGrowth")
    assert(fastGrowth < naiveGrowth / 2, s"fast growth $fastGrowth vs naive $naiveGrowth")
  }

  test("BMTreeExp.run produces all three variants with sane metrics") {
    val rows = BMTreeExp.run(dist = "UNI", n = 5000, nQueries = 20, h = 3,
      rho = 0.05, bits = 8, blockSize = 32, edge = 32)
    assert(rows.map(_.variant) == Seq("BMTree-SP", "BMTree-GC", "BMTree-LC"))
    assert(rows.forall(_.blockAccesses >= 0))
    assert(rows.forall(r => r.rewardNanos <= r.learnNanos))
  }

  test("QueryExp.competitors returns the six paper competitors") {
    val bits = 8
    val data = SpatialGen.quantizeAll(SpatialGen.points("UNI", 3000, 1), bits)
    val qs = Workloads.squares("UNI", 20, 16, bits, 2)
    val curves = QueryExp.competitors("UNI", data, qs, bits, h = 3, rho = 0.05)
    assert(curves.map(_.name) == Seq("LBMC", "BMTree", "QUILTS", "ZC", "HC", "LC"))
    // All curves are evaluable.
    val rows = QueryExp.evaluate(data, curves, qs, blockSize = 32)
    assert(rows.forall(_._2 > 0))
  }

  test("SP reward dominates GC/LC reward time on large samples (Fig. 11 shape)") {
    val rows = BMTreeExp.run(dist = "OSM", n = 50000, nQueries = 40, h = 4,
      rho = 0.2, bits = 10, blockSize = 64, edge = 64)
    val byName = rows.map(r => r.variant -> r.rewardNanos).toMap
    assert(byName("BMTree-SP") > byName("BMTree-GC"), byName.toString)
    assert(byName("BMTree-SP") > byName("BMTree-LC"), byName.toString)
  }

  test("Table 6 rows: naive time grows with n") {
    val rows = CostEfficiencyExp.table6(maxExp = 6)
    val ngc = rows.map(_._2.naiveNanosPerEval)
    // n grows 32× across the sweep; NGC is O(n) so the largest point must
    // clearly dominate the cheapest one (JIT jitter tolerated via min).
    assert(ngc.last > ngc.min * 4, s"NGC: $ngc")
  }

  test("BMTree reward abstraction: rewards order candidate dims") {
    // Full-height thin columns: putting an x bit on top keeps the y span
    // low in the merged value, so the global cost must prefer the x split.
    val bits = 4
    val qs = (0 until 16 by 2).map(x => Rect.of2d(x, x, 0, 15))
    val ctx = BMTree.NodeCtx(Array(bits, bits), qs, Array.empty, 16)
    val eval = BMTree.GCReward.forNode(ctx)
    val belowX = Array(bits - 1, bits)
    val sigX = BMC(PiecewiseBMC.interleave(belowX).dims.toSeq :+ 0, 2)
    val belowY = Array(bits, bits - 1)
    val sigY = BMC(PiecewiseBMC.interleave(belowY).dims.toSeq :+ 1, 2)
    assert(eval(sigX) < eval(sigY), s"x-split ${eval(sigX)} vs y-split ${eval(sigY)}")
  }
}
