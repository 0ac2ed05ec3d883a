package repro.exp

import repro.core._
import repro.learn.BMTree

/** BMTree reward-replacement experiments (Section 6.3: Figures 11–13).
  *
  * Learns BMTrees with the original sampled-data reward (SP) and with the
  * paper's GC / LC rewards, reporting reward-calculation time and the
  * query cost (average block accesses over a held-out workload on the
  * *full* dataset) of the learned curves.
  */
object BMTreeExp {

  /** Defaults (scaled from Table 5, see DESIGN.md § 6). */
  val DefaultBits = 16
  val DefaultN = 100_000
  val DefaultQueries = 200
  val DefaultH = 6
  // The original BMTree samples 10⁵ of 10⁸ points; scaled to our N this
  // keeps the SP sample in the thousands so its cost profile is realistic.
  val DefaultRho = 0.05
  val DefaultBlock = 128
  // Queries cover (8192/65536)² ≈ 1.6% of the space — selective enough to
  // be index-friendly, large enough that block counts differentiate curves
  // (the paper's PostgreSQL runs report thousands of block reads/query).
  val DefaultEdge = 8192L

  final case class VariantRow(
      variant: String,
      rewardNanos: Long,
      learnNanos: Long,
      blockAccesses: Double)

  /** Learn with each reward variant on one configuration and evaluate. */
  def run(dist: String = "OSM",
          n: Int = DefaultN,
          nQueries: Int = DefaultQueries,
          h: Int = DefaultH,
          rho: Double = DefaultRho,
          bits: Int = DefaultBits,
          blockSize: Int = DefaultBlock,
          edge: Long = DefaultEdge,
          rewards: Seq[BMTree.Reward] = Seq(BMTree.SPReward, BMTree.GCReward, BMTree.LCReward),
          seed: Long = 21): Seq[VariantRow] = {
    val data = SpatialGen.quantizeAll(SpatialGen.points(dist, n, seed), bits)
    val learnQs = Workloads.squares(dist, nQueries, edge, bits, seed + 1)
    val testQs = Workloads.squares(dist, 2 * nQueries, edge, bits, seed + 2)
    rewards.map { rw =>
      val res = BMTree.learn(learnQs.toSeq, data, 2, bits, h, rho, rw, blockSize, seed + 3)
      val idx = ClusteredIndex.build(data, res.curve, blockSize)
      VariantRow(s"BMTree-${rw.name}", res.rewardNanos, res.totalNanos,
        idx.avgBlockAccesses(testQs.toSeq))
    }
  }

  /** Run one small learning pass per reward so the JIT compiles the hot
    * paths before any reward time is recorded (same hygiene as the
    * cost-estimation micro-benchmarks).
    */
  def warmup(): Unit = {
    run(n = 5_000, nQueries = 30, h = 3, rho = 0.1)
    ()
  }

  /** Fig. 11: vary the dataset cardinality N. */
  def varyCardinality(ns: Seq[Int] = Seq(10_000, 100_000, 1_000_000)): Seq[(Int, Seq[VariantRow])] = {
    warmup()
    ns.map(n => (n, run(n = n)))
  }

  /** Fig. 12: vary the number of learning queries n. */
  def varyQueries(qs: Seq[Int] = Seq(50, 100, 200, 400)): Seq[(Int, Seq[VariantRow])] = {
    warmup()
    qs.map(q => (q, run(nQueries = q)))
  }

  /** Fig. 13: vary the sampling rate ρ (SP only) and the depth h (all). */
  def varySamplingAndDepth(
      dist: String = "SKEW",
      rhos: Seq[Double] = Seq(0.001, 0.01, 0.1),
      hs: Seq[Int] = Seq(4, 6, 8)): (Seq[(Double, Int, VariantRow)], Seq[(Int, VariantRow)], Seq[(Int, VariantRow)]) = {
    warmup()
    val sp = for (h <- hs; rho <- rhos)
      yield (rho, h, run(dist = dist, h = h, rho = rho, rewards = Seq(BMTree.SPReward)).head)
    val gc = hs.map(h => (h, run(dist = dist, h = h, rewards = Seq(BMTree.GCReward)).head))
    val lc = hs.map(h => (h, run(dist = dist, h = h, rewards = Seq(BMTree.LCReward)).head))
    (sp, gc, lc)
  }
}
