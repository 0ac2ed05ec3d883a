package repro.exp

import repro.core._
import repro.learn.{BMTree, LBMC, LBMCConfig, Quilts}

/** Query-efficiency and learning-time experiments (Section 6.4:
  * Figures 14–17 and Table 7).
  *
  * Compares the curves learned/constructed by LBMC, BMTree (SP reward,
  * like the released code the paper uses), QUILTS, ZC, HC, and LC by the
  * average number of block accesses on the full dataset — the paper's
  * PostgreSQL metric, simulated by [[repro.core.ClusteredIndex]].
  */
object QueryExp {

  val DefaultBits = 16
  val DefaultN = 100_000
  val LearnQueries = 200
  val TestQueries = 400
  val DefaultBlock = 128
  // ≈1.6% of the space per query; see BMTreeExp.DefaultEdge.
  val DefaultEdge = 8192L
  val DefaultH = 6
  val DefaultRho = 0.02

  final case class CurveRow(name: String, curve: SpaceFillingCurve, learnNanos: Long)

  /** Build all six competitors for one dataset + learning workload. */
  def competitors(dist: String,
                  data: Array[Array[Long]],
                  learnQs: Array[Rect],
                  bits: Int = DefaultBits,
                  h: Int = DefaultH,
                  rho: Double = DefaultRho,
                  blockSize: Int = DefaultBlock,
                  seed: Long = 31,
                  lbmcCfg: LBMCConfig = LBMCConfig()): Seq[CurveRow] = {
    val (wc, wcNanos) = TableFmt.timed(WorkloadCost(learnQs.toSeq, 2, bits))

    val lbmcRes = new LBMC(wc, lbmcCfg).learn(BMC.zOrder(2, bits))
    val lbmc = CurveRow("LBMC", lbmcRes.best, wcNanos + lbmcRes.totalNanos)

    val bmRes = BMTree.learn(learnQs.toSeq, data, 2, bits, h, rho, BMTree.SPReward, blockSize, seed)
    val bmtree = CurveRow("BMTree", bmRes.curve, bmRes.totalNanos)

    val ((quiltsCurve, _), quiltsNanos) = TableFmt.timed(Quilts.design(wc, bits))
    val quilts = CurveRow("QUILTS", quiltsCurve, wcNanos + quiltsNanos)

    Seq(
      lbmc, bmtree, quilts,
      CurveRow("ZC", BMC.zOrder(2, bits), 0L),
      CurveRow("HC", new Hilbert(2, bits), 0L),
      CurveRow("LC", BMC.lexicographic(2, bits, 0), 0L),
    )
  }

  /** Average block accesses of each curve over the test workload. */
  def evaluate(data: Array[Array[Long]], curves: Seq[CurveRow], testQs: Array[Rect],
               blockSize: Int = DefaultBlock): Seq[(String, Double)] =
    curves.map { c =>
      val idx = ClusteredIndex.build(data, c.curve, blockSize)
      (c.name, idx.avgBlockAccesses(testQs.toSeq))
    }

  /** Fig. 14: all curves on all four datasets. */
  def overall(n: Int = DefaultN, bits: Int = DefaultBits, edge: Long = DefaultEdge,
              seed: Long = 41): Seq[(String, Seq[(String, Double)])] =
    SpatialGen.Distributions.map { dist =>
      val data = SpatialGen.quantizeAll(SpatialGen.points(dist, n, seed), bits)
      val learnQs = Workloads.squares(dist, LearnQueries, edge, bits, seed + 1)
      val testQs = Workloads.squares(dist, TestQueries, edge, bits, seed + 2)
      val curves = competitors(dist, data, learnQs, bits)
      (dist, evaluate(data, curves, testQs))
    }

  /** Fig. 15 + Table 7: vary the dataset cardinality (OSM-like data).
    * Returns per N: (learning time per learned curve, block accesses per
    * curve).
    */
  def varyCardinality(ns: Seq[Int] = Seq(10_000, 100_000, 1_000_000),
                      bits: Int = DefaultBits, edge: Long = DefaultEdge,
                      seed: Long = 51): Seq[(Int, Seq[CurveRow], Seq[(String, Double)])] =
    ns.map { n =>
      val data = SpatialGen.quantizeAll(SpatialGen.points("OSM", n, seed), bits)
      val learnQs = Workloads.squares("OSM", LearnQueries, edge, bits, seed + 1)
      val testQs = Workloads.squares("OSM", TestQueries, edge, bits, seed + 2)
      val curves = competitors("OSM", data, learnQs, bits)
      (n, curves, evaluate(data, curves, testQs))
    }

  /** Fig. 16: vary the query aspect ratio at fixed area (OSM-like). */
  def varyAspectRatio(ratios: Seq[Double] = Seq(16.0, 4.0, 1.0, 0.25, 0.0625),
                      n: Int = DefaultN, bits: Int = DefaultBits, edge: Long = DefaultEdge,
                      seed: Long = 61): Seq[(String, Seq[(String, Double)])] = {
    val data = SpatialGen.quantizeAll(SpatialGen.points("OSM", n, seed), bits)
    ratios.map { r =>
      val learnQs = Workloads.withAspectRatio("OSM", LearnQueries, edge, r, bits, seed + 1)
      val testQs = Workloads.withAspectRatio("OSM", TestQueries, edge, r, bits, seed + 2)
      val curves = competitors("OSM", data, learnQs, bits)
      val label = if (r >= 1) s"${r.toInt}:1" else s"1:${(1 / r).toInt}"
      (label, evaluate(data, curves, testQs))
    }
  }

  /** Fig. 17: vary the query edge length (OSM-like). */
  def varyEdge(edges: Seq[Long] = Seq(2048, 4096, 8192, 16384),
               n: Int = DefaultN, bits: Int = DefaultBits,
               seed: Long = 71): Seq[(Long, Seq[(String, Double)])] = {
    val data = SpatialGen.quantizeAll(SpatialGen.points("OSM", n, seed), bits)
    edges.map { e =>
      val learnQs = Workloads.squares("OSM", LearnQueries, e, bits, seed + 1)
      val testQs = Workloads.squares("OSM", TestQueries, e, bits, seed + 2)
      val curves = competitors("OSM", data, learnQs, bits)
      (e, evaluate(data, curves, testQs))
    }
  }
}
