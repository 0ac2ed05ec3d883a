package repro.spark

import java.nio.file.Files
import repro.SparkSpec
import repro.core._

/** Cost-model-chosen Parquet layout and min/max file skipping — the
  * repro-hint scenario: the O(1) estimator picks the SFC used to cluster
  * the table before `DataFrame.write`.
  */
class LayoutSpec extends SparkSpec {

  private val bits = 8

  private def tmpDir(name: String): String =
    Files.createTempDirectory(name).toString

  test("chooseCurve returns the argmin over candidates") {
    val qs = Workloads.squares("UNI", 40, 16, bits, 1).toSeq
    val wc = WorkloadCost(qs, 2, bits)
    val cands = Seq(BMC.zOrder(2, bits), BMC.lexicographic(2, bits, 0),
                    BMC.lexicographic(2, bits, 1))
    val (best, cost) = Layout.chooseCurve(wc, cands)
    assert(cands.forall(c => wc.cost(c) >= cost))
    assert(cost == wc.cost(best))
  }

  test("layout round-trips through Parquet with all rows intact") {
    val df = SpatialData.dataset(spark, "OSM", 4000, 2, bits)
    val path = tmpDir("layout-roundtrip")
    Layout.write(df, BMC.zOrder(2, bits), path, numFiles = 8)
    val back = spark.read.parquet(path)
    assert(back.count() == 4000)
    assert(back.columns.toSet == Set("x", "y", "xq", "yq"))
  }

  test("files are clustered: per-file curve ranges are disjoint-ish") {
    val df = SpatialData.dataset(spark, "UNI", 4000, 3, bits)
    val curve = BMC.zOrder(2, bits)
    val path = tmpDir("layout-cluster")
    Layout.write(df, curve, path, numFiles = 8)
    val stats = Layout.fileStats(spark, path).collect()
    assert(stats.length >= 2, "expected multiple output files")
    // Each file's bounding box must not cover the whole grid (clustering
    // happened); with range partitioning on the curve value, the average
    // bbox area is far below the full grid.
    val k = (1L << bits).toDouble
    val avgArea = stats.map { r =>
      (r.getLong(2) - r.getLong(1) + 1).toDouble * (r.getLong(4) - r.getLong(3) + 1)
    }.sum / stats.length
    assert(avgArea < k * k * 0.6, s"avg bbox area $avgArea of ${k * k}")
  }

  test("cost-model-chosen layout skips more files than the adversarial layout") {
    // Wide flat queries: x-extent 64, y-extent 4. The cost model should
    // choose a curve that keeps rows of equal y together, pruning files.
    val dist = "UNI"
    val df = SpatialData.dataset(spark, dist, 6000, 4, bits)
    val qs = Workloads.rectangles(dist, 60, 64, 4, bits, 5)
    val wc = WorkloadCost(qs.toSeq, 2, bits)
    val cands = (Seq(BMC.zOrder(2, bits), BMC.lexicographic(2, bits, 0),
                     BMC.lexicographic(2, bits, 1)) ++
      repro.learn.Quilts.candidates(qs.toSeq, 2, bits)).distinct
    val (best, _) = Layout.chooseCurve(wc, cands)
    val worst = cands.maxBy(wc.cost)

    val bestPath = tmpDir("layout-best")
    val worstPath = tmpDir("layout-worst")
    Layout.write(df, best, bestPath, numFiles = 16)
    Layout.write(df, worst, worstPath, numFiles = 16)
    val bestTouched = Layout.avgFilesTouched(spark, bestPath, qs)
    val worstTouched = Layout.avgFilesTouched(spark, worstPath, qs)
    assert(bestTouched <= worstTouched,
      s"chosen layout touches $bestTouched files vs $worstTouched")
  }

  test("avgFilesTouched is bounded by the file count and ≥ 1 for nonempty queries") {
    val df = SpatialData.dataset(spark, "NYC", 3000, 6, bits)
    val path = tmpDir("layout-bounds")
    Layout.write(df, new Hilbert(2, bits), path, numFiles = 8)
    val qs = Workloads.squares("NYC", 30, 32, bits, 7)
    val touched = Layout.avgFilesTouched(spark, path, qs)
    val files = Layout.fileStats(spark, path).count()
    assert(touched >= 0.0 && touched <= files.toDouble)
  }
}
