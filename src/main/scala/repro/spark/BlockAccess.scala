package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{Rect, SpaceFillingCurve}

/** DataFrame pipeline measuring block accesses of range queries over an
  * SFC-clustered table — the Spark counterpart of
  * [[repro.core.ClusteredIndex]] (the two are asserted equal in tests).
  *
  * Pipeline: curve value per point (UDF) → global sort → dense global rank
  * → block id (`rank / B`) → per-query distinct-block count. The global
  * rank is assigned with `zipWithIndex` on the sorted distributed rows:
  * unlike a `row_number()` window (which funnels every row through one
  * partition) it preserves Spark's range-partitioned sort, so the pipeline
  * scales with the data.
  */
object BlockAccess {

  /** Per-query block-access counts.
    *
    * @param points  DataFrame with quantized cell columns `xq`, `yq`
    * @param curve   the SFC ordering the table
    * @param blockSize points per block (B)
    * @param queries the workload; query id = position in this array
    * @return DataFrame (qid: Int, blocks: Long), one row per query with ≥ 1 access
    */
  def perQuery(spark: SparkSession, points: DataFrame, curve: SpaceFillingCurve,
               blockSize: Int, queries: Array[Rect]): DataFrame = {
    import spark.implicits._
    require(queries.forall(_.d == 2), "2-D queries expected")
    val sorted = CurveUdfs.withCurveValue(points.select("xq", "yq"), curve)
      .orderBy("sfc")
      .select($"xq".cast("long"), $"yq".cast("long"))
      .as[(Long, Long)]
    val ranked = sorted.rdd.zipWithIndex().map { case ((x, y), rank) =>
      (x, y, rank / blockSize)
    }.toDF("xq", "yq", "block")

    // The workload is small (≤ a few thousand rects); ship it in the
    // closure and match each point against it with a per-partition index.
    val qlo = queries.map(q => (q.lo(0), q.lo(1)))
    val qhi = queries.map(q => (q.hi(0), q.hi(1)))
    val hits = ranked.as[(Long, Long, Long)].mapPartitions { it =>
      it.flatMap { case (x, y, block) =>
        // Queries are few; a linear scan per point is the simple, exact
        // match (the bench-scale bottleneck is the sort, not this scan).
        (0 until qlo.length).iterator.collect {
          case i if x >= qlo(i)._1 && x <= qhi(i)._1 &&
                    y >= qlo(i)._2 && y <= qhi(i)._2 => (i, block)
        }
      }
    }.toDF("qid", "block")

    hits.distinct().groupBy("qid").agg(count(lit(1)) as "blocks")
  }

  /** Mean block accesses over the workload (queries matching no point
    * count zero accesses, as in the driver-side simulator).
    */
  def average(spark: SparkSession, points: DataFrame, curve: SpaceFillingCurve,
              blockSize: Int, queries: Array[Rect]): Double = {
    val total = perQuery(spark, points, curve, blockSize, queries)
      .agg(coalesce(sum("blocks"), lit(0L))).collect()(0).getLong(0)
    total.toDouble / queries.length
  }
}
