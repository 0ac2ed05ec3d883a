package repro.core

import java.util.Random

/** Deterministic synthetic spatial datasets in `[0,1)^2`.
  *
  * Substitutes for the paper's datasets (DESIGN.md § 4):
  *  - UNI:  uniform (matches the paper's UNI),
  *  - SKEW: power-law concentration toward the origin (paper's SKEW),
  *  - OSM-like: Gaussian mixture of "cities" with heavy-tailed weights,
  *  - NYC-like: a dominant elongated anisotropic cluster (Manhattan-ish)
  *    plus secondary clusters and uniform noise.
  *
  * Generators are pure functions of (n, seed) so the driver-side learner
  * and the Spark DataFrames see identical data.
  */
object SpatialGen {

  /** Supported distribution names, as used in bench output. */
  val Distributions: Seq[String] = Seq("UNI", "SKEW", "OSM", "NYC")

  /** Generate `n` points of the named distribution. */
  def points(dist: String, n: Int, seed: Long): Array[Array[Double]] = dist match {
    case "UNI"  => uniform(n, seed)
    case "SKEW" => skew(n, seed)
    case "OSM"  => osmLike(n, seed)
    case "NYC"  => nycLike(n, seed)
    case other  => throw new IllegalArgumentException(s"unknown distribution: $other")
  }

  def uniform(n: Int, seed: Long): Array[Array[Double]] = {
    val rng = new Random(seed)
    Array.fill(n)(Array(rng.nextDouble(), rng.nextDouble()))
  }

  /** Power-law transform: mass concentrates toward (0, 0). */
  def skew(n: Int, seed: Long): Array[Array[Double]] = {
    val rng = new Random(seed)
    Array.fill(n)(Array(math.pow(rng.nextDouble(), 4), math.pow(rng.nextDouble(), 4)))
  }

  /** Gaussian-mixture "cities": 64 clusters with Zipf-ish weights. */
  def osmLike(n: Int, seed: Long): Array[Array[Double]] = {
    val rng = new Random(seed)
    val k = 64
    val centers = Array.fill(k)(Array(rng.nextDouble(), rng.nextDouble()))
    val sigmas = Array.fill(k)(0.004 + 0.03 * rng.nextDouble())
    // Zipf weights over cluster ranks → a few dominant metro areas.
    val w = Array.tabulate(k)(i => 1.0 / math.pow(i + 1, 1.1))
    val cum = w.scanLeft(0.0)(_ + _).tail.map(_ / w.sum)
    Array.fill(n) {
      val u = rng.nextDouble()
      var c = java.util.Arrays.binarySearch(cum, u)
      if (c < 0) c = -c - 1
      if (c >= k) c = k - 1
      Array(clamp(centers(c)(0) + rng.nextGaussian() * sigmas(c)),
            clamp(centers(c)(1) + rng.nextGaussian() * sigmas(c)))
    }
  }

  /** Taxi-pickup-like: 70% in a rotated elongated hotspot, 25% in small
    * secondary clusters, 5% uniform noise.
    */
  def nycLike(n: Int, seed: Long): Array[Array[Double]] = {
    val rng = new Random(seed)
    val secondary = Array.fill(8)(Array(rng.nextDouble(), rng.nextDouble()))
    val cos = math.cos(0.5); val sin = math.sin(0.5)
    Array.fill(n) {
      val u = rng.nextDouble()
      if (u < 0.70) {
        // Elongated cluster: long axis ~0.15, short axis ~0.015, rotated.
        val a = rng.nextGaussian() * 0.15
        val b = rng.nextGaussian() * 0.015
        Array(clamp(0.45 + a * cos - b * sin), clamp(0.55 + a * sin + b * cos))
      } else if (u < 0.95) {
        val c = secondary(rng.nextInt(secondary.length))
        Array(clamp(c(0) + rng.nextGaussian() * 0.01),
              clamp(c(1) + rng.nextGaussian() * 0.01))
      } else {
        Array(rng.nextDouble(), rng.nextDouble())
      }
    }
  }

  private def clamp(x: Double): Double = math.min(1.0 - 1e-12, math.max(0.0, x))

  /** Quantize a `[0,1)` coordinate to a grid column index in `[0, 2^bits)`. */
  def quantize(x: Double, bits: Int): Long = {
    val k = 1L << bits
    math.min(k - 1, math.max(0L, (x * k).toLong))
  }

  /** Quantize a full dataset onto the `2^bits × 2^bits` grid. */
  def quantizeAll(pts: Array[Array[Double]], bits: Int): Array[Array[Long]] =
    pts.map(p => p.map(quantize(_, bits)))
}
