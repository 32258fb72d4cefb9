package repro.geometry

import java.util.Random

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types.{DoubleType, LongType, StructField, StructType}

/** Synthetic point-set generators mirroring the paper's data sets (§5).
  *
  * The paper evaluates on 10M-point synthetic sets (UniformFill, SS-varden)
  * and four real UCI/Microsoft data sets. We reproduce the synthetic sets
  * exactly as described and substitute the real ones with generators that
  * preserve the property each set is used for (density skew, moderate/high
  * dimensionality with cluster structure) — see DESIGN.md §3.
  *
  * All generators are deterministic in their `(n, dim, seed)` arguments.
  */
object Generators {

  /** Points distributed uniformly at random in a hypergrid of side sqrt(n),
    * exactly the paper's UniformFill.
    */
  def uniformFill(n: Int, dim: Int, seed: Long = 42L): PointSet = {
    val rnd = new Random(seed)
    val side = math.sqrt(n.toDouble)
    val coords = new Array[Double](n * dim)
    var i = 0
    while (i < coords.length) { coords(i) = rnd.nextDouble() * side; i += 1 }
    new PointSet(coords, dim)
  }

  /** Seed-spreader data with variable density (the paper's SS-varden,
    * produced by the generator of Gan and Tao [27]).
    *
    * A spreader performs a random walk, dropping `cReset` points around its
    * location with local noise before restarting at a random location; the
    * local radius alternates between dense and sparse clusters, giving the
    * variable-density structure. A small fraction of uniform noise points is
    * mixed in, as in the original generator.
    */
  def ssVarden(n: Int, dim: Int, seed: Long = 42L): PointSet = {
    val rnd = new Random(seed)
    val side = math.sqrt(n.toDouble) * 2.0
    val coords = new Array[Double](n * dim)
    val nNoise = math.max(1, n / 10000) // generator default: 1/10^4 random noise
    val cReset = math.max(10, n / 100)  // points per restart

    val loc = new Array[Double](dim)
    var remaining = 0
    var radius = 0.0
    var step = 0.0
    var cluster = 0
    var i = 0
    while (i < n - nNoise) {
      if (remaining == 0) {
        var k = 0
        while (k < dim) { loc(k) = rnd.nextDouble() * side; k += 1 }
        // Alternate dense and sparse clusters (variable density).
        radius = if (cluster % 2 == 0) side / 1000.0 else side / 100.0
        step = radius / 2.0
        remaining = cReset
        cluster += 1
      }
      var k = 0
      while (k < dim) {
        coords(i * dim + k) = loc(k) + (rnd.nextDouble() * 2 - 1) * radius
        loc(k) += (rnd.nextDouble() * 2 - 1) * step
        k += 1
      }
      remaining -= 1
      i += 1
    }
    while (i < n) { // uniform noise points
      var k = 0
      while (k < dim) { coords(i * dim + k) = rnd.nextDouble() * side; k += 1 }
      i += 1
    }
    new PointSet(coords, dim)
  }

  /** Synthetic substitute for the GeoLife GPS trajectory data set: 3D,
    * extremely skewed. Heavy-tailed trajectory lengths (a few very long
    * walks and many short ones) concentrated around a handful of "urban"
    * hubs, with altitude on a much smaller scale than lat/long — matching
    * the extreme density skew the paper calls out.
    */
  def geoLifeLike(n: Int, seed: Long = 42L): PointSet = {
    val dim = 3
    val rnd = new Random(seed)
    val coords = new Array[Double](n * dim)
    val nHubs = 8
    val hubs = Array.fill(nHubs, 2)(rnd.nextDouble() * 360.0 - 180.0)
    val loc = new Array[Double](3)
    var remaining = 0
    var i = 0
    while (i < n) {
      if (remaining == 0) {
        // Pareto-ish trajectory length: most walks short, some huge.
        remaining = math.max(5, (5.0 / math.pow(rnd.nextDouble() + 1e-6, 1.2)).toInt.min(n / 4))
        val h = hubs(rnd.nextInt(nHubs))
        loc(0) = h(0) + rnd.nextGaussian() * 0.5
        loc(1) = h(1) + rnd.nextGaussian() * 0.5
        loc(2) = math.abs(rnd.nextGaussian()) * 50.0
      }
      coords(i * dim) = loc(0)
      coords(i * dim + 1) = loc(1)
      coords(i * dim + 2) = loc(2)
      loc(0) += rnd.nextGaussian() * 1e-3
      loc(1) += rnd.nextGaussian() * 1e-3
      loc(2) += rnd.nextGaussian() * 0.5
      remaining -= 1
      i += 1
    }
    new PointSet(coords, dim)
  }

  /** Synthetic substitute for the UCI sensor data sets (Household 7D,
    * HT 10D, CHEM 16D): a mixture of `nClusters` axis-aligned Gaussians
    * with per-dimension scale jitter plus a uniform noise floor. Preserves
    * the "clusterable, moderate-to-high dimension" structure the paper's
    * real sets exhibit.
    */
  def sensorLike(n: Int, dim: Int, nClusters: Int = 16, seed: Long = 42L): PointSet = {
    val rnd = new Random(seed)
    val side = 100.0
    val centers = Array.fill(nClusters, dim)(rnd.nextDouble() * side)
    val scales = Array.fill(nClusters, dim)(math.pow(10.0, rnd.nextDouble() * 2 - 1)) // 0.1..10
    val coords = new Array[Double](n * dim)
    val nNoise = n / 20
    var i = 0
    while (i < n - nNoise) {
      val c = rnd.nextInt(nClusters)
      var k = 0
      while (k < dim) {
        coords(i * dim + k) = centers(c)(k) + rnd.nextGaussian() * scales(c)(k)
        k += 1
      }
      i += 1
    }
    while (i < n) {
      var k = 0
      while (k < dim) { coords(i * dim + k) = rnd.nextDouble() * side; k += 1 }
      i += 1
    }
    new PointSet(coords, dim)
  }

  /** Exposes a point set as a Spark DataFrame with columns
    * `id, x0..x{dim-1}` — used by the DuckDB oracle checks and the jobs.
    */
  def toDF(spark: SparkSession, ps: PointSet): DataFrame = {
    val schema = StructType(
      StructField("id", LongType, nullable = false) +:
        (0 until ps.dim).map(k => StructField(s"x$k", DoubleType, nullable = false))
    )
    val rows = (0 until ps.n).map { i =>
      Row.fromSeq(i.toLong +: (0 until ps.dim).map(k => ps(i, k)))
    }
    spark.createDataFrame(spark.sparkContext.parallelize(rows), schema)
  }

  /** The 12 named benchmark data sets of the paper's §5, scaled by the
    * given factor relative to the paper's sizes (paper: 10M base; we use
    * `base` points for the synthetic sets and scale the real-substitute
    * sizes by the same ratio).
    */
  def benchmarkSets(base: Int): Seq[(String, PointSet)] = {
    val ratio = base.toDouble / 10_000_000.0
    def scaled(paperN: Int): Int = math.max(200, math.round(paperN * ratio).toInt)
    def label(k: Int): String = if (k >= 1000) s"${k / 1000}K" else k.toString
    Seq(
      (s"2D-UniformFill-${label(base)}", uniformFill(base, 2, 11)),
      (s"3D-UniformFill-${label(base)}", uniformFill(base, 3, 12)),
      (s"5D-UniformFill-${label(base)}", uniformFill(base, 5, 13)),
      (s"7D-UniformFill-${label(base)}", uniformFill(base, 7, 14)),
      (s"2D-SS-varden-${label(base)}", ssVarden(base, 2, 21)),
      (s"3D-SS-varden-${label(base)}", ssVarden(base, 3, 22)),
      (s"5D-SS-varden-${label(base)}", ssVarden(base, 5, 23)),
      (s"7D-SS-varden-${label(base)}", ssVarden(base, 7, 24)),
      (s"3D-GeoLife-${label(base)}", geoLifeLike(base, 31)),
      (s"7D-Household-${label(scaled(2_049_280))}", sensorLike(scaled(2_049_280), 7, 16, 32)),
      (s"10D-HT-${label(scaled(928_991))}", sensorLike(scaled(928_991), 10, 16, 33)),
      (s"16D-CHEM-${label(scaled(4_208_261))}", sensorLike(scaled(4_208_261), 16, 16, 34)),
    )
  }
}
