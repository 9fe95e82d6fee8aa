package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic OLAP data at a configurable scale factor.
  *
  * SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
  * benchmarks use SF~=0.1. Generators are deterministic in (sf, seed) so
  * the DuckDB oracle sees identical input.
  */
object SynthData {
  private val NLineitemPerSf = 6_000_000L
  private val NOrdersPerSf   = 1_500_000L
  private val NCustomerPerSf =   150_000L
  private val NPartPerSf     =   200_000L

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  def lineitem(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    import spark.implicits._
    val nOrders = n(NOrdersPerSf, sf); val nPart = n(NPartPerSf, sf)
    spark.range(n(NLineitemPerSf, sf)).select(
      (rand(seed)     * nOrders + 1).cast(LongType)    as "l_orderkey",
      (rand(seed + 1) * nPart   + 1).cast(LongType)    as "l_partkey",
      (rand(seed + 2) * 7 + 1).cast(IntegerType)       as "l_linenumber",
      (rand(seed + 3) * 50 + 1).cast(DoubleType)       as "l_quantity",
      round(rand(seed + 4) * 90000 + 900, 2)           as "l_extendedprice",
      round(rand(seed + 5) * 0.10, 2)                  as "l_discount",
      round(rand(seed + 6) * 0.08, 2)                  as "l_tax",
      element_at(array(lit("N"), lit("R"), lit("A")),
                 (rand(seed + 7) * 3 + 1).cast("int")) as "l_returnflag",
      element_at(array(lit("O"), lit("F")),
                 (rand(seed + 8) * 2 + 1).cast("int")) as "l_linestatus",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 9) * 2557).cast("int"))    as "l_shipdate",
    )
  }

  def orders(spark: SparkSession, sf: Double = 0.01, seed: Long = 1): DataFrame = {
    import spark.implicits._
    val nCust = n(NCustomerPerSf, sf)
    spark.range(1, n(NOrdersPerSf, sf) + 1).toDF("o_orderkey").select(
      $"o_orderkey",
      (rand(seed)     * nCust + 1).cast(LongType)             as "o_custkey",
      element_at(array(lit("O"), lit("F"), lit("P")),
                 (rand(seed + 1) * 3 + 1).cast("int"))         as "o_orderstatus",
      round(rand(seed + 2) * 500000 + 1000, 2)                 as "o_totalprice",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 3) * 2406).cast("int"))            as "o_orderdate",
    )
  }

  def customer(spark: SparkSession, sf: Double = 0.01, seed: Long = 2): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NCustomerPerSf, sf) + 1).toDF("c_custkey").select(
      $"c_custkey",
      (rand(seed) * 25).cast(IntegerType)                as "c_nationkey",
      round(rand(seed + 1) * 10000 - 1000, 2)            as "c_acctbal",
      element_at(array(lit("BUILDING"), lit("AUTOMOBILE"), lit("MACHINERY"),
                       lit("HOUSEHOLD"), lit("FURNITURE")),
                 (rand(seed + 2) * 5 + 1).cast("int"))   as "c_mktsegment",
    )
  }

  def part(spark: SparkSession, sf: Double = 0.01, seed: Long = 5): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NPartPerSf, sf) + 1).toDF("p_partkey").select(
      $"p_partkey",
      element_at(array(lit("STANDARD"), lit("SMALL"), lit("MEDIUM"),
                       lit("LARGE"), lit("ECONOMY"), lit("PROMO")),
                 (rand(seed) * 6 + 1).cast("int"))              as "p_type",
      (rand(seed + 1) * 50 + 1).cast(IntegerType)               as "p_size",
      round(lit(900.0) + ($"p_partkey" % 1000) / 10.0, 2)       as "p_retailprice",
    )
  }

  /** Skewed key column — for join-skew / cardinality-estimation papers. */
  def zipfKeys(spark: SparkSession, rows: Long, nKeys: Long,
               alpha: Double = 1.1, seed: Long = 3): DataFrame = {
    import spark.implicits._
    // Inverse-CDF draw over rank weights 1/k^alpha; good enough for skew.
    val norm = (1L to math.min(nKeys, 10000L)).map(k => 1.0 / math.pow(k, alpha)).sum
    spark.range(rows).select(
      least(lit(nKeys),
            greatest(lit(1L),
              pow(lit(1.0) / (rand(seed) * norm + 1e-9), lit(1.0 / alpha)).cast(LongType)
            )) as "k",
      rand(seed + 1) as "v",
    )
  }

  def uniformKeys(spark: SparkSession, rows: Long, nKeys: Long, seed: Long = 4): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      (rand(seed) * nKeys + 1).cast(LongType) as "k",
      rand(seed + 1)                          as "v",
    )
  }

  // ─── Vector datasets for the ANN-search reproduction ────────────────────
  // The paper evaluates on ANN-benchmark SIFT (1M x 128d) and MNIST
  // (60k x 784d) plus scikit-learn 2-D toy sets. The container is offline,
  // so we generate synthetic equivalents (see DESIGN.md §3): what the
  // partitioning methods are sensitive to is multi-modal local structure,
  // which these mixtures reproduce at laptop scale. All generators are
  // deterministic in their seed.

  import java.util.Random

  /** Gaussian mixture with anisotropic per-cluster scales and an optional
    * uniform background-noise fraction. Rows are returned driver-side; use
    * [[toVecDF]] for the DataFrame view.
    */
  def gaussianMixture(n: Int, d: Int, clusters: Int, seed: Long,
                      scale: Double = 10.0, noiseFrac: Double = 0.0): Array[Array[Double]] = {
    val rng = new Random(seed)
    val centers = Array.fill(clusters, d)((rng.nextDouble() * 2 - 1) * scale)
    val sigmas  = Array.fill(clusters, d)(0.3 + rng.nextDouble() * 1.2)
    Array.fill(n) {
      if (noiseFrac > 0 && rng.nextDouble() < noiseFrac)
        Array.fill(d)((rng.nextDouble() * 2 - 1) * scale * 1.2)
      else {
        val c = rng.nextInt(clusters)
        Array.tabulate(d)(j => centers(c)(j) + rng.nextGaussian() * sigmas(c)(j))
      }
    }
  }

  /** Mixture of low-rank ("manifold-like") clusters: each cluster spreads
    * along `rank` random directions with per-direction scales drawn in
    * [0.5, 1.5]·basisScale, plus small isotropic noise. This is the regime
    * of real descriptor/image data (SIFT, MNIST): elongated, curved mass
    * that convex k-means cells cut across — exactly the structure the
    * paper's learned partitions exploit.
    */
  def lowRankMixture(n: Int, d: Int, clusters: Int, rank: Int, centerScale: Double,
                     basisScale: Double, noise: Double, noiseFrac: Double,
                     seed: Long): Array[Array[Double]] = {
    val rng = new Random(seed)
    val centers = Array.fill(clusters, d)((rng.nextDouble() * 2 - 1) * centerScale)
    val bases = Array.fill(clusters, rank, d) {
      rng.nextGaussian() / math.sqrt(d.toDouble)
    }
    val basisScales = Array.fill(clusters, rank)((0.5 + rng.nextDouble()) * basisScale)
    Array.fill(n) {
      if (noiseFrac > 0 && rng.nextDouble() < noiseFrac)
        Array.fill(d)((rng.nextDouble() * 2 - 1) * centerScale * 1.2)
      else {
        val c = rng.nextInt(clusters)
        val z = Array.tabulate(rank)(r => rng.nextGaussian() * basisScales(c)(r))
        Array.tabulate(d) { j =>
          var s = centers(c)(j)
          var r = 0
          while (r < rank) { s += z(r) * bases(c)(r)(j); r += 1 }
          s + rng.nextGaussian() * noise
        }
      }
    }
  }

  /** Mixture of curved 1-D filaments: each cluster is a smooth curve
    * `c + t·L·v1 + sin(2πt)·W·v2 + cos(2πt)·W·v3` swept by t ~ U(0,1), plus
    * isotropic noise. Long curved support is the regime where convex
    * (K-means) cells must chop a single manifold into many pieces while
    * kNN-graph-driven partitions can follow it — the structural property of
    * real descriptor data (SIFT) that the paper's method exploits.
    */
  def filamentMixture(n: Int, d: Int, filaments: Int, length: Double,
                      width: Double, noise: Double, noiseFrac: Double,
                      seed: Long): Array[Array[Double]] = {
    val rng = new Random(seed)
    val centers = Array.fill(filaments, d)((rng.nextDouble() * 2 - 1) * 10.0)
    def unit(): Array[Double] = {
      val v = Array.fill(d)(rng.nextGaussian())
      val nrm = math.sqrt(v.map(x => x * x).sum)
      v.map(_ / nrm)
    }
    val dir1 = Array.fill(filaments)(unit())
    val dir2 = Array.fill(filaments)(unit())
    val dir3 = Array.fill(filaments)(unit())
    Array.fill(n) {
      if (noiseFrac > 0 && rng.nextDouble() < noiseFrac)
        Array.fill(d)((rng.nextDouble() * 2 - 1) * 12.0)
      else {
        val c = rng.nextInt(filaments)
        val t = rng.nextDouble() - 0.5
        val s = math.sin(2 * math.Pi * t) * width
        val w = math.cos(2 * math.Pi * t) * width
        Array.tabulate(d) { j =>
          centers(c)(j) + t * length * dir1(c)(j) + s * dir2(c)(j) + w * dir3(c)(j) +
            rng.nextGaussian() * noise
        }
      }
    }
  }

  /** SIFT-like stand-in: curved low-dimensional filaments at moderate
    * ambient dimension (see [[filamentMixture]] and DESIGN.md §3).
    */
  def siftLite(n: Int, seed: Long = 7, d: Int = 32): Array[Array[Double]] =
    filamentMixture(n, d, filaments = 48, length = 40.0, width = 6.0,
      noise = 0.3, noiseFrac = 0.05, seed = seed)

  /** MNIST-like stand-in: 10 low-rank clusters in higher ambient dimension. */
  def mnistLite(n: Int, seed: Long = 11, d: Int = 96, rank: Int = 8): Array[Array[Double]] =
    lowRankMixture(n, d, clusters = 10, rank = rank, centerScale = 8.0,
      basisScale = 10.0, noise = 0.1, noiseFrac = 0.0, seed = seed)

  /** Two interleaved half-circles (scikit-learn `make_moons` equivalent).
    * Returns (points, labels).
    */
  def moons(n: Int, noise: Double = 0.06, seed: Long = 13): (Array[Array[Double]], Array[Int]) = {
    val rng = new Random(seed)
    val pts = new Array[Array[Double]](n)
    val lab = new Array[Int](n)
    var i = 0
    while (i < n) {
      val t = rng.nextDouble() * math.Pi
      if (i % 2 == 0) {
        pts(i) = Array(math.cos(t) + rng.nextGaussian() * noise,
                       math.sin(t) + rng.nextGaussian() * noise)
        lab(i) = 0
      } else {
        pts(i) = Array(1.0 - math.cos(t) + rng.nextGaussian() * noise,
                       0.5 - math.sin(t) + rng.nextGaussian() * noise)
        lab(i) = 1
      }
      i += 1
    }
    (pts, lab)
  }

  /** Two concentric rings (scikit-learn `make_circles` equivalent). */
  def circles(n: Int, noise: Double = 0.04, factor: Double = 0.5,
              seed: Long = 17): (Array[Array[Double]], Array[Int]) = {
    val rng = new Random(seed)
    val pts = new Array[Array[Double]](n)
    val lab = new Array[Int](n)
    var i = 0
    while (i < n) {
      val t = rng.nextDouble() * 2 * math.Pi
      val r = if (i % 2 == 0) 1.0 else factor
      pts(i) = Array(r * math.cos(t) + rng.nextGaussian() * noise,
                     r * math.sin(t) + rng.nextGaussian() * noise)
      lab(i) = i % 2
      i += 1
    }
    (pts, lab)
  }

  /** Four separated blobs in 2-D (stand-in for the paper's 4-cluster
    * `make_classification` sample).
    */
  def blobs4(n: Int, seed: Long = 19): (Array[Array[Double]], Array[Int]) = {
    val rng = new Random(seed)
    val centers = Array(Array(-4.0, -4.0), Array(4.0, -4.0), Array(-4.0, 4.0), Array(4.0, 4.0))
    val pts = new Array[Array[Double]](n)
    val lab = new Array[Int](n)
    var i = 0
    while (i < n) {
      val c = rng.nextInt(4)
      pts(i) = Array(centers(c)(0) + rng.nextGaussian() * 1.1,
                     centers(c)(1) + rng.nextGaussian() * 1.1)
      lab(i) = c
      i += 1
    }
    (pts, lab)
  }

  /** DataFrame view `(id BIGINT, vec ARRAY<DOUBLE>)` of a driver-side
    * vector set — the canonical on-cluster representation (DESIGN.md §4).
    */
  def toVecDF(spark: SparkSession, vecs: Array[Array[Double]]): DataFrame = {
    import spark.implicits._
    spark.sparkContext
      .parallelize(vecs.toIndexedSeq.zipWithIndex.map { case (v, i) => (i.toLong, v.toSeq) })
      .toDF("id", "vec")
  }
}
