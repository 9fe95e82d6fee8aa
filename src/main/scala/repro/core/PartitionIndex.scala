package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.linalg.Mat
import repro.nn.Net

/** A space partitioning of R^d into `numBins` bins: the common contract for
  * the paper's method and every baseline (K-means, Neural LSH, LSH, trees).
  *
  * `assign` places a dataset point into its bin (index build); `probeOrder`
  * ranks bins most-probable-first for a query (online multiprobe, §4.3 —
  * "instead of searching in just one bin, we use the probability
  * distribution output by the model to search in the m' most probable
  * bins").
  */
trait SpacePartitioner extends Serializable {
  def numBins: Int
  def assign(v: Array[Double]): Int
  def probeOrder(q: Array[Double]): Array[Int]
}

/** Anything that can produce a candidate set for a query at probe depth m'.
  * The accuracy/|C| sweeps (all figures/tables) are computed against this.
  */
trait CandidateIndex {
  def maxProbe: Int
  /** Dataset point ids likely near `q`, probing the `mProbe` best bins. */
  def candidates(q: Array[Double], mProbe: Int): Array[Int]
}

/** A trained partitioner plus its bin→points lookup table (Algorithm 1,
  * step 3 / Algorithm 2). The lookup table is exactly the paper's: point
  * indices grouped by assigned bin.
  */
final class PartitionIndex(val partitioner: SpacePartitioner,
                           val assignments: Array[Int]) extends CandidateIndex {
  require(assignments.forall(b => b >= 0 && b < partitioner.numBins))

  /** bin → ids of the dataset points assigned to it. */
  val lookup: Array[Array[Int]] = {
    val buf = Array.fill(partitioner.numBins)(new scala.collection.mutable.ArrayBuilder.ofInt)
    var i = 0
    while (i < assignments.length) { buf(assignments(i)) += i; i += 1 }
    buf.map(_.result())
  }

  def binSizes: Array[Int] = lookup.map(_.length)

  override def maxProbe: Int = partitioner.numBins

  override def candidates(q: Array[Double], mProbe: Int): Array[Int] = {
    val order = partitioner.probeOrder(q)
    val out = new scala.collection.mutable.ArrayBuilder.ofInt
    var i = 0
    while (i < math.min(mProbe, order.length)) {
      out ++= lookup(order(i))
      i += 1
    }
    out.result()
  }

  /** Exact k-NN within the candidate set (Algorithm 2, step 3). */
  def search(data: Array[Array[Double]], q: Array[Double], k: Int, mProbe: Int): Array[Int] = {
    val cand = candidates(q, mProbe)
    cand.map(i => (KnnMatrix.sqDist(data(i), q), i)).sortBy(_._1).take(k).map(_._2)
  }

  /** The assignment table as a DataFrame `(id BIGINT, bin INT)` — the
    * distributed form of the lookup table, consumed by the Spark-side
    * evaluation joins (and oracle-checked in tests).
    */
  def assignmentDF(spark: SparkSession): DataFrame = {
    import spark.implicits._
    spark.sparkContext
      .parallelize(assignments.toIndexedSeq.zipWithIndex.map { case (b, i) => (i.toLong, b) })
      .toDF("id", "bin")
  }
}

object PartitionIndex {
  /** Index a dataset with a partitioner (runs `assign` as a Spark map when a
    * session is given, else on the driver).
    */
  def build(partitioner: SpacePartitioner, data: Array[Array[Double]],
            spark: SparkSession = null): PartitionIndex = {
    val assignments =
      if (spark == null) data.map(partitioner.assign)
      else {
        val bc = spark.sparkContext.broadcast(data)
        val bp = spark.sparkContext.broadcast(partitioner)
        val res = spark.sparkContext
          .range(0, data.length, numSlices = spark.sparkContext.defaultParallelism)
          .map(i => (i.toInt, bp.value.assign(bc.value(i.toInt))))
          .collect()
        bc.destroy()
        val out = new Array[Int](data.length)
        res.foreach { case (i, b) => out(i) = b }
        out
      }
    new PartitionIndex(partitioner, assignments)
  }
}

/** USP model as a [[SpacePartitioner]]: bins ranked by the trained model's
  * softmax output.
  */
final class ModelPartitioner(net: Net, val numBins: Int) extends SpacePartitioner {
  override def assign(v: Array[Double]): Int =
    net.predictProbs(Mat.fromRows(Seq(v))).argmaxRows(0)

  override def probeOrder(q: Array[Double]): Array[Int] = {
    val p = net.predictProbs(Mat.fromRows(Seq(q))).row(0)
    Array.tabulate(numBins)(identity).sortBy(j => -p(j))
  }

  /** Full probability row for a query (used by the ensemble's confidence). */
  def probs(q: Array[Double]): Array[Double] =
    net.predictProbs(Mat.fromRows(Seq(q))).row(0)
}
