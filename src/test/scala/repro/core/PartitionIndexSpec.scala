package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}

/** Simple fixed partitioner for testing the index mechanics in isolation:
  * bins points by the sign pattern of their first two coordinates.
  * Top-level so Spark can serialize it without dragging in the test suite.
  */
private class QuadrantPartitioner extends SpacePartitioner {
  override val numBins = 4
  override def assign(v: Array[Double]): Int =
    (if (v(0) >= 0) 1 else 0) + 2 * (if (v(1) >= 0) 1 else 0)
  override def probeOrder(q: Array[Double]): Array[Int] = {
    val scores = Array.tabulate(4) { b =>
      val sx = if ((b & 1) == 1) 1.0 else -1.0
      val sy = if ((b & 2) == 2) 1.0 else -1.0
      sx * q(0) + sy * q(1)
    }
    Array.tabulate(4)(identity).sortBy(b => -scores(b))
  }
}

class PartitionIndexSpec extends SparkSpec {

  private lazy val data = SynthData.gaussianMixture(300, 4, 4, seed = 31)
  private lazy val index = PartitionIndex.build(new QuadrantPartitioner, data)

  test("lookup table covers every point exactly once") {
    assert(index.lookup.map(_.length).sum == data.length)
    assert(index.lookup.flatten.sorted.toSeq == data.indices.toSeq)
  }

  test("lookup table groups ids by their assigned bin") {
    for (b <- 0 until 4; i <- index.lookup(b))
      assert(index.assignments(i) == b)
  }

  test("binSizes matches the lookup table") {
    assert(index.binSizes.toSeq == index.lookup.map(_.length).toSeq)
  }

  test("Spark-side build gives identical assignments to driver-side build") {
    val sparkIdx = PartitionIndex.build(new QuadrantPartitioner, data, spark)
    assert(sparkIdx.assignments.sameElements(index.assignments))
  }

  test("candidates grow monotonically with probe depth and end at the full dataset") {
    val q = data(0)
    var prev = -1
    for (p <- 1 to 4) {
      val c = index.candidates(q, p)
      assert(c.length >= prev)
      prev = c.length
    }
    assert(index.candidates(q, 4).length == data.length)
  }

  test("first probed bin is the assigned bin for points in the dataset") {
    for (i <- Seq(0, 50, 100, 299)) {
      val order = index.partitioner.probeOrder(data(i))
      assert(order.head == index.assignments(i),
        s"point $i assigned to ${index.assignments(i)} but probes ${order.head} first")
    }
  }

  test("search returns the exact k-NN among the candidates") {
    val q = SynthData.gaussianMixture(1, 4, 4, seed = 32)(0)
    val got = index.search(data, q, k = 5, mProbe = 2).toSeq
    val cand = index.candidates(q, 2)
    val want = cand.sortBy(i => KnnMatrix.sqDist(data(i), q)).take(5).toSeq
    assert(got == want)
  }

  test("full-probe search equals global brute-force k-NN") {
    val q = SynthData.gaussianMixture(1, 4, 4, seed = 33)(0)
    val got = index.search(data, q, k = 10, mProbe = 4).toSeq
    val want = data.indices.sortBy(i => KnnMatrix.sqDist(data(i), q)).take(10).toSeq
    assert(got == want)
  }

  test("assignmentDF bin histogram matches the driver lookup table (oracle-checked)") {
    val df = index.assignmentDF(spark)
    val hist = df.groupBy(col("bin")).agg(count(lit(1)).as("cnt"))
      .select(col("bin").cast("double").as("bin"), col("cnt").cast("double").as("cnt"))
    Oracle.assertEquivalent(
      hist,
      "SELECT CAST(bin AS DOUBLE) AS bin, CAST(count(*) AS DOUBLE) AS cnt FROM asg GROUP BY bin",
      "asg" -> df)
    // and the driver-side sizes agree with the DataFrame counts
    val counts = df.groupBy("bin").count().collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap
    for (b <- 0 until 4)
      assert(counts.getOrElse(b, 0L) == index.binSizes(b))
  }

  test("ModelPartitioner assign equals argmax of its probs and heads probeOrder") {
    val knn = KnnMatrix.selfKnn(spark, data, 5)
    val model = UspTrainer.train(data, knn,
      UspConfig(m = 4, epochs = 8, batchSize = 64, hidden = 16, seed = 34))
    val mp = new ModelPartitioner(model.net, 4)
    for (i <- Seq(1, 42, 137)) {
      val p = mp.probs(data(i))
      assert(mp.assign(data(i)) == p.indexOf(p.max))
      assert(mp.probeOrder(data(i)).head == mp.assign(data(i)))
      assert(mp.probeOrder(data(i)).sorted.toSeq == Seq(0, 1, 2, 3))
    }
  }

  test("index construction rejects out-of-range assignments") {
    intercept[IllegalArgumentException] {
      new PartitionIndex(new QuadrantPartitioner, Array(0, 1, 7))
    }
  }
}
