package repro.eval

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.core.{CandidateIndex, KnnMatrix, PartitionIndex, SpacePartitioner}

/** Deterministic first-coordinate bucket partitioner — top-level so Spark
  * serialization never captures the test suite.
  */
private class BucketPartitioner extends SpacePartitioner {
  override val numBins = 3
  override def assign(v: Array[Double]): Int =
    if (v(0) < -1) 0 else if (v(0) < 1) 1 else 2
  override def probeOrder(q: Array[Double]): Array[Int] = {
    val centers = Array(-2.0, 0.0, 2.0)
    Array.tabulate(3)(identity).sortBy(b => math.abs(q(0) - centers(b)))
  }
}

class SweepSpec extends SparkSpec {

  private lazy val data = SynthData.gaussianMixture(200, 3, 4, seed = 61, scale = 3.0)
  private lazy val queries = SynthData.gaussianMixture(30, 3, 4, seed = 62, scale = 3.0)
  private lazy val gt = KnnMatrix.queryKnn(spark, data, queries, 5)
  private lazy val index = PartitionIndex.build(new BucketPartitioner, data)

  test("accuracy is monotone nondecreasing in probe depth and hits 1.0 at full probe") {
    val points = Sweep.run(index, data.length, queries, gt, Seq(1, 2, 3))
    assert(points.map(_.accuracy) == points.map(_.accuracy).sorted)
    assert(math.abs(points.last.accuracy - 1.0) < 1e-12)
    assert(math.abs(points.last.avgCand - data.length) < 1e-9)
  }

  test("avgCand is monotone nondecreasing in probe depth") {
    val points = Sweep.run(index, data.length, queries, gt, Seq(1, 2, 3))
    assert(points.map(_.avgCand) == points.map(_.avgCand).sorted)
  }

  test("a perfect index (all points probed) has accuracy exactly 1") {
    val all = new CandidateIndex {
      override def maxProbe = 1
      override def candidates(q: Array[Double], p: Int): Array[Int] =
        Array.tabulate(data.length)(identity)
    }
    val pts = Sweep.run(all, data.length, queries, gt, Seq(1))
    assert(pts.head.accuracy == 1.0)
  }

  test("an empty index has accuracy 0 and candidate size 0") {
    val none = new CandidateIndex {
      override def maxProbe = 1
      override def candidates(q: Array[Double], p: Int): Array[Int] = Array.empty
    }
    val pts = Sweep.run(none, data.length, queries, gt, Seq(1))
    assert(pts.head.accuracy == 0.0 && pts.head.avgCand == 0.0)
  }

  test("candidateSizeAtAccuracy interpolates linearly between sweep points") {
    val pts = Seq(
      Sweep.Point(1, 100.0, 0.5),
      Sweep.Point(2, 200.0, 0.9))
    val c = Sweep.candidateSizeAtAccuracy(pts, 0.7).get
    assert(math.abs(c - 150.0) < 1e-9)
  }

  test("candidateSizeAtAccuracy returns None when the target is never reached") {
    val pts = Seq(Sweep.Point(1, 100.0, 0.5))
    assert(Sweep.candidateSizeAtAccuracy(pts, 0.9).isEmpty)
  }

  test("candidateSizeAtAccuracy returns the first point when it already meets the target") {
    val pts = Seq(Sweep.Point(1, 100.0, 0.95), Sweep.Point(2, 200.0, 0.99))
    assert(Sweep.candidateSizeAtAccuracy(pts, 0.9).get == 100.0)
  }

  test("sparkEval matches the driver-side sweep on candidate sizes and hits") {
    import spark.implicits._
    val probe = 2
    val assignDF = index.assignmentDF(spark)
    val queryBins = spark.sparkContext.parallelize(
      queries.toIndexedSeq.zipWithIndex.map { case (q, qi) =>
        (qi.toLong, index.partitioner.probeOrder(q).take(probe).toSeq)
      }).toDF("qid", "bins")
    val gtDF = spark.sparkContext.parallelize(
      gt.toIndexedSeq.zipWithIndex.map { case (g, qi) => (qi.toLong, g.toSeq.map(_.toLong)) }
    ).toDF("qid", "neighbors")
    val res = Sweep.sparkEval(spark, assignDF, queryBins, gtDF).collect()
      .map(r => r.getLong(0) -> (r.getLong(1), r.getLong(2))).toMap
    // driver-side reference
    for (qi <- queries.indices) {
      val cand = index.candidates(queries(qi), probe)
      val hits = gt(qi).count(cand.contains)
      assert(res(qi.toLong)._1 == cand.length, s"cand size mismatch for query $qi")
      assert(res(qi.toLong)._2 == hits, s"hits mismatch for query $qi")
    }
  }

  test("sparkEval agrees with a DuckDB SQL formulation (oracle-checked)") {
    import spark.implicits._
    val assignDF = index.assignmentDF(spark)
    val queryBins = spark.sparkContext.parallelize(
      queries.toIndexedSeq.zipWithIndex.map { case (q, qi) =>
        (qi.toLong, index.partitioner.probeOrder(q).take(2).toSeq)
      }).toDF("qid", "bins")
    val gtDF = spark.sparkContext.parallelize(
      gt.toIndexedSeq.zipWithIndex.map { case (g, qi) => (qi.toLong, g.toSeq.map(_.toLong)) }
    ).toDF("qid", "neighbors")
    val res = Sweep.sparkEval(spark, assignDF, queryBins, gtDF)
      .select(col("qid").cast("double").as("qid"),
              col("cand_size").cast("double").as("cand_size"),
              col("hits").cast("double").as("hits"))
    // scalar views for DuckDB
    val probedFlat = queryBins.select(col("qid"), explode(col("bins")).as("bin"))
    val gtFlat = gtDF.select(col("qid"), explode(col("neighbors")).as("nid"))
    Oracle.assertEquivalent(
      res,
      """
        |WITH cand AS (
        |  SELECT p.qid AS qid, a.id AS id
        |  FROM probed p JOIN asg a ON CAST(p.bin AS INT) = CAST(a.bin AS INT)
        |), cs AS (
        |  SELECT qid, count(*) AS cand_size FROM cand GROUP BY qid
        |), h AS (
        |  SELECT g.qid AS qid, count(*) AS hits
        |  FROM gt g JOIN cand c ON g.qid = c.qid AND CAST(g.nid AS BIGINT) = CAST(c.id AS BIGINT)
        |  GROUP BY g.qid
        |)
        |SELECT CAST(cs.qid AS DOUBLE) AS qid,
        |       CAST(cs.cand_size AS DOUBLE) AS cand_size,
        |       CAST(COALESCE(h.hits, 0) AS DOUBLE) AS hits
        |FROM cs LEFT JOIN h ON cs.qid = h.qid
        |""".stripMargin,
      "probed" -> probedFlat, "asg" -> assignDF, "gt" -> gtFlat)
  }
}
