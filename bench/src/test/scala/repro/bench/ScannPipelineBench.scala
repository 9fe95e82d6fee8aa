package repro.bench

import repro.SparkSpec
import repro.eval.Tables

/** Figure 7's claim, tabled: plugging our partitioner in front of a
  * ScaNN-style anisotropic-PQ scanner speeds up 10-NN retrieval versus
  * vanilla ScaNN (full ADC scan) and versus K-means+ScaNN at comparable
  * accuracy (the paper reports ≈40% average speedup over K-means+ScaNN).
  */
class ScannPipelineBench extends SparkSpec {

  test("ScaNN pipelines: USP + ScaNN vs K-means + ScaNN vs vanilla ScaNN") {
    val rows = Tables.scannPipelines(spark)
    println("== ScaNN pipelines (SIFT-lite, 16 bins, PQ 8x16, rerank 100) ==")
    println(f"${"method"}%-32s ${"10NN acc"}%9s ${"avg |C|"}%9s ${"us/query"}%9s")
    rows.foreach { r =>
      println(f"${r.method}%-32s ${r.accuracy}%9.4f ${r.avgCand}%9.0f ${r.usPerQuery}%9.1f")
    }
    val byName = rows.map(r => r.method.takeWhile(_ != '(').trim -> r).toMap
    val vanilla = byName("Vanilla ScaNN")
    val km = byName("K-means + ScaNN")
    val usp = byName("USP + ScaNN")

    // partitioned pipelines scan far fewer points than the full ADC scan
    assert(usp.avgCand < vanilla.avgCand * 0.5)
    assert(km.avgCand < vanilla.avgCand * 0.5)
    // at the same probe depth, our partition yields candidate sets at least
    // as useful as K-means' (higher accuracy at comparable |C|)
    assert(usp.accuracy >= km.accuracy - 0.02,
      s"USP+ScaNN accuracy ${usp.accuracy} must not trail K-means+ScaNN ${km.accuracy}")
    // and a real wall-clock win over the unpartitioned scan
    assert(usp.usPerQuery < vanilla.usPerQuery,
      "USP+ScaNN must be faster per query than a full ADC scan")
  }
}
