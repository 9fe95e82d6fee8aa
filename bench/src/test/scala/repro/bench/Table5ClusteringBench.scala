package repro.bench

import repro.SparkSpec
import repro.eval.Tables

/** Table 5: clustering comparison on the 2-D toy datasets (moons, circles,
  * 4-cluster). The paper's table is a picture grid; we report ARI and
  * best-match accuracy against the generative labels.
  */
class Table5ClusteringBench extends SparkSpec {

  test("Table 5: clustering quality on moons/circles/blobs4") {
    val rows = Tables.table5(spark)
    println("== Table 5: clustering quality (ARI / matched accuracy) ==")
    println(f"${"dataset"}%-9s ${"method"}%-9s ${"ARI"}%7s ${"acc"}%7s  paper-verdict")
    rows.foreach { r =>
      println(f"${r.dataset}%-9s ${r.method}%-9s ${r.ari}%7.3f ${r.accuracy}%7.3f  ${r.paperVerdict}")
    }
    val m = rows.map(r => (r.dataset, r.method) -> r.ari).toMap

    // K-means fails on the non-convex sets (the motivating pitfall)
    assert(m(("moons", "K-Means")) < 0.5, "K-means must fail on moons")
    assert(m(("circles", "K-Means")) < 0.5, "K-means must fail on circles")
    // density/graph/learned methods recover every dataset (the paper's grid)
    for (ds <- Seq("moons", "circles", "blobs4"); method <- Seq("DBSCAN", "Spectral", "Ours"))
      assert(m((ds, method)) > 0.9, s"$method must recover $ds (got ${m((ds, method))})")
    assert(m(("blobs4", "K-Means")) > 0.9, "K-means recovers the convex blobs")
  }
}
