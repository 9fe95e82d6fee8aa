package repro.bench

import repro.{SparkSpec, SynthData}
import repro.baselines._
import repro.core.{KnnMatrix, PartitionIndex}
import repro.eval.Sweep

/** The Figure 6 experiment (tree/hyperplane methods, logistic learners) at
  * bench scale: depth-6 binary trees (64 bins) on SIFT-lite. Methods:
  * ours (USP logistic), Regression LSH, PCA tree, 2-means tree, random
  * projection tree, learned KD-tree, boosted search forest.
  *
  * Reproduced shape: the learned hyperplane methods (ours, Regression LSH)
  * dominate the data-oblivious/one-shot trees, and ours is at least
  * competitive with Regression LSH (the paper shows ours strictly better,
  * up to 60% smaller |C| in the high-accuracy regime).
  */
class TreeSweepsBench extends SparkSpec {

  test("Figure 6 shape: hyperplane-tree methods on SIFT-lite, 64 bins") {
    val n = 8000
    val depth = 6
    val data = SynthData.siftLite(n)
    val queries = SynthData.siftLite(300, seed = 207)
    val knn = KnnMatrix.selfKnn(spark, data, 10)
    val gt = KnnMatrix.queryKnn(spark, data, queries, 10)
    val probes = Seq(1, 2, 4, 8, 16, 32, 64)

    def sweepOf(name: String, tree: BspTree): (String, Seq[Sweep.Point]) = {
      val idx = PartitionIndex.build(tree, data)
      (name, Sweep.run(idx, n, queries, gt, probes))
    }
    val results = Seq(
      sweepOf("Ours (USP logistic)", BspTree.build(data, depth, BspTree.uspLogistic(epochs = 25), seed = 1)),
      sweepOf("Regression LSH", BspTree.build(data, depth, BspTree.regressionLsh(epochs = 25), seed = 1)),
      sweepOf("PCA tree", BspTree.build(data, depth, BspTree.pca, seed = 1)),
      sweepOf("2-means tree", BspTree.build(data, depth, BspTree.twoMeans, seed = 1)),
      sweepOf("RP tree", BspTree.build(data, depth, BspTree.rp, seed = 1)),
      sweepOf("Learned KD-tree", BspTree.build(data, depth, BspTree.kd, seed = 1)),
    ) :+ {
      val forest = BoostedForest.fit(data, knn, depth, numTrees = 3, seed = 1)
      ("Boosted search forest", Sweep.run(forest, n, queries, gt, probes))
    }

    println("== Figure 6 sweep data (SIFT-lite, depth-6 trees = 64 bins) ==")
    results.foreach { case (name, pts) =>
      println(name)
      pts.foreach(p => println(f"  probe=${p.probe}%3d |C|=${p.avgCand}%8.1f acc=${p.accuracy}%.4f"))
    }

    def at(name: String, acc: Double): Double =
      Sweep.candidateSizeAtAccuracy(results.find(_._1 == name).get._2, acc)
        .getOrElse(Double.MaxValue)
    val target = 0.8
    println(f"|C| at ${target * 100}%.0f%% accuracy: " +
      results.map { case (nm, _) => f"$nm=${at(nm, target)}%.0f" }.mkString("  "))

    assert(at("Ours (USP logistic)", target) <= at("Regression LSH", target) * 1.05,
      "ours must be at least competitive with Regression LSH")
    assert(at("Ours (USP logistic)", target) < at("RP tree", target),
      "learned split must beat random projections")
    assert(at("Ours (USP logistic)", target) < at("Learned KD-tree", target),
      "learned hyperplanes must beat axis-aligned splits")
  }
}
