package repro.baselines

import repro.{SparkSpec, SynthData}
import repro.core.{KnnMatrix, PartitionIndex}
import repro.nn.Net
import java.util.Random

class TreesSpec extends SparkSpec {

  private lazy val data = SynthData.gaussianMixture(300, 4, 4, seed = 101)
  private lazy val knn = KnnMatrix.selfKnn(spark, data, 8)

  private def checkTree(tree: BspTree, depth: Int): Unit = {
    assert(tree.numBins == (1 << depth))
    val bins = data.map(tree.assign)
    assert(bins.forall(b => b >= 0 && b < tree.numBins))
    // probeOrder is a permutation; the hard-assigned bin ranks highly under
    // the soft product scores (greedy hard descent maximizes each factor,
    // not the global product, so exact head equality is not guaranteed)
    for (i <- Seq(0, 50, 299)) {
      val order = tree.probeOrder(data(i))
      assert(order.sorted.toSeq == (0 until tree.numBins).toSeq)
      val rank = order.indexOf(bins(i))
      assert(rank < math.max(2, tree.numBins / 2),
        s"assigned bin ${bins(i)} ranked $rank of ${tree.numBins} in probeOrder")
    }
  }

  test("dot computes the inner product") {
    assert(BspTree.dot(Array(1.0, 2.0), Array(3.0, 4.0)) == 11.0)
  }

  test("KD tree: builds, assigns in range, soft probe consistent") {
    checkTree(BspTree.build(data, 3, BspTree.kd, seed = 1), 3)
  }

  test("KD tree: median split yields near-perfect leaf balance") {
    val tree = BspTree.build(data, 3, BspTree.kd, seed = 2)
    val idx = PartitionIndex.build(tree, data)
    val ideal = data.length / 8
    assert(idx.binSizes.forall(s => s >= ideal - 2 && s <= ideal + 2),
      s"sizes ${idx.binSizes.toSeq}")
  }

  test("KD tree root splits the axis of maximum variance") {
    // stretch axis 2 to dominate variance
    val stretched = data.map(v => Array(v(0), v(1), v(2) * 100, v(3)))
    val tree = BspTree.build(stretched, 1, BspTree.kd, seed = 3)
    val split = tree.root.asInstanceOf[BspSplit]
    assert(split.w(2) == 1.0 && split.w.sum == 1.0)
  }

  test("PCA tree: builds and the split direction has unit norm") {
    val tree = BspTree.build(data, 3, BspTree.pca, seed = 4)
    checkTree(tree, 3)
    val w = tree.root.asInstanceOf[BspSplit].w
    assert(math.abs(math.sqrt(w.map(x => x * x).sum) - 1.0) < 1e-6)
  }

  test("PCA direction aligns with the dominant variance direction") {
    // data spread along (1,1)/√2 in 2-D
    val rng = new Random(5)
    val line = Array.fill(200) {
      val t = rng.nextGaussian() * 10
      Array(t + rng.nextGaussian() * 0.1, t + rng.nextGaussian() * 0.1)
    }
    val (w, _) = BspTree.pca(line, rng)
    val cos = math.abs((w(0) + w(1)) / math.sqrt(2.0))
    assert(cos > 0.99, s"PCA direction ${w.toSeq} not aligned with (1,1)")
  }

  test("RP tree: builds with near-balanced leaves") {
    val tree = BspTree.build(data, 3, BspTree.rp, seed = 6)
    checkTree(tree, 3)
    val idx = PartitionIndex.build(tree, data)
    assert(idx.binSizes.forall(_ > 0))
  }

  test("2-means tree: builds and separates two blobs at the root") {
    val rng = new Random(7)
    val two = Array.tabulate(200) { i =>
      val off = if (i % 2 == 0) -50.0 else 50.0
      Array(off + rng.nextGaussian(), rng.nextGaussian())
    }
    val tree = BspTree.build(two, 1, BspTree.twoMeans, seed = 8)
    val bins = two.map(tree.assign)
    // all left-blob points on one side, all right-blob points on the other
    val left = bins.zipWithIndex.filter(_._2 % 2 == 0).map(_._1).distinct
    val right = bins.zipWithIndex.filter(_._2 % 2 == 1).map(_._1).distinct
    assert(left.length == 1 && right.length == 1 && left.head != right.head)
  }

  test("Regression LSH rule: builds a valid tree") {
    val tree = BspTree.build(data, 2, BspTree.regressionLsh(kPrime = 6, epochs = 15), seed = 9)
    checkTree(tree, 2)
  }

  test("USP logistic rule: builds a valid tree with both sides populated") {
    val tree = BspTree.build(data, 2, BspTree.uspLogistic(kPrime = 6, eta = 2.0, epochs = 15), seed = 10)
    checkTree(tree, 2)
    val idx = PartitionIndex.build(tree, data)
    assert(idx.binSizes.count(_ > 0) >= 3, s"sizes ${idx.binSizes.toSeq}")
  }

  test("hyperplaneOf recovers the decision boundary of a 2-logit linear net") {
    val net = Net.logistic(3, 2, seed = 11)
    val (w, t) = BspTree.hyperplaneOf(net)
    val rng = new Random(12)
    for (_ <- 0 until 20) {
      val x = Array.fill(3)(rng.nextGaussian() * 3)
      val probs = net.predictProbs(repro.linalg.Mat.fromRows(Seq(x)))
      val side = BspTree.dot(w, x) >= t
      assert(side == (probs(0, 1) >= probs(0, 0)),
        "hyperplane side disagrees with the net's argmax")
    }
  }

  test("degenerate tiny subsets still build a full-depth tree") {
    val tiny = SynthData.gaussianMixture(5, 3, 1, seed = 13)
    val tree = BspTree.build(tiny, 4, BspTree.rp, seed = 14)
    assert(tree.numBins == 16)
    tiny.foreach(v => assert(tree.assign(v) >= 0))
  }

  test("BoostedForest: candidates union over trees, all valid and distinct") {
    val forest = BoostedForest.fit(data, knn, depth = 3, numTrees = 3, seed = 15)
    val q = SynthData.gaussianMixture(5, 4, 4, seed = 102)
    q.foreach { qv =>
      val c = forest.candidates(qv, 1)
      assert(c.nonEmpty && c.distinct.length == c.length)
      assert(c.forall(i => i >= 0 && i < data.length))
    }
  }

  test("BoostedForest with more trees yields higher recall at one probe") {
    val queries = SynthData.gaussianMixture(40, 4, 4, seed = 103)
    val gt = KnnMatrix.queryKnn(spark, data, queries, 5)
    val f1 = BoostedForest.fit(data, knn, depth = 3, numTrees = 1, seed = 16)
    val f3 = BoostedForest.fit(data, knn, depth = 3, numTrees = 3, seed = 16)
    val a1 = repro.eval.Sweep.run(f1, data.length, queries, gt, Seq(1)).head
    val a3 = repro.eval.Sweep.run(f3, data.length, queries, gt, Seq(1)).head
    assert(a3.accuracy >= a1.accuracy, s"3 trees ${a3.accuracy} < 1 tree ${a1.accuracy}")
  }
}
