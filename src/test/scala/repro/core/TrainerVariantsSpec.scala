package repro.core

import repro.{SparkSpec, SynthData}
import repro.eval.Tables
import repro.nn.Net

/** Coverage for the trainer's target-mode variants and the clustering
  * merge helper built on top of the fine partitions.
  */
class TrainerVariantsSpec extends SparkSpec {

  private lazy val data = SynthData.gaussianMixture(500, 6, 4, seed = 131)
  private lazy val knn = KnnMatrix.selfKnn(spark, data, 8)

  test("amortized targets (exactTargets=false) also converge to a balanced partition") {
    val cfg = UspConfig(m = 4, kPrime = 8, eta = 6.0, epochs = 30, batchSize = 128,
      lr = 3e-3, hidden = 32, seed = 1, exactTargets = false)
    val model = UspTrainer.train(data, knn, cfg)
    val sizes = Array.fill(4)(0)
    model.assignments.foreach(b => sizes(b) += 1)
    assert(sizes.forall(_ > 0) && sizes.max <= data.length / 2)
  }

  test("exact and amortized targets reach comparable neighbor preservation") {
    def preserved(exact: Boolean): Double = {
      val cfg = UspConfig(m = 4, kPrime = 8, eta = 4.0, epochs = 30, batchSize = 128,
        lr = 3e-3, hidden = 32, seed = 2, exactTargets = exact)
      val model = UspTrainer.train(data, knn, cfg)
      var same = 0L; var tot = 0L
      for (i <- data.indices; j <- knn(i)) {
        if (model.assignments(i) == model.assignments(j)) same += 1
        tot += 1
      }
      same.toDouble / tot
    }
    val pe = preserved(true); val pa = preserved(false)
    assert(pe > 0.7 && pa > 0.7, s"exact=$pe amortized=$pa")
  }

  test("soft targets train and produce a valid multi-bin partition") {
    val cfg = UspConfig(m = 4, kPrime = 8, eta = 6.0, epochs = 30, batchSize = 128,
      lr = 3e-3, hidden = 32, seed = 3, softTargets = true)
    val model = UspTrainer.train(data, knn, cfg)
    assert(model.assignments.forall(b => b >= 0 && b < 4))
    assert(model.assignments.distinct.length >= 2)
  }

  test("mlp2 gradient check (CE loss, finite differences)") {
    val net = Net.mlp2(4, 6, 3, seed = 5, dropout = 0.0)
    val rng = new java.util.Random(6)
    val x = repro.linalg.Mat(10, 4)((_, _) => rng.nextGaussian())
    val y = Array.tabulate(10)(_ % 3)
    def loss(): Double = {
      val p = Net.softmaxRows(net.forward(x, training = true))
      (0 until 10).map(i => -math.log(p(i, y(i)) + 1e-12)).sum
    }
    // analytic gradient
    val p = Net.softmaxRows(net.forward(x, training = true))
    val dz = repro.linalg.Mat(10, 3)((i, j) => p(i, j) - (if (j == y(i)) 1.0 else 0.0))
    net.zeroGrad(); net.backward(dz)
    val analytic = net.params.map(_.g.copy())
    val eps = 1e-5
    for ((param, pi) <- net.params.zipWithIndex; _ <- 0 until 4) {
      val k = rng.nextInt(param.v.a.length)
      val orig = param.v.a(k)
      param.v.a(k) = orig + eps; val lp = loss()
      param.v.a(k) = orig - eps; val lm = loss()
      param.v.a(k) = orig
      val num = (lp - lm) / (2 * eps)
      assert(math.abs(num - analytic(pi).a(k)) < 1e-3 * math.max(1.0, math.abs(num)),
        s"param $pi entry $k: numeric=$num analytic=${analytic(pi).a(k)}")
    }
  }

  test("uspClusterFromFine merges connected fine bins and never bridges disconnected groups") {
    // two far blobs, fine partition = 4 bins (2 per blob)
    val rng = new java.util.Random(7)
    val pts = Array.tabulate(200) { i =>
      val off = if (i < 100) 0.0 else 1000.0
      Array(off + rng.nextGaussian(), rng.nextGaussian())
    }
    val knnB = Array.tabulate(200)(i => KnnMatrix.topK(pts, pts(i), 8, i))
    // fine bins: split each blob in half arbitrarily
    val fine = Array.tabulate(200)(i => (if (i < 100) 0 else 2) + i % 2)
    val merged = Tables.uspClusterFromFine(pts, knnB, 2, fine, 4)
    assert(merged.distinct.length == 2)
    // all of blob A in one group, all of blob B in the other
    assert(merged.take(100).distinct.length == 1)
    assert(merged.drop(100).distinct.length == 1)
    assert(merged(0) != merged(150))
  }

  test("uspClusterFromFine handles empty fine bins") {
    val rng = new java.util.Random(8)
    val pts = Array.fill(50)(Array(rng.nextGaussian(), rng.nextGaussian()))
    val knnB = Array.tabulate(50)(i => KnnMatrix.topK(pts, pts(i), 5, i))
    val fine = Array.fill(50)(0) // only bin 0 of 8 used
    val merged = Tables.uspClusterFromFine(pts, knnB, 1, fine, 8)
    assert(merged.forall(_ == 0))
  }

  test("uspCluster end-to-end recovers two separated blobs") {
    val rng = new java.util.Random(9)
    val pts = Array.tabulate(300) { i =>
      val off = if (i % 2 == 0) -8.0 else 8.0
      Array(off + rng.nextGaussian(), rng.nextGaussian())
    }
    val knnB = Array.tabulate(300)(i => KnnMatrix.topK(pts, pts(i), 10, i))
    val labels = Tables.uspCluster(pts, knnB, k = 2, epochs = 60)
    val truth = Array.tabulate(300)(_ % 2)
    assert(repro.cluster.ClusterMetrics.ari(labels, truth) > 0.95)
  }
}
