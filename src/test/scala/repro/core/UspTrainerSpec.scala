package repro.core

import repro.{SparkSpec, SynthData}
import repro.linalg.Mat

class UspTrainerSpec extends SparkSpec {

  private lazy val data = SynthData.gaussianMixture(600, 8, 4, seed = 21)
  private lazy val knn = KnnMatrix.selfKnn(spark, data, 10)

  test("training reduces the loss substantially") {
    val cfg = UspConfig(m = 4, epochs = 25, batchSize = 128, eta = 4.0, hidden = 32, seed = 1)
    val model = UspTrainer.train(data, knn, cfg)
    val first = model.lossTrace.take(3).min
    val last = model.lossTrace.takeRight(3).min
    assert(last < first, s"loss did not decrease: first=$first last=$last")
  }

  test("learned partition is roughly balanced (within 2x of n/m)") {
    val cfg = UspConfig(m = 4, epochs = 30, batchSize = 128, eta = 6.0, hidden = 32, seed = 2)
    val model = UspTrainer.train(data, knn, cfg)
    val sizes = Array.fill(4)(0)
    model.assignments.foreach(b => sizes(b) += 1)
    val ideal = data.length / 4
    assert(sizes.forall(_ > 0), s"empty bin: ${sizes.toSeq}")
    assert(sizes.max <= ideal * 2, s"imbalanced: ${sizes.toSeq}")
  }

  test("learned partition keeps most kNN edges inside bins (quality objective)") {
    val cfg = UspConfig(m = 4, epochs = 30, batchSize = 128, eta = 4.0, hidden = 32, seed = 3)
    val model = UspTrainer.train(data, knn, cfg)
    var same = 0L; var total = 0L
    for (i <- data.indices; j <- knn(i)) {
      if (model.assignments(i) == model.assignments(j)) same += 1
      total += 1
    }
    val frac = same.toDouble / total
    assert(frac > 0.7, s"only $frac of neighbor edges preserved")
  }

  test("assignments field agrees with fresh inference through the net") {
    val cfg = UspConfig(m = 4, epochs = 10, batchSize = 128, hidden = 16, seed = 4)
    val model = UspTrainer.train(data, knn, cfg)
    val x = Mat.fromRows(data.toIndexedSeq)
    val fresh = UspTrainer.inferAssignments(model.net, x)
    assert(fresh.sameElements(model.assignments))
  }

  test("inferAssignments chunking is invariant to chunk size") {
    val cfg = UspConfig(m = 3, epochs = 5, batchSize = 128, hidden = 16, seed = 5)
    val model = UspTrainer.train(data, knn, cfg)
    val x = Mat.fromRows(data.toIndexedSeq)
    val a = UspTrainer.inferAssignments(model.net, x, chunk = 7)
    val b = UspTrainer.inferAssignments(model.net, x, chunk = 100000)
    assert(a.sameElements(b))
  }

  test("logistic architecture (hidden=0) trains and yields valid assignments") {
    val cfg = UspConfig(m = 2, epochs = 20, batchSize = 128, eta = 2.0, hidden = 0, seed = 6)
    val model = UspTrainer.train(data, knn, cfg)
    assert(model.assignments.forall(b => b == 0 || b == 1))
    assert(model.assignments.distinct.length == 2, "logistic model collapsed to one bin")
  }

  test("training is deterministic in the seed") {
    val cfg = UspConfig(m = 4, epochs = 8, batchSize = 128, hidden = 16, seed = 7)
    val a = UspTrainer.train(data, knn, cfg)
    val b = UspTrainer.train(data, knn, cfg)
    assert(a.assignments.sameElements(b.assignments))
    assert(a.lossTrace.sameElements(b.lossTrace))
  }

  test("per-point weights steer the partition (weighted points get cleaner bins)") {
    // weight the first cluster's points 10x: their neighbor edges should be
    // preserved at least as well as under uniform weights
    val cfg = UspConfig(m = 4, epochs = 25, batchSize = 128, eta = 4.0, hidden = 32, seed = 8)
    val uniform = UspTrainer.train(data, knn, cfg)
    val w = Array.tabulate(data.length)(i => if (i < 150) 10.0 else 0.1)
    val weighted = UspTrainer.train(data, knn, cfg, weights = w)
    def cutOf(model: UspModel, range: Range): Double = {
      var cut = 0L; var tot = 0L
      for (i <- range; j <- knn(i)) {
        if (model.assignments(i) != model.assignments(j)) cut += 1
        tot += 1
      }
      cut.toDouble / tot
    }
    assert(cutOf(weighted, 0 until 150) <= cutOf(uniform, 0 until 150) + 0.05)
  }

  test("queryProbs returns a distribution per query") {
    val cfg = UspConfig(m = 4, epochs = 5, batchSize = 128, hidden = 16, seed = 9)
    val model = UspTrainer.train(data, knn, cfg)
    val queries = SynthData.gaussianMixture(10, 8, 4, seed = 22)
    val probs = UspTrainer.queryProbs(model.net, queries)
    assert(probs.rows == 10 && probs.cols == 4)
    probs.rowSum.foreach(s => assert(math.abs(s - 1.0) < 1e-9))
  }
}
