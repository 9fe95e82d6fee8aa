package repro.baselines

import repro.{SparkSpec, SynthData}
import repro.core.KnnMatrix

class NeuralLshSpec extends SparkSpec {

  private lazy val data = SynthData.gaussianMixture(400, 6, 4, seed = 91)
  private lazy val knn = KnnMatrix.selfKnn(spark, data, 8)

  test("training learns to reproduce the graph-partition labels") {
    val t = NeuralLsh.train(data, knn, m = 4, hidden = 64, epochs = 120, lr = 2e-2, seed = 1)
    val pred = data.map(t.partitioner.assign)
    val acc = pred.zip(t.labels).count { case (a, b) => a == b }.toDouble / data.length
    assert(acc > 0.85, s"classifier train accuracy $acc too low")
  }

  test("labels are balanced within the graph partitioner's cap") {
    val t = NeuralLsh.train(data, knn, m = 4, hidden = 16, epochs = 5, seed = 2)
    val sizes = Array.fill(4)(0)
    t.labels.foreach(b => sizes(b) += 1)
    val cap = math.ceil(1.05 * data.length / 4.0).toInt
    assert(sizes.forall(_ <= cap))
  }

  test("classifier loss decreases during training") {
    val t = NeuralLsh.train(data, knn, m = 4, hidden = 32, epochs = 20, seed = 3)
    assert(t.lossTrace.last < t.lossTrace.head)
  }

  test("logistic (Regression LSH) variant also trains") {
    val t = NeuralLsh.train(data, knn, m = 2, hidden = 0, epochs = 60, lr = 5e-2, seed = 4)
    val pred = data.map(t.partitioner.assign)
    val acc = pred.zip(t.labels).count { case (a, b) => a == b }.toDouble / data.length
    assert(acc > 0.7, s"logistic accuracy $acc")
  }

  test("probeOrder is a permutation headed by the assigned bin") {
    val t = NeuralLsh.train(data, knn, m = 4, hidden = 16, epochs = 10, seed = 5)
    val q = data(11)
    val order = t.partitioner.probeOrder(q)
    assert(order.sorted.toSeq == Seq(0, 1, 2, 3))
    assert(order.head == t.partitioner.assign(q))
  }
}

class CrossPolytopeLshSpec extends SparkSpec {

  private lazy val data = SynthData.gaussianMixture(200, 8, 4, seed = 95)

  test("rotation rows are orthonormal") {
    val lsh = new CrossPolytopeLsh(8, numBins = 8, seed = 1)
    // probe the rotation indirectly: distances of projections are preserved
    // for vectors in the span; instead verify assign determinism + range
    data.foreach { v =>
      val b = lsh.assign(v)
      assert(b >= 0 && b < 8)
    }
  }

  test("rejects odd bin counts and m/2 > d") {
    intercept[IllegalArgumentException](new CrossPolytopeLsh(8, numBins = 7, seed = 1))
    intercept[IllegalArgumentException](new CrossPolytopeLsh(3, numBins = 8, seed = 1))
  }

  test("probeOrder heads with the assigned bin and is a permutation") {
    val lsh = new CrossPolytopeLsh(8, numBins = 8, seed = 2)
    data.take(20).foreach { v =>
      val order = lsh.probeOrder(v)
      assert(order.sorted.toSeq == (0 until 8).toSeq)
      assert(order.head == lsh.assign(v))
    }
  }

  test("opposite vectors map to opposite polytope vertices") {
    val lsh = new CrossPolytopeLsh(8, numBins = 8, seed = 3)
    data.take(20).foreach { v =>
      val neg = v.map(-_)
      val b = lsh.assign(v); val nb = lsh.assign(neg)
      assert(b / 2 == nb / 2 && b % 2 != nb % 2,
        s"v in bin $b but -v in bin $nb (should be the paired vertex)")
    }
  }

  test("hashing is deterministic in the seed and varies across seeds") {
    val a = new CrossPolytopeLsh(8, 8, seed = 4)
    val b = new CrossPolytopeLsh(8, 8, seed = 4)
    val c = new CrossPolytopeLsh(8, 8, seed = 5)
    val va = data.map(a.assign)
    assert(va.sameElements(data.map(b.assign)))
    assert(!va.sameElements(data.map(c.assign)))
  }
}
