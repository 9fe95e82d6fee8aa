package repro.baselines

import repro.core.{SpacePartitioner, UspConfig, ModelPartitioner}
import repro.linalg.Mat
import repro.nn.{Adam, Net}
import java.util.Random

/** Neural LSH (Dong et al., ICLR 2020) — the paper's main comparator.
  *
  * The pipeline the paper describes (§2.3): (1) build the k-NN graph,
  * (2) run a balanced combinatorial graph partitioner to obtain bin labels
  * — this is the expensive supervised preprocessing USP eliminates —
  * (3) train a neural network with plain cross-entropy to classify points
  * into those fixed bins; multiprobe by the classifier's softmax ranking.
  * Our balanced partitioner is [[GraphPartitioner]] (KaHIP substitute).
  */
object NeuralLsh {

  final case class Trained(net: Net, labels: Array[Int], m: Int,
                           partitioner: ModelPartitioner, lossTrace: Array[Double])

  /** Supervised CE training on graph-partition labels.
    *
    * @param hidden hidden width — the paper's Neural LSH uses 512 (Table 2);
    *               `hidden <= 0` gives the logistic "Regression LSH" variant.
    */
  def train(data: Array[Array[Double]], knn: Array[Array[Int]], m: Int,
            hidden: Int = 512, epochs: Int = 40, batchSize: Int = 512,
            lr: Double = 1e-2, seed: Long = 9): Trained = {
    val adj = GraphPartitioner.symmetrize(knn)
    // KaHIP-quality labels: the multilevel partitioner is the faithful
    // substitute; fall back to flat region growth if it ever cuts worse.
    val grown = GraphPartitioner.partition(adj, m, seed = seed)
    val ml = GraphPartitioner.partitionMultilevel(adj, m, seed = seed)
    val labels =
      if (GraphPartitioner.edgeCut(adj, ml) < GraphPartitioner.edgeCut(adj, grown)) ml
      else grown
    val net = trainClassifier(data, labels, m, hidden, epochs, batchSize, lr, seed)
    Trained(net._1, labels, m, new ModelPartitioner(net._1, m), net._2)
  }

  /** Plain softmax-CE classifier training (shared with Regression LSH). */
  def trainClassifier(data: Array[Array[Double]], labels: Array[Int], m: Int,
                      hidden: Int, epochs: Int, batchSize: Int, lr: Double,
                      seed: Long): (Net, Array[Double]) = {
    val n = data.length
    val d = data(0).length
    val net = if (hidden <= 0) Net.logistic(d, m, seed) else Net.mlp(d, hidden, m, seed)
    val opt = new Adam(net.params, lr)
    val rng = new Random(seed ^ 0xabc)
    val x = Mat.fromRows(data.toIndexedSeq)
    val idx = Array.tabulate(n)(identity)
    val trace = new Array[Double](epochs)
    var epoch = 0
    while (epoch < epochs) {
      // Fisher-Yates
      var i = n - 1
      while (i > 0) { val j = rng.nextInt(i + 1); val t = idx(i); idx(i) = idx(j); idx(j) = t; i -= 1 }
      var lossSum = 0.0
      var steps = 0
      var start = 0
      while (start < n) {
        val end = math.min(n, start + batchSize)
        val b = java.util.Arrays.copyOfRange(idx, start, end)
        val logits = net.forward(x.selectRows(b), training = true)
        val probs = Net.softmaxRows(logits)
        // CE vs one-hot labels; d(logits) = (p - y)/batch
        val dz = Mat.zeros(b.length, m)
        var loss = 0.0
        var r = 0
        while (r < b.length) {
          val y = labels(b(r))
          loss -= math.log(probs(r, y) + 1e-12)
          var j = 0
          while (j < m) {
            dz(r, j) = (probs(r, j) - (if (j == y) 1.0 else 0.0)) / b.length
            j += 1
          }
          r += 1
        }
        net.zeroGrad()
        net.backward(dz)
        opt.step()
        lossSum += loss / b.length
        steps += 1
        start = end
      }
      trace(epoch) = lossSum / steps
      epoch += 1
    }
    (net, trace)
  }
}

/** Cross-polytope LSH (Andoni et al. [3]) — the data-oblivious baseline of
  * Figure 5. The input is passed through a random rotation (a random
  * orthonormal map onto m/2 coordinates) and hashed to the closest signed
  * basis vector: bin = argmax_i |y_i| with the sign deciding between the
  * (i,+) and (i,−) polytope vertices, giving m = 2·(m/2) bins. Multiprobe
  * ranks vertices by their signed coordinate value.
  */
final class CrossPolytopeLsh(d: Int, val numBins: Int, seed: Long) extends SpacePartitioner {
  require(numBins % 2 == 0, "cross-polytope bins come in ± pairs")
  private val half = numBins / 2
  require(half <= d, s"m/2=$half must be <= d=$d")

  // Random orthonormal rows via Gram-Schmidt on Gaussian vectors.
  private val rot: Array[Array[Double]] = {
    val rng = new Random(seed)
    val rows = Array.fill(half)(Array.fill(d)(rng.nextGaussian()))
    var i = 0
    while (i < half) {
      var j = 0
      while (j < i) {
        var dot = 0.0
        var t = 0
        while (t < d) { dot += rows(i)(t) * rows(j)(t); t += 1 }
        t = 0
        while (t < d) { rows(i)(t) -= dot * rows(j)(t); t += 1 }
        j += 1
      }
      var nrm = 0.0
      var t = 0
      while (t < d) { nrm += rows(i)(t) * rows(i)(t); t += 1 }
      nrm = math.sqrt(nrm)
      t = 0
      while (t < d) { rows(i)(t) /= nrm; t += 1 }
      i += 1
    }
    rows
  }

  private def project(v: Array[Double]): Array[Double] =
    Array.tabulate(half) { i =>
      var s = 0.0
      var t = 0
      while (t < v.length) { s += rot(i)(t) * v(t); t += 1 }
      s
    }

  override def assign(v: Array[Double]): Int = {
    val y = project(v)
    var best = 0
    var bv = math.abs(y(0))
    var i = 1
    while (i < half) { if (math.abs(y(i)) > bv) { bv = math.abs(y(i)); best = i }; i += 1 }
    2 * best + (if (y(best) >= 0) 0 else 1)
  }

  override def probeOrder(q: Array[Double]): Array[Int] = {
    val y = project(q)
    // score of vertex (i,+) is y_i, of (i,−) is −y_i
    Array.tabulate(numBins)(identity)
      .sortBy { b => val i = b / 2; -(if (b % 2 == 0) y(i) else -y(i)) }
  }
}
