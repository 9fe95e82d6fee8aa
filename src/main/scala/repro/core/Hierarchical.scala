package repro.core

import repro.nn.Net
import repro.linalg.Mat

/** Hierarchical partitioning (§4.4.2): a root model splits the dataset into
  * m1 bins; a leaf model per root bin splits its subset into m2 bins, for
  * m1·m2 total. A query's final bin probability is the product of the
  * root's and the leaf's probabilities down the tree (Figure 4). This is
  * how the paper reaches 256 bins (16 × 16) with small models.
  */
object Hierarchical {

  final case class Trained(root: UspModel, leaves: Array[UspModel],
                           m1: Int, m2: Int, partitioner: HierPartitioner)

  /** Exact k-NN inside a small subset, driver-side (leaf preprocessing). */
  def localKnn(subset: Array[Array[Double]], k: Int): Array[Array[Int]] = {
    val kk = math.max(1, math.min(k, subset.length - 1))
    Array.tabulate(subset.length)(i => KnnMatrix.topK(subset, subset(i), kk, i))
  }

  def train(data: Array[Array[Double]], knn: Array[Array[Int]],
            rootCfg: UspConfig, m2: Int, leafEpochs: Int = 0): Trained = {
    val m1 = rootCfg.m
    val root = UspTrainer.train(data, knn, rootCfg)
    val leafCfgBase = rootCfg.copy(
      m = m2,
      epochs = if (leafEpochs > 0) leafEpochs else rootCfg.epochs,
    )
    val leaves = new Array[UspModel](m1)
    var b = 0
    while (b < m1) {
      val subsetIdx = root.assignments.zipWithIndex.collect { case (bin, i) if bin == b => i }
      val subset = subsetIdx.map(data)
      if (subset.length <= math.max(2, m2)) {
        // Degenerate bin: too few points to subdivide; a fresh (untrained)
        // model still yields a valid (arbitrary) m2-way split of <=m2 points.
        val net = UspTrainer.defaultNet(data(0).length, leafCfgBase.copy(seed = rootCfg.seed + b))
        val asg = subset.map(v => net.predictProbs(Mat.fromRows(Seq(v))).argmaxRows(0))
        leaves(b) = UspModel(net, asg, Array.empty, leafCfgBase)
      } else {
        val localK = localKnn(subset, rootCfg.kPrime)
        leaves(b) = UspTrainer.train(subset, localK,
          leafCfgBase.copy(seed = rootCfg.seed + 31L * (b + 1),
                           batchSize = math.min(leafCfgBase.batchSize, subset.length)))
      }
      b += 1
    }
    val part = new HierPartitioner(root.net, leaves.map(_.net), m1, m2)
    Trained(root, leaves, m1, m2, part)
  }
}

/** The combined m1·m2-way partitioner: bin id = rootBin * m2 + leafBin. */
final class HierPartitioner(rootNet: Net, leafNets: Array[Net],
                            m1: Int, m2: Int) extends SpacePartitioner {
  override val numBins: Int = m1 * m2

  override def assign(v: Array[Double]): Int = {
    val x = Mat.fromRows(Seq(v))
    val rb = rootNet.predictProbs(x).argmaxRows(0)
    val lb = leafNets(rb).predictProbs(x).argmaxRows(0)
    rb * m2 + lb
  }

  /** Combined probabilities p[j*m2+t] = rootP[j] · leafP_j[t], ranked. */
  def combinedProbs(q: Array[Double]): Array[Double] = {
    val x = Mat.fromRows(Seq(q))
    val rp = rootNet.predictProbs(x).row(0)
    val out = new Array[Double](numBins)
    var j = 0
    while (j < m1) {
      val lp = leafNets(j).predictProbs(x).row(0)
      var t = 0
      while (t < m2) { out(j * m2 + t) = rp(j) * lp(t); t += 1 }
      j += 1
    }
    out
  }

  override def probeOrder(q: Array[Double]): Array[Int] = {
    val p = combinedProbs(q)
    Array.tabulate(numBins)(identity).sortBy(j => -p(j))
  }
}
