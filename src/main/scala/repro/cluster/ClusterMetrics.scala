package repro.cluster

/** Clustering quality metrics for Table 5. The paper shows pictures; we
  * report the Adjusted Rand Index against the generative labels plus
  * best-matching cluster accuracy, which quantify the same "did the method
  * recover the natural clusters" judgement.
  */
object ClusterMetrics {

  /** Adjusted Rand Index. Noise labels (−1) count as their own cluster. */
  def ari(labelsA: Array[Int], labelsB: Array[Int]): Double = {
    require(labelsA.length == labelsB.length)
    val n = labelsA.length
    val as = labelsA.distinct.sorted
    val bs = labelsB.distinct.sorted
    val aIdx = as.zipWithIndex.toMap
    val bIdx = bs.zipWithIndex.toMap
    val cont = Array.fill(as.length, bs.length)(0L)
    var i = 0
    while (i < n) { cont(aIdx(labelsA(i)))(bIdx(labelsB(i))) += 1; i += 1 }
    def c2(x: Long): Double = x * (x - 1) / 2.0
    val sumIJ = cont.flatten.map(c2).sum
    val sumA = cont.map(_.sum).map(c2).sum
    val sumB = bs.indices.map(j => c2(cont.map(_(j)).sum)).sum
    val expected = sumA * sumB / c2(n)
    val max = (sumA + sumB) / 2.0
    if (max == expected) 1.0 else (sumIJ - expected) / (max - expected)
  }

  /** Accuracy under the best greedy matching of predicted→true clusters. */
  def matchAccuracy(pred: Array[Int], truth: Array[Int]): Double = {
    val pairs = pred.zip(truth)
    val byPred = pairs.groupBy(_._1)
    val correct = byPred.values.map { grp =>
      grp.groupBy(_._2).values.map(_.length).max
    }.sum
    correct.toDouble / pred.length
  }
}
