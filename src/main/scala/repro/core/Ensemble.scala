package repro.core

/** AdaBoost-style ensembling (Algorithms 3 and 4).
  *
  * Models are trained sequentially. After model j, every point's weight is
  * multiplied by the number of its k' neighbors that model j separated from
  * it (Equation 14's weight update), so later models concentrate on points
  * that ALL earlier partitions placed badly. Weights are renormalised to
  * mean 1 before each run — a scale-invariance of the loss the paper leaves
  * implicit (only relative weights matter to the argmin; renormalising keeps
  * Adam's step size meaningful).
  *
  * At query time each model reports its top softmax probability as a
  * confidence; the candidate set of the most confident model is used
  * (Algorithm 4).
  */
object Ensemble {

  final case class Trained(models: Seq[UspModel], indexes: Seq[PartitionIndex])

  /** @param weightFloor minimum per-point weight (after mean-1 renormalising)
    *   fed to later models. The paper's raw multiplicative update zeroes the
    *   weight of every point whose neighbors were all kept together; at
    *   small m that is most of the dataset, which would leave later models
    *   with no signal about the bulk of the space. The floor keeps them
    *   anchored to the global structure while still over-weighting the hard
    *   points (DESIGN.md §6).
    */
  def train(data: Array[Array[Double]], knn: Array[Array[Int]], cfg: UspConfig,
            e: Int, weightFloor: Double = 0.1): Trained = {
    require(e >= 1)
    val n = data.length
    var w = Array.fill(n)(1.0)
    val models = Seq.newBuilder[UspModel]
    val indexes = Seq.newBuilder[PartitionIndex]
    var j = 0
    while (j < e) {
      val model = UspTrainer.train(data, knn, cfg.copy(seed = cfg.seed + 1000L * j), weights = w)
      models += model
      indexes += new PartitionIndex(new ModelPartitioner(model.net, cfg.m), model.assignments)
      if (j < e - 1) {
        w = nextWeights(w, knn, model.assignments).map(math.max(_, weightFloor))
      }
      j += 1
    }
    Trained(models.result(), indexes.result())
  }

  /** w_i^{j+1} = w_i^j * |{p in N_k'(i) : R(p) != R(i)}|, renormalised. */
  def nextWeights(w: Array[Double], knn: Array[Array[Int]],
                  assignments: Array[Int]): Array[Double] = {
    val n = w.length
    val out = new Array[Double](n)
    var i = 0
    while (i < n) {
      val nbs = knn(i)
      var cut = 0
      var t = 0
      while (t < nbs.length) { if (assignments(nbs(t)) != assignments(i)) cut += 1; t += 1 }
      out(i) = w(i) * cut
      i += 1
    }
    val mean = out.sum / n
    if (mean <= 0) Array.fill(n)(1.0) // every point perfectly placed: reset
    else out.map(_ / mean)
  }
}

/** Query-time view of a trained ensemble (Algorithm 4): probe the bins of
  * the single most-confident member.
  *
  * Confidences are calibrated per model: each member's top softmax
  * probability is divided by that member's mean top probability over (a
  * sample of) the dataset. Raw softmax maxima are not comparable between
  * independently trained networks (a member trained on extreme boosting
  * weights can be systematically overconfident); calibration restores the
  * "which model actually knows this region" semantics Algorithm 4 intends.
  */
final class EnsembleIndex(trained: Ensemble.Trained,
                          calibrationData: Array[Array[Double]] = null,
                          confidence: String = "mass") extends CandidateIndex {
  private val parts = trained.indexes
  private val partitioners = parts.map(_.partitioner.asInstanceOf[ModelPartitioner])
  private val m = parts.head.partitioner.numBins

  /** conf(model, q, m') under the chosen mode: "top1" is Algorithm 4
    * verbatim (the model's highest probability); "mass" generalises it to
    * the total probability the model puts on the m' bins it would probe —
    * the same quantity at m'=1, strictly more informative deeper into the
    * sweep.
    */
  private def rawConf(j: Int, q: Array[Double], mProbe: Int): Double = {
    val p = partitioners(j).probs(q)
    if (confidence == "top1") p.max
    else p.sorted.takeRight(math.min(mProbe, m)).sum
  }

  // per-(model, probe-depth) calibration over a data sample
  private val calib: Array[Array[Double]] =
    if (calibrationData == null) Array.fill(parts.length)(Array.fill(m + 1)(1.0))
    else {
      val sample = calibrationData.take(500)
      Array.tabulate(parts.length) { j =>
        val c = new Array[Double](m + 1)
        for (p <- 1 to m)
          c(p) = sample.map(v => rawConf(j, v, p)).sum / sample.length
        c(0) = 1.0
        c
      }
    }

  override def maxProbe: Int = m

  override def candidates(q: Array[Double], mProbe: Int): Array[Int] = {
    val p = math.min(math.max(mProbe, 1), m)
    var best = 0
    var bestConf = Double.NegativeInfinity
    var j = 0
    while (j < parts.length) {
      val conf = rawConf(j, q, p) / calib(j)(p)
      if (conf > bestConf) { bestConf = conf; best = j }
      j += 1
    }
    parts(best).candidates(q, mProbe)
  }
}
