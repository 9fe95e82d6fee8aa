package repro.cluster

import repro.core.KnnMatrix

/** DBSCAN (Ester et al. 1996) — density-based clustering comparator of
  * Table 5. Classic region-query formulation with brute-force ε-neighbor
  * lookups (the Table 5 datasets are ≤ a few thousand 2-D points).
  * Noise points get label −1.
  */
object Dbscan {

  def fit(data: Array[Array[Double]], eps: Double, minPts: Int): Array[Int] = {
    val n = data.length
    val eps2 = eps * eps
    val labels = Array.fill(n)(-2) // -2 = unvisited, -1 = noise
    var cluster = -1

    def regionQuery(i: Int): Array[Int] = {
      val out = new scala.collection.mutable.ArrayBuilder.ofInt
      var j = 0
      while (j < n) {
        if (KnnMatrix.sqDist(data(i), data(j)) <= eps2) out += j
        j += 1
      }
      out.result()
    }

    var i = 0
    while (i < n) {
      if (labels(i) == -2) {
        val seeds = regionQuery(i)
        if (seeds.length < minPts) labels(i) = -1
        else {
          cluster += 1
          labels(i) = cluster
          val queue = scala.collection.mutable.Queue(seeds.toIndexedSeq: _*)
          while (queue.nonEmpty) {
            val j = queue.dequeue()
            if (labels(j) == -1) labels(j) = cluster // border point
            if (labels(j) == -2) {
              labels(j) = cluster
              val js = regionQuery(j)
              if (js.length >= minPts) queue ++= js
            }
          }
        }
      }
      i += 1
    }
    labels
  }
}
