package repro.baselines

import java.util.Random

/** Balanced k-NN-graph partitioning — the substrate Neural LSH needs.
  *
  * The paper's Neural LSH uses KaHIP [40] (a closed-source-built C++
  * multilevel partitioner) to produce balanced, low-cut partitions of the
  * k-NN graph that then serve as supervised labels. We build an equivalent:
  * greedy weighted-degree growth (LDG-style: each node goes to the bin
  * holding most of its neighbors, damped by a capacity penalty) followed by
  * Kernighan–Lin-style move refinement under the same (1+ε) balance
  * constraint. At our dataset scales this reaches comparable edge cuts; the
  * downstream Neural LSH behaviour (classify points into the given bins)
  * only depends on the labels being balanced and locality-preserving.
  */
object GraphPartitioner {

  /** Symmetrized adjacency lists from a k-NN matrix. */
  def symmetrize(knn: Array[Array[Int]]): Array[Array[Int]] = {
    val n = knn.length
    val sets = Array.fill(n)(new scala.collection.mutable.TreeSet[Int])
    var i = 0
    while (i < n) {
      knn(i).foreach { j => sets(i) += j; sets(j) += i }
      i += 1
    }
    sets.map(_.toArray)
  }

  /** Partition the graph into `m` bins with max size ⌈(1+eps)·n/m⌉. */
  def partition(adj: Array[Array[Int]], m: Int, eps: Double = 0.05,
                seed: Long = 1, refinePasses: Int = 8): Array[Int] = {
    val n = adj.length
    val cap = math.ceil((1 + eps) * n / m).toInt
    val rng = new Random(seed)
    val bin = Array.fill(n)(-1)
    val size = new Array[Int](m)

    // Multi-source BFS region growth: each bin grows a contiguous region
    // from a random seed; the smallest growable bin extends next, which
    // keeps regions balanced AND spatially coherent (random-order greedy
    // fragments space, which both hurts the cut and makes the labels
    // unlearnable for the downstream classifier).
    val frontiers = Array.fill(m)(scala.collection.mutable.Queue.empty[Int])
    val order = Array.tabulate(n)(identity)
    shuffle(order, rng)
    var seedPtr = 0
    def nextUnassigned(): Int = {
      while (seedPtr < n && bin(order(seedPtr)) >= 0) seedPtr += 1
      if (seedPtr < n) order(seedPtr) else -1
    }
    // Farthest-point seeding in graph distance (k-means++ analogue): each
    // new seed maximises its BFS distance to all previous seeds, spreading
    // the regions over the graph before growth starts.
    val seeds = new Array[Int](m)
    seeds(0) = order(0)
    val minDist = Array.fill(n)(Int.MaxValue)
    def bfsUpdate(src: Int): Unit = {
      val q = scala.collection.mutable.Queue((src, 0))
      minDist(src) = 0
      while (q.nonEmpty) {
        val (v, dv) = q.dequeue()
        adj(v).foreach { u =>
          if (dv + 1 < minDist(u)) { minDist(u) = dv + 1; q.enqueue((u, dv + 1)) }
        }
      }
    }
    bfsUpdate(seeds(0))
    for (b <- 1 until m) {
      var best = -1; var bd = -1
      var v = 0
      while (v < n) {
        val dv = if (minDist(v) == Int.MaxValue) Int.MaxValue - 1 else minDist(v)
        if (dv > bd) { bd = dv; best = v }
        v += 1
      }
      seeds(b) = best
      bfsUpdate(best)
    }
    for (b <- 0 until m) {
      val s = if (bin(seeds(b)) == -1) seeds(b) else nextUnassigned()
      if (s >= 0) { bin(s) = b; size(b) += 1; frontiers(b) ++= adj(s) }
    }
    var assigned = size.sum
    while (assigned < n) {
      // smallest bin (under cap) with a growable frontier
      var b = -1
      for (c <- 0 until m)
        if (size(c) < cap && (b == -1 || size(c) < size(b))) b = c
      if (b == -1) b = (0 until m).minBy(size(_)) // all at cap: overflow smallest
      var v = -1
      val q = frontiers(b)
      while (v == -1 && q.nonEmpty) {
        val cand = q.dequeue()
        if (bin(cand) == -1) v = cand
      }
      if (v == -1) v = nextUnassigned() // frontier exhausted: new seed
      if (v == -1) assigned = n // defensive: nothing left
      else {
        bin(v) = b; size(b) += 1; assigned += 1
        frontiers(b) ++= adj(v).filter(bin(_) == -1)
      }
    }
    refine(adj, bin, size, m, cap, rng, refinePasses)
    bin
  }

  /** Balanced partition seeded from an externally supplied assignment
    * (e.g., K-means cells): enforce the capacity cap by evicting the
    * least-connected nodes of oversized bins, then KL-refine. Multilevel
    * partitioners like KaHIP reach cuts at or below good geometric
    * partitions; seeding from geometry gets our substitute into that
    * regime at scales where pure BFS growth plateaus.
    */
  def partitionWithInit(adj: Array[Array[Int]], m: Int, initial: Array[Int],
                        eps: Double = 0.05, seed: Long = 1,
                        refinePasses: Int = 8): Array[Int] = {
    val n = adj.length
    require(initial.length == n && initial.forall(b => b >= 0 && b < m))
    val cap = math.ceil((1 + eps) * n / m).toInt
    val rng = new Random(seed)
    val bin = initial.clone()
    val size = new Array[Int](m)
    bin.foreach(size(_) += 1)
    // Evict from oversized bins: lowest internal connectivity first.
    for (b <- 0 until m if size(b) > cap) {
      val members = (0 until n).filter(bin(_) == b)
      val byConn = members.sortBy(v => adj(v).count(bin(_) == b))
      var i = 0
      while (size(b) > cap && i < byConn.length) {
        val v = byConn(i)
        // best under-cap destination by neighbor count
        var best = -1; var bestScore = -1
        for (c <- 0 until m if c != b && size(c) < cap) {
          val s = adj(v).count(bin(_) == c)
          if (s > bestScore) { bestScore = s; best = c }
        }
        if (best >= 0) { bin(v) = best; size(b) -= 1; size(best) += 1 }
        i += 1
      }
    }
    refine(adj, bin, size, m, cap, rng, refinePasses)
    bin
  }

  /** Recursive bisection: split the graph into two balanced halves
    * (BFS growth + KL at m=2, where move-based refinement is most
    * effective), then recurse on each side's induced subgraph. `m` must be
    * a power of two. This is the classic multilevel-partitioner outer loop
    * and reaches markedly lower cuts than direct m-way growth at scale.
    */
  def partitionRecursive(adj: Array[Array[Int]], m: Int, eps: Double = 0.05,
                         seed: Long = 1, refinePasses: Int = 12): Array[Int] = {
    require(m >= 1 && (m & (m - 1)) == 0, s"m=$m must be a power of two")
    val n = adj.length
    val out = new Array[Int](n)
    def go(nodes: Array[Int], bins: Int, binBase: Int, s: Long): Unit = {
      if (bins == 1 || nodes.length <= 1) {
        nodes.foreach(out(_) = binBase)
      } else {
        // induced subgraph
        val local = nodes.zipWithIndex.toMap
        val subAdj = nodes.map(v => adj(v).flatMap(local.get(_)))
        val half = partition(subAdj, 2, eps, s, refinePasses)
        val left = nodes.indices.filter(half(_) == 0).map(nodes).toArray
        val right = nodes.indices.filter(half(_) == 1).map(nodes).toArray
        go(left, bins / 2, binBase, s * 31 + 1)
        go(right, bins / 2, binBase + bins / 2, s * 31 + 2)
      }
    }
    go(Array.tabulate(n)(identity), m, 0, seed)
    out
  }

  /** KL-style refinement: move a node to the bin with the best cut gain if
    * capacity allows; sweep until no improving move or pass budget spent.
    */
  private def refine(adj: Array[Array[Int]], bin: Array[Int], size: Array[Int],
                     m: Int, cap: Int, rng: Random, refinePasses: Int): Unit = {
    val n = adj.length
    val order = Array.tabulate(n)(identity)
    val nbCount = new Array[Int](m)
    var pass = 0
    var moved = true
    while (moved && pass < refinePasses) {
      moved = false
      shuffle(order, rng)
      order.foreach { v =>
        java.util.Arrays.fill(nbCount, 0)
        adj(v).foreach(u => nbCount(bin(u)) += 1)
        val cur = bin(v)
        var best = cur
        var bestGain = 0
        var b = 0
        while (b < m) {
          if (b != cur && size(b) < cap) {
            val gain = nbCount(b) - nbCount(cur)
            if (gain > bestGain) { bestGain = gain; best = b }
          }
          b += 1
        }
        if (best != cur) {
          size(cur) -= 1; size(best) += 1; bin(v) = best
          moved = true
        }
      }
      pass += 1
    }
  }

  /** Multilevel partitioning (Metis/KaHIP-lite): coarsen by heavy-edge
    * matching until the graph is small, partition the coarsest graph by
    * weighted region growth, then uncoarsen with weighted KL refinement at
    * every level. This is the algorithmic core that makes KaHIP's cuts good;
    * the flat heuristics above plateau on large locally-dense kNN graphs.
    */
  def partitionMultilevel(adj: Array[Array[Int]], m: Int, eps: Double = 0.05,
                          seed: Long = 1, refinePasses: Int = 10): Array[Int] = {
    val rng = new Random(seed)
    // level representation: parallel adjacency (neighbor ids, edge weights),
    // node weights, and the fine→coarse map used for uncoarsening
    final case class Level(nbrs: Array[Array[Int]], wts: Array[Array[Double]],
                           nodeW: Array[Int], toCoarse: Array[Int])
    var nbrs = adj.map(_.clone())
    var wts = adj.map(a => Array.fill(a.length)(1.0))
    var nodeW = Array.fill(adj.length)(1)
    val levels = scala.collection.mutable.ArrayBuffer.empty[Level]
    val totalW = adj.length

    while (nbrs.length > math.max(256, 8 * m)) {
      val n = nbrs.length
      val matched = Array.fill(n)(-1)
      val order = Array.tabulate(n)(identity)
      shuffle(order, rng)
      order.foreach { v =>
        if (matched(v) == -1) {
          var best = -1
          var bw = -1.0
          var i = 0
          while (i < nbrs(v).length) {
            val u = nbrs(v)(i)
            if (matched(u) == -1 && u != v && wts(v)(i) > bw) { bw = wts(v)(i); best = u }
            i += 1
          }
          if (best >= 0) { matched(v) = best; matched(best) = v }
          else matched(v) = v
        }
      }
      // coarse ids
      val toCoarse = Array.fill(n)(-1)
      var cn = 0
      for (v <- 0 until n if toCoarse(v) == -1) {
        toCoarse(v) = cn
        if (matched(v) != v) toCoarse(matched(v)) = cn
        cn += 1
      }
      if (cn >= n) {
        // no progress — stop coarsening
        levels.prepend(Level(nbrs, wts, nodeW, toCoarse))
        nbrs = Array.empty
      } else {
        val cNodeW = new Array[Int](cn)
        for (v <- 0 until n) cNodeW(toCoarse(v)) += nodeW(v)
        val agg = Array.fill(cn)(scala.collection.mutable.HashMap.empty[Int, Double])
        for (v <- 0 until n; i <- nbrs(v).indices) {
          val a = toCoarse(v); val b = toCoarse(nbrs(v)(i))
          if (a != b) agg(a)(b) = agg(a).getOrElse(b, 0.0) + wts(v)(i)
        }
        levels.prepend(Level(nbrs, wts, nodeW, toCoarse))
        nbrs = agg.map(_.keys.toArray)
        wts = agg.zip(nbrs).map { case (mp, ks) => ks.map(mp) }
        nodeW = cNodeW
      }
    }
    if (nbrs.isEmpty) {
      // coarsening stalled at the last prepended level; partition it flat
      val lvl = levels.remove(0)
      nbrs = lvl.nbrs; wts = lvl.wts; nodeW = lvl.nodeW
    }

    val cap = math.ceil((1 + eps) * totalW.toDouble / m).toInt
    // initial partition of the coarsest graph: weighted region growth
    var bin = growWeighted(nbrs, wts, nodeW, m, cap, rng)
    refineWeighted(nbrs, wts, nodeW, bin, m, cap, rng, refinePasses * 2)

    // uncoarsen, refining at each level
    levels.foreach { lvl =>
      val fineBin = Array.tabulate(lvl.toCoarse.length)(v => bin(lvl.toCoarse(v)))
      refineWeighted(lvl.nbrs, lvl.wts, lvl.nodeW, fineBin, m, cap, rng, refinePasses)
      bin = fineBin
    }
    bin
  }

  private def growWeighted(nbrs: Array[Array[Int]], wts: Array[Array[Double]],
                           nodeW: Array[Int], m: Int, cap: Int, rng: Random): Array[Int] = {
    val n = nbrs.length
    val bin = Array.fill(n)(-1)
    val size = new Array[Int](m)
    val order = Array.tabulate(n)(identity)
    shuffle(order, rng)
    val frontiers = Array.fill(m)(scala.collection.mutable.Queue.empty[Int])
    var seedPtr = 0
    def nextUnassigned(): Int = {
      while (seedPtr < n && bin(order(seedPtr)) >= 0) seedPtr += 1
      if (seedPtr < n) order(seedPtr) else -1
    }
    for (b <- 0 until m) {
      val s = nextUnassigned()
      if (s >= 0) { bin(s) = b; size(b) += nodeW(s); frontiers(b) ++= nbrs(s) }
    }
    var assignedNodes = bin.count(_ >= 0)
    while (assignedNodes < n) {
      var b = -1
      for (c <- 0 until m)
        if (size(c) < cap && (b == -1 || size(c) < size(b))) b = c
      if (b == -1) b = (0 until m).minBy(size(_))
      var v = -1
      val q = frontiers(b)
      while (v == -1 && q.nonEmpty) {
        val cand = q.dequeue()
        if (bin(cand) == -1) v = cand
      }
      if (v == -1) v = nextUnassigned()
      if (v == -1) assignedNodes = n
      else {
        bin(v) = b; size(b) += nodeW(v); assignedNodes += 1
        frontiers(b) ++= nbrs(v).filter(bin(_) == -1)
      }
    }
    bin
  }

  private def refineWeighted(nbrs: Array[Array[Int]], wts: Array[Array[Double]],
                             nodeW: Array[Int], bin: Array[Int], m: Int, cap: Int,
                             rng: Random, passes: Int): Unit = {
    val n = nbrs.length
    val size = new Array[Int](m)
    for (v <- 0 until n) size(bin(v)) += nodeW(v)
    val order = Array.tabulate(n)(identity)
    val gainTo = new Array[Double](m)
    var pass = 0
    var moved = true
    while (moved && pass < passes) {
      moved = false
      shuffle(order, rng)
      order.foreach { v =>
        java.util.Arrays.fill(gainTo, 0.0)
        var i = 0
        while (i < nbrs(v).length) { gainTo(bin(nbrs(v)(i))) += wts(v)(i); i += 1 }
        val cur = bin(v)
        var best = cur
        var bestGain = 1e-12
        var b = 0
        while (b < m) {
          if (b != cur && size(b) + nodeW(v) <= cap) {
            val gain = gainTo(b) - gainTo(cur)
            if (gain > bestGain) { bestGain = gain; best = b }
          }
          b += 1
        }
        if (best != cur) {
          size(cur) -= nodeW(v); size(best) += nodeW(v); bin(v) = best
          moved = true
        }
      }
      pass += 1
    }
  }

  /** Number of graph edges crossing bins (each undirected edge once). */
  def edgeCut(adj: Array[Array[Int]], bin: Array[Int]): Long = {
    var cut = 0L
    var i = 0
    while (i < adj.length) {
      adj(i).foreach(j => if (j > i && bin(i) != bin(j)) cut += 1)
      i += 1
    }
    cut
  }

  private def shuffle(a: Array[Int], rng: Random): Unit = {
    var i = a.length - 1
    while (i > 0) {
      val j = rng.nextInt(i + 1)
      val t = a(i); a(i) = a(j); a(j) = t
      i -= 1
    }
  }
}
