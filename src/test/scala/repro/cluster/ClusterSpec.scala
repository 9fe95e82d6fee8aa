package repro.cluster

import org.scalatest.funsuite.AnyFunSuite
import repro.SynthData

class ClusterMetricsSpec extends AnyFunSuite {

  test("ARI of identical labelings is 1") {
    val l = Array(0, 0, 1, 1, 2, 2)
    assert(ClusterMetrics.ari(l, l) == 1.0)
  }

  test("ARI is invariant to label permutation") {
    val a = Array(0, 0, 1, 1, 2, 2)
    val b = Array(2, 2, 0, 0, 1, 1)
    assert(math.abs(ClusterMetrics.ari(a, b) - 1.0) < 1e-12)
  }

  test("ARI of a random labeling vs structure is near 0") {
    val rng = new java.util.Random(1)
    val truth = Array.tabulate(2000)(_ % 4)
    val rand = Array.fill(2000)(rng.nextInt(4))
    assert(math.abs(ClusterMetrics.ari(rand, truth)) < 0.05)
  }

  test("ARI on a known contingency example") {
    // classic example: truth (0,0,0,1,1,1), pred (0,0,1,1,2,2)
    val ari = ClusterMetrics.ari(Array(0, 0, 1, 1, 2, 2), Array(0, 0, 0, 1, 1, 1))
    assert(ari > 0.2 && ari < 0.5) // sklearn gives ≈0.2424
    assert(math.abs(ari - 0.24242424) < 1e-6)
  }

  test("ARI handles the single-cluster degenerate case") {
    val a = Array(0, 0, 0)
    assert(ClusterMetrics.ari(a, a) == 1.0)
  }

  test("matchAccuracy is 1 for a perfect match up to naming") {
    val a = Array(5, 5, 9, 9)
    val b = Array(0, 0, 1, 1)
    assert(ClusterMetrics.matchAccuracy(a, b) == 1.0)
  }

  test("matchAccuracy of a half-wrong labeling is 0.75 under greedy matching") {
    val pred = Array(0, 0, 1, 1)
    val truth = Array(0, 1, 1, 1)
    // pred cluster 0 → majority truth is tie (1 each) → 1; cluster 1 → 2
    assert(ClusterMetrics.matchAccuracy(pred, truth) == 0.75)
  }
}

class DbscanSpec extends AnyFunSuite {

  test("recovers two well-separated blobs and marks distant noise") {
    val rng = new java.util.Random(2)
    val pts = Array.tabulate(100) { i =>
      val off = if (i % 2 == 0) 0.0 else 10.0
      Array(off + rng.nextGaussian() * 0.3, off + rng.nextGaussian() * 0.3)
    } ++ Array(Array(100.0, 100.0)) // isolated noise point
    val labels = Dbscan.fit(pts, eps = 1.5, minPts = 4)
    assert(labels.last == -1, "isolated point should be noise")
    val clusters = labels.dropRight(1).distinct.filter(_ >= 0)
    assert(clusters.length == 2, s"found ${clusters.length} clusters")
    // blob membership consistent
    val even = labels.zipWithIndex.filter(x => x._2 % 2 == 0 && x._2 < 100).map(_._1).distinct
    assert(even.length == 1)
  }

  test("separates the two moons (the K-means failure case)") {
    val (pts, truth) = SynthData.moons(400, noise = 0.05, seed = 3)
    val labels = Dbscan.fit(pts, eps = 0.2, minPts = 5)
    val ari = ClusterMetrics.ari(labels, truth)
    assert(ari > 0.9, s"DBSCAN ARI on moons = $ari")
  }

  test("separates concentric circles") {
    val (pts, truth) = SynthData.circles(400, noise = 0.03, seed = 4)
    val labels = Dbscan.fit(pts, eps = 0.15, minPts = 4)
    val ari = ClusterMetrics.ari(labels, truth)
    assert(ari > 0.9, s"DBSCAN ARI on circles = $ari")
  }

  test("a too-small eps marks everything noise") {
    val (pts, _) = SynthData.moons(100, seed = 5)
    val labels = Dbscan.fit(pts, eps = 1e-6, minPts = 3)
    assert(labels.forall(_ == -1))
  }

  test("labels every point (no unvisited markers left)") {
    val (pts, _) = SynthData.blobs4(300, seed = 6)
    val labels = Dbscan.fit(pts, eps = 1.0, minPts = 4)
    assert(labels.forall(_ >= -1))
  }
}

class SpectralSpec extends AnyFunSuite {

  test("recovers concentric circles (the canonical spectral win)") {
    val (pts, truth) = SynthData.circles(300, noise = 0.03, seed = 7)
    val labels = Spectral.fit(pts, k = 2, knnK = 10, seed = 1)
    val ari = ClusterMetrics.ari(labels, truth)
    assert(ari > 0.9, s"spectral ARI on circles = $ari")
  }

  test("recovers the two moons") {
    val (pts, truth) = SynthData.moons(300, noise = 0.05, seed = 8)
    val labels = Spectral.fit(pts, k = 2, knnK = 10, seed = 2)
    val ari = ClusterMetrics.ari(labels, truth)
    assert(ari > 0.9, s"spectral ARI on moons = $ari")
  }

  test("recovers four separated blobs") {
    val (pts, truth) = SynthData.blobs4(300, seed = 9)
    val labels = Spectral.fit(pts, k = 4, knnK = 10, seed = 3)
    val ari = ClusterMetrics.ari(labels, truth)
    assert(ari > 0.8, s"spectral ARI on blobs4 = $ari")
  }

  test("returns a label in range for every point") {
    val (pts, _) = SynthData.moons(150, seed = 10)
    val labels = Spectral.fit(pts, k = 2, knnK = 8, seed = 4)
    assert(labels.forall(l => l >= 0 && l < 2))
  }
}
