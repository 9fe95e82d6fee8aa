package repro.bench

import repro.SparkSpec
import repro.eval.{Sweep, Tables}

/** Table 4 (and the Figure 5a sweep behind it): SIFT-lite, 16 bins, 10-NN.
  *
  * Reproduced claim: at 85% 10-NN accuracy, our ensemble-of-3 needs a
  * substantially smaller candidate set than Neural LSH (paper: −33%) and
  * K-means (paper: −38%). The full accuracy-vs-|C| sweeps for all five
  * methods (ours ×2, Neural LSH, K-means, cross-polytope LSH) are printed —
  * they are the data behind Figure 5a.
  */
class Table4CandidateSizeBench extends SparkSpec {

  test("Table 4: candidate-set decrease at 85% 10-NN accuracy (SIFT-lite, 16 bins)") {
    val sweeps = Tables.sift16Sweeps(spark)
    println("== Figure 5a sweep data (SIFT-lite, 16 bins, 10-NN) ==")
    sweeps.foreach(s => println(Tables.fmtSweep(s)))

    val rows = Tables.table4(sweeps)
    println("== Table 4: |C| decrease at 85% 10-NN accuracy ==")
    println(f"${"method"}%-12s ${"|C| method"}%11s ${"|C| ours"}%9s ${"decrease"}%9s ${"paper"}%6s")
    rows.foreach { r =>
      println(f"${r.method}%-12s ${r.candAt85}%11.0f ${r.oursCandAt85}%9.0f ${r.decreasePct}%8.1f%% ${r.paperDecreasePct}%5.0f%%")
    }

    rows.foreach { r =>
      assert(!r.candAt85.isNaN && !r.oursCandAt85.isNaN,
        s"${r.method}: sweep never reached 85% accuracy")
      assert(r.decreasePct > 5.0,
        s"ours must need a smaller |C| than ${r.method} at 85% (got ${r.decreasePct}%)")
    }

    // Figure 5 ordering shape: learning-based beats data-oblivious LSH.
    val byName = sweeps.map(s => s.method -> s.points).toMap
    def at85(m: String) = Sweep.candidateSizeAtAccuracy(byName(m), 0.85).getOrElse(Double.MaxValue)
    assert(at85("Ours (ensemble of 3)") < at85("Cross-polytope LSH"),
      "ours must beat cross-polytope LSH")
    // the paper's 16-bin finding: a single unsupervised model is on par with
    // Neural LSH (which needed hours of supervised preprocessing)
    assert(at85("Ours (1 model)") <= at85("Neural LSH") * 1.15,
      "a single unsupervised model must be at least on par with Neural LSH")
    // ensembling helps (the paper's ~10% claim, asserted loosely)
    assert(at85("Ours (ensemble of 3)") <= at85("Ours (1 model)") * 1.05,
      "the ensemble must not be materially worse than a single model")
  }
}
