package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Tables

/** Table 2: learnable parameters when dividing SIFT (d=128) into 256 bins
  * (hierarchical 16×16, Neural LSH hidden 512, ours hidden 128).
  * Paper: Neural LSH 729k, Ours 183k, K-Means 33k.
  */
class Table2ParamsBench extends AnyFunSuite {

  test("Table 2: parameter counts and ordering") {
    val rows = Tables.table2()
    println("== Table 2: learnable parameters, SIFT d=128, 256 bins ==")
    println(f"${"method"}%-26s ${"ours"}%10s ${"paper"}%8s")
    rows.foreach(r => println(f"${r.method}%-26s ${r.params}%10d ${r.paperParams}%8s"))

    val byName = rows.map(r => r.method -> r.params).toMap
    val nlsh = byName("Neural LSH (hidden 512)")
    val ours = byName("Ours (hidden 128)")
    val km = byName("K-Means")
    assert(nlsh > ours && ours > km, "Table 2 ordering must hold")
    assert(km == 32768L, "K-means centroids are exactly m*d = 33k, matching the paper")
    val ratio = nlsh.toDouble / ours
    assert(ratio > 2.5 && ratio < 6.0,
      s"Neural-LSH/ours parameter ratio $ratio should be near the paper's 729k/183k ≈ 4")
  }
}
