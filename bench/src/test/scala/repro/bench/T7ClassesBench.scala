package repro.bench

import repro.SparkSpec
import repro.tables.T7Classes

/** T7 — Fig. 6g / Fig. 6l: accuracy and cost vs number of classes. */
class T7ClassesBench extends SparkSpec {

  private lazy val rows = T7Classes.run(spark)

  test("T7: print table") {
    println(T7Classes.format(rows))
    assert(rows.size == 5)
  }

  test("T7: DCEr tracks GS for every k (Result 4)") {
    rows.foreach { r =>
      assert(r.accDCEr > r.accGS - 0.07, s"k=${r.k}: DCEr ${r.accDCEr} vs GS ${r.accGS}")
    }
  }

  test("T7: DCEr beats the homophily baseline for every k") {
    rows.foreach { r =>
      assert(r.accDCEr > r.accHarmonic, s"k=${r.k}: DCEr ${r.accDCEr} vs harmonic ${r.accHarmonic}")
    }
  }

  test("T7: GS propagation beats random guessing for every k") {
    rows.foreach { r =>
      assert(r.accGS > r.random + 0.05, s"k=${r.k}: GS ${r.accGS} vs random ${r.random}")
    }
  }

  test("T7: optimization cost grows with k (O(k⁴·r)) while the sketch stays flat") {
    val optSmall = rows.head.optMs.max(1L)
    val optLarge = rows.last.optMs.max(1L)
    assert(optLarge > optSmall, s"opt ms: ${rows.map(r => r.k -> r.optMs)}")
  }
}
