package repro.bench

import repro.SparkSpec
import repro.tables.T8Imbalance

/** T8 — Fig. 6j: class imbalance with a general H. */
class T8ImbalanceBench extends SparkSpec {

  private lazy val rows = T8Imbalance.run(spark)

  test("T8: print table") {
    println(T8Imbalance.format(rows))
    assert(rows.size == 3)
  }

  test("T8: DCEr stays at GS level under imbalance and general H (Result 4)") {
    rows.foreach { r =>
      assert(r.accDCEr > r.accGS - 0.05, s"f=${r.f}: DCEr ${r.accDCEr} vs GS ${r.accGS}")
    }
  }

  test("T8: at the sparsest f DCEr clearly beats MCE and the homophily baseline") {
    // This is Fig. 6j's claim: in the sparse regime DCEr is robustly
    // better than the alternatives; with plentiful labels they converge.
    val sparse = rows.head
    assert(sparse.accDCEr > sparse.accMCE + 0.05,
      s"DCEr ${sparse.accDCEr} vs MCE ${sparse.accMCE}")
    assert(sparse.accDCEr > sparse.accHarmonic,
      s"DCEr ${sparse.accDCEr} vs harmonic ${sparse.accHarmonic}")
  }

  test("T8: GS accuracy improves with f (signal, not noise)") {
    assert(rows.last.accGS > rows.head.accGS,
      s"GS acc ${rows.map(_.accGS)} should grow with f")
  }
}
