package repro.bench

import repro.SparkSpec
import repro.tables.T5Factorized

/** T5 — Fig. 5b: factorized summation vs explicit W^ℓ. */
class T5FactorizedBench extends SparkSpec {

  private lazy val rows = T5Factorized.run(spark)

  test("T5: print table") {
    println(T5Factorized.format(rows))
    assert(rows.size == 6)
  }

  test("T5: explicit W^ℓ densifies roughly by the average degree per hop") {
    val nnz = rows.filter(_.explicitEntries > 0).map(r => r.l -> r.explicitEntries).toMap
    assert(nnz(2) > 5 * nnz(1), s"nnz: $nnz")
    assert(nnz(3) > 5 * nnz(2), s"nnz: $nnz")
  }

  test("T5: factorized summation beats explicit evaluation from ℓ = 3 on") {
    rows.filter(r => r.l >= 3 && r.explicitMs > 0).foreach { r =>
      assert(r.factorizedMs < r.explicitMs,
        s"ℓ=${r.l}: factorized ${r.factorizedMs}ms vs explicit ${r.explicitMs}ms")
    }
  }

  test("T5: the factorized/explicit gap widens with ℓ (the Fig. 5b shape)") {
    val speedups = rows.filter(r => r.l >= 2 && r.explicitMs > 0)
      .map(r => r.l -> r.explicitMs.toDouble / r.factorizedMs.max(1L))
    assert(speedups.last._2 > speedups.head._2,
      s"speedups should grow with ℓ: $speedups")
  }

  test("T5: ℓ = 8 summarizes >10^13 paths and stays feasible (Example 4.6)") {
    val r8 = rows.find(_.l == 8).get
    assert(r8.approxPaths > 1e13, s"~paths ${r8.approxPaths}")
    assert(r8.factorizedMs < 60000, s"ℓ=8 took ${r8.factorizedMs}ms")
  }
}
