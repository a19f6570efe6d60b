package repro.bench

import repro.SparkSpec
import repro.tables.T6Restarts

/** T6 — Fig. 6h: restarts needed for DCEr. */
class T6RestartsBench extends SparkSpec {

  private lazy val rows = T6Restarts.run(spark)

  test("T6: print table") {
    println(T6Restarts.format(rows))
    assert(rows.size == 4)
  }

  test("T6: energy is non-increasing in the number of restarts") {
    rows.sliding(2).foreach {
      case Seq(a, b) => assert(b.energy <= a.energy + 1e-12, s"r=${b.restarts}")
      case _         =>
    }
  }

  test("T6: with r = 10 DCEr reaches the GS-initialized optimum (Result 3)") {
    val r10 = rows.find(_.restarts == 10).get
    assert(r10.energy <= r10.energyGlobal * 1.05 + 1e-9,
      s"energy ${r10.energy} vs global ${r10.energyGlobal}")
    assert(r10.acc > r10.accGlobal - 0.02,
      s"acc ${r10.acc} vs global-init acc ${r10.accGlobal}")
  }
}
