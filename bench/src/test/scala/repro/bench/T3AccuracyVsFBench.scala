package repro.bench

import repro.SparkSpec
import repro.tables.T3AccuracyVsF

/** T3 — Fig. 3a / Fig. 6f: accuracy vs seed fraction. */
class T3AccuracyVsFBench extends SparkSpec {

  private lazy val rows = T3AccuracyVsF.run(spark)

  test("T3: print table") {
    println(T3AccuracyVsF.format(rows))
    assert(rows.size == 5)
  }

  test("T3: DCEr stays within 0.05 of GS across all f (Result 2)") {
    rows.foreach { r =>
      assert(r.accDCEr > r.accGS - 0.05, s"f=${r.f}: DCEr ${r.accDCEr} vs GS ${r.accGS}")
    }
  }

  test("T3: GS accuracy grows with f and clearly beats random at the sparsest f") {
    assert(rows.last.accGS > rows.head.accGS)
    assert(rows.head.accGS > 1.0 / 3 + 0.05, s"sparsest GS acc ${rows.head.accGS}")
  }

  test("T3: myopic/linear estimation falls behind DCEr in the sparse regime (Fig. 6f)") {
    val sparse = rows.head // ~9 seed nodes of 10k
    assert(sparse.accDCEr > sparse.accMCE + 0.05,
      s"DCEr ${sparse.accDCEr} vs MCE ${sparse.accMCE} at f=${sparse.f}")
    assert(sparse.accDCEr > sparse.accLCE + 0.05,
      s"DCEr ${sparse.accDCEr} vs LCE ${sparse.accLCE} at f=${sparse.f}")
  }

  test("T3: with plentiful labels every sketch method reaches GS level") {
    val dense = rows.last // f = 0.1
    Seq("DCEr" -> dense.accDCEr, "DCE" -> dense.accDCE, "MCE" -> dense.accMCE)
      .foreach { case (name, acc) =>
        assert(acc > dense.accGS - 0.05, s"$name $acc vs GS ${dense.accGS} at f=0.1")
      }
  }

  test("T3: Holdout does not beat DCEr where it ran") {
    rows.filter(r => !r.accHoldout.isNaN).foreach { r =>
      assert(r.accDCEr >= r.accHoldout - 0.05,
        s"f=${r.f}: holdout ${r.accHoldout} vs DCEr ${r.accDCEr}")
    }
  }
}
