package repro.bench

import repro.SparkSpec
import repro.tables.T9Baselines

/** T9 — Fig. 6i: homophily baselines collapse under heterophily. */
class T9BaselinesBench extends SparkSpec {

  private lazy val rows = T9Baselines.run(spark)

  test("T9: print table") {
    println(T9Baselines.format(rows))
    assert(rows.size == 2)
  }

  test("T9: baselines with a homophily assumption fall far behind (Fig. 6i)") {
    rows.foreach { r =>
      assert(r.accDCEr > r.accHarmonic + 0.15, s"f=${r.f}: harmonic ${r.accHarmonic}")
      assert(r.accDCEr > r.accMRW + 0.15, s"f=${r.f}: MRW ${r.accMRW}")
    }
  }

  test("T9: baselines only capture the homophilous share of the graph") {
    // In the planted pair matrix classes 0↔1 attract each other while
    // class 2 is self-paired, so a homophily method can label roughly the
    // class-2 third plus partial credit — but stays far below GS even
    // with plentiful labels.
    rows.foreach { r =>
      assert(r.accHarmonic < 0.7, s"f=${r.f}: harmonic ${r.accHarmonic}")
      assert(r.accMRW < 0.7, s"f=${r.f}: MRW ${r.accMRW}")
    }
  }
}
