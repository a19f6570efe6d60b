package repro.bench

import repro.SparkSpec
import repro.tables.T4Consistency

/** T4 — Fig. 5a / Thm. 4.1: consistency of NB statistics. */
class T4ConsistencyBench extends SparkSpec {

  private lazy val rows = T4Consistency.run(spark)

  test("T4: print table") {
    println(T4Consistency.format(rows))
    assert(rows.size == 5)
  }

  test("T4: the planted H^ℓ series matches Example 4.2: 0.6, 0.44, 0.376, 0.3504") {
    val expected = Seq(0.6, 0.44, 0.376, 0.3504)
    rows.take(4).zip(expected).foreach { case (r, e) =>
      assert(math.abs(r.truth - e) < 1e-9, s"ℓ=${r.l}: ${r.truth} vs $e")
    }
  }

  test("T4: P̂_NB tracks H^ℓ closely at every length (consistent estimator)") {
    rows.foreach { r =>
      assert(math.abs(r.estNB - r.truth) < 0.03, s"ℓ=${r.l}: NB ${r.estNB} vs ${r.truth}")
    }
  }

  test("T4: full-path statistics are biased upward where backtracking lands (even ℓ)") {
    // Backtracking walks return to their start, so the O(1/d) bias of
    // P̂⁽ℓ⁾ concentrates on the diagonal — which is the tracked (0,0)
    // entry exactly at even ℓ. At odd ℓ the tracked entry is off-diagonal
    // and the full-path bias there is second-order.
    rows.filter(_.l % 2 == 0).foreach { r =>
      assert(r.estFull > r.truth + 0.01,
        s"ℓ=${r.l}: full ${r.estFull} should overshoot ${r.truth}")
    }
  }

  test("T4: NB beats full paths in L2 at even ℓ, and is never much worse") {
    rows.filter(_.l % 2 == 0).foreach { r =>
      assert(r.l2NB < r.l2Full, s"ℓ=${r.l}: NB ${r.l2NB} vs full ${r.l2Full}")
    }
    rows.filter(_.l >= 2).foreach { r =>
      assert(r.l2NB < r.l2Full + 0.01, s"ℓ=${r.l}: NB ${r.l2NB} vs full ${r.l2Full}")
    }
  }
}
