package repro.bench

import repro.SparkSpec
import repro.tables.T10Heuristics

/** T10 — Fig. 12: the two-value heuristic's success and failure modes. */
class T10HeuristicsBench extends SparkSpec {

  private lazy val rows = T10Heuristics.run(spark)

  test("T10: print table") {
    println(T10Heuristics.format(rows))
    assert(rows.map(_.dataset).toSet == Set("MovieLens", "Prop-37"))
  }

  test("T10: on MovieLens (near two-valued GS) the heuristic is competitive (Fig. 12b)") {
    val r = rows.find(_.dataset == "MovieLens").get
    assert(r.accHeuristic > r.accDCEr - 0.1,
      s"heuristic ${r.accHeuristic} vs DCEr ${r.accDCEr}")
  }

  test("T10: on Prop-37 (non-two-valued GS) the heuristic loses to DCEr (Fig. 12c)") {
    val p = rows.find(_.dataset == "Prop-37").get
    val m = rows.find(_.dataset == "MovieLens").get
    assert(p.accDCEr > p.accHeuristic,
      s"DCEr ${p.accDCEr} vs heuristic ${p.accHeuristic}")
    // The shape claim: flattening the compatibilities to two values costs
    // much more on Prop-37 than on the genuinely two-valued MovieLens.
    val penaltyProp = p.accDCEr - p.accHeuristic
    val penaltyMl = m.accDCEr - m.accHeuristic
    assert(penaltyProp > penaltyMl + 0.02,
      s"heuristic penalty Prop-37 $penaltyProp vs MovieLens $penaltyMl")
  }

  test("T10: DCEr tracks GS on both datasets") {
    rows.foreach { r =>
      assert(r.accDCEr > r.accGS - 0.07, s"${r.dataset}: ${r.accDCEr} vs ${r.accGS}")
    }
  }
}
