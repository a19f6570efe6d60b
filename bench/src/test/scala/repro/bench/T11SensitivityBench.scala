package repro.bench

import repro.SparkSpec
import repro.tables.T11Sensitivity

/** T11 — Fig. 6a / Fig. 6b: hyperparameter sensitivity. */
class T11SensitivityBench extends SparkSpec {

  private lazy val result = T11Sensitivity.run(spark)

  test("T11: print tables") {
    println(T11Sensitivity.format(result))
    assert(result.variants.size == 9 && result.lambdas.size == 16)
  }

  test("T11: variant 1 is at least as good as variants 2 and 3 at their best ℓmax (Result 1)") {
    // Single-seed runs carry noise; compare each variant at its own best
    // ℓmax, which is the choice a practitioner would make.
    def best(v: Int) = result.variants.filter(_.variant == v).map(_.l2).min
    assert(best(1) <= best(3) + 0.02, s"v1 ${best(1)} vs v3 ${best(3)}")
    assert(best(1) <= best(2) + 0.05, s"v1 ${best(1)} vs v2 ${best(2)}")
  }

  test("T11: longer paths help at sparse f — ℓmax=5 beats ℓmax=1 (Fig. 6b)") {
    def at(lm: Int) = result.lambdas.filter(r => r.lambda == 10.0 && r.lmax == lm).head.l2
    assert(at(5) < at(1), s"lmax5 ${at(5)} vs lmax1 ${at(1)}")
  }

  test("T11: even ℓmax=2 underperforms odd ℓmax=3 (mirror optima, Fig. 6b)") {
    def best(lm: Int) = result.lambdas.filter(_.lmax == lm).map(_.l2).min
    assert(best(3) <= best(2) + 0.02, s"lmax3 ${best(3)} vs lmax2 ${best(2)}")
  }

  test("T11: λ=10 (with a well-chosen ℓmax) is among the robust choices (Result 1)") {
    val chosen = result.lambdas.filter(r => r.lambda == 10.0 && r.lmax >= 3).map(_.l2).min
    val bestOverall = result.lambdas.map(_.l2).min
    assert(chosen <= bestOverall + 0.05, s"λ=10 gives $chosen, best is $bestOverall")
    // And the near-myopic λ=0.1 is far worse at this sparsity.
    val myopic = result.lambdas.filter(r => r.lambda == 0.1).map(_.l2).min
    assert(chosen < myopic, s"λ=10 ($chosen) vs λ=0.1 ($myopic)")
  }
}
