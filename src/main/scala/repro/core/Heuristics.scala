package repro.core

import repro.linalg.Dense

/** The two-value compatibility heuristic of prior work, reproduced for
  * Appendix E.1 (Fig. 12).
  *
  * Prior work [15, 18, 29] guesses H by assuming its entries take only a
  * high value and a low value, with the positions known from domain
  * knowledge. We grant the heuristic its most favorable setting, as the
  * paper does: the positions are read off the gold-standard matrix
  * (entry ≥ mean → "High", else "Low"). The magnitude of the spread is
  * irrelevant to LinBP labeling — ε renormalizes by ρ(H̃) — so only the
  * H/L pattern carries information.
  */
object Heuristics {

  /** The ±δ pattern matrix around 1/k. For a doubly-stochastic GS the
    * mean entry is exactly 1/k, so the threshold is the mean entry.
    */
  def twoValue(gs: Dense, delta: Double = 0.1): Dense = {
    val k = gs.rows
    val mean = gs.sum / (k * k)
    gs.map(x => 1.0 / k + (if (x >= mean) delta else -delta))
  }

  /** The H/L mask alone (true = High), for reporting (cf. Fig. 12a). */
  def mask(gs: Dense): Array[Boolean] = {
    val mean = gs.sum / (gs.rows * gs.cols)
    gs.data.map(_ >= mean)
  }
}
