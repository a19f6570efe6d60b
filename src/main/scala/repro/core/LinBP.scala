package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.linalg.Dense

/** Linearized Belief Propagation (Eq. 1 / Eq. 4), echo cancellation
  * dropped, as the paper does.
  *
  * The update iterated is `F ← X̃ + ε·W·F·H̃`, with H̃ the residual
  * (centered) compatibility matrix and ε = s / (ρ(W)·ρ(H̃)) so that the
  * convergence criterion Eq. (2) holds for s < 1 (paper uses s = 0.5 and
  * 10 iterations in §5.3). Theorem 3.1 guarantees the resulting labels do
  * not depend on the centering, which LinBPSpec verifies.
  */
object LinBP {

  /** Run LinBP and return the final belief matrix F in (node, cls, v)
    * long format.
    *
    * @param g          the graph (symmetric adjacency)
    * @param seedLabels (node, cls) seed labels
    * @param h          compatibility matrix (centered or not — Thm. 3.1)
    * @param iterations fixed iteration count (paper: 10)
    * @param s          convergence parameter, ε = s/(ρ(W)·ρ(H̃))
    * @param rhoW       precomputed ρ(W); pass it when labeling the same
    *                   graph repeatedly (Holdout does), else it is
    *                   computed by distributed power iteration
    * @param center     propagate residuals (default) or raw frequencies
    */
  def run(
      g: SparseGraph,
      seedLabels: DataFrame,
      h: Dense,
      iterations: Int = 10,
      s: Double = 0.5,
      rhoW: Option[Double] = None,
      center: Boolean = true): DataFrame = {
    val k = h.rows
    val hTilde = CompatibilityMatrix.centered(h)
    val rhoH = hTilde.spectralRadius()
    val x = GraphOps.materialize(
      if (center) GraphOps.centeredOneHot(seedLabels, k) else GraphOps.oneHot(seedLabels))
    if (rhoH < 1e-12) return x // uniform H carries no signal: F = X
    val rho = rhoW.getOrElse(GraphOps.spectralRadius(g))
    val eps = s / (rho * rhoH)
    val hEff = (if (center) hTilde else h).scale(eps)
    var f = x
    for (_ <- 1 to iterations) {
      f = GraphOps.materialize(
        GraphOps.plus(x, GraphOps.applyH(GraphOps.multiply(g.edges, f), hEff)))
    }
    f
  }

  /** LinBP energy E(F) = ‖F − X − W·F·H‖² (Prop. 3.2), for a given
    * effective (already ε-scaled) H. Zero at the fixed point.
    */
  def energy(g: SparseGraph, x: DataFrame, f: DataFrame, hEff: Dense): Double = {
    val wfh = GraphOps.applyH(GraphOps.multiply(g.edges, f), hEff)
    val resid = GraphOps.minus(f, GraphOps.plus(x, wfh))
    val r = resid.agg(sum(col("v") * col("v"))).first()
    if (r.isNullAt(0)) 0.0 else r.getDouble(0)
  }
}
