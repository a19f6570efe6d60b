package repro.core

import org.apache.spark.sql.DataFrame
import repro.linalg.Dense

/** The factorized graph representations ("sketches") of §4.3–4.6.
  *
  * For each path length ℓ ∈ [ℓmax] we hold the k×k co-occurrence counts
  *
  *   M⁽ℓ⁾     = Xᵀ·Wℓ·X          (all paths — biased, Thm. 4.1)
  *   M_NB⁽ℓ⁾  = Xᵀ·W_NB⁽ℓ⁾·X     (non-backtracking paths — consistent)
  *
  * computed without ever materializing Wℓ: the recurrence of Prop. 4.3
  * is pushed through the n×k matrices (Algorithm 4.4),
  *
  *   N_NB⁽ℓ⁾ = W·N_NB⁽ℓ⁻¹⁾ − (D−I)·N_NB⁽ℓ⁻²⁾,
  *   N_NB⁽¹⁾ = W·X,  N_NB⁽²⁾ = W·N_NB⁽¹⁾ − D·X,
  *
  * which costs O(m·k·ℓmax) total (Prop. 4.5). The sketches are O(k²·ℓmax)
  * — independent of the graph — so estimation runs on the driver.
  */
final case class Sketches(
    k: Int,
    lmax: Int,
    nLabeled: Long,
    mFull: IndexedSeq[Dense],
    mNB: IndexedSeq[Dense]) {

  require(mFull.length == lmax && mNB.length == lmax, "need one matrix per length")

  /** Observed length-ℓ statistics P̂⁽ℓ⁾ over all paths (1-based ℓ). */
  def pFull(l: Int, variant: Int = 1): Dense = Sketch.normalize(mFull(l - 1), variant)

  /** Observed length-ℓ statistics P̂_NB⁽ℓ⁾ over non-backtracking paths. */
  def pNB(l: Int, variant: Int = 1): Dense = Sketch.normalize(mNB(l - 1), variant)
}

object Sketch {

  /** Normalize a count matrix M into an observed statistics matrix P̂.
    *
    * Variant 1 (Eq. 9): row-stochastic, `diag(M·1)⁻¹·M` — the paper's
    * recommended default. Variant 2 (Eq. 10): symmetric LGC scaling
    * `diag(M·1)^{-1/2}·M·diag(M·1)^{-1/2}`. Variant 3 (Eq. 11): global
    * scale so the mean entry is 1/k.
    */
  def normalize(m: Dense, variant: Int): Dense = variant match {
    case 1 => m.rowNormalized
    case 2 =>
      val rs = m.rowSums.map(s => if (s > 0) 1.0 / math.sqrt(s) else 0.0)
      Dense.diag(rs) * m * Dense.diag(rs)
    case 3 =>
      val total = m.sum
      if (total == 0) Dense.fill(m.rows, m.cols)(1.0 / m.cols) else m.scale(m.cols / total)
    case other => throw new IllegalArgumentException(s"unknown normalization variant $other")
  }

  /** Algorithm 4.4: compute all sketches for ℓ ∈ [ℓmax] in one pass.
    *
    * Both the full-path and the non-backtracking families are produced
    * (the full-path family feeds the biased estimator P̂⁽ℓ⁾ used as the
    * comparison arm of Thm. 4.1, and ℓ ≤ 2 of it feeds LCE).
    */
  def compute(g: SparseGraph, seedLabels: DataFrame, k: Int, lmax: Int): Sketches = {
    require(lmax >= 1, "lmax must be >= 1")
    val x = GraphOps.materialize(GraphOps.oneHot(seedLabels))
    val nLabeled = x.select("node").distinct().count()

    val mFull = Vector.newBuilder[Dense]
    val mNB = Vector.newBuilder[Dense]

    // ℓ = 1: W_NB⁽¹⁾ = W, so both families share N⁽¹⁾ = W·X.
    val n1 = GraphOps.materialize(GraphOps.multiply(g.edges, x))
    mFull += GraphOps.collapse(x.select("node", "cls"), n1, k)
    mNB += GraphOps.collapse(x.select("node", "cls"), n1, k)

    var fullPrev = n1 // N⁽ℓ⁻¹⁾ for full paths
    var nbPrev2 = x   // N_NB⁽ℓ⁻²⁾
    var nbPrev1 = n1  // N_NB⁽ℓ⁻¹⁾
    for (l <- 2 to lmax) {
      val fullCur = GraphOps.materialize(GraphOps.multiply(g.edges, fullPrev))
      mFull += GraphOps.collapse(x.select("node", "cls"), fullCur, k)
      fullPrev = fullCur

      // ℓ = 2 subtracts D·X; ℓ ≥ 3 subtracts (D−I)·N_NB⁽ℓ⁻²⁾ (Prop. 4.3).
      val c = if (l == 2) 0.0 else 1.0
      val nbCur = GraphOps.materialize(
        GraphOps.minus(
          GraphOps.multiply(g.edges, nbPrev1),
          GraphOps.diagScale(nbPrev2, g.degrees, c)))
      mNB += GraphOps.collapse(x.select("node", "cls"), nbCur, k)
      nbPrev2 = nbPrev1
      nbPrev1 = nbCur
    }
    Sketches(k, lmax, nLabeled, mFull.result(), mNB.result())
  }
}
