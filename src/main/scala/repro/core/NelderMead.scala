package repro.core

/** Nelder–Mead downhill simplex, for the gradient-free Holdout baseline.
  *
  * The Holdout energy −Σᵢ Acc_{Qᵢ}(H) is piecewise constant (accuracy over
  * a finite holdout set), so the paper uses Nelder–Mead for it; we do the
  * same. Standard coefficients: reflect 1, expand 2, contract 0.5,
  * shrink 0.5. The eval budget is the knob that matters — every
  * evaluation runs label propagation over the whole graph, which is
  * exactly why Holdout is orders of magnitude slower than DCE.
  */
object NelderMead {

  final case class Result(x: Array[Double], value: Double, evals: Int)

  def minimize(
      f: Array[Double] => Double,
      x0: Array[Double],
      initialStep: Double = 0.1,
      maxEvals: Int = 200,
      tol: Double = 1e-6): Result = {
    val d = x0.length
    var evals = 0
    def eval(x: Array[Double]): Double = { evals += 1; f(x) }

    // Initial simplex: x0 plus a perturbation along each axis.
    var simplex: Array[(Array[Double], Double)] =
      (x0 +: Array.tabulate(d) { i =>
        val p = x0.clone(); p(i) += initialStep; p
      }).map(p => (p, eval(p)))

    def sorted(): Unit = simplex = simplex.sortBy(_._2)

    sorted()
    while (evals < maxEvals && math.abs(simplex.last._2 - simplex.head._2) > tol) {
      val best = simplex.head
      val worst = simplex.last
      val centroid = Array.tabulate(d)(i => simplex.dropRight(1).map(_._1(i)).sum / d)
      def point(coef: Double): Array[Double] =
        Array.tabulate(d)(i => centroid(i) + coef * (centroid(i) - worst._1(i)))

      val refl = point(1.0)
      val fRefl = eval(refl)
      if (fRefl < best._2) {
        val exp = point(2.0)
        val fExp = eval(exp)
        simplex(simplex.length - 1) = if (fExp < fRefl) (exp, fExp) else (refl, fRefl)
      } else if (fRefl < simplex(simplex.length - 2)._2) {
        simplex(simplex.length - 1) = (refl, fRefl)
      } else {
        val cont = point(-0.5)
        val fCont = eval(cont)
        if (fCont < worst._2) {
          simplex(simplex.length - 1) = (cont, fCont)
        } else {
          // Shrink toward the best vertex.
          simplex = simplex.zipWithIndex.map {
            case (v, 0) => v
            case ((p, _), _) =>
              val s = Array.tabulate(d)(i => best._1(i) + 0.5 * (p(i) - best._1(i)))
              (s, eval(s))
          }
        }
      }
      sorted()
    }
    Result(simplex.head._1, simplex.head._2, evals)
  }
}
