package repro.core

import repro.SparkSpec
import repro.linalg.Dense
import repro.testutil.{DenseRef, LocalGraphs}

class LinBPSpec extends SparkSpec {

  private val n = 30
  private val k = 3
  private lazy val edgeList = DenseRef.randomEdges(n, 70, seed = 31)
  private lazy val w = DenseRef.adjacency(n, edgeList)
  private lazy val g = LocalGraphs.graph(spark, n, edgeList)
  private lazy val labelMap = Map(0 -> 0, 7 -> 1, 13 -> 2, 21 -> 0, 28 -> 1)
  private lazy val labelsDf = LocalGraphs.labels(spark, labelMap)
  private lazy val h = CompatibilityMatrix.planted(3, 8.0)

  private def denseRun(iterations: Int, s: Double): Dense = {
    val hTilde = CompatibilityMatrix.centered(h)
    val eps = s / (w.spectralRadius() * hTilde.spectralRadius())
    val x = DenseRef.centeredOneHot(n, k, labelMap)
    DenseRef.linbp(w, x, hTilde.scale(eps), iterations)
  }

  test("distributed LinBP matches the dense reference after 1 iteration") {
    val got = LocalGraphs.toDense(LinBP.run(g, labelsDf, h, iterations = 1), n, k)
    assert(got.approxEquals(denseRun(1, 0.5), 1e-6))
  }

  test("distributed LinBP matches the dense reference after 10 iterations") {
    val got = LocalGraphs.toDense(LinBP.run(g, labelsDf, h, iterations = 10), n, k)
    assert(got.approxEquals(denseRun(10, 0.5), 1e-5))
  }

  test("precomputing rhoW gives identical results") {
    val rho = GraphOps.spectralRadius(g, 40)
    val a = LocalGraphs.toDense(LinBP.run(g, labelsDf, h, rhoW = Some(rho)), n, k)
    val b = LocalGraphs.toDense(LinBP.run(g, labelsDf, h, rhoW = Some(rho)), n, k)
    assert(a.approxEquals(b, 0))
  }

  test("Theorem 3.1: labels are identical with centered and uncentered propagation") {
    val rho = GraphOps.spectralRadius(g, 40)
    val fc = LinBP.run(g, labelsDf, h, rhoW = Some(rho), center = true)
    val fu = LinBP.run(g, labelsDf, h, rhoW = Some(rho), center = false)
    val lc = GraphOps.argmaxLabels(fc).collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    val lu = GraphOps.argmaxLabels(fu).collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    // Compare on nodes that received signal under both runs.
    val common = lc.keySet intersect lu.keySet
    assert(common.nonEmpty)
    val agree = common.count(node => lc(node) == lu(node))
    assert(agree.toDouble / common.size > 0.95,
      s"only $agree/${common.size} labels agree between centered and uncentered")
  }

  test("Theorem 3.1 on the dense reference: adding constants to H and X never changes labels") {
    val hTilde = CompatibilityMatrix.centered(h)
    val eps = 0.5 / (w.spectralRadius() * hTilde.spectralRadius())
    val x1 = DenseRef.centeredOneHot(n, k, labelMap)
    val f1 = DenseRef.linbp(w, x1, hTilde.scale(eps), 10)
    val f2 = DenseRef.linbp(w, x1.addScalar(0.2), hTilde.addScalar(0.1).scale(eps), 10)
    assert(DenseRef.argmaxRows(f1).toSeq == DenseRef.argmaxRows(f2).toSeq)
  }

  test("uniform H produces no propagation (F = X̃)") {
    val got = LocalGraphs.toDense(
      LinBP.run(g, labelsDf, CompatibilityMatrix.uniform(k)), n, k)
    assert(got.approxEquals(DenseRef.centeredOneHot(n, k, labelMap), 1e-12))
  }

  test("Prop 3.2: the LinBP energy decreases toward the fixed point") {
    val hTilde = CompatibilityMatrix.centered(h)
    val rho = GraphOps.spectralRadius(g, 40)
    val eps = 0.5 / (rho * hTilde.spectralRadius())
    val x = GraphOps.materialize(GraphOps.centeredOneHot(labelsDf, k))
    val hEff = hTilde.scale(eps)
    val e2 = LinBP.energy(g, x, LinBP.run(g, labelsDf, h, iterations = 2, rhoW = Some(rho)), hEff)
    val e30 = LinBP.energy(g, x, LinBP.run(g, labelsDf, h, iterations = 30, rhoW = Some(rho)), hEff)
    assert(e30 < e2, s"e30=$e30 e2=$e2")
    assert(e30 < 1e-4, s"energy should be near 0 at convergence, got $e30")
  }

  test("energy of the seed matrix itself is positive (not a fixed point)") {
    val hTilde = CompatibilityMatrix.centered(h)
    val x = GraphOps.materialize(GraphOps.centeredOneHot(labelsDf, k))
    assert(LinBP.energy(g, x, x, hTilde.scale(0.1)) > 0)
  }

  test("seed labels themselves are preserved with strong self-belief") {
    val f = LinBP.run(g, labelsDf, h, iterations = 10)
    val preds = GraphOps.argmaxLabels(f).collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    // The residual seed belief dominates unless neighbors overwhelm it:
    // check most seeds keep their own class.
    val kept = labelMap.count { case (node, cls) => preds.get(node.toLong).contains(cls) }
    assert(kept >= labelMap.size - 1, s"only $kept/${labelMap.size} seeds kept their label")
  }

  test("propagation labels a planted heterophilous graph far better than chance") {
    import repro.graphgen.{DegreeDist, PlantedGraph}
    val hPlanted = CompatibilityMatrix.planted(3, 8.0)
    val gen = PlantedGraph.generate(spark, 2000, 16000,
      Array(1.0 / 3, 1.0 / 3, 1.0 / 3), hPlanted, DegreeDist.Uniform, seed = 5)
    val seeds = repro.eval.Accuracy.sampleSeeds(gen.labels, 0.05, seed = 2)
    val acc = repro.eval.Accuracy.endToEnd(gen.graph, gen.labels, seeds, hPlanted)
    assert(acc > 0.6, s"accuracy $acc should beat 1/3 by a wide margin")
  }
}
