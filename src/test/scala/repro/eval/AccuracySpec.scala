package repro.eval

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.CompatibilityMatrix
import repro.testutil.LocalGraphs

class AccuracySpec extends SparkSpec {

  private lazy val labels = LocalGraphs.labels(
    spark, (0 until 100).map(i => i -> (i % 4)).toMap)

  test("sampleSeeds is stratified: each class contributes round(f·n_c) seeds") {
    val seeds = Accuracy.sampleSeeds(labels, 0.2, seed = 1)
    val byCls = seeds.groupBy("cls").agg(count(lit(1))).collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap
    assert(byCls.values.forall(_ == 5L), s"got $byCls") // 25 per class × 0.2
  }

  test("sampleSeeds guarantees at least one seed per class at tiny f") {
    val seeds = Accuracy.sampleSeeds(labels, 0.001, seed = 2)
    assert(seeds.select("cls").distinct().count() == 4)
    assert(seeds.count() == 4)
  }

  test("sampleSeeds is deterministic in the seed and varies across seeds") {
    val a = Accuracy.sampleSeeds(labels, 0.1, seed = 3).collect().toSet
    val b = Accuracy.sampleSeeds(labels, 0.1, seed = 3).collect().toSet
    val c = Accuracy.sampleSeeds(labels, 0.1, seed = 4).collect().toSet
    assert(a == b)
    assert(a != c)
  }

  test("sampleSeeds rejects degenerate fractions") {
    intercept[IllegalArgumentException](Accuracy.sampleSeeds(labels, 0.0))
    intercept[IllegalArgumentException](Accuracy.sampleSeeds(labels, 1.0))
  }

  test("accuracyOf scores only non-seed nodes") {
    import spark.implicits._
    val truth = LocalGraphs.labels(spark, Map(0 -> 0, 1 -> 1, 2 -> 0, 3 -> 1))
    val seeds = LocalGraphs.labels(spark, Map(0 -> 0))
    // Predictions: node1 right, node2 wrong, node3 missing (defaults to 0 → wrong).
    val preds = Seq((1L, 1), (2L, 1)).toDF("node", "cls")
    val acc = Accuracy.accuracyOf(preds, truth, seeds)
    assert(math.abs(acc - 1.0 / 3) < 1e-12)
  }

  test("accuracyOf is 1.0 for perfect predictions") {
    val truth = LocalGraphs.labels(spark, Map(0 -> 0, 1 -> 1, 2 -> 2))
    val seeds = LocalGraphs.labels(spark, Map(0 -> 0))
    val preds = LocalGraphs.labels(spark, Map(1 -> 1, 2 -> 2))
    assert(Accuracy.accuracyOf(preds, truth, seeds) == 1.0)
  }

  test("measuredGS on a hand-built graph matches hand-computed frequencies") {
    // Triangle 0–1, 1–2, 0–2 with classes 0,0,1:
    // M = [[2,2],[2,0]] → rows [0.5,0.5] and [1.0,0.0].
    val g = LocalGraphs.graph(spark, 3, Seq((0, 1), (1, 2), (0, 2)))
    val l = LocalGraphs.labels(spark, Map(0 -> 0, 1 -> 0, 2 -> 1))
    val gs = Accuracy.measuredGS(g, l, 2)
    assert(gs.approxEquals(repro.linalg.Dense.fromRows(Seq(Seq(0.5, 0.5), Seq(1.0, 0.0))), 1e-9))
  }

  test("endToEnd with the gold standard beats endToEnd with a wrong H") {
    import repro.graphgen.{DegreeDist, PlantedGraph}
    val h = CompatibilityMatrix.planted(3, 8.0)
    val gen = PlantedGraph.generate(spark, 1500, 12000,
      Array(1.0 / 3, 1.0 / 3, 1.0 / 3), h, DegreeDist.Uniform, seed = 6)
    val seeds = Accuracy.sampleSeeds(gen.labels, 0.05, seed = 7)
    val accGS = Accuracy.endToEnd(gen.graph, gen.labels, seeds, h)
    // A maximally wrong H: homophily where the truth is heterophily.
    val wrong = repro.linalg.Dense.fromRows(Seq(
      Seq(0.8, 0.1, 0.1), Seq(0.1, 0.8, 0.1), Seq(0.1, 0.1, 0.8)))
    val accWrong = Accuracy.endToEnd(gen.graph, gen.labels, seeds, wrong)
    assert(accGS > accWrong + 0.2, s"GS=$accGS wrong=$accWrong")
  }
}
