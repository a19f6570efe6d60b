package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.core.CompatibilityMatrix

/** Pure checks of the published dataset specs. */
class RealWorldSpecsSpec extends AnyFunSuite {

  test("all 8 datasets are present with the published sizes (Fig. 8)") {
    val byName = RealWorld.all.map(s => s.name -> s).toMap
    assert(byName.keySet == Set("Cora", "Citeseer", "Hep-Th", "MovieLens",
      "Enron", "Prop-37", "Pokec-Gender", "Flickr"))
    assert(byName("Cora").n == 2708 && byName("Cora").m == 10858 && byName("Cora").k == 7)
    assert(byName("Pokec-Gender").m == 30622564 && byName("Pokec-Gender").k == 2)
    assert(byName("Hep-Th").k == 11)
  }

  test("average degrees match Fig. 8 within rounding") {
    val expected = Map("Cora" -> 8.0, "Citeseer" -> 5.7, "Hep-Th" -> 25.4,
      "MovieLens" -> 25.0, "Enron" -> 26.4, "Prop-37" -> 69.4,
      "Pokec-Gender" -> 37.5, "Flickr" -> 18.1)
    RealWorld.all.foreach { s =>
      assert(math.abs(s.avgDegree - expected(s.name)) < 0.1, s"${s.name}: ${s.avgDegree}")
    }
  }

  test("alpha sums to 1 and has k entries for every dataset") {
    RealWorld.all.foreach { s =>
      assert(s.alpha.length == s.k, s.name)
      assert(math.abs(s.alpha.sum - 1.0) < 1e-9, s.name)
    }
  }

  test("every planted H is symmetric with unit row sums") {
    RealWorld.all.foreach { s =>
      assert(CompatibilityMatrix.isValid(s.h, 1e-6), s"${s.name}:\n${s.h}")
    }
  }

  test("transcribed matrices carry the paper's structural zeros") {
    // MovieLens: tags never connect to tags; Flickr: groups never to groups.
    assert(RealWorld.movieLens.h(2, 2) == 0.0)
    assert(RealWorld.flickr.h(2, 2) == 0.0)
    // Enron: persons never connect to messages.
    assert(RealWorld.enron.h(0, 2) == 0.0 && RealWorld.enron.h(2, 0) == 0.0)
  }

  test("Pokec is mildly heterophilous as published") {
    assert(RealWorld.pokecGender.h(0, 1) == 0.56 && RealWorld.pokecGender.h(0, 0) == 0.44)
  }

  test("scaled preserves k, alpha, H and approximately the average degree") {
    val s = RealWorld.pokecGender.scaled(100000)
    assert(s.m == 100000 && s.k == 2)
    assert(math.abs(s.avgDegree - RealWorld.pokecGender.avgDegree) < 1.0)
    assert(s.h.frobDist(RealWorld.pokecGender.h) == 0.0)
  }

  test("scaled is the identity for small datasets") {
    assert(RealWorld.cora.scaled(1000000) eq RealWorld.cora)
  }
}

/** Generation smoke test over the distributed layer. */
class RealWorldGenerateSpec extends SparkSpec {

  test("a scaled surrogate generates with measured GS close to the planted H") {
    val spec = RealWorld.movieLens.scaled(30000)
    val gen = RealWorld.generate(spark, spec, seed = 3)
    assert(gen.labels.count() == spec.n)
    val gs = Accuracy.measuredGS(gen.graph, gen.labels, spec.k)
    // Imbalanced alpha shifts measured frequencies; structural zeros and the
    // dominant entries must survive.
    assert(gs(2, 2) < 0.05, s"tag-tag block should stay near zero:\n$gs")
    assert(gs(0, 0) < gs(0, 1) && gs(0, 0) < gs(0, 2), "users connect mostly to movies/tags")
  }
}
