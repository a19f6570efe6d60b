package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.RealWorld

class HeuristicsSpec extends AnyFunSuite {

  test("MovieLens mask matches Fig. 12a: [[L,H,H],[H,L,H],[H,H,L]]") {
    val m = Heuristics.mask(RealWorld.movieLens.h)
    assert(m.toSeq == Seq(false, true, true, true, false, true, true, true, false))
  }

  test("Prop-37 mask matches Fig. 12a: [[H,L,H],[L,L,H],[H,H,L]]") {
    val m = Heuristics.mask(RealWorld.prop37.h)
    assert(m.toSeq == Seq(true, false, true, false, false, true, true, true, false))
  }

  test("twoValue has exactly two distinct entries at ±delta around 1/k") {
    val h = Heuristics.twoValue(RealWorld.movieLens.h, delta = 0.1)
    val distinct = h.data.distinct.sorted.toSeq
    assert(distinct == Seq(1.0 / 3 - 0.1, 1.0 / 3 + 0.1))
  }

  test("twoValue preserves the high/low pattern of the gold standard") {
    val gs = RealWorld.enron.h
    val h = Heuristics.twoValue(gs)
    val mask = Heuristics.mask(gs)
    assert(h.data.zip(mask).forall { case (v, hi) => (v > 1.0 / 4) == hi })
  }

  test("centered twoValue is the pure ±delta pattern (magnitude-free for LinBP)") {
    val h = Heuristics.twoValue(RealWorld.movieLens.h, delta = 0.07)
    val c = CompatibilityMatrix.centered(h)
    assert(c.data.forall(v => math.abs(math.abs(v) - 0.07) < 1e-12))
  }
}
