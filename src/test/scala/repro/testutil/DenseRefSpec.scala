package repro.testutil

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.Dense

/** The reference implementations must themselves be right: the NB
  * recurrence (Prop. 4.3) is validated against brute-force enumeration
  * of non-backtracking walks, and the closed forms from §4.5.
  */
class DenseRefSpec extends AnyFunSuite {

  private def randomW(n: Int, m: Int, seed: Long): Dense =
    DenseRef.adjacency(n, DenseRef.randomEdges(n, m, seed))

  test("adjacency is symmetric 0/1 with zero diagonal") {
    val w = randomW(10, 20, 1)
    assert((w - w.t).maxAbs == 0.0)
    assert((0 until 10).forall(i => w(i, i) == 0.0))
    assert(w.data.forall(v => v == 0.0 || v == 1.0))
  }

  test("W_NB⁽¹⁾ = W and W_NB⁽²⁾ = W² − D (§4.5)") {
    for (seed <- 1 to 5) {
      val w = randomW(9, 16, seed)
      assert(DenseRef.nbPower(w, 1).approxEquals(w))
      assert(DenseRef.nbPower(w, 2).approxEquals(w * w - DenseRef.degreeMatrix(w)))
    }
  }

  test("W_NB⁽³⁾ = W³ − (DW + WD − W) (§4.6 closed form)") {
    for (seed <- 1 to 5) {
      val w = randomW(9, 16, seed)
      val d = DenseRef.degreeMatrix(w)
      val expected = w.pow(3) - (d * w + w * d - w)
      assert(DenseRef.nbPower(w, 3).approxEquals(expected, 1e-9), s"seed=$seed")
    }
  }

  test("recurrence matches brute-force NB walk enumeration up to ℓ=5") {
    for (seed <- 1 to 4; l <- 1 to 5) {
      val w = randomW(7, 11, seed)
      val rec = DenseRef.nbPower(w, l)
      val brute = DenseRef.nbPowerBrute(w, l)
      assert(rec.approxEquals(brute, 1e-9), s"seed=$seed l=$l\nrec:\n$rec\nbrute:\n$brute")
    }
  }

  test("NB path counts on a triangle: every walk is non-backtracking") {
    // On a 3-cycle, NB walks of length ℓ just keep circling.
    val w = DenseRef.adjacency(3, Seq((0, 1), (1, 2), (2, 0)))
    for (l <- 1 to 6) {
      assert(DenseRef.nbPower(w, l).approxEquals(DenseRef.nbPowerBrute(w, l), 1e-9))
    }
  }

  test("NB path counts on a path graph: no walk longer than the path") {
    // 0–1–2: the only NB walks of length 2 are 0→1→2 and 2→1→0.
    val w = DenseRef.adjacency(3, Seq((0, 1), (1, 2)))
    val nb2 = DenseRef.nbPower(w, 2)
    assert(nb2(0, 2) == 1.0 && nb2(2, 0) == 1.0)
    assert(nb2.sum == 2.0)
    assert(DenseRef.nbPower(w, 3).maxAbs == 0.0) // dead end: no length-3 NB walks
  }

  test("star graph: all length-2 NB paths go leaf-to-leaf") {
    val w = DenseRef.adjacency(5, Seq((0, 1), (0, 2), (0, 3), (0, 4)))
    val nb2 = DenseRef.nbPower(w, 2)
    for (i <- 1 to 4; j <- 1 to 4) {
      assert(nb2(i, j) == (if (i == j) 0.0 else 1.0), s"($i,$j)")
    }
    assert((0 to 4).forall(i => nb2(0, i) == 0.0 && nb2(i, 0) == 0.0))
  }

  test("the Fig. 4 example: NB removes the echo back to the start") {
    // blue i=0 — orange j=1 — green u=2, plus j's second neighbor is i.
    val w = DenseRef.adjacency(3, Seq((0, 1), (1, 2)))
    val full2 = w.pow(2)
    val nb2 = DenseRef.nbPower(w, 2)
    assert(full2(0, 0) == 1.0 && full2(0, 2) == 1.0) // full paths: echo + real
    assert(nb2(0, 0) == 0.0 && nb2(0, 2) == 1.0)     // NB: only the real one
  }

  test("oneHot and centeredOneHot row structure") {
    val x = DenseRef.oneHot(4, 3, Map(0 -> 1, 2 -> 2))
    assert(x.rowSums.toSeq == Seq(1.0, 0.0, 1.0, 0.0))
    val xc = DenseRef.centeredOneHot(4, 3, Map(0 -> 1, 2 -> 2))
    assert(math.abs(xc.rowSums(0)) < 1e-12 && xc(0, 1) == 1.0 - 1.0 / 3)
    assert(xc.rowSums.forall(s => math.abs(s) < 1e-12))
  }

  test("argmaxRows ties break to the smaller class") {
    val f = Dense.fromRows(Seq(Seq(0.5, 0.5, 0.1), Seq(0.0, 0.2, 0.9)))
    assert(DenseRef.argmaxRows(f).toSeq == Seq(0, 2))
  }

  test("randomEdges: no self loops, no duplicates, spine connects") {
    val es = DenseRef.randomEdges(20, 50, 3)
    assert(es.forall { case (a, b) => a < b })
    assert(es.distinct.size == es.size)
    assert((1 until 20).forall(i => es.contains((i - 1, i))))
  }
}
