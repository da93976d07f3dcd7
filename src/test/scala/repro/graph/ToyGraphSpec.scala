package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.spread.ExactSpread

/** Every number in this suite comes verbatim from Examples 1–2 and the
  * Theorem-2 proof of the paper — the toy graph is our executable ground
  * truth for the whole stack.
  */
class ToyGraphSpec extends AnyFunSuite {
  private val g = ToyGraph.graph
  private val s = Array(ToyGraph.seed)
  private def v(k: Int) = ToyGraph.v(k)

  test("toy graph has 9 vertices and 10 edges") {
    assert(g.n == 9)
    assert(g.m == 10)
  }

  test("exact expected spread is 7.66 (Example 1)") {
    assert(math.abs(ExactSpread.spread(g, s) - 7.66) < 1e-9)
  }

  test("activation probability of v8 is 0.6 (Example 1)") {
    assert(math.abs(ExactSpread.activationProbs(g, s)(v(8)) - 0.6) < 1e-9)
  }

  test("activation probability of v7 is 0.06 (Example 1)") {
    assert(math.abs(ExactSpread.activationProbs(g, s)(v(7)) - 0.06) < 1e-9)
  }

  test("v2..v6 and v9 are certainly activated (Example 1)") {
    val p = ExactSpread.activationProbs(g, s)
    for (k <- Seq(2, 3, 4, 5, 6, 9)) assert(p(v(k)) == 1.0, s"v$k")
  }

  test("blocking v5 leaves expected spread 3 (Example 1)") {
    assert(math.abs(ExactSpread.spreadWithBlockers(g, s, Seq(v(5))) - 3.0) < 1e-9)
  }

  test("blocking v2 or v4 leaves expected spread 6.66 (Example 1)") {
    assert(math.abs(ExactSpread.spreadWithBlockers(g, s, Seq(v(2))) - 6.66) < 1e-9)
    assert(math.abs(ExactSpread.spreadWithBlockers(g, s, Seq(v(4))) - 6.66) < 1e-9)
  }

  test("blocking any single vertex other than v5 keeps spread above 3 (Example 1)") {
    for (k <- Seq(2, 3, 4, 6, 7, 8, 9)) {
      val sp = ExactSpread.spreadWithBlockers(g, s, Seq(v(k)))
      assert(sp > 3.0, s"blocking v$k gave $sp")
    }
  }

  test("Theorem 2 instance: f({v3}) = 6.66") {
    assert(math.abs(ExactSpread.spreadWithBlockers(g, s, Seq(v(3))) - 6.66) < 1e-9)
  }

  test("Theorem 2 instance: f({v2, v3}) = 5.66") {
    assert(math.abs(ExactSpread.spreadWithBlockers(g, s, Seq(v(2), v(3))) - 5.66) < 1e-9)
  }

  test("Theorem 2 instance: f({v3, v4}) = 5.66") {
    assert(math.abs(ExactSpread.spreadWithBlockers(g, s, Seq(v(3), v(4))) - 5.66) < 1e-9)
  }

  test("Theorem 2 instance: f({v2, v3, v4}) = 1") {
    assert(math.abs(ExactSpread.spreadWithBlockers(g, s, Seq(v(2), v(3), v(4))) - 1.0) < 1e-9)
  }

  test("expected spread is not supermodular (Theorem 2)") {
    val fX = ExactSpread.spreadWithBlockers(g, s, Seq(v(3)))
    val fY = ExactSpread.spreadWithBlockers(g, s, Seq(v(2), v(3)))
    val fXx = ExactSpread.spreadWithBlockers(g, s, Seq(v(3), v(4)))
    val fYx = ExactSpread.spreadWithBlockers(g, s, Seq(v(2), v(3), v(4)))
    // supermodularity would require f(X∪x)-f(X) <= f(Y∪x)-f(Y)
    assert(fXx - fX > fYx - fY)
  }

  test("blocking both out-neighbors reduces spread to the seed alone") {
    assert(math.abs(ExactSpread.spreadWithBlockers(g, s, Seq(v(2), v(4))) - 1.0) < 1e-9)
  }

  test("monotonicity: adding blockers never increases spread") {
    val single = ExactSpread.spreadWithBlockers(g, s, Seq(v(9)))
    val double = ExactSpread.spreadWithBlockers(g, s, Seq(v(9), v(8)))
    assert(double <= single + 1e-12)
    assert(single <= ExactSpread.spread(g, s) + 1e-12)
  }
}
