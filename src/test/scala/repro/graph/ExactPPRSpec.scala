package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class ExactPPRSpec extends AnyFunSuite {
  private val alpha = 0.2

  test("exact PPR sums to 1") {
    val pi = ExactPPR.solve(Fig1.graph, 0, alpha)
    assert(math.abs(pi.sum - 1.0) < 1e-12)
  }

  test("all coordinates non-negative") {
    val pi = ExactPPR.solve(Fig1.graph, 1, alpha)
    assert(pi.forall(_ >= -1e-15))
  }

  test("two-node cycle has closed form") {
    // 0↔1: π(0,0) satisfies p = α + (1-α)² p  ⇒  p = α/(1-(1-α)²)
    val g = CSRGraph.fromEdges(2, Seq(0 -> 1, 1 -> 0))
    val pi = ExactPPR.solve(g, 0, alpha)
    val p00 = alpha / (1.0 - (1.0 - alpha) * (1.0 - alpha))
    assert(math.abs(pi(0) - p00) < 1e-12)
    assert(math.abs(pi(1) - (1.0 - p00)) < 1e-12)
  }

  test("single node with dead end: everything at the source") {
    // 0 → 1, 1 is a dead end: walk either stops or returns to 0.
    val g = CSRGraph.fromEdges(2, Seq(0 -> 1))
    val pi = ExactPPR.solve(g, 0, alpha)
    assert(math.abs(pi.sum - 1.0) < 1e-12)
    // π(0,1): prob of stopping at 1 = Σ over k returns: geometric.
    // q = P(stop at 1 | alive at 0) satisfies q = (1-α)·(α + (1-α)·q)
    val q = (1 - alpha) * alpha / (1.0 - (1 - alpha) * (1 - alpha))
    assert(math.abs(pi(1) - q) < 1e-12)
  }

  test("the source always has the largest PPR on Fig1") {
    (0 until 5).foreach { s =>
      val pi = ExactPPR.solve(Fig1.graph, s, alpha)
      assert(pi(s) == pi.max, s"source $s: ${pi.toSeq}")
    }
  }

  test("source PPR at least alpha") {
    (0 until 5).foreach { s =>
      val pi = ExactPPR.solve(Fig1.graph, s, alpha)
      assert(pi(s) >= alpha - 1e-12)
    }
  }

  test("solution depends on the source") {
    val a = ExactPPR.solve(Fig1.graph, 0, alpha)
    val b = ExactPPR.solve(Fig1.graph, 3, alpha)
    assert(a.toSeq != b.toSeq)
  }

  test("alpha = 0.99 concentrates on the source") {
    val pi = ExactPPR.solve(Fig1.graph, 2, 0.99)
    assert(pi(2) > 0.98)
  }

  test("matches a hand-rolled dense power iteration on a random graph") {
    val g = GraphGen.randomGraph(60, 3.0, seed = 21)
    val s = 7
    val exact = ExactPPR.solve(g, s, alpha)
    // Reference: 3000 dense iterations of Eq. (4)-(5).
    var r = Array.tabulate(g.n)(i => if (i == s) 1.0 else 0.0)
    val pi = new Array[Double](g.n)
    (0 until 3000).foreach { _ =>
      val next = new Array[Double](g.n)
      var v = 0
      while (v < g.n) {
        val rv = r(v)
        if (rv != 0.0) {
          pi(v) += alpha * rv
          val d = g.outDegree(v)
          if (d == 0) next(s) += (1 - alpha) * rv
          else g.foreachOut(v)(u => next(u) += (1 - alpha) * rv / d)
        }
        v += 1
      }
      r = next
    }
    assert((0 until g.n).forall(i => math.abs(pi(i) - exact(i)) < 1e-10),
      s"max diff ${(0 until g.n).map(i => math.abs(pi(i) - exact(i))).max}")
  }

  test("rejects oversized graphs") {
    intercept[IllegalArgumentException] {
      ExactPPR.solve(new CSRGraph(3000, new Array[Int](3001), Array.empty), 0)
    }
  }
}
