package repro.core

import java.util.Random
import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{CSRGraph, ExactPPR, Fig1, GraphGen}

class MonteCarloSpec extends AnyFunSuite {
  private val alpha = 0.2

  test("walk endpoint distribution approximates exact PPR on Fig1") {
    val g = Fig1.graph
    val exact = ExactPPR.solve(g, 0, alpha)
    val rng = new Random(123)
    val w = 200000
    val counts = new Array[Int](g.n)
    (0 until w).foreach(_ => counts(MonteCarlo.walk(g, 0, 0, alpha, rng)) += 1)
    (0 until g.n).foreach { v =>
      assert(math.abs(counts(v).toDouble / w - exact(v)) < 0.01,
        s"node $v: empirical ${counts(v).toDouble / w} vs exact ${exact(v)}")
    }
  }

  test("walk from a dead-end-heavy graph respects the jump-to-source rule") {
    val g = CSRGraph.fromEdges(3, Seq(0 -> 1)) // 1, 2 dead ends
    val rng = new Random(7)
    val counts = new Array[Int](3)
    (0 until 100000).foreach(_ => counts(MonteCarlo.walk(g, 0, 0, alpha, rng)) += 1)
    assert(counts(2) == 0, "unreachable node must never be an endpoint")
    val exact = ExactPPR.solve(g, 0, alpha)
    assert(math.abs(counts(0).toDouble / 100000 - exact(0)) < 0.01)
  }

  test("expected walk length is about 1/alpha - 1 moves") {
    val g = Fig1.graph
    val rng = new Random(5)
    val steps = new Array[Long](1)
    val w = 100000
    (0 until w).foreach(_ => MonteCarlo.walkCounted(g, 0, 0, alpha, rng, steps))
    val avg = steps(0).toDouble / w
    // Number of moves is geometric with success prob α: E = (1-α)/α = 4.
    assert(math.abs(avg - (1 - alpha) / alpha) < 0.1, s"avg moves $avg")
  }

  test("deterministic given the seed") {
    val g = GraphGen.randomGraph(50, 3.0, seed = 1)
    val a = MonteCarlo.run(g, 0, 0.5, alpha, seed = 9).pi
    val b = MonteCarlo.run(g, 0, 0.5, alpha, seed = 9).pi
    assert(a.toSeq == b.toSeq)
  }

  test("estimate sums to exactly 1 (every walk stops somewhere)") {
    val g = GraphGen.randomGraph(60, 3.0, seed = 2)
    val res = MonteCarlo.run(g, 0, 0.5, alpha, seed = 3)
    assert(math.abs(res.l1Pi - 1.0) < 1e-9)
  }

  test("relative error criterion holds for nodes with pi >= 1/n (eps = 0.5)") {
    val g = GraphGen.randomGraph(40, 4.0, seed = 4)
    val s = 0
    val exact = ExactPPR.solve(g, s, alpha)
    val res = MonteCarlo.run(g, s, 0.5, alpha, seed = 5)
    val mu = 1.0 / g.n
    (0 until g.n).filter(v => exact(v) >= mu).foreach { v =>
      assert(math.abs(res.pi(v) - exact(v)) <= 0.5 * exact(v) + 1e-12,
        s"node $v: est ${res.pi(v)} exact ${exact(v)}")
    }
  }

  test("walk count W follows Eq. (12)") {
    val n = 1000
    val eps = 0.3
    val w = Common.walkCountW(n, eps, 1.0 / n)
    val expected = 2.0 * (2.0 * eps / 3.0 + 2.0) * math.log(n) / (eps * eps) * n
    assert(math.abs(w - expected) < 1e-6)
  }

  test("larger eps means fewer walks (pushOps)") {
    val g = GraphGen.randomGraph(50, 3.0, seed = 6)
    val loose = MonteCarlo.run(g, 0, 0.5, alpha, seed = 7)
    val tight = MonteCarlo.run(g, 0, 0.2, alpha, seed = 7)
    assert(loose.stats.pushOps < tight.stats.pushOps)
  }
}
