package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{ExactPPR, Fig1, GraphGen}

class PowItrSpec extends AnyFunSuite {
  private val alpha = 0.2

  test("residue plus reserve mass is conserved at 1") {
    val res = PowItr.run(Fig1.graph, 0, 1e-6, alpha)
    assert(math.abs(res.l1Pi + res.l1Residue - 1.0) < 1e-12)
  }

  test("final residue sum is at most lambda") {
    val res = PowItr.run(Fig1.graph, 0, 1e-6, alpha)
    assert(res.l1Residue <= 1e-6)
  }

  test("l1 error after j iterations is exactly (1-alpha)^j (Eq. 6)") {
    val trace = new Trace
    PowItr.run(Fig1.graph, 0, 1e-4, alpha, trace)
    trace.points.zipWithIndex.foreach { case ((_, rsum), j) =>
      assert(math.abs(rsum - math.pow(1 - alpha, j)) < 1e-12,
        s"iteration $j: rsum=$rsum expected ${math.pow(1 - alpha, j)}")
    }
  }

  test("iteration count is ceil(log(1/lambda)/log(1/(1-alpha)))") {
    val lambda = 1e-6
    val res = PowItr.run(Fig1.graph, 0, lambda, alpha)
    val expected = math.ceil(math.log(1.0 / lambda) / math.log(1.0 / (1 - alpha))).toInt
    assert(res.stats.iterations == expected)
  }

  test("matches the exact solution within lambda") {
    val g = GraphGen.randomGraph(80, 3.0, seed = 31)
    val exact = ExactPPR.solve(g, 5, alpha)
    val res = PowItr.run(g, 5, 1e-9, alpha)
    assert(Common.l1Diff(res.pi, exact) <= 1e-9 + 1e-12)
  }

  test("pi is a monotone underestimate: pi(v) <= exact pi(v)") {
    val g = GraphGen.randomGraph(60, 3.0, seed = 32)
    val exact = ExactPPR.solve(g, 2, alpha)
    val res = PowItr.run(g, 2, 1e-4, alpha)
    assert((0 until g.n).forall(v => res.pi(v) <= exact(v) + 1e-12))
  }

  test("edge pushes are charged m per iteration (global approach)") {
    val res = PowItr.run(Fig1.graph, 0, 1e-4, alpha)
    assert(res.stats.edgePushes == res.stats.iterations.toLong * Fig1.graph.m)
  }

  test("handles dead ends: mass conserved on a graph with dead ends") {
    val g = GraphGen.randomGraph(100, 3.0, seed = 33)
    assert(g.deadEnds.nonEmpty)
    val res = PowItr.run(g, 0, 1e-8, alpha)
    assert(math.abs(res.l1Pi + res.l1Residue - 1.0) < 1e-10)
    val exact = ExactPPR.solve(g, 0, alpha)
    assert(Common.l1Diff(res.pi, exact) <= 1e-8 + 1e-10)
  }

  test("works when the source itself is a dead end") {
    val g = repro.graph.CSRGraph.fromEdges(3, Seq(0 -> 2, 2 -> 0, 2 -> 1))
    // node 1 is a dead end; query from it
    val exact = ExactPPR.solve(g, 1, alpha)
    val res = PowItr.run(g, 1, 1e-10, alpha)
    assert(Common.l1Diff(res.pi, exact) <= 1e-9)
  }

  test("lambda = 1 returns immediately with zero estimate") {
    val res = PowItr.run(Fig1.graph, 0, 1.0, alpha)
    assert(res.stats.iterations == 0)
    assert(res.l1Pi == 0.0 && res.l1Residue == 1.0)
  }
}
