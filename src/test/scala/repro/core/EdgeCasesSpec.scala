package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{CSRGraph, ExactPPR, Fig1, GraphGen}

/** Edge-case and closed-form checks shared across all solvers. */
class EdgeCasesSpec extends AnyFunSuite {

  private val alpha = 0.2
  private val solvers: Seq[(String, (CSRGraph, Int, Double) => PPRResult)] = Seq(
    "PowItr"     -> ((g, s, l) => PowItr.run(g, s, l, alpha)),
    "FwdPush"    -> ((g, s, l) => FwdPush.runLambda(g, s, l, alpha)),
    "SimFwdPush" -> ((g, s, l) => SimFwdPush.run(g, s, l, alpha)),
    "PowerPush"  -> ((g, s, l) => PowerPush.run(g, s, l, alpha)),
  )

  test("two-node cycle closed form for every solver") {
    val g = CSRGraph.fromEdges(2, Seq(0 -> 1, 1 -> 0))
    val p00 = alpha / (1.0 - (1.0 - alpha) * (1.0 - alpha))
    solvers.foreach { case (name, run) =>
      val res = run(g, 0, 1e-12)
      assert(math.abs(res.pi(0) - p00) < 1e-11, s"$name pi(0)")
      assert(math.abs(res.pi(1) - (1 - p00)) < 1e-11, s"$name pi(1)")
    }
  }

  test("star graph: hub to leaves, each leaf equally likely") {
    // 0 -> {1,2,3,4}, each leaf -> 0
    val edges = (1 to 4).flatMap(i => Seq(0 -> i, i -> 0))
    val g = CSRGraph.fromEdges(5, edges)
    val exact = ExactPPR.solve(g, 0, alpha)
    solvers.foreach { case (name, run) =>
      val res = run(g, 0, 1e-12)
      assert(Common.l1Diff(res.pi, exact) < 1e-11, name)
      (2 to 4).foreach(i => assert(math.abs(res.pi(1) - res.pi(i)) < 1e-12, s"$name symmetry"))
    }
  }

  test("directed chain: PPR decays along the chain") {
    val g = CSRGraph.fromEdges(5, Seq(0 -> 1, 1 -> 2, 2 -> 3, 3 -> 4, 4 -> 0))
    solvers.foreach { case (name, run) =>
      val pi = run(g, 0, 1e-12).pi
      (0 until 4).foreach(i => assert(pi(i) > pi(i + 1), s"$name monotone at $i"))
    }
  }

  test("alpha = 0.8 converges much faster than alpha = 0.2") {
    val g = GraphGen.scaleFree(500, 5.0, seed = 161)
    val hi = PowItr.run(g, 0, 1e-8, 0.8)
    val lo = PowItr.run(g, 0, 1e-8, 0.2)
    assert(hi.stats.iterations < lo.stats.iterations / 3)
  }

  test("all solvers agree with each other at lambda = 1e-12 on Fig1") {
    val results = solvers.map { case (name, run) => name -> run(Fig1.graph, 2, 1e-12).pi }
    results.sliding(2).foreach {
      case Seq((n1, a), (n2, b)) =>
        assert(Common.l1Diff(a, b) < 1e-11, s"$n1 vs $n2")
      case _ =>
    }
  }

  test("estimates sum below 1 and residues account for the gap") {
    val g = GraphGen.scaleFree(300, 5.0, seed = 162)
    solvers.foreach { case (name, run) =>
      val res = run(g, 1, 1e-6)
      assert(res.l1Pi <= 1.0 + 1e-12, name)
      assert(math.abs(1.0 - res.l1Pi - res.l1Residue) < 1e-9, name)
    }
  }

  test("query from every node of Fig1 matches exact for PowerPush") {
    (0 until 5).foreach { s =>
      val exact = ExactPPR.solve(Fig1.graph, s, alpha)
      val res = PowerPush.run(Fig1.graph, s, 1e-12, alpha)
      assert(Common.l1Diff(res.pi, exact) < 1e-11, s"source $s")
    }
  }

  test("isActive floor prevents denormal livelock on a dead-end source") {
    // Source is a dead end: its push cycles mass back to itself forever
    // without the TinyResidue floor (0.8 * minDenormal rounds to itself).
    val g = CSRGraph.fromEdges(2, Seq(1 -> 0)) // node 0 is a dead end
    val res = FwdPush.runLambda(g, 0, 1e-10, alpha)
    assert(res.pi(0) > 0.99) // everything stops at the source
    // geometric decay 1 → 1e-300 at ×(1−α) per push is ~3100 pushes; without
    // the floor this would spin forever at the smallest denormal
    assert(res.stats.pushOps < 5000)
  }

  test("isActive semantics") {
    assert(Common.isActive(0.5, 2, 0.1))
    assert(!Common.isActive(0.2, 2, 0.1))
    assert(Common.isActive(1e-9, 0, 0.1))        // dead end with real residue
    assert(!Common.isActive(1e-310, 0, 0.1))     // denormal floor
    assert(!Common.isActive(0.0, 0, 0.0))
  }
}
