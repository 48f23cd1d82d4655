package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{ExactPPR, Fig1, GraphGen}

class BePILiteSpec extends AnyFunSuite {
  private val alpha = 0.2

  test("query matches exact PPR on Fig1") {
    val g = Fig1.graph
    val idx = BePILite.preprocess(g, hubCount = 2, alpha, delta = 1e-12)
    (0 until g.n).foreach { s =>
      val res = BePILite.query(idx, s)
      val exact = ExactPPR.solve(g, s, alpha)
      assert(Common.l1Diff(res.pi, exact) < 1e-8, s"source $s")
    }
  }

  test("query matches exact PPR on a random graph with dead ends") {
    val g = GraphGen.randomGraph(120, 4.0, seed = 111)
    assert(g.deadEnds.nonEmpty)
    val idx = BePILite.preprocess(g, hubCount = 16, alpha, delta = 1e-12)
    Seq(0, 7, 55).foreach { s =>
      val exact = ExactPPR.solve(g, s, alpha)
      val res = BePILite.query(idx, s)
      assert(Common.l1Diff(res.pi, exact) < 1e-7, s"source $s")
    }
  }

  test("result is a probability distribution") {
    val g = GraphGen.scaleFree(300, 5.0, seed = 112)
    val idx = BePILite.preprocess(g, hubCount = 16, alpha, delta = 1e-10)
    val res = BePILite.query(idx, 3)
    assert(math.abs(res.l1Pi - 1.0) < 1e-9)
    assert(res.pi.forall(_ >= -1e-12))
  }

  test("hub source and spoke source both work") {
    val g = GraphGen.scaleFree(200, 5.0, seed = 113)
    val idx = BePILite.preprocess(g, hubCount = 8, alpha, delta = 1e-12)
    val hubSource = idx.hubs(0)
    val spokeSource = (0 until g.n).find(idx.hubIdx(_) < 0).get
    Seq(hubSource, spokeSource).foreach { s =>
      val exact = ExactPPR.solve(g, s, alpha)
      assert(Common.l1Diff(BePILite.query(idx, s).pi, exact) < 1e-7, s"source $s")
    }
  }

  test("hubs are the highest-degree nodes") {
    val g = GraphGen.scaleFree(500, 8.0, seed = 114)
    val idx = BePILite.preprocess(g, hubCount = 8, alpha)
    val inDeg = new Array[Int](g.n)
    (0 until g.n).foreach(v => g.foreachOut(v)(u => inDeg(u) += 1))
    val hubMin = idx.hubs.map(v => inDeg(v) + g.outDegree(v)).min
    val nonHubMax = (0 until g.n).filter(idx.hubIdx(_) < 0)
      .map(v => inDeg(v) + g.outDegree(v)).max
    assert(hubMin >= nonHubMax)
  }

  test("index size grows with density (the Orkut effect)") {
    val sparse = GraphGen.scaleFree(400, 4.0, seed = 115)
    val dense = GraphGen.scaleFree(400, 30.0, seed = 115)
    val iSparse = BePILite.preprocess(sparse, 16, alpha)
    val iDense = BePILite.preprocess(dense, 16, alpha)
    assert(iDense.sizeBytes > iSparse.sizeBytes)
  }

  test("agreement with PowerPush at high precision") {
    val g = GraphGen.scaleFree(400, 6.0, seed = 116)
    val idx = BePILite.preprocess(g, 16, alpha, delta = 1e-12)
    val be = BePILite.query(idx, 0)
    val pp = PowerPush.run(g, 0, 1e-12, alpha)
    assert(Common.l1Diff(be.pi, pp.pi) < 1e-7)
  }
}
