package repro.core

import java.util.Random
import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{CSRGraph, ExactPPR, GraphGen}

class WalkIndexSpec extends AnyFunSuite {
  private val alpha = 0.2

  test("SpeedPPR index stores exactly d_v walks per node, total = m") {
    val g = GraphGen.randomGraph(100, 4.0, seed = 71)
    val idx = WalkIndex.buildSpeedPPR(g, alpha)
    assert(idx.totalWalks == g.m)
    (0 until g.n).foreach(v => assert(idx.countOf(v) == g.outDegree(v)))
  }

  test("SpeedPPR index size is independent of eps by construction") {
    val g = GraphGen.randomGraph(100, 4.0, seed = 72)
    val idx = WalkIndex.buildSpeedPPR(g, alpha)
    // The build does not take eps at all; assert the documented bound.
    assert(idx.sizeBytes == 4L * g.m + 8L * (g.n + 1))
  }

  test("FORA index stores K_v = ceil(d_v*sqrt(W/m)) + 1 walks per node") {
    val g = GraphGen.randomGraph(100, 4.0, seed = 73)
    val eps = 0.3
    val idx = WalkIndex.buildFora(g, eps, alpha)
    val w = Common.walkCountW(g.n, eps, 1.0 / g.n)
    val scale = math.sqrt(w / g.m)
    (0 until g.n).foreach { v =>
      assert(idx.countOf(v) == math.ceil(g.outDegree(v) * scale).toLong + 1)
    }
  }

  test("FORA index grows as eps shrinks; SpeedPPR index does not") {
    val g = GraphGen.randomGraph(200, 4.0, seed = 74)
    val f1 = WalkIndex.buildFora(g, 0.5, alpha)
    val f2 = WalkIndex.buildFora(g, 0.1, alpha)
    assert(f2.totalWalks > 2 * f1.totalWalks)
    val s1 = WalkIndex.buildSpeedPPR(g, alpha)
    assert(s1.totalWalks <= g.m)
  }

  test("stored endpoints are either valid nodes or dead-end markers") {
    val g = GraphGen.randomGraph(100, 4.0, seed = 75)
    val idx = WalkIndex.buildSpeedPPR(g, alpha)
    idx.endpoints.foreach { e =>
      val node = if (e >= 0) e else ~e
      assert(node >= 0 && node < g.n)
      if (e < 0) assert(g.outDegree(~e) == 0, "marker must reference a dead end")
    }
  }

  test("indexed endpoint distribution matches the exact PPR of the start node") {
    // Build many walks from a single node and compare against the mixture
    // distribution: walks from v stop according to a PPR-like distribution.
    val g = GraphGen.randomGraph(40, 4.0, seed = 76)
    val v = 1
    val s = 0
    val walks = 100000
    val idx = WalkIndex.build(g, x => if (x == v) walks else 0, alpha, seed = 77)
    val rng = new Random(78)
    val counts = new Array[Int](g.n)
    (0L until idx.countOf(v)).foreach(k => counts(idx.endpoint(v, k, g, s, alpha, rng)) += 1)
    // Reference distribution: empirical live walks with the same semantics.
    val ref = new Array[Int](g.n)
    val rng2 = new Random(79)
    (0 until walks).foreach(_ => ref(MonteCarlo.walk(g, s, v, alpha, rng2)) += 1)
    (0 until g.n).foreach { u =>
      assert(math.abs(counts(u) - ref(u)).toDouble / walks < 0.02,
        s"node $u: idx ${counts(u)} vs live ${ref(u)}")
    }
  }

  test("deterministic build") {
    val g = GraphGen.randomGraph(60, 3.0, seed = 80)
    val a = WalkIndex.buildSpeedPPR(g, alpha, seed = 13)
    val b = WalkIndex.buildSpeedPPR(g, alpha, seed = 13)
    assert(a.endpoints.toSeq == b.endpoints.toSeq)
  }
}
