package repro.core

import org.scalacheck.{Gen, Prop, Properties}
import repro.graph.{CSRGraph, ExactPPR, GraphGen}

/** Property-based invariants over random graphs, sources, and thresholds. */
object InvariantProps extends Properties("PPRInvariants") {

  private val alpha = 0.2

  private val graphGen: Gen[CSRGraph] = for {
    n    <- Gen.choose(10, 120)
    deg  <- Gen.choose(2, 6)
    seed <- Gen.choose(0L, 100000L)
  } yield GraphGen.randomGraph(n, deg.toDouble, seed)

  private val graphSource: Gen[(CSRGraph, Int)] = for {
    g <- graphGen
    s <- Gen.choose(0, g.n - 1)
  } yield (g, s)

  property("powItr mass conservation") = Prop.forAll(graphSource) { case (g, s) =>
    val res = PowItr.run(g, s, 1e-6, alpha)
    math.abs(res.l1Pi + res.l1Residue - 1.0) < 1e-9
  }

  property("fwdPush mass conservation") = Prop.forAll(graphSource) { case (g, s) =>
    val res = FwdPush.runLambda(g, s, 1e-6, alpha)
    math.abs(res.l1Pi + res.l1Residue - 1.0) < 1e-9
  }

  property("powerPush mass conservation") = Prop.forAll(graphSource) { case (g, s) =>
    val res = PowerPush.run(g, s, 1e-6, alpha)
    math.abs(res.l1Pi + res.l1Residue - 1.0) < 1e-9
  }

  property("fwdPush stop condition: r(v) <= d_v * rMax") =
    Prop.forAll(graphSource, Gen.choose(1e-7, 1e-3)) { case ((g, s), rMax) =>
      val res = FwdPush.run(g, s, rMax, alpha)
      (0 until g.n).forall(v => res.residue(v) <= g.outDegree(v) * rMax + 1e-15)
    }

  property("powItr error equals (1-alpha)^iterations") =
    Prop.forAll(graphSource) { case (g, s) =>
      val res = PowItr.run(g, s, 1e-5, alpha)
      math.abs(res.l1Residue - math.pow(1 - alpha, res.stats.iterations)) < 1e-12
    }

  property("lemma 4.1: SimFwdPush equals PowItr after any iteration count") =
    Prop.forAll(graphSource, Gen.choose(1, 15)) { case ((g, s), iters) =>
      val stats = new Stats
      var r = Array.tabulate(g.n)(i => if (i == s) 1.0 else 0.0)
      val piSim = new Array[Double](g.n)
      (0 until iters).foreach(_ => r = SimFwdPush.step(g, s, r, piSim, alpha, stats))
      // PowItr residue after j iterations has l1 exactly (1-alpha)^j and the
      // reserve adds the complement:
      val rsum = r.sum
      math.abs(rsum - math.pow(1 - alpha, iters)) < 1e-12 &&
        math.abs(piSim.sum + rsum - 1.0) < 1e-12
    }

  property("powerPush agrees with exact within lambda (small graphs)") =
    Prop.forAll(Gen.choose(10, 60), Gen.choose(0L, 9999L)) { (n, seed) =>
      val g = GraphGen.randomGraph(n, 3.0, seed)
      val exact = ExactPPR.solve(g, 0, alpha)
      val res = PowerPush.run(g, 0, 1e-9, alpha)
      Common.l1Diff(res.pi, exact) <= 1e-9 + 1e-11
    }

  property("fwdPush estimate underestimates coordinate-wise") =
    Prop.forAll(Gen.choose(10, 60), Gen.choose(0L, 9999L)) { (n, seed) =>
      val g = GraphGen.randomGraph(n, 3.0, seed)
      val exact = ExactPPR.solve(g, 0, alpha)
      val res = FwdPush.runLambda(g, 0, 1e-4, alpha)
      (0 until g.n).forall(v => res.pi(v) <= exact(v) + 1e-10)
    }

  property("all estimates non-negative") = Prop.forAll(graphSource) { case (g, s) =>
    val res = PowerPush.run(g, s, 1e-8, alpha)
    res.pi.forall(_ >= 0.0) && res.residue.forall(_ >= 0.0)
  }
}
