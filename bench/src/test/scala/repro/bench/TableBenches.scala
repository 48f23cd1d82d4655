package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Harness

/** Table 1 of the paper: dataset statistics. Prints the stand-in statistics
  * side by side with the paper's SNAP numbers (EXPERIMENTS.md records both).
  */
class Table1DatasetsBench extends AnyFunSuite {
  test("Table 1: dataset statistics") {
    val t = Harness.table1()
    println(t)
    // sanity: every stand-in exists and m/n tracks the paper's ratio
    Harness.bundles.foreach { b =>
      val paperRatio = b.ds.paperM.toDouble / b.ds.paperN
      assert(b.g.avgDegree > paperRatio * 0.4 && b.g.avgDegree < paperRatio * 2.5,
        s"${b.ds.name}: m/n=${b.g.avgDegree} vs paper $paperRatio")
    }
  }
}

/** Table 2 of the paper: index size and construction time for the indexed
  * competitors (BePI → BePI-lite, FORA+ at ε = 0.1, SpeedPPR).
  */
class Table2IndexBench extends AnyFunSuite {
  test("Table 2: index size and construction time") {
    val (t, reports) = Harness.table2()
    println(t)
    reports.foreach { r =>
      // The paper's headline shape: the SpeedPPR index is about an order of
      // magnitude smaller and faster to build than FORA's (ε = 0.1).
      assert(r.speedBytes < r.foraBytes,
        s"${r.name}: SpeedPPR index ${r.speedBytes} not smaller than FORA ${r.foraBytes}")
      assert(r.speedSec < r.foraSec * 1.5,
        s"${r.name}: SpeedPPR build ${r.speedSec}s vs FORA ${r.foraSec}s")
    }
    // The BePI-density effect (its index explodes on dense graphs): Orkut's
    // BePI-lite index is larger than the sparser LJ-lite's despite fewer nodes.
    val byName = reports.map(r => r.name -> r).toMap
    for (o <- byName.get("orkut-lite"); l <- byName.get("lj-lite"))
      assert(o.bepiBytes > l.bepiBytes, "expected the Orkut density effect")
  }
}

/** Figure 4 rendered as a table: average high-precision query time with
  * λ = min(1/m, 1e-8), and each competitor's ratio to PowerPush.
  */
class Fig4HighPrecisionBench extends AnyFunSuite {
  test("Figure 4 as table: high-precision query time") {
    val (t, reports) = Harness.fig4Table()
    println(t)
    reports.foreach { r =>
      // Paper: PowerPush outperforms PowItr and FIFO-FwdPush in all cases.
      assert(r.powerPush <= r.powItr * 1.2,
        s"${r.name}: PowerPush ${r.powerPush}s vs PowItr ${r.powItr}s")
      assert(r.powerPush <= r.fifo * 1.2,
        s"${r.name}: PowerPush ${r.powerPush}s vs FIFO ${r.fifo}s")
    }
  }
}

/** Figure 6 rendered as a table: number of residue updates (edge pushes)
  * needed to reach each ℓ1-error decade.
  */
class Fig6ConvergenceBench extends AnyFunSuite {
  test("Figure 6 as table: l1 error vs residue updates") {
    println(Harness.fig6Table())
  }
}

/** Figure 7 rendered as a table: approximate query time vs ε. */
class Fig7ApproxTimeBench extends AnyFunSuite {
  test("Figure 7 as table: approximate query time vs eps") {
    println(Harness.fig7Table())
  }
}

/** Figure 8 rendered as a table: actual ℓ1 error vs ε. */
class Fig8ApproxErrorBench extends AnyFunSuite {
  test("Figure 8 as table: actual l1 error vs eps") {
    println(Harness.fig8Table())
    // Paper shape: SpeedPPR's solution quality beats FORA's at small eps on
    // most datasets; assert it in aggregate to avoid per-dataset noise.
    val wins = Harness.approxResults.count { case (_, cells) =>
      val sp = cells.filter(c => c.algo == "SpeedPPR" && c.eps == 0.1).head.l1
      val fo = cells.filter(c => c.algo == "FORA" && c.eps == 0.1).head.l1
      sp <= fo
    }
    assert(wins * 2 >= Harness.approxResults.size,
      s"SpeedPPR should beat FORA's accuracy on most datasets (won $wins)")
  }
}
