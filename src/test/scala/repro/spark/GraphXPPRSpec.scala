package repro.spark

import repro.SparkSpec
import repro.core.{Common, PowItr}
import repro.graph.{CSRGraph, ExactPPR, Fig1, GraphGen}

class GraphXPPRSpec extends SparkSpec {
  private val alpha = 0.2

  private def collect(df: org.apache.spark.sql.DataFrame, n: Int): (Array[Double], Array[Double]) = {
    val pi = new Array[Double](n)
    val r = new Array[Double](n)
    df.collect().foreach { row =>
      val id = row.getLong(0).toInt
      pi(id) = row.getDouble(1); r(id) = row.getDouble(2)
    }
    (pi, r)
  }

  test("GraphX Pregel PowItr matches the local PowItr exactly") {
    val g = GraphGen.randomGraph(35, 3.0, seed = 151)
    val edges = CSRGraph.toDataFrame(g, spark)
    val local = PowItr.run(g, 0, 1e-5, alpha)
    val (pi, _) = collect(GraphXPPR.powItr(spark, edges, g.n, 0, 1e-5, alpha), g.n)
    assert(Common.l1Diff(pi, local.pi) < 1e-12)
  }

  test("GraphX Pregel PowItr matches exact within lambda on Fig1") {
    val g = Fig1.graph
    val edges = CSRGraph.toDataFrame(g, spark)
    val exact = ExactPPR.solve(g, 0, alpha)
    val (pi, r) = collect(GraphXPPR.powItr(spark, edges, g.n, 0, 1e-6, alpha), g.n)
    assert(Common.l1Diff(pi, exact) <= 1e-6 + 1e-10)
    assert(r.sum <= 1e-6)
  }

  test("GraphX frontier FwdPush satisfies the stop condition") {
    val g = GraphGen.randomGraph(35, 3.0, seed = 152)
    val edges = CSRGraph.toDataFrame(g, spark)
    val rMax = 1e-4
    val (pi, r) = collect(GraphXPPR.fwdPush(spark, edges, g.n, 0, rMax, alpha), g.n)
    (0 until g.n).foreach(v => assert(r(v) <= g.outDegree(v) * rMax + 1e-12, s"node $v"))
    val exact = ExactPPR.solve(g, 0, alpha)
    assert(Common.l1Diff(pi, exact) <= g.m * rMax + 1e-10)
  }

  test("GraphX handles dead ends via the driver-side redirect") {
    val g = CSRGraph.fromEdges(4, Seq(0 -> 1, 1 -> 2, 1 -> 0)) // 2, 3 dead ends
    val edges = CSRGraph.toDataFrame(g, spark)
    val exact = ExactPPR.solve(g, 0, alpha)
    val (pi, _) = collect(GraphXPPR.powItr(spark, edges, g.n, 0, 1e-7, alpha), g.n)
    assert(Common.l1Diff(pi, exact) <= 1e-7 + 1e-10)
    assert(pi(3) == 0.0)
  }
}
