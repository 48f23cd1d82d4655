package repro.spark

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.Common
import repro.graph.{CSRGraph, ExactPPR, GraphGen}

class SparkSpeedPPRSpec extends SparkSpec {
  private val alpha = 0.2

  test("distributed SpeedPPR sums to 1 and is close to exact") {
    val g = GraphGen.randomGraph(40, 3.0, seed = 141)
    val exact = ExactPPR.solve(g, 0, alpha)
    val out = SparkSpeedPPR.run(spark, CSRGraph.toDataFrame(g, spark), g.n, g.m, 0,
                                eps = 0.5, alpha = alpha, seed = 3)
    val pi = new Array[Double](g.n)
    out.collect().foreach(r => pi(r.getLong(0).toInt) = r.getDouble(1))
    assert(math.abs(pi.sum - 1.0) < 1e-9)
    assert(Common.l1Diff(pi, exact) < 0.05, s"l1=${Common.l1Diff(pi, exact)}")
  }

  test("relative error criterion for high-PPR nodes at eps = 0.5") {
    val g = GraphGen.randomGraph(30, 4.0, seed = 142)
    val exact = ExactPPR.solve(g, 0, alpha)
    val out = SparkSpeedPPR.run(spark, CSRGraph.toDataFrame(g, spark), g.n, g.m, 0,
                                eps = 0.5, alpha = alpha, seed = 5)
    val pi = new Array[Double](g.n)
    out.collect().foreach(r => pi(r.getLong(0).toInt) = r.getDouble(1))
    (0 until g.n).filter(v => exact(v) >= 1.0 / g.n).foreach { v =>
      assert(math.abs(pi(v) - exact(v)) <= 0.5 * exact(v) + 1e-9,
        s"node $v: ${pi(v)} vs ${exact(v)}")
    }
  }

  test("handles dead ends") {
    val g = GraphGen.randomGraph(30, 3.0, seed = 143)
    assert(g.deadEnds.nonEmpty)
    val out = SparkSpeedPPR.run(spark, CSRGraph.toDataFrame(g, spark), g.n, g.m, 0,
                                eps = 0.5, alpha = alpha, seed = 7)
    val total = out.agg(sum(col("pi"))).head().getDouble(0)
    assert(math.abs(total - 1.0) < 1e-9)
  }
}
