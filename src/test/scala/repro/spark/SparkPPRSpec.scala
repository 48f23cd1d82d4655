package repro.spark

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.graph.{CSRGraph, ExactPPR, Fig1, GraphGen}
import repro.core.{Common, PowItr}

class SparkPPRSpec extends SparkSpec {
  private val alpha = 0.2

  private def collectCol(df: org.apache.spark.sql.DataFrame, n: Int, colName: String): Array[Double] = {
    val out = new Array[Double](n)
    df.select(col("id"), col(colName)).collect().foreach(r => out(r.getLong(0).toInt) = r.getDouble(1))
    out
  }

  test("initState puts residue 1 at the source and degrees everywhere") {
    val g = Fig1.graph
    val edges = CSRGraph.toDataFrame(g, spark)
    val st = SparkPPR.initState(spark, edges, g.n, 0)
    val rows = st.orderBy("id").collect()
    assert(rows.length == g.n)
    assert(rows(0).getDouble(3) == 1.0)
    assert(rows.map(_.getLong(1)).toSeq == (0 until g.n).map(g.outDegree(_).toLong))
    assert(rows.drop(1).forall(_.getDouble(3) == 0.0))
  }

  test("one pushStep at rMax=0 equals one PowItr iteration (oracle vs local)") {
    val g = GraphGen.randomGraph(40, 3.0, seed = 121, allowDeadEnds = false)
    val edges = CSRGraph.toDataFrame(g, spark)
    val st = SparkPPR.initState(spark, edges, g.n, 0)
    val next = SparkPPR.pushStep(st, edges, 0, alpha, 0.0)
    val rSpark = collectCol(next, g.n, "r")
    // local reference
    val stats = new repro.core.Stats
    val r0 = Array.tabulate(g.n)(i => if (i == 0) 1.0 else 0.0)
    val piLocal = new Array[Double](g.n)
    val rLocal = repro.core.SimFwdPush.step(g, 0, r0, piLocal, alpha, stats)
    assert(Common.l1Diff(rSpark, rLocal) < 1e-12)
    val piSpark = collectCol(next, g.n, "pi")
    assert(Common.l1Diff(piSpark, piLocal) < 1e-12)
  }

  test("pushStep residue vs DuckDB SQL oracle") {
    // One dataflow power-iteration step expressed relationally: the residue
    // received by u is sum over in-edges (v,u) of (1-alpha)*r(v)/deg(v).
    val g = GraphGen.randomGraph(30, 3.0, seed = 122, allowDeadEnds = false)
    val edges = CSRGraph.toDataFrame(g, spark)
    val st = SparkPPR.initState(spark, edges, g.n, 0)
    // seed a non-trivial residue state: two supersteps from the start
    val st2 = SparkPPR.pushStep(SparkPPR.pushStep(st, edges, 0, alpha, 0.0), edges, 0, alpha, 0.0)
    val stateTbl = st2.select(col("id"), col("deg").cast("double").as("deg"), col("r"))
    val got = SparkPPR.pushStep(st2, edges, 0, alpha, 0.0)
      .select(col("id"), round(col("r") * 1000, 6).as("r1000"))
    repro.Oracle.assertEquivalent(
      got,
      """SELECT s.id AS id,
        |       round(coalesce(m.msg, 0) * 1000, 6) AS r1000
        |FROM state s
        |LEFT JOIN (
        |  SELECT CAST(e.dst AS BIGINT) AS id,
        |         sum(0.8 * CAST(st.r AS DOUBLE) / CAST(st.deg AS DOUBLE)) AS msg
        |  FROM edges e JOIN state st ON CAST(e.src AS BIGINT) = CAST(st.id AS BIGINT)
        |  WHERE CAST(st.r AS DOUBLE) > 0
        |  GROUP BY e.dst
        |) m ON CAST(s.id AS BIGINT) = m.id
        |""".stripMargin,
      "state" -> stateTbl,
      "edges" -> edges,
    )
  }

  test("out-degree computation vs DuckDB SQL oracle") {
    val g = GraphGen.randomGraph(50, 4.0, seed = 123)
    val edges = CSRGraph.toDataFrame(g, spark)
    val got = edges.groupBy(col("src").as("id")).agg(count(lit(1)).as("deg"))
    repro.Oracle.assertEquivalent(
      got,
      "SELECT CAST(src AS BIGINT) AS id, count(*) AS deg FROM edges GROUP BY src",
      "edges" -> edges,
    )
  }

  test("distributed PowItr matches the local exact solution") {
    val g = GraphGen.randomGraph(40, 3.0, seed = 124)
    val edges = CSRGraph.toDataFrame(g, spark)
    val exact = ExactPPR.solve(g, 0, alpha)
    val out = SparkPPR.powItr(spark, edges, g.n, 0, lambda = 1e-5, alpha = alpha)
    val pi = collectCol(out, g.n, "pi")
    assert(Common.l1Diff(pi, exact) <= 1e-5 + 1e-10)
  }

  test("distributed frontier FwdPush terminates with no active node") {
    val g = GraphGen.randomGraph(40, 3.0, seed = 125)
    val edges = CSRGraph.toDataFrame(g, spark)
    val rMax = 1e-4
    val out = SparkPPR.fwdPush(spark, edges, g.n, 0, rMax, alpha)
    val r = collectCol(out, g.n, "r")
    (0 until g.n).foreach(v => assert(r(v) <= g.outDegree(v) * rMax + 1e-12, s"node $v"))
    val pi = collectCol(out, g.n, "pi")
    val exact = ExactPPR.solve(g, 0, alpha)
    assert(Common.l1Diff(pi, exact) <= g.m * rMax + 1e-10)
  }

  test("distributed PowerPush reaches lambda and matches exact") {
    val g = GraphGen.randomGraph(40, 3.0, seed = 126)
    val edges = CSRGraph.toDataFrame(g, spark)
    val exact = ExactPPR.solve(g, 0, alpha)
    val out = SparkPPR.powerPush(spark, edges, g.n, 0, lambda = 1e-5, m = g.m, alpha = alpha)
    val pi = collectCol(out, g.n, "pi")
    assert(Common.l1Diff(pi, exact) <= 1e-5 + 1e-10)
  }

  test("refine enforces the per-node cap on an existing state") {
    val g = GraphGen.randomGraph(40, 3.0, seed = 127)
    val edges = CSRGraph.toDataFrame(g, spark)
    val pushed = SparkPPR.powItr(spark, edges, g.n, 0, lambda = 1e-3, alpha = alpha)
    val rMax = 1e-5
    val refined = SparkPPR.refine(pushed, edges, 0, rMax, alpha)
    val r = collectCol(refined, g.n, "r")
    (0 until g.n).foreach(v => assert(r(v) <= g.outDegree(v) * rMax + 1e-12, s"node $v"))
  }

  test("mass conservation in the dataflow version") {
    val g = GraphGen.randomGraph(40, 3.0, seed = 128)
    val edges = CSRGraph.toDataFrame(g, spark)
    val out = SparkPPR.powItr(spark, edges, g.n, 0, lambda = 1e-4, alpha = alpha)
    val row = out.agg(sum(col("pi")), sum(col("r"))).head()
    assert(math.abs(row.getDouble(0) + row.getDouble(1) - 1.0) < 1e-9)
  }

  test("dataflow PowItr equals local PowItr after full convergence") {
    val g = GraphGen.randomGraph(35, 3.0, seed = 129)
    val edges = CSRGraph.toDataFrame(g, spark)
    val local = PowItr.run(g, 2, 1e-6, alpha)
    val out = SparkPPR.powItr(spark, edges, g.n, 2, lambda = 1e-6, alpha = alpha)
    val pi = collectCol(out, g.n, "pi")
    assert(Common.l1Diff(pi, local.pi) < 1e-12)
  }
}
