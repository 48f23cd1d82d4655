package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Compact in-memory directed graph in CSR (compressed sparse row) layout.
  *
  * This is the storage format the paper's `PowerPush` relies on: nodes sorted
  * by id, adjacency lists concatenated in id order into one large edge array,
  * so a global sequential scan of all out-edges is cache-friendly (§5,
  * "Global Sequential Scan v.s. Local Random Access").
  *
  * Dead-end nodes (out-degree 0) are kept as-is; per §2 of the paper, an
  * α-random walk at a dead end jumps back to the *source*, so the redirect is
  * applied inside each algorithm (it depends on the query's source node).
  *
  * @param n      number of nodes; ids are 0 until n
  * @param offset CSR row offsets, length n+1; out-edges of v are
  *               `edges(offset(v) until offset(v+1))`
  * @param edges  concatenated adjacency lists, length m
  */
final class CSRGraph(val n: Int, val offset: Array[Int], val edges: Array[Int]) {

  /** Number of directed edges. */
  val m: Int = edges.length

  /** Out-degree of node v. */
  @inline def outDegree(v: Int): Int = offset(v + 1) - offset(v)

  /** Apply f to every out-neighbor of v. */
  @inline def foreachOut(v: Int)(f: Int => Unit): Unit = {
    var i = offset(v)
    val end = offset(v + 1)
    while (i < end) { f(edges(i)); i += 1 }
  }

  /** Out-neighbors of v as a (shared, do-not-mutate) slice view. */
  def outNeighbors(v: Int): Array[Int] =
    java.util.Arrays.copyOfRange(edges, offset(v), offset(v + 1))

  /** Ids of all dead-end nodes (out-degree 0). */
  lazy val deadEnds: Array[Int] = (0 until n).filter(outDegree(_) == 0).toArray

  /** Average out-degree m/n. */
  def avgDegree: Double = m.toDouble / n
}

object CSRGraph {

  /** Build a CSR graph from an edge list. Duplicate edges are kept (the
    * paper's transition matrix is defined off the multiset of out-edges;
    * generators below avoid duplicates anyway). Ids must be in [0, n).
    */
  def fromEdges(n: Int, edgeList: Iterable[(Int, Int)]): CSRGraph = {
    val deg = new Array[Int](n)
    var m = 0
    edgeList.foreach { case (s, d) =>
      require(s >= 0 && s < n && d >= 0 && d < n, s"edge ($s,$d) out of [0,$n)")
      deg(s) += 1; m += 1
    }
    val offset = new Array[Int](n + 1)
    var i = 0
    while (i < n) { offset(i + 1) = offset(i) + deg(i); i += 1 }
    val edges = new Array[Int](m)
    val cursor = offset.clone()
    edgeList.foreach { case (s, d) => edges(cursor(s)) = d; cursor(s) += 1 }
    // Sort each adjacency list so the layout is deterministic in id order.
    i = 0
    while (i < n) {
      java.util.Arrays.sort(edges, offset(i), offset(i + 1))
      i += 1
    }
    new CSRGraph(n, offset, edges)
  }

  /** Collect a (src, dst) edge DataFrame into a local CSR graph.
    * Intended for driver-side algorithms on bench-scale graphs.
    */
  def fromDataFrame(edges: DataFrame, n: Int): CSRGraph = {
    val pairs = edges
      .selectExpr("cast(src as int) src", "cast(dst as int) dst")
      .collect()
      .map(r => (r.getInt(0), r.getInt(1)))
    fromEdges(n, pairs.toIndexedSeq)
  }

  /** Expose a CSR graph as a Spark (src, dst) edge DataFrame. */
  def toDataFrame(g: CSRGraph, spark: SparkSession): DataFrame = {
    import spark.implicits._
    val buf = new scala.collection.mutable.ArrayBuffer[(Int, Int)](g.m)
    var v = 0
    while (v < g.n) { g.foreachOut(v)(u => buf += ((v, u))); v += 1 }
    buf.toSeq.toDF("src", "dst")
  }
}
