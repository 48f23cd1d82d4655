package repro.spark

import org.apache.spark.graphx.{Edge, Graph, VertexId}
import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, SparkSession}

/** GraphX Pregel-style SSPPR (the reproduction hint's distributed mapping).
  *
  * Vertices carry (deg, π̂, r); each superstep aggregates push messages
  * (1−α)·r/d along out-edges from active vertices, exactly the synchronous
  * iteration structure S^(j) of §4.2. With threshold 0 this is PowItr /
  * SimFwdPush (Lemma 4.1); with threshold λ/m it is frontier forward push.
  * Dead-end vertices forward their share to the query source via a driver
  * scalar (GraphX messages can only travel along edges).
  */
object GraphXPPR {

  final case class VAttr(deg: Int, pi: Double, r: Double)

  @inline private def isActive(a: VAttr, rMax: Double): Boolean =
    a.r > repro.core.Common.TinyResidue && a.r > a.deg.toDouble * rMax

  /** Build the (deg, 0, e_s) vertex state over the edge DataFrame.
    * Partition count is kept small: per-superstep scheduling overhead, not
    * data volume, dominates at bench scale.
    */
  private def build(spark: SparkSession, edges: DataFrame, n: Long, s: Long): Graph[VAttr, Unit] = {
    val parts = math.max(2, math.min(8, spark.sparkContext.defaultParallelism / 2))
    val edgeRdd: RDD[Edge[Unit]] = edges
      .selectExpr("cast(src as long) src", "cast(dst as long) dst")
      .rdd.map(r => Edge(r.getLong(0), r.getLong(1), ())).coalesce(parts)
    val vertexRdd: RDD[(VertexId, Unit)] =
      spark.sparkContext.range(0, n, numSlices = parts).map(id => (id, ()))
    val g = Graph(vertexRdd, edgeRdd)
    g.outerJoinVertices(g.outDegrees) { (id, _, degOpt) =>
      VAttr(degOpt.getOrElse(0), 0.0, if (id == s) 1.0 else 0.0)
    }
  }

  /** Iterate push supersteps at a fixed threshold until `stop` says done.
    * `stop(rsum, nActive)`; threshold semantics as in SparkPPR.pushStep.
    */
  private def iterate(graph0: Graph[VAttr, Unit], s: Long, alpha: Double,
                      rMax: Double, maxIters: Int)
                     (stop: (Double, Long) => Boolean): Graph[VAttr, Unit] = {
    val sc = graph0.vertices.sparkContext
    if (sc.getCheckpointDir.isEmpty)
      sc.setCheckpointDir(java.nio.file.Files.createTempDirectory("graphx-ckpt").toString)
    var g = graph0.cache()
    var iter = 0
    var done = false
    while (!done && iter < maxIters) {
      val summary = g.vertices
        .map { case (_, a) => (a.r, if (isActive(a, rMax)) 1L else 0L) }
        .fold((0.0, 0L)) { case ((r1, c1), (r2, c2)) => (r1 + r2, c1 + c2) }
      if (stop(summary._1, summary._2)) done = true
      else {
        val msgs = g.aggregateMessages[Double](
          ctx => {
            val a = ctx.srcAttr
            if (a.deg > 0 && isActive(a, rMax))
              ctx.sendToDst((1.0 - alpha) * a.r / a.deg)
          },
          _ + _)
        val deadMass = g.vertices
          .map { case (_, a) => if (a.deg == 0 && isActive(a, rMax)) a.r else 0.0 }
          .sum()
        val prev = g
        g = g.outerJoinVertices(msgs) { (id, a, msgOpt) =>
          val active = isActive(a, rMax)
          VAttr(
            a.deg,
            a.pi + (if (active) alpha * a.r else 0.0),
            (if (active) 0.0 else a.r) + msgOpt.getOrElse(0.0) +
              (if (id == s) (1.0 - alpha) * deadMass else 0.0),
          )
        }.cache()
        // Truncate lineage periodically — per-superstep DAG growth otherwise
        // makes scheduling cost quadratic in the iteration count.
        if ((iter + 1) % 10 == 0) g.checkpoint()
        g.vertices.count() // materialize before dropping the parent
        prev.unpersist(false)
        iter += 1
      }
    }
    g
  }

  private def toDf(spark: SparkSession, g: Graph[VAttr, Unit]): DataFrame = {
    import spark.implicits._
    g.vertices.map { case (id, a) => (id, a.pi, a.r) }.toDF("id", "pi", "r")
  }

  /** Pregel-style PowItr: all-residue pushes until Σr ≤ λ. */
  def powItr(spark: SparkSession, edges: DataFrame, n: Long, s: Long,
             lambda: Double, alpha: Double = 0.2, maxIters: Int = 300): DataFrame =
    toDf(spark, iterate(build(spark, edges, n, s), s, alpha, 0.0, maxIters)(
      (rsum, _) => rsum <= lambda))

  /** Pregel-style frontier forward push at r_max until no vertex is active. */
  def fwdPush(spark: SparkSession, edges: DataFrame, n: Long, s: Long,
              rMax: Double, alpha: Double = 0.2, maxIters: Int = 300): DataFrame =
    toDf(spark, iterate(build(spark, edges, n, s), s, alpha, rMax, maxIters)(
      (_, nActive) => nActive == 0L))
}
