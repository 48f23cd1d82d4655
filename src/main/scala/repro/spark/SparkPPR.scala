package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.storage.StorageLevel

/** Distributed SSPPR as Catalyst dataflow.
  *
  * The paper's three high-precision algorithms share one bulk-synchronous
  * primitive: *push every node active w.r.t. a threshold r_max, all at once,
  * against the previous superstep's residues*. That is exactly the paper's
  * SimFwdPush / iteration structure S^(j) (§4), which it proves equivalent
  * to PowItr (Lemma 4.1); within-superstep asynchrony (the FIFO queue)
  * cannot be expressed in bulk-synchronous dataflow and is the documented
  * deviation (DESIGN.md §2).
  *
  *  - r_max = 0      → every node with residue pushes: distributed PowItr.
  *  - r_max = λ/m    → frontier forward push: distributed FIFO-FwdPush.
  *  - dynamic r_max  → distributed PowerPush (epoch schedule of §5).
  *
  * State: DataFrame(id LONG, deg LONG, pi DOUBLE, r DOUBLE), one row per
  * node. Dead ends (deg = 0) forward their (1−α) share to the query source.
  */
object SparkPPR {

  /** Initial state: residue 1 at the source, 0 elsewhere. */
  def initState(spark: SparkSession, edges: DataFrame, n: Long, s: Long): DataFrame = {
    val deg = edges.groupBy(col("src").as("id")).agg(count(lit(1)).as("deg"))
    spark.range(n).toDF("id")
      .join(deg, Seq("id"), "left")
      .select(
        col("id"),
        coalesce(col("deg"), lit(0L)).as("deg"),
        lit(0.0).as("pi"),
        when(col("id") === s, 1.0).otherwise(0.0).as("r"),
      )
  }

  /** One synchronous push superstep at threshold `rMax`.
    *
    * A node is active iff r > deg·r_max (a dead end hence iff r > 0, matching
    * the paper's convention). Returns the next state; pure DataFrame
    * transformation except for the dead-end mass scalar, which is a driver
    * aggregate (a scalar broadcast, not a collect of per-node state).
    */
  def pushStep(state: DataFrame, edges: DataFrame, s: Long, alpha: Double,
               rMax: Double): DataFrame = {
    val active = col("r") > greatest(col("deg").cast("double") * rMax,
                                     lit(repro.core.Common.TinyResidue))
    val deadMass = state
      .where(col("deg") === 0L && active)
      .agg(coalesce(sum(col("r")), lit(0.0)))
      .head().getDouble(0)
    val msgs = state
      .where(active && col("deg") > 0L)
      .join(edges, col("id") === col("src"))
      .groupBy(col("dst").as("id"))
      .agg(sum(lit(1.0 - alpha) * col("r") / col("deg")).as("msg"))
    state
      .join(msgs, Seq("id"), "left")
      .select(
        col("id"),
        col("deg"),
        (col("pi") + when(active, lit(alpha) * col("r")).otherwise(0.0)).as("pi"),
        (when(active, 0.0).otherwise(col("r"))
          + coalesce(col("msg"), lit(0.0))
          + when(col("id") === s, lit((1.0 - alpha) * deadMass)).otherwise(0.0)).as("r"),
      )
  }

  /** Aggregate (Σr, #active at rMax) in one pass. */
  def residueSummary(state: DataFrame, rMax: Double): (Double, Long) = {
    val row = state.agg(
      coalesce(sum(col("r")), lit(0.0)),
      coalesce(sum(when(col("r") > greatest(col("deg").cast("double") * rMax,
                                            lit(repro.core.Common.TinyResidue)), 1L)
        .otherwise(0L)), lit(0L)),
    ).head()
    (row.getDouble(0), row.getLong(1))
  }

  private def checkpoint(df: DataFrame): DataFrame = {
    val out = df.persist(StorageLevel.MEMORY_AND_DISK).localCheckpoint(true)
    out
  }

  /** Distributed PowItr: full pushes (r_max = 0) until Σr ≤ λ. */
  def powItr(spark: SparkSession, edges: DataFrame, n: Long, s: Long,
             lambda: Double, alpha: Double = 0.2, maxIters: Int = 500): DataFrame =
    loop(spark, edges, n, s, alpha, maxIters) { (state, _, rsum) =>
      if (rsum <= lambda) None else Some(0.0)
    }

  /** Distributed frontier FwdPush: r_max = λ/m until no node is active. */
  def fwdPush(spark: SparkSession, edges: DataFrame, n: Long, s: Long,
              rMax: Double, alpha: Double = 0.2, maxIters: Int = 500): DataFrame =
    loop(spark, edges, n, s, alpha, maxIters) { (state, nActive, _) =>
      if (nActive == 0L) None else Some(rMax)
    }

  /** Distributed PowerPush: the §5 epoch schedule of thresholds
    * r'_max = λ^(i/epochNum)/m, finishing at λ/m.
    */
  def powerPush(spark: SparkSession, edges: DataFrame, n: Long, s: Long,
                lambda: Double, m: Long, alpha: Double = 0.2,
                epochNum: Int = 8, maxIters: Int = 500): DataFrame = {
    var epoch = 1
    loop(spark, edges, n, s, alpha, maxIters) { (state, nActive, rsum) =>
      var lamEpoch = math.pow(lambda, epoch.toDouble / epochNum)
      while (epoch < epochNum && rsum <= lamEpoch) {
        epoch += 1
        lamEpoch = math.pow(lambda, epoch.toDouble / epochNum)
      }
      if (rsum <= lambda && nActive == 0L) None else Some(lamEpoch / m)
    }
  }

  /** Continue pushing an *existing* state at a fixed threshold until no node
    * is active — the O(m) refinement of Lemma 4.5, used by SparkSpeedPPR to
    * enforce r(s,v) ≤ d_v·r_max with r_max = 1/W before the walk phase.
    */
  def refine(stateIn: DataFrame, edges: DataFrame, s: Long, rMax: Double,
             alpha: Double = 0.2, maxIters: Int = 500): DataFrame = {
    var state = checkpoint(stateIn)
    var iter = 0
    var done = false
    while (!done && iter < maxIters) {
      val (_, nActive) = residueSummary(state, rMax)
      if (nActive == 0L) done = true
      else {
        val prev = state
        state = checkpoint(pushStep(state, edges, s, alpha, rMax))
        prev.unpersist()
        iter += 1
      }
    }
    state
  }

  /** Shared superstep loop. `next` inspects (state, #active-at-last-rMax, Σr)
    * and returns the next threshold, or None to stop. The first call sees the
    * initial state with r_max = 0 statistics.
    */
  private def loop(spark: SparkSession, edges: DataFrame, n: Long, s: Long,
                   alpha: Double, maxIters: Int)
                  (next: (DataFrame, Long, Double) => Option[Double]): DataFrame = {
    var state = checkpoint(initState(spark, edges, n, s))
    var iter = 0
    var rMaxUsed = 0.0
    var continue = true
    while (continue && iter < maxIters) {
      val (rsum, nActive) = residueSummary(state, rMaxUsed)
      next(state, nActive, rsum) match {
        case None => continue = false
        case Some(rMax) =>
          val prev = state
          state = checkpoint(pushStep(state, edges, s, alpha, rMax))
          prev.unpersist()
          rMaxUsed = rMax
          iter += 1
      }
    }
    state
  }
}
