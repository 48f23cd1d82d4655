package repro.graph

import java.util.Random
import scala.collection.mutable

/** Deterministic synthetic graph generators.
  *
  * The paper evaluates on six SNAP graphs (Table 1). Those are not available
  * offline, so we generate *scale-free stand-ins* that preserve each dataset's
  * directedness, average degree m/n, and heavy-tailed degree skew, scaled down
  * in n (see DESIGN.md §4). Generation is Chung-Lu style: node weights follow
  * a power law; out-degrees are proportional to weight; edge targets are drawn
  * with probability proportional to target weight via an inverse-CDF power-law
  * draw. Directed graphs keep a small fraction of dead-end nodes so the
  * dead-end→source redirect path of the algorithms is exercised.
  */
object GraphGen {

  /** One named dataset stand-in, mirroring a row of the paper's Table 1. */
  final case class Dataset(
      name: String,
      paperName: String,
      n: Int,
      avgDeg: Double,
      directed: Boolean,
      /** (n, m) of the original SNAP graph, for EXPERIMENTS.md side-by-side. */
      paperN: Long,
      paperM: Long,
  ) {
    def generate(seed: Long = 42L): CSRGraph =
      if (directed) scaleFree(n, avgDeg, seed = seed)
      else scaleFreeUndirected(n, avgDeg / 2.0, seed = seed)
  }

  /** The six stand-ins; n scaled down 50–1000×, m/n matching Table 1. */
  val datasets: Seq[Dataset] = Seq(
    Dataset("dblp-lite",    "DBLP",    6340,  6.62,  directed = false, 317000L,   2100000L),
    Dataset("webst-lite",   "Web-St",  5640,  8.20,  directed = true,  282000L,   2310000L),
    Dataset("pokec-lite",   "Pokec",   16300, 18.8,  directed = true,  1630000L,  30600000L),
    Dataset("lj-lite",      "LJ",      24250, 14.1,  directed = true,  4850000L,  68400000L),
    Dataset("orkut-lite",   "Orkut",   15350, 76.3,  directed = false, 3070000L,  234000000L),
    Dataset("twitter-lite", "Twitter", 41700, 35.3,  directed = true,  41700000L, 1470000000L),
  )

  /** Small versions of the same shapes for unit tests. */
  val tinyDatasets: Seq[Dataset] =
    datasets.map(d => d.copy(name = d.name + "-tiny", n = math.max(60, d.n / 40)))

  def byName(name: String): Dataset =
    (datasets ++ tinyDatasets).find(_.name == name)
      .getOrElse(throw new NoSuchElementException(s"unknown dataset $name"))

  /** Power-law target draw: returns an id in [0, n) with
    * P(id = k) ∝ (k+1)^(−β), via the continuous inverse CDF. β ∈ (0,1).
    */
  @inline private def powerLawDraw(rng: Random, n: Int, β: Double): Int = {
    val u = rng.nextDouble()
    val x = math.pow(u, 1.0 / (1.0 - β)) * n
    math.min(n - 1, x.toInt)
  }

  /** Directed scale-free graph.
    *
    * @param n           node count
    * @param avgDeg      target average out-degree (m ≈ n·avgDeg)
    * @param beta        power-law exponent for both degree and target skew
    * @param deadEndFrac fraction of nodes forced to out-degree 0
    */
  def scaleFree(n: Int, avgDeg: Double, beta: Double = 0.55,
                deadEndFrac: Double = 0.01, seed: Long = 42L): CSRGraph = {
    require(n >= 2 && avgDeg >= 1.0)
    val rng = new Random(seed)
    // Node weights w_k ∝ (k+1)^(−β); out-degree of k is avgDeg·w_k/mean(w),
    // capped so a single node cannot own more than ~n/2 out-edges.
    val w = Array.tabulate(n)(k => math.pow(k + 1.0, -beta))
    val meanW = w.sum / n
    val nDead = math.max(1, (n * deadEndFrac).toInt)
    val targetDeg = Array.tabulate(n) { k =>
      if (k >= n - nDead) 0 // highest ids become dead ends
      else math.max(1, math.min(n / 2, math.round(avgDeg * w(k) / meanW).toInt))
    }
    val sb = Vector.newBuilder[(Int, Int)]
    val seen = new mutable.HashSet[Int]
    var v = 0
    while (v < n) {
      seen.clear()
      val d = targetDeg(v)
      var tries = 0
      while (seen.size < d && tries < d * 20) {
        val t = powerLawDraw(rng, n, beta)
        if (t != v && !seen.contains(t)) { seen += t; sb += ((v, t)) }
        tries += 1
      }
      v += 1
    }
    CSRGraph.fromEdges(n, sb.result())
  }

  /** Undirected scale-free graph materialized as both directed arcs, exactly
    * like the paper does for DBLP and Orkut ("replace each un-directed edge
    * with two directed edges"). `avgDeg` counts undirected edges per node.
    */
  def scaleFreeUndirected(n: Int, avgDeg: Double, beta: Double = 0.55,
                          seed: Long = 42L): CSRGraph = {
    require(n >= 2 && avgDeg >= 0.5)
    val rng = new Random(seed)
    val w = Array.tabulate(n)(k => math.pow(k + 1.0, -beta))
    val meanW = w.sum / n
    val pairs = new mutable.HashSet[Long]
    val sb = Vector.newBuilder[(Int, Int)]
    var v = 0
    while (v < n) {
      val d = math.max(1, math.min(n / 2, math.round(avgDeg * w(v) / meanW).toInt))
      var added = 0
      var tries = 0
      while (added < d && tries < d * 20) {
        val t = powerLawDraw(rng, n, beta)
        val key = math.min(v, t).toLong * n + math.max(v, t)
        if (t != v && !pairs.contains(key)) {
          pairs += key
          sb += ((v, t)); sb += ((t, v))
          added += 1
        }
        tries += 1
      }
      v += 1
    }
    CSRGraph.fromEdges(n, sb.result())
  }

  /** Uniform random directed graph (Erdős–Rényi-ish), for property tests. */
  def randomGraph(n: Int, avgDeg: Double, seed: Long = 7L,
                  allowDeadEnds: Boolean = true): CSRGraph = {
    val rng = new Random(seed)
    val sb = Vector.newBuilder[(Int, Int)]
    var v = 0
    while (v < n) {
      // Poisson-ish degree via geometric trials around avgDeg.
      val base = if (allowDeadEnds && rng.nextDouble() < 0.05) 0
                 else 1 + rng.nextInt(math.max(1, (2 * avgDeg).toInt))
      val seen = new mutable.HashSet[Int]
      while (seen.size < math.min(base, n - 1)) {
        val t = rng.nextInt(n)
        if (t != v) seen += t
      }
      seen.foreach(t => sb += ((v, t)))
      v += 1
    }
    CSRGraph.fromEdges(n, sb.result())
  }
}
