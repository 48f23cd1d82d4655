package repro.graph

/** Exact SSPPR via dense Gaussian elimination — test-only ground truth.
  *
  * Solves Equation (1) of the paper, π_s = α·e_s + (1−α)·π_s·P, i.e. the
  * linear system (I − (1−α)·Pᵀ)·π_sᵀ = α·e_sᵀ, with partial pivoting.
  * The transition-matrix row of a dead-end node is e_s (the paper's
  * conceptual dead-end→source edge), so P — and hence π — depends on s.
  *
  * O(n³): only for graphs with n up to a few hundred. Used to ground-truth
  * every approximate/iterative algorithm in the test suites.
  */
object ExactPPR {

  /** Exact PPR vector π_s, with ‖π_s‖₁ = 1 (up to float error). */
  def solve(g: CSRGraph, s: Int, alpha: Double = 0.2): Array[Double] = {
    val n = g.n
    require(n <= 2000, s"ExactPPR is dense O(n^3); n=$n too large")
    require(s >= 0 && s < n)
    // A = I − (1−α)·Pᵀ  (column v of Pᵀ is the out-distribution of v)
    val a = Array.fill(n)(new Array[Double](n))
    var v = 0
    while (v < n) {
      a(v)(v) += 1.0
      val d = g.outDegree(v)
      if (d == 0) {
        a(s)(v) -= (1.0 - alpha) // dead end: all mass returns to the source
      } else {
        val p = (1.0 - alpha) / d
        g.foreachOut(v)(u => a(u)(v) -= p)
      }
      v += 1
    }
    val b = new Array[Double](n)
    b(s) = alpha
    gaussianSolve(a, b)
  }

  /** In-place Gaussian elimination with partial pivoting; returns x: Ax = b. */
  private def gaussianSolve(a: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val n = b.length
    var col = 0
    while (col < n) {
      var piv = col
      var best = math.abs(a(col)(col))
      var r = col + 1
      while (r < n) {
        val v = math.abs(a(r)(col))
        if (v > best) { best = v; piv = r }
        r += 1
      }
      require(best > 1e-14, s"singular system at column $col")
      if (piv != col) {
        val tmpRow = a(piv); a(piv) = a(col); a(col) = tmpRow
        val tmpB = b(piv); b(piv) = b(col); b(col) = tmpB
      }
      r = col + 1
      while (r < n) {
        val factor = a(r)(col) / a(col)(col)
        if (factor != 0.0) {
          var c = col
          while (c < n) { a(r)(c) -= factor * a(col)(c); c += 1 }
          b(r) -= factor * b(col)
        }
        r += 1
      }
      col += 1
    }
    // Back substitution.
    val x = new Array[Double](n)
    var row = n - 1
    while (row >= 0) {
      var sum = b(row)
      var c = row + 1
      while (c < n) { sum -= a(row)(c) * x(c); c += 1 }
      x(row) = sum / a(row)(row)
      row -= 1
    }
    x
  }
}
