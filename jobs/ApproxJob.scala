package repro.jobs

import repro.harness.Harness

/** spark-submit entrypoint for the approximate-SSPPR experiments: Figure 7
  * (query time vs ε) and Figure 8 (ℓ1 error vs ε) rendered as tables.
  */
object ApproxJob {
  def main(args: Array[String]): Unit = {
    println(Harness.fig7Table())
    println()
    println(Harness.fig8Table())
  }
}
