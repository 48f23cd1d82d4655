package repro.jobs

import repro.harness.Harness

/** spark-submit entrypoint for the high-precision experiments: Figure 4
  * (query time) and Figure 6 (residue updates) rendered as tables.
  */
object HighPrecisionJob {
  def main(args: Array[String]): Unit = {
    println(Harness.fig4Table()._1)
    println()
    println(Harness.fig6Table())
  }
}
