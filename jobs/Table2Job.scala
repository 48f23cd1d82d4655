package repro.jobs

import repro.harness.Harness

/** spark-submit entrypoint reproducing Table 2 (index size and construction
  * time for BePI-lite, FORA+ at ε = 0.1, and SpeedPPR).
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    println(Harness.table2()._1)
  }
}
