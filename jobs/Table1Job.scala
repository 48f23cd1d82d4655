package repro.jobs

import repro.harness.Harness

/** spark-submit entrypoint reproducing Table 1 (dataset statistics).
  * Usage: spark-submit --class repro.jobs.Table1Job repro.jar
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    println(Harness.table1())
  }
}
