package repro.jobs

import repro.eval.Tables

/** spark-submit entrypoint reproducing paper Table 1 (complexity of Bingo
  * vs Alias / ITS / Rejection sampling). Pure driver-side micro-benchmark —
  * no cluster work, but kept as a job for a uniform launch surface.
  *
  * Usage: spark-submit --class repro.jobs.Table1Job repro-jobs.jar
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    println(Tables.table1())
  }
}
