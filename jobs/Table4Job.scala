package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.{Bench, Tables}

/** spark-submit entrypoint reproducing paper Table 4 (group-type conversion
  * ratios of Bingo's adaptive representation on LJ under mixed updates).
  *
  * Usage: spark-submit --class repro.jobs.Table4Job repro-jobs.jar
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("bingo-table4")
      .config("spark.sql.shuffle.partitions", "16")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try println(Tables.table4(spark, Bench.Params()))
    finally spark.stop()
  }
}
