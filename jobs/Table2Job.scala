package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.Tables

/** spark-submit entrypoint reproducing paper Table 2 (dataset statistics
  * of the five -lite synthetic graphs, computed with Spark aggregations).
  *
  * Usage: spark-submit --class repro.jobs.Table2Job repro-jobs.jar
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("bingo-table2")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try println(Tables.table2(spark))
    finally spark.stop()
  }
}
