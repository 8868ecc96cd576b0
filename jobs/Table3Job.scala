package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.eval.{Bench, Tables}

/** spark-submit entrypoint reproducing paper Table 3 (Bingo vs KnightKing,
  * gSampler and FlowWalker across DeepWalk / node2vec / PPR and the
  * Insertion / Deletion / Mixed update situations on all five datasets).
  *
  * Scale knobs: REPRO_BENCH_BATCH, REPRO_BENCH_ROUNDS, REPRO_BENCH_WALKERS,
  * REPRO_BENCH_WALKLEN (defaults 1000 / 10 / 2048 / 80).
  *
  * Usage: spark-submit --class repro.jobs.Table3Job repro-jobs.jar
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("bingo-table3")
      .config("spark.sql.shuffle.partitions", "16")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try println(Tables.table3(spark, Bench.Params()))
    finally spark.stop()
  }
}
