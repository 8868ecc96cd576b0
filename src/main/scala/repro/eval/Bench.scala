package repro.eval

import org.apache.spark.sql.SparkSession
import repro.engine.{EngineFactory, GraphStore, WalkEngine}
import repro.graph.{GraphGen, Update, UpdateGen, UpdateMode}
import repro.walk.Walks

/** The paper's evaluation workflow (§6.1): per round, (i) apply BATCHSIZE
  * graph updates, (ii) run the random-walk application; repeat for all
  * rounds and report the total time plus the engine's retained memory.
  *
  * Parallelisation mirrors the GPU design through Spark: a round is one
  * Spark job with one task per vertex slice (`v % P`, the 1-D partitioning
  * of supplement §9.1); each task applies its vertices' updates and then
  * runs its slice of the engine's per-round rebuild. Walks fan out as a
  * Spark Dataset of walkers.
  *
  * **Timing.** Reported times are the per-round critical path measured
  * *inside* the tasks (max task time per round, summed over rounds) — the
  * analogue of GPU kernel time in the paper. Spark's fixed job-launch
  * overhead (~tens of ms per round, identical for every system and ~100×
  * the total algorithmic cost of a 1000-update batch at -lite scale) would
  * otherwise drown the systems' algorithmic differences.
  */
object Bench {

  /** Scaled-down defaults (paper: BATCHSIZE=100K, walkers=|V|). Override via
    * REPRO_BENCH_* environment variables.
    */
  final case class Params(
      batchSize: Int = envInt("REPRO_BENCH_BATCH", 1000),
      rounds: Int = envInt("REPRO_BENCH_ROUNDS", 10),
      walkers: Int = envInt("REPRO_BENCH_WALKERS", 2048),
      walkLength: Int = envInt("REPRO_BENCH_WALKLEN", 80),
      seed: Long = 7L,
  )

  private def envInt(k: String, dflt: Int): Int = sys.env.get(k).map(_.toInt).getOrElse(dflt)

  final case class Result(
      dataset: String,
      app: String,
      mode: String,
      framework: String,
      updateSec: Double,
      walkSec: Double,
      memMB: Double,
      steps: Long,
  ) {
    def totalSec: Double = updateSec + walkSec
  }

  /** Apply one update round as a single Spark job (one task per slice).
    *
    * @return critical-path seconds: the slowest task's in-task time
    */
  def applyRoundSpark(spark: SparkSession, handle: String, round: Seq[Update]): Double = {
    import spark.implicits._
    val p = math.max(1, spark.sparkContext.defaultParallelism)
    val bySlice: Map[Int, Seq[Update]] = round.groupBy(u => u.src % p)
    // spark.range(0, p, 1, p): exactly one slice per task
    val taskNanos = spark
      .range(0, p, 1, p)
      .map { sliceL =>
        val slice = sliceL.toInt
        val eng = GraphStore.get(handle)
        val t0 = System.nanoTime()
        bySlice.get(slice).foreach {
          _.groupBy(_.src).foreach { case (src, us) => eng.applyVertexUpdates(src, us.sortBy(_.ts)) }
        }
        eng.postRoundSlice(slice, p)
        System.nanoTime() - t0
      }
      .collect()
    taskNanos.max / 1e9
  }

  /** Run the walk phase, returning (steps sampled, critical-path seconds). */
  def runWalksSpark(
      spark: SparkSession,
      handle: String,
      app: Walks.WalkApp,
      walkers: Int,
      seed: Long,
  ): (Long, Double) = {
    import spark.implicits._
    val perTask = spark
      .range(walkers)
      .mapPartitions { it =>
        val eng = GraphStore.get(handle)
        val t0 = System.nanoTime()
        var steps = 0L
        it.foreach { wid =>
          val rng = Walks.walkerRng(seed, wid)
          val start = (wid % eng.numVertices).toInt
          steps += Walks.walkPath(eng, app, start, rng).length - 1
        }
        Iterator.single((steps, System.nanoTime() - t0))
      }
      .collect()
    (perTask.map(_._1).sum, perTask.map(_._2).max / 1e9)
  }

  /** Run one cell of Table 3: a (dataset, app, mode, framework) config. */
  def runConfig(
      spark: SparkSession,
      graph: GraphGen.GeneratedGraph,
      app: Walks.WalkApp,
      mode: UpdateMode,
      factory: EngineFactory,
      params: Params = Params(),
  ): Result = {
    val plan = UpdateGen.plan(graph.edges, mode, params.batchSize, params.rounds, params.seed)
    val engine: WalkEngine = factory.build(graph.numVertices, plan.initialEdges)
    val handle = s"bench-${graph.spec.abbr}-${app.label}-${mode.label}-${factory.name}"
    GraphStore.register(handle, engine)
    try {
      var updSec = 0.0
      var walkSec = 0.0
      var steps = 0L
      plan.rounds.zipWithIndex.foreach { case (round, r) =>
        updSec += applyRoundSpark(spark, handle, round)
        val (s, w) = runWalksSpark(spark, handle, app, params.walkers, params.seed + r)
        steps += s
        walkSec += w
      }
      Result(
        graph.spec.abbr,
        app.label,
        mode.label,
        factory.name,
        updSec,
        walkSec,
        engine.memoryBytes / 1e6,
        steps,
      )
    } finally GraphStore.remove(handle)
  }
}
