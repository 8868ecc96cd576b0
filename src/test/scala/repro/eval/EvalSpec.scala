package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.{SparkSpec, StatCheck}
import repro.engine._
import repro.graph._
import repro.walk.Walks

/** Harness-level integration tests: Spark-routed updates are equivalent to
  * local application, and the table runners produce sane output at tiny
  * scale (the full-scale runs live in bench/).
  */
class EvalSpec extends AnyFunSuite with SparkSpec {

  private val tinyParams = Bench.Params(batchSize = 50, rounds = 2, walkers = 64, walkLength = 10)

  test("applyRoundSpark ≡ applyRoundLocal for every engine") {
    val g = GraphGen.generate(GraphGen.AM)
    val plan = UpdateGen.plan(g.edges, UpdateMode.Mixed, 200, 2, 17L)
    Tables.frameworks.foreach { f =>
      val viaSpark = f.build(g.numVertices, plan.initialEdges)
      val viaLocal = f.build(g.numVertices, plan.initialEdges)
      GraphStore.register("eval-spec-eq", viaSpark)
      try {
        plan.rounds.foreach { r =>
          Bench.applyRoundSpark(spark, "eval-spec-eq", r)
          viaLocal.applyRoundLocal(r)
        }
      } finally GraphStore.remove("eval-spec-eq")
      // spot-check exact distributions on the 50 highest-degree vertices
      val hot = (0 until g.numVertices).sortBy(-viaLocal.outDegree(_)).take(50)
      hot.foreach { u =>
        val a = viaSpark.exactDistribution(u)
        val b = viaLocal.exactDistribution(u)
        assert(a.keySet == b.keySet, s"${f.name} vertex $u")
        b.foreach { case (d, p) => StatCheck.assertProbEqual(a(d), p, 1e-9) }
      }
    }
  }

  for (f <- Tables.frameworks) {
    test(s"runConfig smoke: ${f.name} on AM-lite/tiny params") {
      val g = GraphGen.generate(GraphGen.AM)
      val r = Bench.runConfig(spark, g, Walks.DeepWalk(10), UpdateMode.Mixed, f, tinyParams)
      assert(r.steps > 0)
      assert(r.memMB > 0)
      assert(r.updateSec >= 0 && r.walkSec >= 0)
      assert(r.framework == f.name)
    }
  }

  test("table1Rows: all samplers measured, positive costs") {
    val rows = Tables.table1Rows(degrees = Seq(64, 256), opCount = 50, sampleCount = 2000)
    assert(rows.size == 4 * 2)
    rows.foreach { r =>
      assert(r.insertNs > 0 && r.deleteNs > 0 && r.sampleNs > 0)
      assert(r.memBytes > 0)
    }
    assert(rows.map(_.method).distinct.size == 4)
  }

  test("scalingExponent: linear data has slope ~1, flat data ~0") {
    val lin = Seq((100, 100.0), (1000, 1000.0), (10000, 10000.0))
    assert(math.abs(Tables.scalingExponent(lin) - 1.0) < 0.01)
    val flat = Seq((100, 5.0), (1000, 5.0), (10000, 5.0))
    assert(math.abs(Tables.scalingExponent(flat)) < 0.01)
  }

  test("table2Rows via Spark matches driver-side stats") {
    val specs = Seq(GraphGen.AM)
    val row = Tables.table2Rows(spark, specs).head
    val g = GraphGen.generate(GraphGen.AM)
    assert(row.vertices == g.numVertices)
    assert(row.edges == g.edges.size)
    assert(row.maxDeg == g.edges.groupBy(_.src).map(_._2.size).max)
  }

  test("table3Format produces a row per app/mode/framework with speedups") {
    val g = GraphGen.generate(GraphGen.AM)
    val rows = for {
      fw <- Tables.frameworks
    } yield Bench.runConfig(spark, g, Walks.DeepWalk(8), UpdateMode.Insertion, fw, tinyParams)
    val out = Tables.table3Format(rows, Seq(GraphGen.AM))
    assert(out.contains("Bingo"))
    assert(out.contains("KnightKing"))
    assert(out.contains("gSampler"))
    assert(out.contains("FlowWalker"))
  }

  test("conversion stats on a real workload stay rare (Table 4 shape)") {
    val g = GraphGen.generate(GraphGen.AM)
    val plan = UpdateGen.plan(g.edges, UpdateMode.Mixed, 500, 4, 19L)
    val engine = new BingoEngine(g.numVertices)
    plan.initialEdges.groupBy(_.src).foreach { case (src, es) =>
      engine.vertices(src).applyBatch(es.map(x => (x.dst, x.bias)), Seq.empty)
    }
    engine.conversions.reset()
    plan.rounds.foreach(engine.applyRoundLocal)
    val cs = engine.conversions
    assert(cs.totalTouches > 0)
    // conversions must be a small fraction of touches (paper: max 0.47%... we
    // allow a loose bound at this tiny scale)
    assert(cs.totalConversions < cs.totalTouches, s"${cs.totalConversions} vs ${cs.totalTouches}")
    val census = engine.groupTypeCensus
    assert(census.values.sum > 0)
  }

  test("walk workload scales with walkers and length") {
    val g = GraphGen.generate(GraphGen.AM)
    val eng = BingoEngine.factory().build(g.numVertices, g.edges)
    GraphStore.register("eval-spec-scale", eng)
    try {
      val s1 = Walks.runCounted(spark, "eval-spec-scale", Walks.DeepWalk(5), 32, 1L)
      val s2 = Walks.runCounted(spark, "eval-spec-scale", Walks.DeepWalk(10), 64, 1L)
      assert(s1 == 32 * 4)
      assert(s2 == 64 * 9)
    } finally GraphStore.remove("eval-spec-scale")
  }
}
