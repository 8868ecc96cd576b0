package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.core.GroupType
import repro.eval.{Bench, Tables}

/** Reproduces paper Table 4: group-type conversion ratios of Bingo's
  * adaptive representation on LJ under mixed updates. The paper's claim is
  * that conversions are *rare* (highest entry 0.47% of touches), which is
  * why the adaptive design's rebuild overhead stays below 8% worst-case.
  */
class Table4Bench extends AnyFunSuite with SparkSpec {

  test("Table 4: group conversion ratios on LJ (mixed updates)") {
    val out = Tables.table4(spark, Bench.Params())
    println(out)
    BenchOutput.write("table4.txt", out)

    // re-derive the stats for assertions
    val g = repro.graph.GraphGen.generate(repro.graph.GraphGen.LJ)
    val plan = repro.graph.UpdateGen.plan(
      g.edges, repro.graph.UpdateMode.Mixed, Bench.Params().batchSize, Bench.Params().rounds, Bench.Params().seed)
    val engine = new repro.engine.BingoEngine(g.numVertices)
    plan.initialEdges.groupBy(_.src).foreach { case (src, es) =>
      engine.vertices(src).applyBatch(es.map(x => (x.dst, x.bias)), Seq.empty)
    }
    engine.conversions.reset()
    plan.rounds.foreach(engine.applyRoundLocal)
    val cs = engine.conversions

    assert(cs.totalTouches > 0L)
    // paper shape: per round, only a tiny fraction of each group population
    // converts (paper max entry 0.47%; we allow slack — our degrees are ~8x
    // smaller, so a single update moves |G|/d ratios further)
    val census = engine.groupTypeCensus
    GroupType.All.foreach { from =>
      val pop = math.max(1L, census.getOrElse(from, 0L)) * Bench.Params().rounds
      GroupType.All.foreach { to =>
        if (from != to) {
          val r = cs.conversions(from, to) * 100.0 / pop
          assert(r < 2.0, s"${from.label} -> ${to.label}: $r% of groups per round — should be rare")
        }
      }
    }
    // and conversions stay well below touch volume, so GA's rebuild overhead
    // is bounded (the paper's <=8% worst-case claim)
    assert(cs.totalConversions < cs.totalTouches)
  }
}
