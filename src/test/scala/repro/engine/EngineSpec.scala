package repro.engine

import java.util.SplittableRandom
import org.scalatest.funsuite.AnyFunSuite
import org.scalactic.Tolerance
import scala.util.Random
import repro.StatCheck
import repro.graph._

/** All four systems must agree exactly with the ground-truth transition
  * distribution after every round of every update mode — the correctness
  * backbone behind Table 3's runtime comparison.
  */
class EngineSpec extends AnyFunSuite with Tolerance {

  private val factories: Seq[(EngineFactory, String)] = Seq(
    BingoEngine.factory() -> "Bingo-batched",
    BingoEngine.factory(streaming = true) -> "Bingo-streaming",
    BingoEngine.factory(adaptive = false) -> "Bingo-baseline",
    KnightKingEngine.factory -> "KnightKing",
    GSamplerEngine.factory -> "gSampler",
    FlowWalkerEngine.factory -> "FlowWalker",
  )

  /** Tiny deterministic graph + plan for exhaustive per-round checking. */
  private def smallWorld(seed: Int): (Int, Vector[Edge]) = {
    val rnd = new Random(seed)
    val v = 30
    val edges = (for {
      s <- 0 until v
      d <- rnd.shuffle((0 until v).filter(_ != s).toList).take(5 + rnd.nextInt(6))
    } yield Edge(s, d, (1 + rnd.nextInt(100)).toDouble)).toVector
    (v, edges.distinctBy(e => (e.src, e.dst)))
  }

  private def groundTruth(edges: Iterable[Edge]): Map[Int, Map[Int, Double]] =
    edges.groupBy(_.src).map { case (s, es) =>
      val tot = es.map(_.bias).sum
      s -> es.groupBy(_.dst).map { case (d, dd) => d -> dd.map(_.bias).sum / tot }
    }

  private def checkEngine(eng: WalkEngine, truth: Map[Int, Map[Int, Double]], v: Int): Unit = {
    (0 until v).foreach { u =>
      val exp = truth.getOrElse(u, Map.empty)
      val got = eng.exactDistribution(u)
      assert(got.keySet == exp.keySet, s"${eng.name} vertex $u: ${got.keySet} vs ${exp.keySet}")
      exp.foreach { case (d, p) => StatCheck.assertProbEqual(got(d), p, 1e-9) }
      assert(eng.outDegree(u) == (if (exp.isEmpty) 0 else eng.outDegree(u)))
    }
  }

  for ((f, tag) <- factories) {
    test(s"$tag: initial build matches ground truth") {
      val (v, edges) = smallWorld(1)
      val eng = f.build(v, edges)
      checkEngine(eng, groundTruth(edges), v)
    }
  }

  for ((f, tag) <- factories; mode <- UpdateMode.All) {
    test(s"$tag stays exact through ${mode.label} rounds") {
      val (v, edges) = smallWorld(2)
      val plan = UpdateGen.plan(edges, mode, batchSize = 15, rounds = 4, seed = 5L)
      val eng = f.build(v, plan.initialEdges)
      checkEngine(eng, groundTruth(plan.initialEdges), v)
      plan.rounds.zipWithIndex.foreach { case (round, k) =>
        eng.applyRoundLocal(round)
        val liveEdges = plan
          .edgeMultisetAfter(k + 1)
          .flatMap { case ((s, d, b), c) => Seq.fill(c)(Edge(s, d, b)) }
        checkEngine(eng, groundTruth(liveEdges), v)
      }
    }
  }

  test("all engines produce identical exact distributions after mixed updates") {
    val (v, edges) = smallWorld(3)
    val plan = UpdateGen.plan(edges, UpdateMode.Mixed, 20, 3, 9L)
    val engines = factories.map(_._1.build(v, plan.initialEdges))
    engines.foreach(e => plan.rounds.foreach(e.applyRoundLocal))
    val ref = engines.head
    (0 until v).foreach { u =>
      val base = ref.exactDistribution(u)
      engines.tail.foreach { e =>
        val got = e.exactDistribution(u)
        assert(got.keySet == base.keySet, s"${e.name} vertex $u")
        base.foreach { case (d, p) => StatCheck.assertProbEqual(got(d), p, 1e-9) }
      }
    }
  }

  test("hasEdge agrees across engines and reflects updates") {
    val (v, edges) = smallWorld(4)
    val plan = UpdateGen.plan(edges, UpdateMode.Mixed, 20, 2, 10L)
    val engines = factories.map(_._1.build(v, plan.initialEdges))
    engines.foreach(e => plan.rounds.foreach(e.applyRoundLocal))
    val live = plan.edgeMultisetAfter(2).keySet.map { case (s, d, _) => (s, d) }
    for (s <- 0 until v; d <- 0 until v) {
      val expect = live.contains((s, d))
      engines.foreach(e => assert(e.hasEdge(s, d) == expect, s"${e.name} ($s,$d)"))
    }
  }

  test("empirical sampling of each engine matches its exact distribution") {
    val (v, edges) = smallWorld(5)
    factories.map(_._1).foreach { f =>
      val eng = f.build(v, edges)
      // pick the highest-degree vertex for a meaningful distribution
      val u = (0 until v).maxBy(eng.outDegree)
      val exp = eng.exactDistribution(u)
      StatCheck.assertMatches(exp, 60000, seed = 77, tol = 0.02)(r => eng.sampleNext(u, r))
    }
  }

  test("dead-end vertices sample -1 in all engines") {
    val edges = Vector(Edge(0, 1, 5.0)) // vertex 1 has no out-edges
    factories.map(_._1).foreach { f =>
      val eng = f.build(3, edges)
      assert(eng.sampleNext(1, new SplittableRandom(1)) == -1, eng.name)
      assert(eng.sampleNext(2, new SplittableRandom(1)) == -1, eng.name)
      assert(eng.sampleNext(0, new SplittableRandom(1)) == 1, eng.name)
    }
  }

  test("memory ordering: Bingo adaptive < Bingo baseline; FlowWalker smallest") {
    val (v, edges) = smallWorld(6)
    val ad = BingoEngine.factory().build(v, edges)
    val bs = BingoEngine.factory(adaptive = false).build(v, edges)
    val fw = FlowWalkerEngine.factory.build(v, edges)
    val gs = GSamplerEngine.factory.build(v, edges)
    assert(ad.memoryBytes < bs.memoryBytes)
    assert(fw.memoryBytes < gs.memoryBytes)
  }

  test("Adjacency: duplicate-edge delete removes earliest instance") {
    val a = new Adjacency(3)
    a.insert(0, 1, 2.0)
    a.insert(0, 1, 5.0)
    assert(a.outDegree(0) == 2)
    assert(a.delete(0, 1))
    assert(a.outDegree(0) == 1)
    assert(a.vertices(0).bias(0) === 5.0 +- 1e-12)
    assert(a.delete(0, 1))
    assert(!a.delete(0, 1))
  }

  test("Adjacency: deepCopy is independent") {
    val a = new Adjacency(2)
    a.insert(0, 1, 2.0)
    val c = a.vertices(0).deepCopy
    a.insert(0, 1, 3.0)
    assert(c.len == 1)
    assert(a.vertices(0).len == 2)
  }

  test("GraphStore register/get/remove") {
    val eng = BingoEngine.factory().build(2, Vector(Edge(0, 1, 1.0)))
    GraphStore.register("t", eng)
    assert(GraphStore.get("t") eq eng)
    GraphStore.remove("t")
    intercept[IllegalArgumentException](GraphStore.get("t"))
  }

  test("streaming vs batched Bingo engine: identical distributions") {
    val (v, edges) = smallWorld(7)
    val plan = UpdateGen.plan(edges, UpdateMode.Mixed, 25, 3, 12L)
    val s = BingoEngine.factory(streaming = true).build(v, plan.initialEdges)
    val b = BingoEngine.factory(streaming = false).build(v, plan.initialEdges)
    plan.rounds.foreach { r => s.applyRoundLocal(r); b.applyRoundLocal(r) }
    (0 until v).foreach { u =>
      val ds = s.exactDistribution(u)
      val db = b.exactDistribution(u)
      assert(ds.keySet == db.keySet)
      ds.foreach { case (d, p) => StatCheck.assertProbEqual(db(d), p, 1e-9) }
    }
  }
}
