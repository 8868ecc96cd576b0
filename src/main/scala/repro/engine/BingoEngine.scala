package repro.engine

import java.util.SplittableRandom
import repro.core.{BingoVertex, ConversionStats}
import repro.graph.{Edge, Update}

/** BINGO — the paper's system. One [[repro.core.BingoVertex]] radix-
  * factorized sampler per vertex; updates are incremental (O(K) per edge)
  * and there is *no* per-round global rebuild: each touched vertex rebuilds
  * only its ≤K-entry inter-group alias table, either per update (streaming
  * mode, §4.2) or once per batch (batched mode, §5.2).
  *
  * @param streaming  true = streaming_insert/streaming_delete kernels
  *                   (one structural maintenance pass per update);
  *                   false = batched_insert/batched_delete (+ one rebuild)
  * @param adaptive   adaptive group representation (§5.1) vs BaSeline
  * @param lambda     float-bias amortisation factor (§4.3); 1.0 = integer
  */
final class BingoEngine(
    val numVertices: Int,
    val streaming: Boolean = false,
    val adaptive: Boolean = true,
    val lambda: Double = 1.0,
    val conversions: ConversionStats = new ConversionStats,
) extends WalkEngine {

  val vertices: Array[BingoVertex] =
    Array.fill(numVertices)(new BingoVertex(adaptive = adaptive, lambda = lambda, conversions = conversions))

  def name: String = "Bingo"
  def outDegree(v: Int): Int = vertices(v).degree
  def hasEdge(u: Int, v: Int): Boolean = vertices(u).contains(v)

  def applyVertexUpdates(src: Int, updates: Seq[Update]): Unit = {
    val v = vertices(src)
    if (streaming) {
      updates.foreach { u =>
        if (u.insert) v.insert(u.dst, u.bias)
        else v.delete(u.dst)
      }
    } else {
      val ins = updates.collect { case u if u.insert => (u.dst, u.bias) }
      val del = updates.collect { case u if !u.insert => u.dst }
      v.applyBatch(ins, del)
    }
  }

  /** No global rebuild — Bingo's point. */
  def postRoundSlice(slice: Int, stride: Int): Unit = ()

  def sampleNext(u: Int, rng: SplittableRandom): Int = vertices(u).sample(rng)

  def memoryBytes: Long = {
    var s = 0L
    var i = 0
    while (i < numVertices) { s += vertices(i).memoryBytes; i += 1 }
    s
  }

  def exactDistribution(u: Int): Map[Int, Double] = {
    val v = vertices(u)
    val dsts = (0 until v.degree).map(v.dstAt).distinct
    dsts.map(d => d -> v.structProbabilityOf(d)).toMap
  }

  /** How many groups of each adaptive type exist across all vertices
    * (context for Table 4 / the Fig. 11e group-ratio discussion).
    */
  def groupTypeCensus: Map[repro.core.GroupType, Long] = {
    val m = scala.collection.mutable.Map[repro.core.GroupType, Long]().withDefaultValue(0L)
    vertices.foreach { v =>
      v.activeGroupBits.foreach(k => v.groupTypeOf(k).foreach(t => m(t) += 1L))
    }
    m.toMap
  }
}

object BingoEngine {
  def factory(
      streaming: Boolean = false,
      adaptive: Boolean = true,
      lambda: Double = 1.0,
  ): EngineFactory = new EngineFactory {
    def name: String = "Bingo"
    def build(numVertices: Int, initial: Seq[Edge]): WalkEngine = {
      val e = new BingoEngine(numVertices, streaming, adaptive, lambda)
      initial.groupBy(_.src).foreach { case (src, es) =>
        e.vertices(src).applyBatch(es.map(x => (x.dst, x.bias)), Seq.empty)
      }
      e
    }
  }
}
