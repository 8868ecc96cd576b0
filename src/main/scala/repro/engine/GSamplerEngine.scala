package repro.engine

import java.util.SplittableRandom
import repro.graph.{Edge, Update}

/** gSampler-like baseline [15] as used in paper §6.2.
  *
  * gSampler is a GPU graph-sampling system with matrix-centric APIs; it
  * supports only static graphs, so each update round reconstructs its
  * sampling state from scratch (as the paper did for evaluation). We model
  * its sampling state as per-vertex CDF (prefix-sum) arrays sampled by
  * inverse transform (binary search, O(log d)) — the bulk "matrix" flavour
  * of its per-step operators — and account for the matrix-API workspace the
  * paper calls out as its dominant memory cost (it is consistently the most
  * memory-hungry system in Table 3) as a workspace factor over the CDF size.
  */
final class GSamplerEngine(val numVertices: Int) extends WalkEngine {
  /** Harness-side bookkeeping edge list (the "new graph" to reload from). */
  val adj = new Adjacency(numVertices)

  private val cdfs = new Array[Array[Double]](numVertices)

  /** The engine-resident graph, re-ingested (lists + lookup maps) each round. */
  private val loaded = new Array[Adjacency#VertexAdj](numVertices)

  /** Matrix-API temporaries ≈ this factor × the CDF footprint (Table 3 note). */
  private val MatrixWorkspaceFactor = 2.0

  def name: String = "gSampler"
  def outDegree(v: Int): Int = adj.outDegree(v)
  def hasEdge(u: Int, v: Int): Boolean = adj.hasEdge(u, v)

  def applyVertexUpdates(src: Int, updates: Seq[Update]): Unit =
    updates.foreach { u =>
      if (u.insert) adj.insert(u.src, u.dst, u.bias)
      else adj.delete(u.src, u.dst)
    }

  /** From-scratch reconstruction each round (O(E) total): re-ingest the
    * graph as its "matrix" representation and rebuild the per-vertex CDFs.
    */
  def postRoundSlice(slice: Int, stride: Int): Unit = {
    var v = slice
    while (v < numVertices) {
      val a = adj.vertices(v).deepCopy
      loaded(v) = a
      if (a.len == 0) cdfs(v) = null
      else {
        val c = new Array[Double](a.len)
        var acc = 0.0
        var i = 0
        while (i < a.len) { acc += a.bias(i); c(i) = acc; i += 1 }
        cdfs(v) = c
      }
      v += stride
    }
  }

  /** O(log d) inverse-transform draw on the per-vertex CDF. */
  def sampleNext(u: Int, rng: SplittableRandom): Int = {
    val c = cdfs(u)
    if (c == null) return -1
    val x = rng.nextDouble() * c(c.length - 1)
    var lo = 0
    var hi = c.length - 1
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (c(mid) <= x) lo = mid + 1 else hi = mid
    }
    loaded(u).dst(lo)
  }

  /** Engine-resident state only (reloaded graph + CDFs + matrix workspace);
    * the harness-side `adj` edge list is bookkeeping and not charged.
    */
  def memoryBytes: Long = {
    var cdfBytes = 0L
    var csrBytes = 0L
    var v = 0
    while (v < numVertices) {
      if (loaded(v) != null) csrBytes += loaded(v).memoryBytes
      if (cdfs(v) != null) cdfBytes += cdfs(v).length.toLong * 8
      v += 1
    }
    csrBytes + cdfBytes + (cdfBytes * MatrixWorkspaceFactor).toLong
  }

  def exactDistribution(u: Int): Map[Int, Double] = adj.distribution(u)
}

object GSamplerEngine {
  def factory: EngineFactory = new EngineFactory {
    def name: String = "gSampler"
    def build(numVertices: Int, initial: Seq[Edge]): WalkEngine = {
      val e = new GSamplerEngine(numVertices)
      initial.foreach(x => e.adj.insert(x.src, x.dst, x.bias))
      e.postRoundSlice(0, 1)
      e
    }
  }
}
