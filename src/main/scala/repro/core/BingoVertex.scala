package repro.core

import java.util.SplittableRandom
import scala.collection.mutable.ArrayBuffer

/** BINGO's per-vertex radix-factorized sampling structure (paper §4–§5).
  *
  * Every neighbor occupies a *slot* in Hornet-style dynamic arrays
  * (`dstArr`, `biasIntArr`, `decArr`). Each integer (λ-scaled) bias is
  * decomposed by its set bits (Eq. 3); slots sharing bit `k` form radix
  * group `p_k` with weight `|G_k|·2^k` (Eq. 4). Sampling is hierarchical
  * (§4.1): an inter-group alias table picks a group in O(1), then uniform
  * intra-group sampling picks a slot in O(1). Streaming insert/delete cost
  * O(K) (§4.2); batched updates follow the paper's per-vertex
  * insert → delete → rebuild workflow with the two-phase parallel
  * delete-and-swap (§5.2, Fig. 10b). Groups adapt their representation
  * (dense / one-element / sparse / regular, §5.1) to cut memory.
  *
  * Duplicate edges are allowed; a deletion removes the *earliest* surviving
  * instance of (vertex, dst), per the paper's timestamped-duplicate rule.
  *
  * @param adaptive    false reproduces the BaSeline (BS) all-regular design
  * @param lambda      amortisation factor for floating-point biases (§4.3);
  *                    1.0 with integer biases means a pure integer radix space
  * @param alpha       dense threshold percentage (paper default 40)
  * @param beta        sparse threshold percentage (paper default 10)
  * @param conversions optional shared collector for Table 4 statistics
  */
final class BingoVertex(
    val adaptive: Boolean = true,
    val lambda: Double = 1.0,
    val alpha: Double = 40.0,
    val beta: Double = 10.0,
    val conversions: ConversionStats = null,
) extends Serializable {

  import BingoVertex._

  // ---- Hornet-style dynamic neighbor arrays ("slots") -------------------
  private var dstArr = new Array[Int](InitialCap)
  private var biasIntArr = new Array[Long](InitialCap) // λ-scaled integer part
  private var rawBiasArr = new Array[Double](InitialCap) // pre-λ bias (introspection only)
  private var decArr: Array[Double] = null // decimal remainders; allocated on demand
  private var d = 0

  /** dst → slots holding an instance of (v, dst), in insertion (timestamp) order. */
  private val slotsByDst = new java.util.HashMap[Int, ArrayBuffer[Int]]()

  // ---- Radix groups ------------------------------------------------------
  private val groups = new Array[Group](Radix.MaxBits + 1)

  // ---- Decimal group (float mode, §4.3) ---------------------------------
  private var decList = new Array[Int](0)
  private var decLen = 0
  private val decInv = new java.util.HashMap[Int, Int]()
  private var decSum = 0.0
  private var decMax = 0.0

  // ---- Inter-group sampling space ---------------------------------------
  private var interAlias: AliasTable = null
  private var aliasGroupIds: Array[Int] = null // bit position, or DecimalGroupId

  // =======================================================================
  // Public API
  // =======================================================================

  def degree: Int = d
  def dstAt(slot: Int): Int = dstArr(slot)
  def rawBiasAt(slot: Int): Double = rawBiasArr(slot)
  def scaledIntBiasAt(slot: Int): Long = biasIntArr(slot)
  def decimalAt(slot: Int): Double = if (decArr == null) 0.0 else decArr(slot)
  def contains(dst: Int): Boolean = { val b = slotsByDst.get(dst); b != null && b.nonEmpty }

  /** Total λ-scaled mass Σ(int + dec) — the sampling normaliser. */
  def totalMass: Double = {
    var m = decSum
    var k = 0
    while (k <= Radix.MaxBits) {
      val g = groups(k)
      if (g != null) m += g.count.toDouble * (1L << k).toDouble
      k += 1
    }
    m
  }

  /** Streaming insertion (§4.2, Fig. 5): append slot, update each radix
    * group the bias contributes to, rebuild the inter-group alias table.
    * O(K) total.
    */
  def insert(dst: Int, bias: Double): Unit = {
    val slot = appendSlot(dst, bias)
    var rest = biasIntArr(slot)
    while (rest != 0) {
      val k = java.lang.Long.numberOfTrailingZeros(rest)
      groupInsert(k, slot, reclassifyNow = true)
      rest &= rest - 1
    }
    if (decimalAt(slot) > 0.0) decInsert(slot)
    rebuildInterAlias()
  }

  /** Streaming deletion (§4.2, Fig. 6): locate the earliest instance via the
    * inverted indexes, delete-and-swap inside each group, compact the slot
    * arrays by swapping in the last slot, reclassify the touched groups, and
    * rebuild the inter-group alias table. O(K) total.
    *
    * @return false if no instance of (v, dst) exists
    */
  def delete(dst: Int): Boolean = {
    val buf = slotsByDst.get(dst)
    if (buf == null || buf.isEmpty) return false
    val slot = buf.remove(0)
    if (buf.isEmpty) slotsByDst.remove(dst)

    val bits = biasIntArr(slot)
    var rest = bits
    while (rest != 0) {
      val k = java.lang.Long.numberOfTrailingZeros(rest)
      reprDelete(k, slot)
      rest &= rest - 1
    }
    if (decimalAt(slot) > 0.0) decDelete(slot)
    compactSlot(slot)
    rest = bits
    while (rest != 0) {
      val k = java.lang.Long.numberOfTrailingZeros(rest)
      reclassify(k)
      rest &= rest - 1
    }
    rebuildInterAlias()
    true
  }

  /** Batched updates for this vertex (§5.2, Fig. 10a): insert all, delete
    * all (two-phase parallel delete-and-swap per group, Fig. 10b), then one
    * rebuild pass that handles group-type conversions, the decimal group
    * statistics, and the inter-group alias table.
    *
    * @return number of deletions actually applied
    */
  def applyBatch(inserts: Seq[(Int, Double)], deletes: Seq[Int]): Int = {
    // Groups an update actually landed in — only these are reconsidered for
    // a type conversion in the rebuild phase (§5.2: conversions are driven
    // by the insertions/deletions a group received, not by drift of d).
    var touchedBits = 0L

    // -- insert phase: append slots; groups absorb without reclassification
    inserts.foreach { case (dst, bias) =>
      val slot = appendSlot(dst, bias)
      touchedBits |= biasIntArr(slot)
      var rest = biasIntArr(slot)
      while (rest != 0) {
        val k = java.lang.Long.numberOfTrailingZeros(rest)
        groupInsert(k, slot, reclassifyNow = false)
        rest &= rest - 1
      }
      if (decimalAt(slot) > 0.0) decInsert(slot)
    }

    // -- delete phase: resolve earliest instances, two-phase per group
    val delSlots = new java.util.HashSet[Integer]()
    var applied = 0
    deletes.foreach { dst =>
      val buf = slotsByDst.get(dst)
      if (buf != null && buf.nonEmpty) {
        val slot = buf.remove(0)
        if (buf.isEmpty) slotsByDst.remove(dst)
        delSlots.add(slot)
        applied += 1
      }
    }
    if (!delSlots.isEmpty) {
      // group-level two-phase compaction
      val perGroup = new java.util.HashMap[Int, ArrayBuffer[Int]]() // k -> positions
      val it = delSlots.iterator()
      while (it.hasNext) {
        val slot = it.next().intValue()
        touchedBits |= biasIntArr(slot)
        var rest = biasIntArr(slot)
        while (rest != 0) {
          val k = java.lang.Long.numberOfTrailingZeros(rest)
          val g = groups(k)
          touch(g.tpe)
          g.tpe match {
            case GroupType.Dense =>
              g.count -= 1
              if (g.count == 0) groups(k) = null
            case GroupType.OneElement =>
              g.count -= 1
              if (g.count == 0) groups(k) = null else g.dirty = true
            case GroupType.Regular | GroupType.Sparse =>
              var ps = perGroup.get(k)
              if (ps == null) { ps = new ArrayBuffer[Int](); perGroup.put(k, ps) }
              ps += g.posOf(slot)
            case _ =>
          }
          rest &= rest - 1
        }
        if (decimalAt(slot) > 0.0) decDelete(slot)
      }
      perGroup.forEach { (k, positions) => twoPhaseGroupCompact(groups(k), positions) }
      perGroup.forEach { (k, _) => if (groups(k) != null && groups(k).count == 0) groups(k) = null }
      // slot-array two-phase compaction
      twoPhaseSlotCompact(delSlots)
    }

    // -- rebuild phase: conversions + decimal stats + inter-group alias
    var k = 0
    while (k <= Radix.MaxBits) {
      val g = groups(k)
      if (g != null && (((touchedBits >>> k) & 1L) == 1L || g.dirty)) reclassify(k)
      k += 1
    }
    recomputeDecMax()
    rebuildInterAlias()
    applied
  }

  /** Hierarchical O(1) sampling (§4.1): inter-group alias draw, then uniform
    * (or dense-rejection / decimal-rejection) intra-group draw.
    *
    * @return the sampled neighbor's dst, or -1 if the vertex has no mass
    */
  def sample(rng: SplittableRandom): Int = {
    val slot = sampleSlot(rng)
    if (slot < 0) -1 else dstArr(slot)
  }

  /** Like [[sample]] but returns the internal slot (test introspection). */
  def sampleSlot(rng: SplittableRandom): Int = {
    if (interAlias == null) return -1
    val gid = aliasGroupIds(interAlias.sample(rng))
    if (gid == DecimalGroupId) {
      // rejection inside the decimal group
      while (true) {
        val slot = decList(rng.nextInt(decLen))
        if (rng.nextDouble() * decMax < decArr(slot)) return slot
      }
      -1
    } else {
      val g = groups(gid)
      g.tpe match {
        case GroupType.OneElement => g.oneSlot
        case GroupType.Regular | GroupType.Sparse => g.list(rng.nextInt(g.listLen))
        case GroupType.Dense =>
          // rejection on the original neighbor list: accept iff bit k set
          val mask = 1L << gid
          while (true) {
            val slot = rng.nextInt(d)
            if ((biasIntArr(slot) & mask) != 0L) return slot
          }
          -1
        case _ => -1
      }
    }
  }

  // ---- Introspection for tests, stats and memory accounting -------------

  /** Expected probability w/Σw of picking any instance of `dst` (Eq. 2). */
  def expectedProbabilityOf(dst: Int): Double = {
    val buf = slotsByDst.get(dst)
    if (buf == null || buf.isEmpty) return 0.0
    var w = 0.0
    buf.foreach(s => w += biasIntArr(s).toDouble + decimalAt(s))
    w / totalMass
  }

  /** Probability of `dst` *derived from the live data structures* (Eq. 7):
    * Σ_k P(p_k)·P(slot|p_k) over the alias table and group contents. By
    * Theorem 4.1 this must equal [[expectedProbabilityOf]] exactly.
    */
  def structProbabilityOf(dst: Int): Double = {
    if (interAlias == null) return 0.0
    var p = 0.0
    var i = 0
    while (i < aliasGroupIds.length) {
      val pg = interAlias.probabilityOf(i)
      val gid = aliasGroupIds(i)
      if (gid == DecimalGroupId) {
        var j = 0
        while (j < decLen) {
          val slot = decList(j)
          if (dstArr(slot) == dst) p += pg * decArr(slot) / decSum
          j += 1
        }
      } else {
        val g = groups(gid)
        g.tpe match {
          case GroupType.OneElement =>
            if (dstArr(g.oneSlot) == dst) p += pg
          case GroupType.Regular | GroupType.Sparse =>
            var j = 0
            var hits = 0
            while (j < g.listLen) { if (dstArr(g.list(j)) == dst) hits += 1; j += 1 }
            p += pg * hits.toDouble / g.count
          case GroupType.Dense =>
            val mask = 1L << gid
            var j = 0
            var hits = 0
            while (j < d) { if (dstArr(j) == dst && (biasIntArr(j) & mask) != 0L) hits += 1; j += 1 }
            p += pg * hits.toDouble / g.count
          case _ =>
        }
      }
      i += 1
    }
    p
  }

  def groupTypeOf(k: Int): Option[GroupType] = Option(groups(k)).map(_.tpe)
  def groupCountOf(k: Int): Int = { val g = groups(k); if (g == null) 0 else g.count }
  def activeGroupBits: Seq[Int] = (0 to Radix.MaxBits).filter(groups(_) != null)
  def decimalGroupSize: Int = decLen

  /** Retained bytes of the sampling structures (adjacency slots + groups +
    * inverted indexes + decimal group + inter-group alias). `rawBiasArr` is
    * test instrumentation and excluded.
    */
  def memoryBytes: Long = {
    var m = dstArr.length.toLong * (4 + 8) // dst + scaled bias
    if (decArr != null) m += decArr.length.toLong * 8
    m += slotsByDst.size().toLong * 24 // dst index entries (approx.)
    var k = 0
    while (k <= Radix.MaxBits) {
      val g = groups(k)
      if (g != null) m += g.memoryBytes
      k += 1
    }
    m += decLen.toLong * 4 + decInv.size().toLong * 24
    if (interAlias != null) m += interAlias.memoryBytes + aliasGroupIds.length.toLong * 4
    m
  }

  /** Fail-fast structural invariant check (test support). */
  def validate(): Unit = {
    // group counts and memberships
    var k = 0
    while (k <= Radix.MaxBits) {
      val mask = 1L << k
      var expect = 0
      var i = 0
      while (i < d) { if ((biasIntArr(i) & mask) != 0L) expect += 1; i += 1 }
      val g = groups(k)
      val got = if (g == null) 0 else g.count
      require(got == expect, s"group $k count $got != expected $expect")
      if (g != null) {
        g.tpe match {
          case GroupType.OneElement =>
            require(g.count == 1 && (biasIntArr(g.oneSlot) & mask) != 0L, s"one-element group $k broken")
          case GroupType.Regular | GroupType.Sparse =>
            require(g.listLen == g.count, s"group $k listLen ${g.listLen} != count ${g.count}")
            var j = 0
            while (j < g.listLen) {
              val slot = g.list(j)
              require((biasIntArr(slot) & mask) != 0L, s"group $k member $slot lacks bit")
              require(g.posOf(slot) == j, s"group $k inverted index wrong for slot $slot")
              j += 1
            }
          case GroupType.Dense => // nothing stored
          case _ =>
        }
      }
      k += 1
    }
    // decimal group
    var sum = 0.0
    var i = 0
    while (i < decLen) {
      val slot = decList(i)
      require(decimalAt(slot) > 0.0, s"decimal member $slot has no decimal")
      require(decInv.get(slot) == i, s"decimal inverted index wrong for $slot")
      sum += decArr(slot)
      i += 1
    }
    require(math.abs(sum - decSum) < 1e-9, s"decSum drift: $sum vs $decSum")
    // slotsByDst covers every slot exactly once
    var covered = 0
    slotsByDst.forEach { (dst, buf) =>
      buf.foreach { s => require(dstArr(s) == dst, s"slotsByDst wrong: slot $s"); covered += 1 }
    }
    require(covered == d, s"slotsByDst covers $covered of $d slots")
  }

  // =======================================================================
  // Internals
  // =======================================================================

  private def touch(t: GroupType): Unit = if (conversions != null) conversions.recordTouch(t)

  private def appendSlot(dst: Int, bias: Double): Int = {
    val (ip, dec) = Radix.scaleFloat(bias, lambda)
    require(ip > 0 || dec > 0.0, s"λ-scaled bias vanished for $bias (λ=$lambda)")
    ensureCapacity(d + 1)
    val slot = d
    dstArr(slot) = dst
    biasIntArr(slot) = ip
    rawBiasArr(slot) = bias
    if (dec > 0.0) {
      if (decArr == null) decArr = new Array[Double](dstArr.length)
      decArr(slot) = dec
    } else if (decArr != null) decArr(slot) = 0.0
    var buf = slotsByDst.get(dst)
    if (buf == null) { buf = new ArrayBuffer[Int](1); slotsByDst.put(dst, buf) }
    buf += slot
    d += 1
    slot
  }

  private def ensureCapacity(need: Int): Unit = {
    if (need <= dstArr.length) return
    var cap = dstArr.length
    while (cap < need) cap *= 2
    dstArr = java.util.Arrays.copyOf(dstArr, cap)
    biasIntArr = java.util.Arrays.copyOf(biasIntArr, cap)
    rawBiasArr = java.util.Arrays.copyOf(rawBiasArr, cap)
    if (decArr != null) decArr = java.util.Arrays.copyOf(decArr, cap)
    var k = 0
    while (k <= Radix.MaxBits) {
      val g = groups(k)
      if (g != null && g.tpe == GroupType.Regular && g.inv != null) {
        val old = g.inv.length
        g.inv = java.util.Arrays.copyOf(g.inv, cap)
        java.util.Arrays.fill(g.inv, old, cap, -1)
      }
      k += 1
    }
  }

  /** Insert `slot` into group `k`; in streaming mode reclassify immediately,
    * in batch mode leave conversions to the rebuild phase.
    */
  private def groupInsert(k: Int, slot: Int, reclassifyNow: Boolean): Unit = {
    var g = groups(k)
    if (g == null) {
      g = new Group(k)
      groups(k) = g
      g.count = 1
      g.tpe = GroupType.classify(1, d, alpha, beta, adaptive)
      g.initRepr(this)
      g.reprAdd(this, slot)
      return
    }
    touch(g.tpe)
    g.count += 1
    g.tpe match {
      case GroupType.Dense => // nothing maintained
      case GroupType.OneElement => g.dirty = true // cannot absorb a 2nd member
      case GroupType.Regular | GroupType.Sparse => g.reprAdd(this, slot)
      case _ =>
    }
    if (reclassifyNow) reclassify(k)
  }

  /** Streaming delete-and-swap of `slot` from group `k` (paper Fig. 6). */
  private def reprDelete(k: Int, slot: Int): Unit = {
    val g = groups(k)
    touch(g.tpe)
    g.count -= 1
    g.tpe match {
      case GroupType.Dense | GroupType.OneElement => // nothing / single slot
      case GroupType.Regular | GroupType.Sparse =>
        val pos = g.posOf(slot)
        val lastPos = g.listLen - 1
        val moved = g.list(lastPos)
        if (pos != lastPos) { g.list(pos) = moved; g.setPos(moved, pos) }
        g.listLen -= 1
        g.clearPos(slot)
      case _ =>
    }
    if (g.count == 0) groups(k) = null
  }

  /** Re-point references of a slot that moved oldSlot → newSlot. */
  private def reindexSlot(oldSlot: Int, newSlot: Int): Unit = {
    var rest = biasIntArr(oldSlot)
    while (rest != 0) {
      val k = java.lang.Long.numberOfTrailingZeros(rest)
      val g = groups(k)
      g.tpe match {
        case GroupType.Dense => // positions not stored
        case GroupType.OneElement => g.oneSlot = newSlot
        case GroupType.Regular | GroupType.Sparse =>
          val pos = g.posOf(oldSlot)
          g.list(pos) = newSlot
          g.clearPos(oldSlot)
          g.setPos(newSlot, pos)
        case _ =>
      }
      rest &= rest - 1
    }
    if (decimalAt(oldSlot) > 0.0) {
      val pos = decInv.remove(oldSlot)
      decList(pos) = newSlot
      decInv.put(newSlot, pos)
    }
    // dst index entry keeps its timestamp position, only the value changes
    val buf = slotsByDst.get(dstArr(oldSlot))
    val at = buf.indexOf(oldSlot)
    buf(at) = newSlot
  }

  /** Swap the last slot into the freed slot and shrink (streaming path). */
  private def compactSlot(slot: Int): Unit = {
    val last = d - 1
    if (slot != last) {
      reindexSlot(last, slot)
      dstArr(slot) = dstArr(last)
      biasIntArr(slot) = biasIntArr(last)
      rawBiasArr(slot) = rawBiasArr(last)
      if (decArr != null) decArr(slot) = decArr(last)
    }
    if (decArr != null) decArr(last) = 0.0
    d -= 1
  }

  /** Two-phase parallel delete-and-swap of `positions` inside a group's
    * member list (paper Fig. 10b): phase (i) drops the doomed entries that
    * already live in the tail window; phase (ii) fills the remaining doomed
    * front entries with the tail's guaranteed survivors.
    */
  private def twoPhaseGroupCompact(g: Group, positions: ArrayBuffer[Int]): Unit = {
    val n = positions.length
    val l = g.listLen
    val tailStart = l - n
    val doomed = new java.util.HashSet[Integer]()
    positions.foreach(p => doomed.add(p))
    // phase (i): tail window survivors; doomed tail entries die by truncation
    val survivors = new ArrayBuffer[Int](n)
    var p = tailStart
    while (p < l) { if (!doomed.contains(p)) survivors += p; p += 1 }
    // phase (ii): fill doomed front entries with survivors
    var si = 0
    positions.foreach { fp =>
      if (fp < tailStart) {
        val sp = survivors(si); si += 1
        val movedSlot = g.list(sp)
        val deadSlot = g.list(fp)
        g.list(fp) = movedSlot
        g.setPos(movedSlot, fp)
        g.clearPos(deadSlot)
      } else {
        g.clearPos(g.list(fp))
      }
    }
    g.listLen = tailStart
    g.count -= n
  }

  /** Two-phase compaction of the slot arrays themselves for a batch of
    * deleted slots (same Fig. 10b scheme at the adjacency level).
    */
  private def twoPhaseSlotCompact(delSlots: java.util.HashSet[Integer]): Unit = {
    val n = delSlots.size()
    val tailStart = d - n
    val survivors = new ArrayBuffer[Int](n)
    var s = tailStart
    while (s < d) { if (!delSlots.contains(s)) survivors += s; s += 1 }
    var si = 0
    val it = delSlots.iterator()
    while (it.hasNext) {
      val dead = it.next().intValue()
      if (dead < tailStart) {
        val moved = survivors(si); si += 1
        reindexSlot(moved, dead)
        dstArr(dead) = dstArr(moved)
        biasIntArr(dead) = biasIntArr(moved)
        rawBiasArr(dead) = rawBiasArr(moved)
        if (decArr != null) decArr(dead) = decArr(moved)
      }
    }
    if (decArr != null) java.util.Arrays.fill(decArr, tailStart, d, 0.0)
    d = tailStart
  }

  /** Apply Eq. 9 to group `k`; on a type change rebuild its representation
    * (recorded as a conversion, paper Table 4).
    */
  private def reclassify(k: Int): Unit = {
    val g = groups(k)
    if (g == null) return
    val target = GroupType.classify(g.count, d, alpha, beta, adaptive)
    if (target != g.tpe) {
      if (conversions != null) conversions.recordConversion(g.tpe, target)
      g.tpe = target
      g.dirty = false
      g.rebuildRepr(this)
    } else if (g.dirty) {
      g.dirty = false
      g.rebuildRepr(this)
    }
  }

  private def decInsert(slot: Int): Unit = {
    if (decLen == decList.length) decList = java.util.Arrays.copyOf(decList, math.max(4, decLen * 2))
    decList(decLen) = slot
    decInv.put(slot, decLen)
    decLen += 1
    decSum += decArr(slot)
    if (decArr(slot) > decMax) decMax = decArr(slot)
  }

  private def decDelete(slot: Int): Unit = {
    val pos = decInv.remove(slot)
    val lastPos = decLen - 1
    val moved = decList(lastPos)
    if (pos != lastPos) { decList(pos) = moved; decInv.put(moved, pos) }
    decLen -= 1
    val v = decArr(slot)
    decSum -= v
    if (decLen == 0) decSum = 0.0
    if (v == decMax) recomputeDecMax()
  }

  private def recomputeDecMax(): Unit = {
    decMax = 0.0
    var i = 0
    while (i < decLen) { val v = decArr(decList(i)); if (v > decMax) decMax = v; i += 1 }
  }

  /** Rebuild the inter-group alias table over active group weights (Eq. 5). */
  private def rebuildInterAlias(): Unit = {
    var active = 0
    var k = 0
    while (k <= Radix.MaxBits) { if (groups(k) != null) active += 1; k += 1 }
    val hasDec = decLen > 0 && decSum > 0.0
    if (active == 0 && !hasDec) { interAlias = null; aliasGroupIds = null; return }
    val ids = new Array[Int](active + (if (hasDec) 1 else 0))
    val ws = new Array[Double](ids.length)
    var i = 0
    k = 0
    while (k <= Radix.MaxBits) {
      val g = groups(k)
      if (g != null) {
        ids(i) = k
        ws(i) = g.count.toDouble * (1L << k).toDouble
        i += 1
      }
      k += 1
    }
    if (hasDec) { ids(i) = DecimalGroupId; ws(i) = decSum }
    aliasGroupIds = ids
    interAlias = AliasTable(ws)
  }

  // Group internals need array access for rebuild scans.
  private[core] def scanMembers(k: Int): ArrayBuffer[Int] = {
    val mask = 1L << k
    val out = new ArrayBuffer[Int]()
    var i = 0
    while (i < d) { if ((biasIntArr(i) & mask) != 0L) out += i; i += 1 }
    out
  }
  private[core] def capacity: Int = dstArr.length
}

object BingoVertex {
  private val InitialCap = 4

  /** Sentinel group id for the decimal group (float-bias mode, §4.3). */
  val DecimalGroupId: Int = 64

  /** One radix group `p_k` with its adaptive representation (§5.1). */
  private final class Group(val k: Int) extends Serializable {
    var count: Int = 0
    var tpe: GroupType = GroupType.Regular
    /** Batch flag: representation must be rebuilt at the rebuild step. */
    var dirty: Boolean = false

    // Regular / Sparse: member list (intra-group neighbor index list)
    var list: Array[Int] = null
    var listLen: Int = 0
    // Regular: slot-indexed inverted index; Sparse: hash inverted index
    var inv: Array[Int] = null
    var invMap: java.util.HashMap[Int, Int] = null
    // One-element
    var oneSlot: Int = -1

    def posOf(slot: Int): Int =
      if (tpe == GroupType.Regular) inv(slot) else invMap.get(slot)
    def setPos(slot: Int, pos: Int): Unit =
      if (tpe == GroupType.Regular) inv(slot) = pos else invMap.put(slot, pos)
    def clearPos(slot: Int): Unit =
      if (tpe == GroupType.Regular) inv(slot) = -1 else invMap.remove(slot)

    def initRepr(owner: BingoVertex): Unit = tpe match {
      case GroupType.Regular =>
        list = new Array[Int](4); listLen = 0
        inv = Array.fill(owner.capacity)(-1)
        invMap = null; oneSlot = -1
      case GroupType.Sparse =>
        list = new Array[Int](4); listLen = 0
        invMap = new java.util.HashMap[Int, Int](); inv = null; oneSlot = -1
      case GroupType.OneElement | GroupType.Dense =>
        list = null; listLen = 0; inv = null; invMap = null; oneSlot = -1
    }

    def reprAdd(owner: BingoVertex, slot: Int): Unit = tpe match {
      case GroupType.Dense => // nothing
      case GroupType.OneElement => oneSlot = slot
      case GroupType.Regular | GroupType.Sparse =>
        if (list == null) initRepr(owner)
        if (listLen == list.length) list = java.util.Arrays.copyOf(list, listLen * 2)
        list(listLen) = slot
        setPos(slot, listLen)
        listLen += 1
    }

    /** Rebuild the representation by scanning the neighbor arrays (used for
      * group-type conversions and batch rebuilds — O(d), rare).
      */
    def rebuildRepr(owner: BingoVertex): Unit = {
      val members = owner.scanMembers(k)
      require(members.length == count, s"group $k rebuild: scan ${members.length} != count $count")
      initRepr(owner)
      tpe match {
        case GroupType.Dense => // nothing
        case GroupType.OneElement => oneSlot = members(0)
        case GroupType.Regular | GroupType.Sparse => members.foreach(reprAdd(owner, _))
      }
    }

    def memoryBytes: Long = tpe match {
      case GroupType.Dense => 0L
      case GroupType.OneElement => 8L
      case GroupType.Sparse => listLen.toLong * 4 + (if (invMap == null) 0L else invMap.size().toLong * 24)
      case GroupType.Regular =>
        (if (list == null) 0L else list.length.toLong * 4) + (if (inv == null) 0L else inv.length.toLong * 4)
    }
  }

  /** Build a vertex sampler from scratch via one batch (fast path). */
  def build(
      neighbors: Seq[(Int, Double)],
      adaptive: Boolean = true,
      lambda: Double = 1.0,
      conversions: ConversionStats = null,
  ): BingoVertex = {
    val v = new BingoVertex(adaptive = adaptive, lambda = lambda, conversions = conversions)
    v.applyBatch(neighbors, Seq.empty)
    v
  }
}
