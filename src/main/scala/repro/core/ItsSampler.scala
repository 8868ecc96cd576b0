package repro.core

import java.util.SplittableRandom

/** Inverse Transform Sampling (ITS) — paper §2.3.
  *
  * Maintains the prefix-sum (CDF) array `C` of the candidate biases and
  * samples by drawing `x ∈ [0, C_d)` uniformly, then binary-searching the
  * interval that contains `x`. Complexities match Table 1 of the paper:
  * O(log d) sampling, O(1) amortised insertion (append one prefix entry),
  * O(d) deletion (the suffix of the CDF must be rebuilt).
  */
final class ItsSampler extends Serializable {
  private var weights = new Array[Double](4)
  private var cdf = new Array[Double](4) // cdf(i) = Σ_{j<=i} w_j
  private var n = 0

  def size: Int = n
  def totalWeight: Double = if (n == 0) 0.0 else cdf(n - 1)
  def weightOf(i: Int): Double = weights(i)

  private def grow(): Unit = {
    if (n == weights.length) {
      weights = java.util.Arrays.copyOf(weights, n * 2)
      cdf = java.util.Arrays.copyOf(cdf, n * 2)
    }
  }

  /** O(1) amortised — append a candidate with weight `w`. */
  def insert(w: Double): Unit = {
    require(w > 0.0, s"weight must be positive: $w")
    grow()
    weights(n) = w
    cdf(n) = totalWeight + w
    n += 1
  }

  /** O(d) — remove candidate `i`, shifting the tail and rebuilding the CDF suffix. */
  def delete(i: Int): Unit = {
    require(i >= 0 && i < n, s"index $i out of range [0,$n)")
    System.arraycopy(weights, i + 1, weights, i, n - i - 1)
    n -= 1
    var j = i
    var acc = if (i == 0) 0.0 else cdf(i - 1)
    while (j < n) { acc += weights(j); cdf(j) = acc; j += 1 }
  }

  /** O(log d) — binary search the CDF for a uniform draw. */
  def sample(rng: SplittableRandom): Int = {
    require(n > 0, "empty sampler")
    val x = rng.nextDouble() * totalWeight
    var lo = 0
    var hi = n - 1
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (cdf(mid) <= x) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** Exact probability of candidate `i`. */
  def probabilityOf(i: Int): Double = weights(i) / totalWeight

  def memoryBytes: Long = weights.length.toLong * 16
}

object ItsSampler {
  def apply(ws: Seq[Double]): ItsSampler = {
    val s = new ItsSampler
    ws.foreach(s.insert)
    s
  }
}
