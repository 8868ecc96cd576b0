package repro

import java.util.SplittableRandom

/** Statistical assertions for sampling tests. All call sites use fixed
  * seeds, so these checks are deterministic for a given build.
  */
object StatCheck {

  /** Total-variation distance between an exact distribution and empirical counts. */
  def tvDistance(expected: Map[Int, Double], counts: Map[Int, Long], n: Long): Double = {
    val keys = expected.keySet ++ counts.keySet
    keys.iterator.map { k =>
      math.abs(expected.getOrElse(k, 0.0) - counts.getOrElse(k, 0L).toDouble / n)
    }.sum / 2.0
  }

  /** Draw `n` samples from `draw` and assert the empirical distribution is
    * within `tol` total-variation distance of `expected`.
    */
  def assertMatches(
      expected: Map[Int, Double],
      n: Int,
      seed: Long,
      tol: Double,
  )(draw: SplittableRandom => Int): Unit = {
    val rng = new SplittableRandom(seed)
    val counts = scala.collection.mutable.Map[Int, Long]().withDefaultValue(0L)
    var i = 0
    while (i < n) { counts(draw(rng)) += 1L; i += 1 }
    val tv = tvDistance(expected, counts.toMap, n)
    assert(tv <= tol, s"TV distance $tv > $tol (n=$n)\nexpected=$expected\ncounts=$counts")
  }

  /** Exact-probability equality with a numeric tolerance. */
  def assertProbEqual(a: Double, b: Double, tol: Double = 1e-9): Unit =
    assert(math.abs(a - b) <= tol, s"probabilities differ: $a vs $b")
}
