package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalactic.Tolerance
import scala.util.Random
import repro.StatCheck

/** Targeted tests for the batched two-phase delete-and-swap (paper §5.2,
  * Fig. 10b) and the floating-point bias mode (paper §4.3).
  */
class BingoBatchAndFloatSpec extends AnyFunSuite with Tolerance {

  // ---------------- two-phase delete-and-swap ----------------

  test("two-phase: deleting tail elements only (the Fig. 10b hazard)") {
    // all deleted entries sit in the tail window — fillers must not be doomed
    val v = BingoVertex.build((0 until 10).map(i => (i, 4.0))) // all in one group
    val dels = Seq(9, 8, 7) // the whole tail window is doomed
    v.applyBatch(Seq.empty, dels)
    v.validate()
    assert(v.degree == 7)
    (0 until 7).foreach(i => assert(v.contains(i)))
  }

  test("two-phase: mixed front and tail deletions") {
    val v = BingoVertex.build((0 until 10).map(i => (i, 4.0)))
    v.applyBatch(Seq.empty, Seq(0, 9, 1, 8)) // 2 front + 2 tail doomed
    v.validate()
    assert(v.degree == 6)
    Seq(0, 1, 8, 9).foreach(d => assert(!v.contains(d)))
    Seq(2, 3, 4, 5, 6, 7).foreach(d => assert(v.contains(d)))
  }

  test("two-phase: delete everything") {
    val v = BingoVertex.build((0 until 12).map(i => (i, (i + 1).toDouble)))
    v.applyBatch(Seq.empty, 0 until 12)
    v.validate()
    assert(v.degree == 0)
    assert(v.sample(new java.util.SplittableRandom(1)) == -1)
  }

  test("two-phase: delete all but one") {
    val v = BingoVertex.build((0 until 12).map(i => (i, 7.0)))
    v.applyBatch(Seq.empty, 1 until 12)
    v.validate()
    assert(v.degree == 1)
    assert(v.contains(0))
    assert(v.expectedProbabilityOf(0) === 1.0 +- 1e-12)
  }

  test("batch insert of previously deleted edge in same batch (timestamp rule)") {
    val v = BingoVertex.build(Seq((1, 3.0), (2, 5.0)))
    // delete existing (1) and re-insert it with a new bias in the same batch:
    // the insert lands first (paper order), the delete then removes the
    // *earlier* instance, leaving the new one.
    v.applyBatch(Seq((1, 9.0)), Seq(1))
    v.validate()
    assert(v.degree == 2)
    assert(v.expectedProbabilityOf(1) === 9.0 / 14 +- 1e-12)
  }

  test("batch deletes of absent edges are counted but harmless") {
    val v = BingoVertex.build(Seq((1, 3.0)))
    val applied = v.applyBatch(Seq.empty, Seq(42, 1, 42))
    assert(applied == 1)
    v.validate()
    assert(v.degree == 0)
  }

  test("pure-insert batch equals incremental inserts") {
    val rnd = new Random(123)
    val ns = (0 until 100).map(i => (i, (1 + rnd.nextInt(300)).toDouble))
    val vb = new BingoVertex(); vb.applyBatch(ns, Seq.empty)
    val vs = new BingoVertex(); ns.foreach { case (d, b) => vs.insert(d, b) }
    vb.validate(); vs.validate()
    ns.foreach { case (d, _) =>
      StatCheck.assertProbEqual(vb.structProbabilityOf(d), vs.structProbabilityOf(d), 1e-9)
    }
  }

  for (seed <- 0 until 8) {
    test(s"two-phase stress: random batch deletions seed=$seed") {
      val rnd = new Random(600 + seed)
      val n = 40 + rnd.nextInt(60)
      val ns = (0 until n).map(i => (i, (1 + rnd.nextInt(1023)).toDouble))
      val v = BingoVertex.build(ns)
      val dels = rnd.shuffle((0 until n).toList).take(rnd.nextInt(n + 1))
      v.applyBatch(Seq.empty, dels)
      v.validate()
      assert(v.degree == n - dels.size)
      val tot = ns.filterNot(x => dels.contains(x._1)).map(_._2).sum
      ns.filterNot(x => dels.contains(x._1)).foreach { case (d, b) =>
        StatCheck.assertProbEqual(v.structProbabilityOf(d), b / tot, 1e-9)
      }
    }
  }

  // ---------------- floating-point biases (§4.3) ----------------

  test("paper Fig. 7: λ=10 on biases 0.554/0.726/0.320") {
    val v = new BingoVertex(lambda = 10.0)
    v.insert(1, 0.554)
    v.insert(4, 0.726)
    v.insert(5, 0.320)
    v.validate()
    // integer parts 5, 7, 3 -> groups 2^0 {5.54->1? no:} — int parts 5(101b),7(111b),3(011b)
    assert(v.groupCountOf(0) == 3) // 5,7,3 all odd
    assert(v.groupCountOf(1) == 2) // 7 and 3
    assert(v.groupCountOf(2) == 2) // 5 and 7
    assert(v.decimalGroupSize == 3) // decimals .54, .26, .20
    val tot = 5.54 + 7.26 + 3.20
    assert(v.expectedProbabilityOf(1) === 5.54 / tot +- 1e-9)
    assert(v.structProbabilityOf(1) === 5.54 / tot +- 1e-9)
    assert(v.structProbabilityOf(4) === 7.26 / tot +- 1e-9)
    assert(v.structProbabilityOf(5) === 3.20 / tot +- 1e-9)
  }

  test("float sampling distribution matches scaled biases") {
    val v = new BingoVertex(lambda = 10.0)
    v.insert(1, 0.554); v.insert(4, 0.726); v.insert(5, 0.320)
    val tot = 5.54 + 7.26 + 3.20
    val exp = Map(1 -> 5.54 / tot, 4 -> 7.26 / tot, 5 -> 3.20 / tot)
    StatCheck.assertMatches(exp, 200000, seed = 41, tol = 0.01)(v.sample)
  }

  test("float: deleting a decimal-group member keeps decSum consistent") {
    val v = new BingoVertex(lambda = 10.0)
    v.insert(1, 0.554); v.insert(4, 0.726); v.insert(5, 0.320)
    assert(v.delete(4))
    v.validate()
    val tot = 5.54 + 3.20
    assert(v.structProbabilityOf(1) === 5.54 / tot +- 1e-9)
    assert(v.decimalGroupSize == 2)
  }

  test("float: batch updates with decimals") {
    val rnd = new Random(321)
    val v = new BingoVertex(lambda = 100.0)
    val ns = (0 until 60).map(i => (i, rnd.nextDouble() * 5 + 0.01))
    v.applyBatch(ns, Seq.empty)
    v.validate()
    val dels = rnd.shuffle((0 until 60).toList).take(25)
    v.applyBatch((100 until 110).map(i => (i, rnd.nextDouble() * 5 + 0.01)), dels)
    v.validate()
    val liveNs = ns.filterNot(x => dels.contains(x._1))
    assert(v.degree == liveNs.size + 10)
  }

  test("float: integer-valued doubles with λ=1 have empty decimal group") {
    val v = new BingoVertex(lambda = 1.0)
    v.insert(1, 5.0); v.insert(2, 4.0)
    assert(v.decimalGroupSize == 0)
    v.validate()
  }

  test("float: λ chosen by chooseLambda keeps decimal group mass < 1/d") {
    val rnd = new Random(55)
    val biases = Array.fill(40)(rnd.nextDouble() * 2 + 0.05)
    val lambda = Radix.chooseLambda(biases)
    val v = new BingoVertex(lambda = lambda)
    biases.zipWithIndex.foreach { case (b, i) => v.insert(i, b) }
    v.validate()
    // decimal group weight / total mass < 1/d  =>  O(1) expected sampling
    val decMass = biases.map(b => { val (_, dec) = Radix.scaleFloat(b, lambda); dec }).sum
    assert(decMass / v.totalMass < 1.0 / v.degree)
    // distribution still exact
    val tot = biases.map(_ * lambda).sum
    biases.zipWithIndex.foreach { case (b, i) =>
      StatCheck.assertProbEqual(v.structProbabilityOf(i), b * lambda / tot, 1e-9)
    }
  }

  test("float vs integer: λ-scaled integer biases equal pure integer mode") {
    val ws = Seq(5.0, 4.0, 3.0)
    val vi = BingoVertex.build(ws.zipWithIndex.map { case (b, i) => (i, b) })
    val vf = new BingoVertex(lambda = 4.0) // λ·w stays integral
    ws.zipWithIndex.foreach { case (b, i) => vf.insert(i, b) }
    ws.indices.foreach { i =>
      StatCheck.assertProbEqual(vi.structProbabilityOf(i), vf.structProbabilityOf(i), 1e-9)
    }
  }
}
