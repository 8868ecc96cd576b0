package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalactic.Tolerance
import scala.util.Random
import repro.{Oracle, SparkSpec}

/** Radix decomposition laws (paper Eq. 3–4) — in-JVM and via Spark SQL
  * cross-checked against DuckDB's bitwise operators.
  */
class RadixSpec extends AnyFunSuite with SparkSpec with Tolerance {

  test("decompose recovers set bits (paper example: 5 = 2^0 + 2^2)") {
    assert(Radix.decompose(5L).toSeq == Seq(0, 2))
    assert(Radix.decompose(4L).toSeq == Seq(2))
    assert(Radix.decompose(3L).toSeq == Seq(0, 1))
    assert(Radix.decompose(1L).toSeq == Seq(0))
  }

  test("decompose rejects non-positive biases") {
    intercept[IllegalArgumentException](Radix.decompose(0L))
    intercept[IllegalArgumentException](Radix.decompose(-3L))
  }

  for (trial <- 0 until 25) {
    test(s"law Σ D(w) = w for random biases #$trial") {
      val rnd = new Random(42 + trial)
      val w = 1L + (rnd.nextLong() & ((1L << 50) - 1))
      assert(Radix.recompose(Radix.decompose(w)) == w)
      assert(Radix.decompose(w).length == java.lang.Long.bitCount(w))
    }
  }

  test("groupWeights matches Eq. 4 on the running example {5,4,3}") {
    val w = Radix.groupWeights(Array(5L, 4L, 3L))
    assert(w(0) == 2L) // neighbors with bit 0: biases 5 and 3 -> 2 * 2^0
    assert(w(1) == 2L) // bias 3 -> 1 * 2^1
    assert(w(2) == 8L) // biases 5 and 4 -> 2 * 2^2
    assert((3 to Radix.MaxBits).forall(w(_) == 0L))
  }

  test("groupWeights total equals bias sum (mass preservation)") {
    val rnd = new Random(7)
    val biases = Array.fill(500)(1L + rnd.nextInt(100000).toLong)
    assert(Radix.groupWeights(biases).sum == biases.sum)
  }

  test("scaleFloat splits integer and decimal parts") {
    val (i, d) = Radix.scaleFloat(0.554, 10.0)
    assert(i == 5L)
    assert(d === 0.54 +- 1e-9)
  }

  test("decimalMassFraction matches paper Fig. 7 example (1/16 at λ=10)") {
    // biases 0.554, 0.726, 0.320 scaled by 10 -> int parts 5,7,3; dec parts 0.54+0.26+0.20=1.0
    val f = Radix.decimalMassFraction(Array(0.554, 0.726, 0.320), 10.0)
    assert(f === 1.0 / 16 +- 1e-9)
    assert(f < 1.0 / 3, "λ=10 must keep decimal mass below 1/d (O(1) sampling rule)")
  }

  test("chooseLambda enforces W_D/(W_I+W_D) < 1/d") {
    val rnd = new Random(9)
    val biases = Array.fill(50)(rnd.nextDouble() * 3 + 0.01)
    val lambda = Radix.chooseLambda(biases)
    assert(Radix.decimalMassFraction(biases, lambda) < 1.0 / biases.length)
  }

  test("chooseLambda is 1 for already-integer biases") {
    assert(Radix.chooseLambda(Array(5.0, 4.0, 3.0)) == 1.0)
  }

  test("Spark group weights W(p_k) match DuckDB bitwise SQL (Eq. 4)") {
    import org.apache.spark.sql.functions._
    import spark.implicits._
    val rnd = new Random(21)
    val biases = Seq.fill(300)(1L + rnd.nextInt(500).toLong)
    val df = biases.toDF("bias")
    val k = (0 until 9).map(k => k -> (1L << k)).toMap
    // Spark side: per-bit group weights via bitwise AND + aggregation
    val sparkGw = df
      .select(explode(array((0 until 9).map(b => lit(b)): _*)).as("k"), col("bias"))
      .withColumn("contrib", col("bias").bitwiseAND(pow(lit(2.0), col("k")).cast("long")))
      .where(col("contrib") =!= 0)
      .groupBy("k")
      .agg(sum("contrib").as("w"))
    Oracle.assertEquivalent(
      sparkGw,
      """
        |SELECT k, SUM(CAST(bias AS BIGINT) & (1 << k)) AS w
        |FROM biases CROSS JOIN (SELECT UNNEST(range(9)) AS k)
        |WHERE (CAST(bias AS BIGINT) & (1 << k)) <> 0
        |GROUP BY k
        |""".stripMargin,
      "biases" -> df,
    )
    // and both match the in-JVM Radix computation
    val jvm = Radix.groupWeights(biases.toArray)
    val rows = sparkGw.collect().map(r => r.getAs[Int]("k") -> r.getAs[Long]("w")).toMap
    (0 until 9).foreach(b => assert(rows.getOrElse(b, 0L) == jvm(b), s"bit $b"))
  }
}
