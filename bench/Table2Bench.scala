package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.eval.Tables

/** Reproduces paper Table 2: statistics of the five (-lite) datasets,
  * computed through Spark aggregations. Asserts the scaled graphs keep the
  * paper's shape: average-degree and max-degree orderings.
  */
class Table2Bench extends AnyFunSuite with SparkSpec {

  test("Table 2: dataset statistics") {
    val out = Tables.table2(spark)
    println(out)
    BenchOutput.write("table2.txt", out)

    val rows = Tables.table2Rows(spark).map(r => r.abbr -> r).toMap
    // paper avg degrees: AM 8.4, GO 5.8, CT 4.4, LJ 14.3, TW 35.2
    assert(math.abs(rows("AM").avgDeg - 8.4) < 1.5)
    assert(math.abs(rows("GO").avgDeg - 5.8) < 1.0)
    assert(math.abs(rows("CT").avgDeg - 4.4) < 1.0)
    assert(math.abs(rows("LJ").avgDeg - 14.3) < 2.5)
    assert(math.abs(rows("TW").avgDeg - 35.2) < 6.0)
    // orderings follow the paper
    assert(rows("CT").avgDeg < rows("GO").avgDeg)
    assert(rows("GO").avgDeg < rows("AM").avgDeg)
    assert(rows("AM").avgDeg < rows("LJ").avgDeg)
    assert(rows("LJ").avgDeg < rows("TW").avgDeg)
    assert(rows("AM").maxDeg < rows("GO").maxDeg)
    assert(rows("GO").maxDeg < rows("CT").maxDeg)
    assert(rows("CT").maxDeg < rows("LJ").maxDeg)
    assert(rows("LJ").maxDeg < rows("TW").maxDeg)
    // AM is near-regular like the original (max degree 10)
    assert(rows("AM").maxDeg <= 10)
  }
}
