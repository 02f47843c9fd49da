package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Baseline-comparison benchmarks: ET runtime scaling (Figure 11), the ET
  * pattern dump (Table 10), and CAPE's counterbalances (Figure 13).
  */
class EtComparisonBench extends SparkSpec {
  test("Figure 11: ET runtime vs sample size against CaJaDE mining") {
    val lines = Tables.etComparison(spark)
    lines.foreach(println)
    def secOf(tag: String): Double =
      lines.find(_.contains(tag)).get.split(":")(1).trim.split(" ").head.toDouble
    // The quadratic candidate-pair loop must dominate at 512 rows.
    assert(secOf("sample= 512") > secOf("sample=  16"))
  }
}

class Table10EtBench extends SparkSpec {
  test("Table 10: first 20 ET patterns over the player-stats APT") {
    val lines = Tables.table10EtPatterns(spark)
    lines.foreach(println)
    assert(lines.count(_.trim.matches("^\\d+\\..*")) >= 5)
  }
}

class CapeBench extends SparkSpec {
  test("Figure 13: CAPE explanations for the two NBA questions") {
    val lines = Tables.figure13Cape(spark)
    lines.foreach(println)
    assert(lines.exists(_.contains("UQ_cape1")))
    assert(lines.count(_.trim.startsWith("1.")) == 2)
  }
}
