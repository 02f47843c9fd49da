package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Performance benchmarks: the Figure 7 runtime-breakdown tables, the
  * Figure 10a APT statistics, and the Figure 12 per-query runtimes.
  */
class Figure7NbaBench extends SparkSpec {
  test("Figure 7 (NBA): step runtime breakdown, with/without feature selection") {
    val lines = Tables.figure7Breakdown(spark, "NBA")
    lines.foreach(println)
    assert(lines.exists(_.contains("F-score Calc.")))
    assert(lines.exists(_.contains("total")))
  }
}

class Figure7MimicBench extends SparkSpec {
  test("Figure 7 (MIMIC): step runtime breakdown, with/without feature selection") {
    val lines = Tables.figure7Breakdown(spark, "MIMIC")
    lines.foreach(println)
    assert(lines.exists(_.contains("Feature Selection")))
  }
}

class Figure10aBench extends SparkSpec {
  test("Figure 10a: APT rows/attributes for Ω1..Ω4") {
    val lines = Tables.figure10aAptStats(spark)
    lines.foreach(println)
    // Augmentation multiplies rows: Ω2 > Ω1 and Ω4 ≥ Ω3 as in the paper.
    def rowsOf(tag: String): Long =
      lines.find(_.trim.startsWith(tag)).get.trim.split("\\s+").dropRight(1).last.toLong
    assert(rowsOf("Ω2") > rowsOf("Ω1"))
    assert(rowsOf("Ω4") >= rowsOf("Ω3"))
  }
}

class Figure12Bench extends SparkSpec {
  test("Figure 12: runtime per workload query") {
    val lines = Tables.figure12VaryingQueries(spark)
    lines.foreach(println)
    assert(lines.count(_.contains("join graphs")) == 9)
  }
}
