package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Benchmarks reproducing the qualitative case-study tables (paper
  * Tables 4 and 6). Prints the same rows the paper reports; the measured
  * output is recorded against the paper's in EXPERIMENTS.md.
  */
class Table4NbaBench extends SparkSpec {
  test("Table 4: NBA top-3 explanations per user question") {
    val lines = Tables.table4Nba(spark)
    lines.foreach(println)
    // One block per query, each with up to 3 ranked explanations.
    assert(lines.count(_.startsWith("Q_nba")) == 5)
    assert(lines.count(_.trim.startsWith("1.")) == 5)
  }
}

class Table6MimicBench extends SparkSpec {
  test("Table 6: MIMIC top-3 explanations per user question") {
    val lines = Tables.table6Mimic(spark)
    lines.foreach(println)
    assert(lines.count(_.startsWith("Q_mimic")) == 5)
    assert(lines.count(_.trim.startsWith("1.")) == 5)
  }
}
