package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** User-study benchmarks (paper Tables 8 and 9) with the simulated rater
  * panel standing in for the 20 human participants (see DESIGN.md).
  */
class StudyBench extends SparkSpec {
  test("Tables 8 and 9: study explanation metrics and ranking quality") {
    val (rated, t8) = Tables.table8Study(spark)
    t8.foreach(println)
    Tables.table9RankQuality(rated).foreach(println)
    assert(rated.size == 10)
    // S2 of the paper: high-F explanations are rated above the control.
    val byLabel = rated.map(r => r.expl.label -> r).toMap
    assert(byLabel("Expl7").avgAll > byLabel("Expl10").avgAll)
  }
}
