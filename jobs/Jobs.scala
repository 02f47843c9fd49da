package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Tables

/** spark-submit entrypoints, one per reproduced table.
  *
  * Example:
  *   spark-submit --class repro.jobs.Table4Nba target/scala-2.13/repro_2.13-*.jar [sf]
  */
object JobRunner {
  def session(): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("cajade-repro")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN") // job output should be the table itself
    s
  }

  def sfOf(args: Array[String]): Double =
    args.headOption.map(_.toDouble).getOrElse(0.1)

  def run(lines: => Seq[String]): Unit = {
    lines.foreach(println)
  }
}

/** Paper Table 4: NBA case-study explanations. */
object Table4Nba {
  def main(args: Array[String]): Unit =
    JobRunner.run(Tables.table4Nba(JobRunner.session(), JobRunner.sfOf(args)))
}

/** Paper Table 6: MIMIC case-study explanations. */
object Table6Mimic {
  def main(args: Array[String]): Unit =
    JobRunner.run(Tables.table6Mimic(JobRunner.session(), JobRunner.sfOf(args)))
}

/** Paper Figure 7 runtime-breakdown tables (pass NBA or MIMIC). */
object Figure7Breakdown {
  def main(args: Array[String]): Unit = {
    val dataset = args.headOption.getOrElse("NBA")
    JobRunner.run(Tables.figure7Breakdown(JobRunner.session(), dataset,
      args.drop(1).headOption.map(_.toDouble).getOrElse(0.1)))
  }
}

/** Paper Figure 10a: APT statistics of the sampling-study join graphs. */
object Figure10aAptStats {
  def main(args: Array[String]): Unit =
    JobRunner.run(Tables.figure10aAptStats(JobRunner.session(), JobRunner.sfOf(args)))
}

/** Paper Figure 11 / Section 5.5: ET-vs-CaJaDE runtime comparison. */
object EtComparison {
  def main(args: Array[String]): Unit =
    JobRunner.run(Tables.etComparison(JobRunner.session(), JobRunner.sfOf(args)))
}

/** Paper Figure 12: runtime per workload query. */
object Figure12VaryingQueries {
  def main(args: Array[String]): Unit =
    JobRunner.run(Tables.figure12VaryingQueries(JobRunner.session(), JobRunner.sfOf(args)))
}

/** Paper Figure 13: CAPE counterbalance explanations. */
object Figure13Cape {
  def main(args: Array[String]): Unit =
    JobRunner.run(Tables.figure13Cape(JobRunner.session(), JobRunner.sfOf(args)))
}

/** Paper Tables 8/9: user-study metrics with the simulated rater panel. */
object Table89Study {
  def main(args: Array[String]): Unit = {
    val spark = JobRunner.session()
    val (rated, t8) = Tables.table8Study(spark, JobRunner.sfOf(args))
    t8.foreach(println)
    Tables.table9RankQuality(rated).foreach(println)
  }
}

/** Paper Table 10: ET's first 20 patterns on the player-stats APT. */
object Table10Et {
  def main(args: Array[String]): Unit =
    JobRunner.run(Tables.table10EtPatterns(JobRunner.session(), JobRunner.sfOf(args)))
}
