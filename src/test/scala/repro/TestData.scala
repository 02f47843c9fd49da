package repro

import org.apache.spark.sql.SparkSession
import repro.core.Schema.Database
import repro.data.{Mimic, Nba}

/** Shared, cached tiny databases for the unit-test run (SF≈0.05 NBA,
  * SF≈0.03 MIMIC). Generated once per JVM; tables are Spark-cached so the
  * many suites touching them stay fast.
  */
object TestData {
  private var nbaCache: Option[Database] = None
  private var mimicCache: Option[Database] = None

  def nba(spark: SparkSession): Database = synchronized {
    nbaCache.getOrElse {
      val d = Nba.generate(spark, sf = 0.05)
      d.tables.values.foreach(df => df.cache().count())
      nbaCache = Some(d); d
    }
  }

  def mimic(spark: SparkSession): Database = synchronized {
    mimicCache.getOrElse {
      val d = Mimic.generate(spark, sf = 0.03)
      d.tables.values.foreach(df => df.cache().count())
      mimicCache = Some(d); d
    }
  }
}
