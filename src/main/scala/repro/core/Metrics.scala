package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Quality metrics of explanation patterns (paper Definition 7).
  *
  * A PT tuple t' of output t is *covered* by (Ω, Φ) if at least one APT row
  * derived from t' matches Φ. Coverage is therefore counted per distinct
  * `pt_id`, never per APT row — the group-by/max/sum cascade below computes
  * it for a whole batch of patterns in a single Spark job, which is the
  * optimization that makes mining over many candidates feasible.
  */
object Metrics {

  /** Coverage of one pattern: distinct PT tuples covered in the provenance
    * of t1 and of t2.
    */
  final case class Coverage(cov1: Long, cov2: Long)

  /** Full quality metrics for a pattern with a chosen primary tuple. */
  final case class Quality(
      primary: String, // "t1" or "t2"
      tp: Long, fp: Long, fn: Long,
      precision: Double, recall: Double, fscore: Double,
      support1: (Long, Long), // (covered, total) for t1
      support2: (Long, Long), // (covered, total) for t2
  )

  /** Counts |PT(Q,D,t1)| and |PT(Q,D,t2)| as distinct pt_ids by grp. */
  def provSizes(pt: DataFrame): (Long, Long) = {
    val rows = pt.groupBy("grp").agg(countDistinct("pt_id").as("n")).collect()
    val m = rows.map(r => r.getString(0) -> r.getLong(1)).toMap
    (m.getOrElse("t1", 0L), m.getOrElse("t2", 0L))
  }

  /** Batched coverage: one Spark aggregation per `chunk` patterns.
    *
    * For every pattern i we compute max(match_i) per (pt_id, grp) — "was
    * any APT row of this PT tuple a match" — then sum those indicators per
    * grp. Returns coverage aligned with `patterns`.
    */
  def coverage(apt: DataFrame, patterns: Seq[Pattern.Pattern], chunk: Int = 96): Seq[Coverage] = {
    if (patterns.isEmpty) return Nil
    patterns.grouped(chunk).flatMap { batch =>
      val matchCols = batch.zipWithIndex.map { case (p, i) =>
        max(when(p.toColumn, lit(1)).otherwise(lit(0))).as(s"m$i")
      }
      val perTuple = apt.groupBy(col("pt_id"), col("grp"))
        .agg(matchCols.head, matchCols.tail: _*)
      val sumCols = batch.indices.map(i => sum(col(s"m$i")).as(s"s$i"))
      val rows = perTuple.groupBy(col("grp")).agg(sumCols.head, sumCols.tail: _*).collect()
      val byGrp = rows.map(r => r.getString(0) -> r).toMap
      batch.indices.map { i =>
        def cnt(g: String): Long =
          byGrp.get(g).map(r => if (r.isNullAt(i + 1)) 0L else r.getLong(i + 1)).getOrElse(0L)
        Coverage(cnt("t1"), cnt("t2"))
      }
    }.toSeq
  }

  /** Derives precision/recall/F-score (Definition 7(e)) from coverage given
    * the provenance sizes and the chosen primary tuple.
    */
  def quality(cov: Coverage, n1: Long, n2: Long, primary: String): Quality = {
    val (tp, fp, nPrim) =
      if (primary == "t1") (cov.cov1, cov.cov2, n1) else (cov.cov2, cov.cov1, n2)
    val fn = nPrim - tp
    val prec = if (tp + fp == 0) 0.0 else tp.toDouble / (tp + fp)
    val rec = if (nPrim == 0) 0.0 else tp.toDouble / nPrim
    val f1 = if (prec + rec == 0) 0.0 else 2 * prec * rec / (prec + rec)
    Quality(primary, tp, fp, fn, prec, rec, f1, (cov.cov1, n1), (cov.cov2, n2))
  }
}
