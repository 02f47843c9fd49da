package repro.baseline

import org.apache.spark.sql.DataFrame

/** CAPE baseline (Miao et al. [34], compared against in paper Section 5.6).
  *
  * CAPE explains an outlier aggregate value by finding *counterbalances*:
  * it learns a trend over the aggregate series (here ordinary least
  * squares over the group index, CAPE's regression-based pattern model
  * specialized to one group-by attribute) and returns the result tuples
  * that deviate most in the *opposite* direction of the user's question —
  * exactly the behaviour Figure 13 shows (low-win GSW seasons answer "why
  * was 2015-16 high?").
  */
object Cape {

  sealed trait Direction
  case object High extends Direction
  case object Low extends Direction

  final case class Counterbalance(group: String, value: Double, residual: Double)

  /** Top-k counterbalances for a question "why is `group`'s value
    * high/low?" over a (group, value) result series. Groups are ordered
    * lexicographically (season names order chronologically) for the trend
    * fit.
    */
  def explain(result: Seq[(String, Double)], questionGroup: String, dir: Direction, k: Int = 3): Seq[Counterbalance] = {
    val sorted = result.sortBy(_._1)
    val n = sorted.size
    if (n < 2) return Nil
    val xs = sorted.indices.map(_.toDouble)
    val ys = sorted.map(_._2)
    val mx = xs.sum / n; val my = ys.sum / n
    val sxx = xs.map(x => (x - mx) * (x - mx)).sum
    val slope = if (sxx == 0) 0.0 else xs.zip(ys).map { case (x, y) => (x - mx) * (y - my) }.sum / sxx
    val icept = my - slope * mx
    val residuals = sorted.zipWithIndex.map { case ((g, v), i) =>
      Counterbalance(g, v, v - (slope * i + icept))
    }
    val others = residuals.filterNot(_.group == questionGroup)
    dir match {
      case High => others.sortBy(_.residual).take(k)          // most-below-trend outliers
      case Low  => others.sortBy(-_.residual).take(k)         // most-above-trend outliers
    }
  }

  /** Reads a two-column (group, value) DataFrame into the series CAPE
    * consumes.
    */
  def series(df: DataFrame, groupCol: String, valueCol: String): Seq[(String, Double)] =
    df.select(groupCol, valueCol).collect().toSeq.map { r =>
      val v = r.get(1) match {
        case d: java.lang.Double => d.doubleValue
        case n: Number           => n.doubleValue
        case x                   => x.toString.toDouble
      }
      (Option(r.get(0)).map(_.toString).getOrElse("∅"), v)
    }
}
