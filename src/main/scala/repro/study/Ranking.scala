package repro.study

/** Rank-quality measures used by the user study (paper Section 6.3):
  * Kendall-tau rank distance [28] and normalized discounted cumulative
  * gain (NDCG) [24].
  */
object Ranking {

  /** Kendall-tau distance: number of discordant pairs between a score
    * vector (higher = better) and a ground-truth rating vector over the
    * same items. Ties on either side are not counted as discordant.
    */
  def kendallTauDistance(scores: Seq[Double], ratings: Seq[Double]): Int = {
    require(scores.size == ratings.size)
    val n = scores.size
    var d = 0
    for (i <- 0 until n; j <- i + 1 until n) {
      val s = math.signum(scores(i) - scores(j))
      val r = math.signum(ratings(i) - ratings(j))
      if (s != 0 && r != 0 && s != r) d += 1
    }
    d
  }

  /** NDCG of ranking items by `scores` when true gains are `ratings`. */
  def ndcg(scores: Seq[Double], ratings: Seq[Double]): Double = {
    require(scores.size == ratings.size)
    if (scores.isEmpty) return 0.0
    def dcg(gains: Seq[Double]): Double =
      gains.zipWithIndex.map { case (g, i) => (math.pow(2, g) - 1) / (math.log(i + 2) / math.log(2)) }.sum
    val ranked = scores.zip(ratings).sortBy(-_._1).map(_._2)
    val ideal = ratings.sorted.reverse
    val idcg = dcg(ideal)
    if (idcg == 0) 0.0 else dcg(ranked) / idcg
  }
}
