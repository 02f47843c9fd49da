package repro.study

import repro.{SparkSpec, TestData}
import repro.data.Nba

/** Tests for the rank-quality math and the user-study harness. */
class StudySpec extends SparkSpec {

  // ---- Kendall tau distance ----------------------------------------------

  test("kendall distance of identical rankings is 0") {
    assert(Ranking.kendallTauDistance(Seq(3, 2, 1), Seq(3, 2, 1)) == 0)
  }
  test("kendall distance of reversed rankings is n(n-1)/2") {
    assert(Ranking.kendallTauDistance(Seq(1, 2, 3, 4), Seq(4, 3, 2, 1)) == 6)
  }
  test("kendall distance counts single swaps") {
    assert(Ranking.kendallTauDistance(Seq(1, 2, 3), Seq(2, 1, 3)) == 1)
  }
  test("kendall distance skips tied pairs") {
    assert(Ranking.kendallTauDistance(Seq(1.0, 1.0, 2.0), Seq(5.0, 1.0, 3.0)) == 1)
  }

  // ---- NDCG ---------------------------------------------------------------

  test("ndcg of a perfect ranking is 1") {
    assert(math.abs(Ranking.ndcg(Seq(0.9, 0.5, 0.1), Seq(5, 3, 1)) - 1.0) < 1e-9)
  }
  test("ndcg penalizes misordered top items") {
    val good = Ranking.ndcg(Seq(0.9, 0.5, 0.1), Seq(5, 3, 1))
    val bad = Ranking.ndcg(Seq(0.1, 0.5, 0.9), Seq(5, 3, 1))
    assert(bad < good)
  }
  test("ndcg stays within [0, 1]") {
    val v = Ranking.ndcg(Seq(0.2, 0.9, 0.4, 0.6), Seq(1, 2, 5, 4))
    assert(v >= 0.0 && v <= 1.0)
  }
  test("ndcg of constant ratings is 1 (any order is ideal)") {
    assert(math.abs(Ranking.ndcg(Seq(3, 1, 2), Seq(2, 2, 2)) - 1.0) < 1e-9)
  }

  // ---- user study harness -------------------------------------------------

  private lazy val nba = TestData.nba(spark)
  private lazy val qualities = UserStudy.evaluate(
    nba, Nba.qNba4, Nba.seasonQuestion(Nba.qNba4, "2015-16", "2012-13"))

  test("all ten study explanations evaluate (Table 7)") {
    assert(qualities.size == 10)
    assert(qualities.map(_._1.label) == (1 to 10).map(i => s"Expl$i"))
  }
  test("Expl2 (regular-season tautology) has recall ≈ 1") {
    val e2 = qualities.find(_._1.label == "Expl2").get._2
    assert(e2.recall > 0.8)
  }
  test("Expl7 (Green minutes > 15) separates the seasons strongly") {
    val e7 = qualities.find(_._1.label == "Expl7").get._2
    assert(e7.fscore > 0.6)
  }
  test("the control Expl10 scores below the CaJaDE top explanations") {
    val byLabel = qualities.map { case (e, q) => e.label -> q.fscore }.toMap
    assert(byLabel("Expl10") < Seq(byLabel("Expl6"), byLabel("Expl7"), byLabel("Expl8")).max)
  }
  test("simulated ratings stay in the 1..5 scale") {
    val rated = UserStudy.simulateRatings(qualities)
    assert(rated.forall(_.ratings.forall(r => r >= 1 && r <= 5)))
    assert(rated.forall(_.ratings.size == 20))
  }
  test("ratings correlate with F-score across explanations (S2)") {
    val rated = UserStudy.simulateRatings(qualities)
    val hi = rated.maxBy(_.quality.fscore)
    val lo = rated.minBy(_.quality.fscore)
    assert(hi.avgAll > lo.avgAll)
  }
  test("rank quality improves when the most controversial item is dropped") {
    val rated = UserStudy.simulateRatings(qualities).filter(_.expl.group == "cajade")
    val all = UserStudy.rankQuality(rated, _.fscore, _ => true, dropWorst = false)
    val drop = UserStudy.rankQuality(rated, _.fscore, _ => true, dropWorst = true)
    assert(drop.kendall <= all.kendall + 1e-9)
  }
  test("fan cohort aggregates separately") {
    val rated = UserStudy.simulateRatings(qualities)
    val r = rated.head
    assert(r.fans.count(identity) == 5)
    assert(r.avg(true) >= 1.0 && r.avg(false) >= 1.0)
  }
}
