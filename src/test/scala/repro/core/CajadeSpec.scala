package repro.core

import repro.{SparkSpec, TestData}
import repro.data.{Mimic, Nba}

/** End-to-end CaJaDE integration tests: enumerate → mine → rank on the
  * tiny synthetic databases.
  */
class CajadeSpec extends SparkSpec {

  private lazy val nba = TestData.nba(spark)
  private lazy val mimic = TestData.mimic(spark)

  private val fast = Params(maxEdges = 2, maxJoinGraphs = 12, topK = 5,
    f1SampleRate = 1.0, qCostThreshold = 5e5)

  test("UQ₁ (GSW 2015-16 vs 2012-13) produces ranked explanations") {
    val res = Cajade.explain(nba, Nba.qNba4, Nba.seasonQuestion(Nba.qNba4, "2015-16", "2012-13"), fast)
    assert(res.joinGraphCount > 1)
    val top = res.topExplanations(10)
    assert(top.nonEmpty)
    val fs = top.map(_.fscore)
    assert(fs == fs.sortBy(-(_: Double)))
    assert(top.head.fscore > 0.5)
  }

  test("UQ₁ top explanations include context (non-PT) attributes") {
    val res = Cajade.explain(nba, Nba.qNba4, Nba.seasonQuestion(Nba.qNba4, "2015-16", "2012-13"), fast)
    val top = res.topExplanations(10)
    assert(top.exists(e => e.pattern.preds.exists(p => p.attr.startsWith("a"))))
  }

  test("global ranking dedupes identical patterns from different graphs") {
    val res = Cajade.explain(nba, Nba.qNba4, Nba.seasonQuestion(Nba.qNba4, "2015-16", "2012-13"), fast)
    val top = res.topExplanations(20)
    val keys = top.map(e => (e.pattern, e.quality.primary))
    assert(keys.distinct.size == keys.size)
  }

  test("MIMIC UQ₂ (Medicare vs Private) surfaces emergency/age context") {
    val res = Cajade.explain(mimic, Mimic.qMimicInsurance,
      Mimic.question(Mimic.qMimicInsurance, "Medicare", "Private"), fast)
    val top = res.topExplanations(10)
    assert(top.nonEmpty)
    val rendered = top.map(_.pattern.render).mkString(" | ")
    assert(rendered.contains("EMERGENCY") || rendered.contains("age") ||
      rendered.contains("expire_flag") || rendered.contains("gender"))
  }

  test("single-point questions work end to end") {
    val sp = Query.SinglePoint(Map("prov_s_season_name" -> "2015-16"))
    val res = Cajade.explain(nba, Nba.qNba4, sp, fast.copy(maxEdges = 1, maxJoinGraphs = 5))
    assert(res.explanations.nonEmpty)
  }

  test("timer records join-graph enumeration separately") {
    val timer = new Mine.StepTimer
    Cajade.explain(nba, Nba.qNba4, Nba.seasonQuestion(Nba.qNba4, "2015-16", "2012-13"),
      fast.copy(maxEdges = 1, maxJoinGraphs = 4), timer)
    assert(timer.seconds("JG Enum.") > 0)
    assert(timer.seconds("Materialize APTs") > 0)
  }
}
