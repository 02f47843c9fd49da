package repro.core

import repro.SparkSpec
import repro.core.Schema._
import repro.data.{Mimic, Nba}

/** Unit tests for the schema-graph/join-graph model (Definitions 2–3). */
class SchemaSpec extends SparkSpec {

  test("JoinCond flip reverses attribute pairs") {
    val c = JoinCond(Seq("a" -> "x", "b" -> "y"))
    assert(c.flipped == JoinCond(Seq("x" -> "a", "y" -> "b")))
    assert(c.flipped.flipped == c)
  }
  test("JoinCond renders as conjunctive equalities") {
    val c = JoinCond(Seq("a" -> "x", "b" -> "y"))
    assert(c.render("L", "R") == "L.a=R.x AND L.b=R.y")
  }

  test("adjacent sees both edge orientations") {
    val fromGame = Nba.schemaGraph.adjacent("game").map(_._1)
    assert(fromGame.contains("team") && fromGame.contains("season"))
    val fromTeam = Nba.schemaGraph.adjacent("team").map(_._1)
    assert(fromTeam.contains("game"))
  }
  test("adjacent flips conditions for the reverse orientation") {
    val gameToTeam = Nba.schemaGraph.adjacent("game")
      .filter(_._1 == "team").map(_._2)
    assert(gameToTeam.contains(JoinCond(Seq("winner_id" -> "team_id"))))
    val teamToGame = Nba.schemaGraph.adjacent("team")
      .filter(_._1 == "game").map(_._2)
    assert(teamToGame.contains(JoinCond(Seq("team_id" -> "winner_id"))))
  }
  test("multiple conditions on one edge are all offered (l_Sedge of u₁)") {
    val conds = Nba.schemaGraph.adjacent("game").filter(_._1 == "team")
    assert(conds.size == 3) // home / away / winner role joins
  }
  test("primaryKey falls back to empty for unknown relations") {
    assert(Nba.schemaGraph.primaryKey("nope").isEmpty)
    assert(Nba.schemaGraph.primaryKey("player_salary") == Seq("player_id", "season_id"))
  }

  test("join graph Ω₀ has only the PT node") {
    assert(JoinGraph.empty.nodes.map(_.rel) == Vector("PT"))
    assert(JoinGraph.empty.contextNodes.isEmpty)
    assert(JoinGraph.empty.describe == "PT")
  }
  test("describe names PT aliases and context relations") {
    val jg = JoinGraph(
      Vector(JGNode(0, "PT"), JGNode(1, "team")),
      Vector(JGEdge(0, 1, Some("g"), JoinCond(Seq("winner_id" -> "team_id")))))
    assert(jg.describe.contains("PT(g)"))
    assert(jg.describe.contains("team#1"))
  }
  test("canonical is stable under node insertion order") {
    val jg1 = JoinGraph(
      Vector(JGNode(0, "PT"), JGNode(1, "a"), JGNode(2, "b")),
      Vector(
        JGEdge(0, 1, Some("g"), JoinCond(Seq("x" -> "x"))),
        JGEdge(0, 2, Some("g"), JoinCond(Seq("y" -> "y")))))
    val jg2 = JoinGraph(
      Vector(JGNode(0, "PT"), JGNode(1, "b"), JGNode(2, "a")),
      Vector(
        JGEdge(0, 2, Some("g"), JoinCond(Seq("x" -> "x"))),
        JGEdge(0, 1, Some("g"), JoinCond(Seq("y" -> "y")))))
    assert(jg1.canonical == jg2.canonical)
  }
  test("canonical distinguishes different PT aliases") {
    val base = Vector(JGNode(0, "PT"), JGNode(1, "team"))
    val a = JoinGraph(base, Vector(JGEdge(0, 1, Some("g"), JoinCond(Seq("x" -> "x")))))
    val b = JoinGraph(base, Vector(JGEdge(0, 1, Some("t"), JoinCond(Seq("x" -> "x")))))
    assert(a.canonical != b.canonical)
  }
  test("database lookup by name") {
    val db = repro.TestData.nba(spark)
    assert(db("team").columns.contains("team"))
    intercept[NoSuchElementException] { db("nope") }
  }
  test("MIMIC schema graph reaches every relation from admissions") {
    val reach = Mimic.schemaGraph.adjacent("admissions").map(_._1).toSet ++
      Mimic.schemaGraph.adjacent("patients").map(_._1).toSet
    assert(reach.contains("patients_admit_info") && reach.contains("icustays") &&
      reach.contains("diagnoses") && reach.contains("procedures"))
  }
  test("NBA schema graph covers all 11 relations") {
    val touched = Nba.schemaGraph.edges.flatMap(e => Seq(e.relA, e.relB)).toSet
    assert(touched == Nba.schemaGraph.rels.keySet)
  }
}
