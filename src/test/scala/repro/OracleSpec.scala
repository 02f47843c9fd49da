package repro

import org.scalatest.funsuite.AnyFunSuite

/** Sanity tests for the DuckDB oracle itself plus property-style checks of
  * the pattern/metric math that need no SparkSession.
  */
class OracleSpec extends AnyFunSuite {
  import repro.core.Pattern._
  import org.scalacheck.{Gen, Prop}
  import org.scalacheck.Prop.forAll
  import org.scalacheck.Test.{check, Parameters}

  private def holds(p: Prop): Unit = {
    val r = check(Parameters.default.withMinSuccessfulTests(60), p)
    assert(r.passed, r.status.toString)
  }

  private val predGen: Gen[Pred] = for {
    attr <- Gen.oneOf("a", "b", "c", "d")
    num <- Gen.choose(-100.0, 100.0)
    op <- Gen.oneOf(Seq(OpLe, OpGe))
    isCat <- Gen.oneOf(true, false)
  } yield if (isCat) Pred(attr, OpEq, CatV(s"v${num.toInt}")) else Pred(attr, op, NumV(num))

  private val patternGen: Gen[Pattern] = for {
    preds <- Gen.listOfN(3, predGen)
  } yield Pattern(preds.groupBy(_.attr).values.map(_.head).toVector.sortBy(_.attr))

  test("property: diversity is bounded in [-2, 1]") {
    holds(forAll(patternGen, patternGen) { (p, q) =>
      val d = diversity(p, q)
      d >= -2.0 - 1e-9 && d <= 1.0 + 1e-9
    })
  }
  test("property: diversity of a pattern with itself is -2 (non-empty)") {
    holds(forAll(patternGen) { p =>
      p.preds.isEmpty || math.abs(diversity(p, p) + 2.0) < 1e-9
    })
  }
  test("property: wscore never exceeds F-score + 1") {
    holds(forAll(patternGen, patternGen, Gen.choose(0.0, 1.0)) { (p, q, f) =>
      wscore(f, p, Seq(q)) <= f + 1.0 + 1e-9
    })
  }
  test("property: quality precision/recall stay in [0,1]") {
    holds(forAll(Gen.choose(0L, 50L), Gen.choose(0L, 50L), Gen.choose(1L, 60L), Gen.choose(1L, 60L)) {
      (c1, c2, n1, n2) =>
        val cov = repro.core.Metrics.Coverage(math.min(c1, n1), math.min(c2, n2))
        val q = repro.core.Metrics.quality(cov, n1, n2, "t1")
        q.precision >= 0 && q.precision <= 1 && q.recall >= 0 && q.recall <= 1 &&
          q.fscore >= 0 && q.fscore <= 1
    })
  }
  test("property: render/attrs agree on predicate count") {
    holds(forAll(patternGen) { p =>
      p.isEmpty || p.render.split(" ∧ ").length == p.size
    })
  }

  test("oracle detects a genuine mismatch") {
    val spark = SparkSpec.shared
    import spark.implicits._
    val df = Seq(("a", 1)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.selectExpr("k", "v + 1 as v"),
        "SELECT k, v FROM t",
        "t" -> df)
    }
  }
  test("oracle accepts an exact match with reordered rows") {
    val spark = SparkSpec.shared
    import spark.implicits._
    val df = Seq(("b", 2), ("a", 1)).toDF("k", "v")
    Oracle.assertEquivalent(df, "SELECT k, v FROM t", "t" -> df)
  }
  test("oracle requires identical column sets") {
    val spark = SparkSpec.shared
    import spark.implicits._
    val df = Seq(("a", 1)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT k AS other, v FROM t", "t" -> df)
    }
  }
  test("oracle canonicalizes doubles across engines") {
    val spark = SparkSpec.shared
    import spark.implicits._
    val df = Seq(("a", 0.30000000000000004), ("b", 0.3)).toDF("k", "v")
    Oracle.assertEquivalent(df, "SELECT k, CAST(v AS DOUBLE) AS v FROM t", "t" -> df)
  }
  test("oracle handles nulls") {
    val spark = SparkSpec.shared
    import spark.implicits._
    val df = Seq(("a", Option(1)), ("b", None)).toDF("k", "v")
    Oracle.assertEquivalent(df, "SELECT k, v FROM t", "t" -> df)
  }
}
