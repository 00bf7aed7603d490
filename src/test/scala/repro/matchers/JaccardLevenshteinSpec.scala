package repro.matchers

import repro.{Oracle, SparkSpec}
import repro.core.Metrics

class JaccardLevenshteinSpec extends SparkSpec with MatcherFixtures {

  private lazy val src = tdata("custA", customersA)
  private lazy val tgt = tdata("custB", customersB)

  test("identical value sets score 1 at any threshold") {
    import spark.implicits._
    val a = tdata("a1", (1 to 50).map(i => Tuple1(s"v$i")).toSeq.toDF("x"))
    val b = tdata("b1", (1 to 50).map(i => Tuple1(s"v$i")).toSeq.toDF("y"))
    val ms = run(JaccardLevenshtein(0.8), a, b)
    assert(math.abs(score(ms, "x", "y") - 1.0) < 1e-12)
    a.unpersist(); b.unpersist()
  }

  test("output is ranked by descending score") {
    assertRanked(run(JaccardLevenshtein(0.6), src, tgt))
  }

  test("matching columns outrank non-matching ones on the fixture") {
    val ms = run(JaccardLevenshtein(0.8), src, tgt)
    assert(Metrics.recallAtGroundTruth(ms, customersGt) >= 0.6)
  }

  test("country column matches its renamed counterpart exactly") {
    val ms = run(JaccardLevenshtein(0.9), src, tgt)
    // Identical 4-value domains -> jaccard 1.
    assert(score(ms, "country", "nation") > 0.99)
  }

  test("lower thresholds admit fuzzier matches (monotone scores)") {
    val strict = run(JaccardLevenshtein(0.9), src, tgt)
    val loose = run(JaccardLevenshtein(0.4), src, tgt)
    customersGt.pairs.foreach { case (s, t) =>
      assert(score(loose, s, t) >= score(strict, s, t) - 1e-9)
    }
  }

  test("typo'd values still match at a permissive threshold") {
    import spark.implicits._
    val a = tdata("a2", (1 to 40).map(i => Tuple1(s"value$i")).toSeq.toDF("x"))
    val b = tdata("b2", (1 to 40).map(i => Tuple1(s"valve$i")).toSeq.toDF("y"))
    assert(score(run(JaccardLevenshtein(0.8), a, b), "x", "y") > 0.5)
    assert(score(run(JaccardLevenshtein(0.99), a, b), "x", "y") == 0.0)
    a.unpersist(); b.unpersist()
  }

  test("disjoint unrelated values score 0") {
    import spark.implicits._
    val a = tdata("a3", (1 to 30).map(i => Tuple1(s"aaaa$i")).toSeq.toDF("x"))
    val b = tdata("b3", (1 to 30).map(i => Tuple1(s"zzzz${i + 1000}")).toSeq.toDF("y"))
    assert(score(run(JaccardLevenshtein(0.9), a, b), "x", "y") == 0.0)
    a.unpersist(); b.unpersist()
  }

  test("fuzzy-jaccard at threshold 1.0-ish agrees with exact SQL jaccard") {
    import spark.implicits._
    val av = (1 to 60).map(i => s"k$i")
    val bv = (31 to 90).map(i => s"k$i")
    val a = tdata("a4", av.map(Tuple1(_)).toDF("x"))
    val b = tdata("b4", bv.map(Tuple1(_)).toDF("y"))
    val got = score(run(JaccardLevenshtein(0.999), a, b), "x", "y")
    // Oracle: exact distinct-set jaccard via DuckDB.
    val expDf = Seq(Tuple1(got)).toDF("j")
    Oracle.assertEquivalent(
      expDf,
      """SELECT (SELECT CAST(COUNT(*) AS DOUBLE) FROM (SELECT x FROM a4 INTERSECT SELECT y FROM b4))
              / (SELECT COUNT(*) FROM (SELECT x FROM a4 UNION SELECT y FROM b4)) AS j""",
      "a4" -> av.map(Tuple1(_)).toDF("x"), "b4" -> bv.map(Tuple1(_)).toDF("y"))
    a.unpersist(); b.unpersist()
  }

  test("grid holds the coarsened Table II thresholds") {
    assert(JaccardLevenshtein.grid.map(_.threshold) == Seq(0.4, 0.6, 0.8))
  }

  test("invalid threshold is rejected") {
    intercept[IllegalArgumentException](JaccardLevenshtein(0.0))
  }

  test("declares the value-overlap match type only") {
    assert(JaccardLevenshtein(0.5).matchTypes == Set(repro.core.MatchType.ValueOverlap))
  }
}
