package repro.core

import repro.{Oracle, SparkSpec}

class ValueOverlapSpec extends SparkSpec {

  private lazy val (a, b) = {
    import spark.implicits._
    val x = Seq(("u1", "nl"), ("u2", "de"), ("u3", "fr"), ("u4", "nl"))
      .toDF("user", "country")
    val y = Seq(("nl", 1), ("de", 2), ("es", 3)).toDF("cntr", "rank")
    (x, y)
  }
  private lazy val ta = Profiler.profile(spark, TableRef("ta", a), 20)
  private lazy val tb = Profiler.profile(spark, TableRef("tb", b), 20)

  test("overlap counts are exact for shared values") {
    val ov = ValueOverlap.overlapCounts(ta, tb)
    // country ∩ cntr = {nl, de} = 2 distinct values.
    assert(ov(("country", "cntr")) == 2L)
  }

  test("non-overlapping column pairs are absent from counts") {
    val ov = ValueOverlap.overlapCounts(ta, tb)
    assert(!ov.contains(("user", "cntr")))
  }

  test("numeric-vs-string overlap goes through string casting") {
    val ov = ValueOverlap.overlapCounts(ta, tb)
    assert(!ov.contains(("country", "rank")))
  }

  test("jaccard matches hand computation and DuckDB") {
    val j = ValueOverlap.jaccard(ta, tb)
    // |{nl,de,fr} ∩ {nl,de,es}| / |∪| = 2/4.
    assert(math.abs(j(("country", "cntr")) - 0.5) < 1e-12)
    assert(j(("user", "cntr")) == 0.0)

    import org.apache.spark.sql.functions._
    val overlapDf = ta.longDistinct.toDF("sc", "value")
      .join(tb.longDistinct.toDF("tc", "value"), "value")
      .where(col("sc") === "country" && col("tc") === "cntr")
      .groupBy("sc", "tc").agg(count(lit(1)).as("overlap"))
    Oracle.assertEquivalent(
      overlapDf,
      """SELECT 'country' AS sc, 'cntr' AS tc, COUNT(*) AS overlap FROM
           (SELECT DISTINCT country FROM ta INTERSECT SELECT DISTINCT cntr FROM tb)""",
      "ta" -> a, "tb" -> b)
  }

  test("jaccard is defined for every column pair") {
    val j = ValueOverlap.jaccard(ta, tb)
    assert(j.keySet == (for (s <- ta.columns; t <- tb.columns) yield (s, t)).toSet)
    assert(j.values.forall(v => v >= 0.0 && v <= 1.0))
  }
}
