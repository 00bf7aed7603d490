package repro.core

import repro.{Oracle, SparkSpec}

class ProfilerSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  private lazy val df = {
    import spark.implicits._
    Seq(
      (1L, "alice", 10.5, "2020-01-01"),
      (2L, "bob", 20.0, "2020-02-01"),
      (3L, "carol", 30.5, "2020-03-01"),
      (4L, "alice", 40.0, "2020-04-01"),
      (5L, null.asInstanceOf[String], 50.5, "2020-05-01"),
    ).toDF("id", "name", "score", "day")
  }
  private lazy val td = Profiler.profile(spark, TableRef("people", df), sampleCap = 10)

  test("profiles every column") {
    assert(td.profiles.keySet == Set("id", "name", "score", "day"))
    assert(td.columns == Seq("id", "name", "score", "day"))
  }

  test("row and non-null counts are exact") {
    assert(td.profile("id").rowCount == 5)
    assert(td.profile("name").nonNull == 4)
    assert(math.abs(td.profile("name").nullFraction - 0.2) < 1e-12)
  }

  test("distinct counts match DuckDB") {
    val counts = td.columns.map(c => c -> td.profile(c).distinct).toMap
    val expected = Map("id" -> 5L, "name" -> 3L, "score" -> 5L, "day" -> 5L)
    assert(counts == expected)
    // Cross-check one column through the oracle: melt + distinct agree with SQL.
    val sparkDistinct = td.longDistinct.where(col("column") === "name")
      .groupBy("column").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      sparkDistinct,
      "SELECT 'name' AS column, COUNT(DISTINCT name) AS n FROM people WHERE name IS NOT NULL",
      "people" -> df)
  }

  test("inferred types are sensible") {
    assert(td.profile("id").inferredType == "numeric")
    assert(td.profile("score").inferredType == "numeric")
    assert(td.profile("name").inferredType == "string")
    assert(td.profile("day").inferredType == "date")
  }

  test("samples contain the distinct values at small scale") {
    assert(td.profile("name").sample.toSet == Set("alice", "bob", "carol"))
    assert(td.profile("id").sample.size == 5)
  }

  test("sample respects the cap and is deterministic") {
    val td2 = Profiler.profile(spark, TableRef("people2", df), sampleCap = 2)
    assert(td2.profile("id").sample.size == 2)
    val td3 = Profiler.profile(spark, TableRef("people3", df), sampleCap = 2)
    assert(td2.profile("id").sample == td3.profile("id").sample)
    td2.unpersist(); td3.unpersist()
  }

  test("numeric stats computed for numeric columns") {
    val ns = td.profile("score").numeric.get
    assert(ns.min == 10.5 && ns.max == 50.5)
    assert(math.abs(ns.mean - 30.3) < 0.01)
  }

  test("numericSample is sorted doubles") {
    val s = td.profile("id").numericSample
    assert(s == s.sorted)
    assert(s.size == 5)
  }

  test("pattern histogram sums to 1 for non-empty columns") {
    td.columns.foreach { c =>
      val h = td.profile(c).patternHist
      assert(h.nonEmpty)
      assert(math.abs(h.values.sum - 1.0) < 1e-9)
    }
  }

  test("pattern compression examples") {
    assert(Profiler.pattern("AB-12") == "a-9")
    assert(Profiler.pattern("2020-01-01") == "9-9-9")
    assert(Profiler.pattern("") == "")
    assert(Profiler.pattern(null) == "")
  }

  test("minhash signatures have the configured width") {
    assert(td.profile("name").minhash.length == Profiler.MinHashK)
  }

  test("identical columns share minhash signatures") {
    val dup = df.select(col("name").as("n1"), col("name").as("n2"))
    val tdd = Profiler.profile(spark, TableRef("dup", dup), 10)
    assert(tdd.profile("n1").minhash.toSeq == tdd.profile("n2").minhash.toSeq)
    tdd.unpersist()
  }

  test("melt emits (column, value) rows without nulls, matching DuckDB") {
    val long = Profiler.melt(df.select("id", "name"))
      .groupBy("column").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      long,
      """SELECT 'id' AS column, COUNT(id) AS n FROM people
         UNION ALL
         SELECT 'name', COUNT(name) FROM people""",
      "people" -> df)
  }
}
