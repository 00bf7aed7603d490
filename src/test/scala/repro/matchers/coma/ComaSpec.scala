package repro.matchers.coma

import repro.SparkSpec
import repro.core.{GroundTruth, Metrics}
import repro.matchers.MatcherFixtures

class ComaSpec extends SparkSpec with MatcherFixtures {

  private lazy val src = tdata("custA", customersA)
  private lazy val tgt = tdata("custB", customersB)

  test("schema strategy resolves identical names perfectly") {
    val ms = run(Coma.schemaBased, src, src)
    val gt = GroundTruth(src.columns.map(c => c -> c).toSet)
    assert(Metrics.recallAtGroundTruth(ms, gt) == 1.0)
  }

  test("instance strategy resolves the renamed fixture via value overlap") {
    val ms = run(Coma.instanceBased, src, tgt)
    assert(Metrics.recallAtGroundTruth(ms, customersGt) >= 0.8)
  }

  test("instance strategy beats schema strategy when names diverge but values overlap") {
    import spark.implicits._
    val a = tdata("ca", (1 to 80).map(i => Tuple1(s"shared$i")).toDF("totally_x"))
    val b = tdata("cb", (1 to 80).map(i => Tuple1(s"shared$i")).toDF("different_y"))
    val sSchema = score(run(Coma.schemaBased, a, b), "totally_x", "different_y")
    val sInst = score(run(Coma.instanceBased, a, b), "totally_x", "different_y")
    assert(sInst > sSchema)
    a.unpersist(); b.unpersist()
  }

  test("MaxDelta selection keeps only near-best candidates per column") {
    val ms = run(Coma.schemaBased, src, tgt)
    // Selected list is much smaller than the full cross product.
    assert(ms.size < src.columns.size * tgt.columns.size)
    assertRanked(ms)
  }

  test("MaxDelta caps recall on 1-to-many ground truth (the ING#2 effect)") {
    import spark.implicits._
    // One target column matching three source columns with identical values.
    val a = tdata("ma", (1 to 60).map(i => (s"v$i", s"v$i", s"v$i")).toDF("app_name", "app_alias", "app_title"))
    val b = tdata("mb", (1 to 60).map(i => Tuple1(s"v$i")).toDF("application"))
    val gt = GroundTruth(Set("app_name" -> "application", "app_alias" -> "application", "app_title" -> "application"))
    val msInst = run(Coma.instanceBased, a, b)
    // All three have identical sims here, so MaxDelta keeps them — but with
    // differing name sims only near-best survive:
    val c = tdata("mc", (1 to 60).map(i => (s"v$i", s"v$i", s"w$i")).toDF("application_name", "alias", "other"))
    val msC = run(Coma.instanceBased, c, b)
    assert(rank(msC, "application_name", "application") < rank(msC, "other", "application"))
    assert(Metrics.recallAtGroundTruth(msInst, gt) >= 2.0 / 3 - 1e-9)
    a.unpersist(); b.unpersist(); c.unpersist()
  }

  test("threshold filters low scores") {
    val strict = Coma("schema", threshold = 0.9)
    val ms = run(strict, src, tgt)
    assert(ms.forall(_.score >= 0.9))
  }

  test("pattern matcher separates numeric-looking from text columns") {
    import spark.implicits._
    val a = tdata("pa", (1 to 50).map(i => (i * 3, s"txt$i")).toDF("n1", "t1"))
    val b = tdata("pb", (1 to 50).map(i => (i * 7 + 1, s"str$i")).toDF("n2", "t2"))
    val ms = run(Coma.instanceBased, a, b)
    assert(score(ms, "n1", "n2") > score(ms, "n1", "t2"))
    a.unpersist(); b.unpersist()
  }

  test("unknown strategy is rejected") {
    intercept[IllegalArgumentException](Coma("bogus"))
  }

  test("grid has the two Table II strategies at threshold 0") {
    assert(Coma.grid.map(_.strategy) == Seq("schema", "instance"))
    assert(Coma.grid.forall(_.threshold == 0.0))
  }

  test("instance flavor declares the union of schema and instance match types") {
    import repro.core.MatchType._
    assert(Coma.instanceBased.matchTypes ==
      Set(AttributeOverlap, SemanticOverlap, DataType, ValueOverlap, Distribution))
  }
}
