package repro.fabricate

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.TpcDiLite

class SplitterSpec extends SparkSpec {

  private lazy val df = TpcDiLite.prospect(spark, rows = 400).cache()

  test("zero-overlap horizontal split partitions the table") {
    val (a, b) = Splitter.horizontal(df, TpcDiLite.idCol, 0.0, seed = 1)
    assert(a.count() + b.count() == df.count())
    assert(a.join(b, TpcDiLite.idCol).count() == 0)
  }

  test("full-overlap horizontal split duplicates the table") {
    val (a, b) = Splitter.horizontal(df, TpcDiLite.idCol, 1.0, seed = 1)
    assert(a.count() == df.count())
    assert(b.count() == df.count())
  }

  test("partial overlap is approximately the requested fraction") {
    val (a, b) = Splitter.horizontal(df, TpcDiLite.idCol, 0.5, seed = 1)
    val inter = a.join(b, TpcDiLite.idCol).count().toDouble / df.count()
    assert(inter > 0.4 && inter < 0.6, s"overlap fraction $inter")
  }

  test("split sides are balanced") {
    val (a, b) = Splitter.horizontal(df, TpcDiLite.idCol, 0.3, seed = 2)
    val ratio = a.count().toDouble / b.count()
    assert(ratio > 0.7 && ratio < 1.4, s"ratio $ratio")
  }

  test("union of a zero-overlap split reconstructs the table (oracle)") {
    val (a, b) = Splitter.horizontal(df.select("p_id", "last_name", "income"), TpcDiLite.idCol, 0.0, seed = 3)
    Oracle.assertEquivalent(
      a.union(b).agg(count(lit(1)).as("n"), countDistinct(col("p_id")).as("ids")),
      "SELECT COUNT(*) AS n, COUNT(DISTINCT p_id) AS ids FROM orig",
      "orig" -> df.select("p_id", "last_name", "income"))
  }

  test("splits are deterministic in the seed") {
    val (a1, _) = Splitter.horizontal(df, TpcDiLite.idCol, 0.4, seed = 9)
    val (a2, _) = Splitter.horizontal(df, TpcDiLite.idCol, 0.4, seed = 9)
    assert(a1.exceptAll(a2).count() == 0 && a2.exceptAll(a1).count() == 0)
  }

  test("invalid overlap is rejected") {
    intercept[IllegalArgumentException](Splitter.horizontal(df, TpcDiLite.idCol, 1.5, 1))
  }

  test("verticalPlan keeps key columns shared") {
    val (ua, shared, ub) = Splitter.verticalPlan(df.columns.toSeq, Seq(TpcDiLite.idCol), 0.5, 5)
    assert(shared.contains(TpcDiLite.idCol))
    assert((ua ++ shared ++ ub).toSet == df.columns.toSet)
    assert(ua.intersect(ub).isEmpty)
    assert(ua.intersect(shared).isEmpty)
  }

  test("verticalPlan shared fraction scales") {
    val cols = df.columns.toSeq
    val (_, s30, _) = Splitter.verticalPlan(cols, Seq(TpcDiLite.idCol), 0.3, 5)
    val (_, s70, _) = Splitter.verticalPlan(cols, Seq(TpcDiLite.idCol), 0.7, 5)
    assert(s30.size < s70.size)
    val (_, sAll, _) = Splitter.verticalPlan(cols, Seq(TpcDiLite.idCol), 1.0, 5)
    assert(sAll.toSet == cols.toSet)
  }

  test("verticalPlan distributes leftovers to both sides") {
    val (ua, _, ub) = Splitter.verticalPlan(df.columns.toSeq, Seq(TpcDiLite.idCol), 0.3, 5)
    assert(ua.nonEmpty && ub.nonEmpty)
  }

  test("project preserves original column order") {
    val projected = Splitter.project(df, Seq("income", "p_id", "city"))
    assert(projected.columns.toSeq == Seq("p_id", "city", "income"))
  }
}
