package repro.matchers

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.core._

/** Shared helpers for matcher suites: profile tables, run a matcher, and
  * inspect rankings.
  */
trait MatcherFixtures { self: SparkSpec =>

  /** Profile a DataFrame into the TableData the matchers consume. */
  def tdata(name: String, df: DataFrame, cap: Int = 60): TableData =
    Profiler.profile(spark, TableRef(name, df), cap)

  /** Run a matcher over two tables and return its ranked matches. */
  def run(m: Matcher, src: TableData, tgt: TableData): Seq[ScoredMatch] =
    m.matchColumns(spark, src, tgt)

  /** Score lookup in a result list (0 when the pair is absent). */
  def score(ms: Seq[ScoredMatch], s: String, t: String): Double =
    ms.find(x => x.srcCol == s && x.tgtCol == t).map(_.score).getOrElse(0.0)

  /** Rank (0-based) of a pair, or Int.MaxValue when absent. */
  def rank(ms: Seq[ScoredMatch], s: String, t: String): Int = {
    val i = ms.indexWhere(x => x.srcCol == s && x.tgtCol == t)
    if (i < 0) Int.MaxValue else i
  }

  /** Assert a list is sorted by non-increasing score. */
  def assertRanked(ms: Seq[ScoredMatch]): Unit =
    ms.sliding(2).foreach {
      case Seq(a, b) => assert(a.score >= b.score, s"not ranked: $a before $b")
      case _         => ()
    }

  /** Two small clearly-matchable tables: same concepts, renamed columns on
    * the target, shared values on the overlapping id range.
    */
  def customersA: DataFrame = {
    import spark.implicits._
    (1 to 120).map { i =>
      (i.toLong, s"name$i", Seq("nl", "de", "fr", "es")(i % 4), 20 + i % 50, i * 110.0)
    }.toDF("cust_id", "cust_name", "country", "age", "balance")
  }

  def customersB: DataFrame = {
    import spark.implicits._
    (61 to 180).map { i =>
      (i.toLong, s"name$i", Seq("nl", "de", "fr", "es")(i % 4), 20 + i % 50, i * 110.0)
    }.toDF("client_id", "client_name", "nation", "years", "account_balance")
  }

  /** Ground truth for the customers fixture. */
  val customersGt: GroundTruth = GroundTruth(Set(
    "cust_id" -> "client_id", "cust_name" -> "client_name",
    "country" -> "nation", "age" -> "years", "balance" -> "account_balance"))
}
