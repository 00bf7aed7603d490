package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}

/** A named tabular dataset participating in a matching experiment. */
final case class TableRef(name: String, df: DataFrame)

/** One ranked column correspondence produced by a matcher. */
final case class ScoredMatch(srcCol: String, tgtCol: String, score: Double)

/** Ground truth for a pair: the set of (source column, target column)
  * correspondences a matcher should rank at the top.
  */
final case class GroundTruth(pairs: Set[(String, String)]) {
  def size: Int = pairs.size
  def contains(m: ScoredMatch): Boolean = pairs.contains((m.srcCol, m.tgtCol))
}

/** The four dataset-relatedness scenarios of §III. */
sealed abstract class Scenario(val label: String)
object Scenario {
  case object Unionable           extends Scenario("unionable")
  case object ViewUnionable       extends Scenario("view-unionable")
  case object Joinable            extends Scenario("joinable")
  case object SemanticallyJoinable extends Scenario("semantically-joinable")
  val all: Seq[Scenario] = Seq(Unionable, ViewUnionable, Joinable, SemanticallyJoinable)
}

/** Match-type taxonomy of Table I — what information a matcher exploits. */
sealed abstract class MatchType(val label: String)
object MatchType {
  case object AttributeOverlap extends MatchType("Attribute Overlap")
  case object ValueOverlap     extends MatchType("Value Overlap")
  case object SemanticOverlap  extends MatchType("Semantic Overlap")
  case object DataType         extends MatchType("Data Type")
  case object Distribution     extends MatchType("Distribution")
  case object Embeddings       extends MatchType("Embeddings")
  val all: Seq[MatchType] =
    Seq(AttributeOverlap, ValueOverlap, SemanticOverlap, DataType, Distribution, Embeddings)
}

/** A dataset pair under evaluation: fabricated (§IV) or human-curated (§V),
  * with its ground truth. `source` keeps the verbatim schema; `target` may
  * carry schema and/or instance noise.
  */
final case class DatasetPair(
    name: String,
    scenario: Scenario,
    source: TableRef,
    target: TableRef,
    groundTruth: GroundTruth,
    noisySchema: Boolean,
    noisyInstances: Boolean,
)

/** A schema matching method adapted to dataset discovery: its output is a
  * ranked list of column pairs, best match first (§II-C).
  */
trait Matcher {
  /** Display name, including the configuration when parameterized. */
  def name: String

  /** Method family name, constant across configurations (for grouping). */
  def family: String

  /** Which Table I match types this method covers. */
  def matchTypes: Set[MatchType]

  /** Rank all column correspondences between the two profiled tables. */
  def matchColumns(spark: SparkSession, src: TableData, tgt: TableData): Seq[ScoredMatch]
}

object Matcher {
  /** Sort matches by descending score, tie-broken deterministically. */
  def ranked(ms: Seq[ScoredMatch]): Seq[ScoredMatch] =
    ms.sortBy(m => (-m.score, m.srcCol, m.tgtCol))
}
