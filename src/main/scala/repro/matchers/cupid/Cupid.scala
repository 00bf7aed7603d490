package repro.matchers.cupid

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.text.{StringSim, Thesaurus, Tokenizer}

/** Cupid [Madhavan, Bernstein, Rahm — VLDB'01], schema-based.
  *
  * Schemata become trees (here 2-level: table root, attribute leaves — the
  * paper notes w_struct < 0.6 because relational tables lack XML nesting).
  * Element similarity is a weighted sum of:
  *
  *  - linguistic similarity: thesaurus-aware token matching over attribute
  *    names (the WordNet role is played by [[repro.text.Thesaurus]]), scaled
  *    by data-type compatibility, per the paper's name-similarity formula;
  *  - structural similarity: leaves start from type compatibility and are
  *    reinforced/penalized by how strongly their parent tables link, where a
  *    parent link is the fraction of leaf pairs whose weighted similarity
  *    clears `th_accept` (Cupid's leaves-first bottom-up pass).
  *
  * @param leafWStruct structural weight in the final leaf wsim (Table II)
  * @param wStruct     structural weight when scoring the parent link
  * @param thAccept    accept threshold for "strong link" counting
  */
final case class Cupid(leafWStruct: Double, wStruct: Double, thAccept: Double) extends Matcher {

  override val name: String =
    f"Cupid(leaf_w=$leafWStruct%.1f,w=$wStruct%.1f,th=$thAccept%.1f)"
  override val family: String = "Cupid"
  override val matchTypes: Set[MatchType] =
    Set(MatchType.AttributeOverlap, MatchType.SemanticOverlap, MatchType.DataType)

  /** Data-type compatibility, Cupid's data-type coefficient table. */
  def typeCompat(a: String, b: String): Double =
    (a, b) match {
      case (x, y) if x == y        => 1.0
      case ("numeric", "date") | ("date", "numeric") => 0.4
      case ("string", _) | (_, "string")             => 0.6
      case _                        => 0.5
    }

  /** Linguistic similarity of two attribute names (tokenized, thesaurus). */
  def linguisticSim(a: String, b: String): Double =
    StringSim.tokenSetSim(
      Tokenizer.tokensWithDigits(a), Tokenizer.tokensWithDigits(b), Thesaurus.tokenSim)

  override def matchColumns(spark: SparkSession, src: TableData, tgt: TableData): Seq[ScoredMatch] = {
    val pairs = for (sc <- src.columns; tc <- tgt.columns) yield (sc, tc)

    val lsim = pairs.map { case (sc, tc) =>
      val base = linguisticSim(sc, tc)
      val compat = typeCompat(src.profile(sc).inferredType, tgt.profile(tc).inferredType)
      (sc, tc) -> base * compat
    }.toMap

    // Initial structural similarity of leaves = type compatibility.
    val ssim0 = pairs.map { case (sc, tc) =>
      (sc, tc) -> typeCompat(src.profile(sc).inferredType, tgt.profile(tc).inferredType)
    }.toMap

    // Parent (table) structural link: fraction of strong leaf links, where a
    // leaf link uses the first-pass weighted similarity.
    val firstPass = pairs.map { case p => p -> (wStruct * ssim0(p) + (1 - wStruct) * lsim(p)) }.toMap
    val nLeaves = math.max(src.columns.size, tgt.columns.size)
    val strongLeaves = pairs.count(p => firstPass(p) > thAccept)
    val parentLink = if (nLeaves == 0) 0.0 else math.min(1.0, strongLeaves.toDouble / nLeaves)

    // Leaves-first reinforcement: strongly-linked parents boost leaf ssim by
    // Cupid's c_inc = 1.2 (capped at 1), weak parents decay it by c_dec.
    val ssim = ssim0.map { case (p, s) =>
      p -> (if (parentLink > thAccept) math.min(1.0, s * 1.2) else s * 0.9)
    }

    val ms = pairs.map { case p @ (sc, tc) =>
      ScoredMatch(sc, tc, leafWStruct * ssim(p) + (1 - leafWStruct) * lsim(p))
    }
    Matcher.ranked(ms)
  }
}

object Cupid {
  /** Table II grid: leaf_w_struct, w_struct in [0, 0.6] step 0.2; th_accept
    * in [0.3, 0.8] step 0.1 (coarsened to 0.3/0.5/0.7 for bench wall-time).
    */
  def grid: Seq[Cupid] = for {
    leafW <- Seq(0.0, 0.2, 0.4, 0.6)
    w     <- Seq(0.0, 0.2, 0.4, 0.6)
    th    <- Seq(0.3, 0.5, 0.7)
  } yield Cupid(leafW, w, th)

  /** A mid-grid default configuration for timing runs. */
  def default: Cupid = Cupid(0.2, 0.2, 0.5)
}
