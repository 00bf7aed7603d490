package repro.matchers.coma

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.text.{StringSim, Thesaurus, Tokenizer}

/** COMA [Do & Rahm — VLDB'02; instance matchers per Engmann & Massmann '07].
  *
  * COMA is a *library* of matchers whose results are aggregated and then fed
  * to a selection operator:
  *
  *  - schema strategy: Name (character-trigram), NameToken (thesaurus-aware
  *    token sets), DataType — the COMA 3.0 "context-independent" workflow;
  *  - instance strategy: the schema matchers plus ValueOverlap (an exact
  *    distinct-value Jaccard computed as a Spark long-format join), Pattern
  *    (character-class histogram overlap) and NumericStats.
  *
  * Aggregation is Average, direction Both, selection MaxDelta — the COMA
  * defaults — with the accept threshold set to 0 as in Valentine's Table II
  * so every selected pair stays in the ranked output.
  *
  * MaxDelta keeps, per source column, only candidates within `delta` of that
  * column's best score (and symmetrically for target columns). This is the
  * behaviour that caps COMA's recall on 1-to-many ground truths (the paper's
  * ING#2 observation).
  */
final case class Coma(strategy: String, threshold: Double = 0.0, delta: Double = 0.008)
    extends Matcher {
  require(strategy == "schema" || strategy == "instance", s"unknown strategy $strategy")

  override val name: String = s"COMA($strategy)"
  override val family: String = s"COMA-$strategy"
  override val matchTypes: Set[MatchType] =
    if (strategy == "schema")
      Set(MatchType.AttributeOverlap, MatchType.SemanticOverlap, MatchType.DataType)
    else
      Set(MatchType.AttributeOverlap, MatchType.SemanticOverlap, MatchType.DataType,
        MatchType.ValueOverlap, MatchType.Distribution)

  /** COMA's data-type similarity table (collapsed to inferred types). */
  private def typeSim(a: String, b: String): Double =
    if (a == b) 1.0
    else if (a == "string" || b == "string") 0.4
    else 0.2

  private def patternSim(a: Map[String, Double], b: Map[String, Double]): Double = {
    if (a.isEmpty || b.isEmpty) return 0.0
    // Histogram intersection: sum of min shared mass per pattern class.
    (a.keySet ++ b.keySet).iterator
      .map(k => math.min(a.getOrElse(k, 0.0), b.getOrElse(k, 0.0)))
      .sum
  }

  private def numericSim(a: ColumnProfile, b: ColumnProfile): Double =
    (a.numeric, b.numeric) match {
      case (Some(x), Some(y)) =>
        val scale = math.max(math.max(math.abs(x.mean), math.abs(y.mean)), 1e-9)
        val meanSim = 1.0 - math.min(1.0, math.abs(x.mean - y.mean) / scale)
        val spread = math.max(math.max(x.std, y.std), 1e-9)
        val stdSim = 1.0 - math.min(1.0, math.abs(x.std - y.std) / spread)
        0.6 * meanSim + 0.4 * stdSim
      case _ => 0.0
    }

  override def matchColumns(spark: SparkSession, src: TableData, tgt: TableData): Seq[ScoredMatch] = {
    val pairs = for (sc <- src.columns; tc <- tgt.columns) yield (sc, tc)

    val overlapJaccard: Map[(String, String), Double] =
      if (strategy == "instance") ValueOverlap.jaccard(src, tgt) else Map.empty

    val combined = pairs.map { case p @ (sc, tc) =>
      val pa = src.profile(sc); val pb = tgt.profile(tc)
      val nameSim = StringSim.trigramSim(sc, tc)
      val tokenSim = StringSim.tokenSetSim(
        Tokenizer.tokensWithDigits(sc), Tokenizer.tokensWithDigits(tc), Thesaurus.tokenSim)
      val dtSim = typeSim(pa.inferredType, pb.inferredType)
      val sims =
        if (strategy == "schema") Seq(nameSim, tokenSim, dtSim)
        else Seq(nameSim, tokenSim, dtSim,
          overlapJaccard.getOrElse(p, 0.0), patternSim(pa.patternHist, pb.patternHist),
          numericSim(pa, pb))
      p -> sims.sum / sims.size
    }.toMap

    // Both-direction MaxDelta selection: a candidate survives only when it
    // is within delta of the best score of BOTH its source and its target
    // column (COMA's Direction=Both semantics). This intersection is what
    // caps COMA's recall on 1-to-many ground truths (the ING#2 effect).
    val bestPerSrc = combined.groupBy(_._1._1).view.mapValues(_.values.max).toMap
    val bestPerTgt = combined.groupBy(_._1._2).view.mapValues(_.values.max).toMap
    val selected = combined.collect {
      case (p @ (sc, tc), s)
          if s >= threshold &&
            s >= bestPerSrc(sc) - delta && s >= bestPerTgt(tc) - delta =>
        ScoredMatch(sc, tc, s)
    }.toSeq
    Matcher.ranked(selected)
  }
}

object Coma {
  /** Table II: strategy in {schema, instance}, accept threshold 0. */
  def grid: Seq[Coma] = Seq(Coma("schema"), Coma("instance"))
  def schemaBased: Coma = Coma("schema")
  def instanceBased: Coma = Coma("instance")
}
