package repro.matchers

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.core._

/** Valentine's baseline matcher: all pairwise column similarities by fuzzy
  * Jaccard, where two values count as identical when their normalized
  * Levenshtein similarity clears `threshold`.
  *
  * Expressed as a Spark column-similarity join: the sampled distinct values
  * of both tables (long format) are cross-joined with a length prefilter and
  * Spark's built-in `levenshtein`, then aggregated per column pair.
  */
final case class JaccardLevenshtein(threshold: Double) extends Matcher {
  require(threshold > 0 && threshold <= 1, s"threshold in (0,1], got $threshold")

  override val name: String = f"JaccardLevenshtein(th=$threshold%.1f)"
  override val family: String = "JaccardLevenshtein"
  override val matchTypes: Set[MatchType] = Set(MatchType.ValueOverlap)

  override def matchColumns(spark: SparkSession, src: TableData, tgt: TableData): Seq[ScoredMatch] = {
    import spark.implicits._

    val sRows = src.columns.flatMap(c => src.profile(c).sample.map(v => (c, v)))
    val tRows = tgt.columns.flatMap(c => tgt.profile(c).sample.map(v => (c, v)))
    if (sRows.isEmpty || tRows.isEmpty) return Seq.empty
    val s = sRows.toDF("sc", "sv")
    val t = tRows.toDF("tc", "tv")

    // maxLen·(1-threshold) bounds the edit distance a qualifying pair can
    // have, so the length gap prefilter is lossless.
    val maxLen = greatest(length($"sv"), length($"tv"))
    val matched = s
      .join(t, abs(length($"sv") - length($"tv")) <= (lit(1.0) - threshold) * maxLen)
      .where(lit(1.0) - levenshtein($"sv", $"tv").cast("double") / maxLen >= threshold)
      .groupBy("sc", "tc")
      .agg(
        countDistinct($"sv").as("sMatched"),
        countDistinct($"tv").as("tMatched"),
      )
      .collect()
      .map(r => (r.getString(0), r.getString(1)) -> math.min(r.getLong(2), r.getLong(3)))
      .toMap

    val ms = for {
      sc <- src.columns
      tc <- tgt.columns
    } yield {
      val nS = src.profile(sc).sample.size.toLong
      val nT = tgt.profile(tc).sample.size.toLong
      val o = matched.getOrElse((sc, tc), 0L).toDouble
      val union = nS + nT - o
      ScoredMatch(sc, tc, if (union <= 0) 0.0 else o / union)
    }
    Matcher.ranked(ms)
  }
}

object JaccardLevenshtein {
  /** Table II grid: threshold in [0.4, 0.8] step 0.1 (coarsened to 3 points
    * for bench wall-time; see DESIGN.md scale-downs).
    */
  def grid: Seq[JaccardLevenshtein] = Seq(0.4, 0.6, 0.8).map(JaccardLevenshtein(_))
}
