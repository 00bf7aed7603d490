package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core._
import repro.fabricate.{Noise, Splitter}

/** Synthetic stand-in for the human-curated WikiData pairs (§V-B): two
  * tables about USA-citizen singers with (i) varied column names on the
  * second table (partner → spouse, …) and (ii) six value columns re-encoded
  * with alternative versions (Elvis Presley → Elvis Aaron Presley,
  * 1935-01-08 → 01/08/1935, usa → United States, …). One pair is curated
  * per relatedness scenario, as in the paper (4 pairs, 13–20 columns).
  */
object WikiDataLite {

  val idCol = "singer_id"

  private val genres = Seq(
    "rock and roll", "country", "pop", "jazz", "blues", "soul", "gospel", "folk")
  private val genreAlt = Map(
    "rock and roll" -> "rock'n'roll", "country" -> "country music", "pop" -> "pop music",
    "jazz" -> "jazz music", "blues" -> "blues music", "soul" -> "soul music",
    "gospel" -> "gospel music", "folk" -> "folk music")
  private val voices = Seq("tenor", "baritone", "bass", "soprano", "alto", "mezzo-soprano")
  private val labels = Seq("rca", "columbia", "capitol", "atlantic", "motown", "decca", "sun")
  private val instruments = Seq("guitar", "piano", "voice", "drums", "bass guitar", "harmonica")

  /** Column rename map applied to the second table (synonym-style renames
    * on roughly half the schema, like the paper's partner → spouse).
    */
  val renames: Map[String, String] = Map(
    "artist_name" -> "stage_name",
    "birth_place" -> "place_of_birth",
    "record_label" -> "imprint",
    "partner" -> "spouse",
    "official_site" -> "homepage",
    "awards" -> "accolades",
    "residence" -> "domicile",
    "genre" -> "music_genre",
    "active_from" -> "career_start",
    "active_to" -> "career_end",
  ).withDefault(identity)

  /** The six columns whose values are re-encoded in the second table. */
  val reencodedColumns: Set[String] =
    Set("artist_name", "birth_date", "citizenship", "genre", "partner", "official_site")

  /** Base singer table, 20 columns. `alt` selects the alternative value
    * encodings (and keeps column names unchanged — renaming is separate so
    * joinable pairs can share verbatim values under different names).
    */
  def singers(spark: SparkSession, rows: Long = 1200, alt: Boolean = false, seed: Int = 404): DataFrame = {
    val id = col("id")
    val first = Gen.pick(id, seed + 1, Gen.firstNames)
    val middle = Gen.pick(id, seed + 2, Gen.firstNames)
    val last = Gen.pick(id, seed + 3, Gen.lastNames)
    val pFirst = Gen.pick(id, seed + 4, Gen.firstNames)
    val pLast = Gen.pick(id, seed + 5, Gen.lastNames)
    val bdate = Gen.date(id, seed + 6, 18000)
    val genre = Gen.pick(id, seed + 7, genres)
    val site = concat(first, lit("-"), last, lit(".example.com"))

    val artistName = if (!alt) concat(first, lit(" "), last)
      else concat(first, lit(" "), middle, lit(" "), last)
    val birthDate: Column = if (!alt) bdate.cast("string")
      else date_format(bdate, "MM/dd/yyyy")
    val citizenship = if (!alt) lit("usa") else lit("United States")
    val genreCol = if (!alt) genre
      else element_at(
        map(genreAlt.flatMap { case (k, v) => Seq(lit(k), lit(v)) }.toIndexedSeq: _*), genre)
    val partner = if (!alt) concat(pFirst, lit(" "), pLast)
      else concat(pFirst, lit(" "), upper(substring(pLast, 1, 1)), lit("."))
    val siteCol = if (!alt) concat(lit("http://"), site) else site

    spark.range(1, rows + 1).select(
      id.as(idCol),
      artistName.as("artist_name"),
      concat(first, lit(" "), middle, lit(" "), last).as("birth_name"),
      birthDate.as("birth_date"),
      Gen.pick(id, seed + 8, Gen.cities).as("birth_place"),
      citizenship.as("citizenship"),
      genreCol.as("genre"),
      Gen.pick(id, seed + 9, instruments).as("instrument"),
      Gen.pick(id, seed + 10, labels).as("record_label"),
      partner.as("partner"),
      concat(Gen.pick(id, seed + 11, Gen.firstNames), lit(" "), last).as("father_name"),
      concat(Gen.pick(id, seed + 12, Gen.firstNames), lit(" "), Gen.pick(id, seed + 13, Gen.lastNames)).as("mother_name"),
      concat(Gen.pick(id, seed + 14, Gen.words), lit(" "), Gen.pick(id, seed + 15, Gen.words)).as("debut_song"),
      concat(Gen.pick(id, seed + 16, Gen.words), lit(" album")).as("latest_album"),
      Gen.pick(id, seed + 17, Seq("grammy", "billboard award", "none", "hall of fame")).as("awards"),
      Gen.pick(id, seed + 18, Gen.cities).as("residence"),
      Gen.pick(id, seed + 19, voices).as("voice_type"),
      (Gen.int(id, seed + 20, 40) + 1950).as("active_from"),
      (Gen.int(id, seed + 21, 30) + 1990).as("active_to"),
      siteCol.as("official_site"),
    )
  }

  private def rename(df: DataFrame): DataFrame =
    df.select(df.columns.map(c => col(s"`$c`").as(renames(c))).toIndexedSeq: _*)

  /** The four curated pairs, one per relatedness scenario. */
  def pairs(spark: SparkSession, rows: Long = 1200): Seq[DatasetPair] = {
    val base = singers(spark, rows, alt = false)
    val altT = singers(spark, rows, alt = true)
    val cols = base.columns.toSeq
    val gtAll = GroundTruth(cols.map(c => c -> renames(c)).toSet)

    // Unionable: 50% row overlap, all columns, renamed + re-encoded target.
    val (ua, ub0) = Splitter.horizontal(base, idCol, 0.5, 31)
    val (_, ub1) = Splitter.horizontal(altT, idCol, 0.5, 31)
    val unionable = DatasetPair("wikidata/unionable", Scenario.Unionable,
      TableRef("singers_a", ua), TableRef("singers_b", rename(ub1)),
      gtAll, noisySchema = true, noisyInstances = true)

    // View-unionable: zero row overlap + vertical split.
    val (va0, vb0) = Splitter.horizontal(base, idCol, 0.0, 37)
    val (_, vbAlt) = Splitter.horizontal(altT, idCol, 0.0, 37)
    val (uniqueA, shared, uniqueB) = Splitter.verticalPlan(cols, Seq(idCol), 0.5, 41)
    val va = Splitter.project(va0, uniqueA ++ shared)
    val vb = rename(Splitter.project(vbAlt, shared ++ uniqueB))
    val viewUnionable = DatasetPair("wikidata/view-unionable", Scenario.ViewUnionable,
      TableRef("singers_a", va), TableRef("singers_b", vb),
      GroundTruth(shared.map(c => c -> renames(c)).toSet), noisySchema = true, noisyInstances = true)

    // Joinable: vertical split, 60% row overlap, verbatim values under
    // renamed columns (the "classical" join: high value overlap).
    val (ja0, jb0) = Splitter.horizontal(base, idCol, 0.6, 43)
    val ja = Splitter.project(ja0, uniqueA ++ shared)
    val jb = rename(Splitter.project(jb0, shared ++ uniqueB))
    val joinable = DatasetPair("wikidata/joinable", Scenario.Joinable,
      TableRef("singers_a", ja), TableRef("singers_b", jb),
      GroundTruth(shared.map(c => c -> renames(c)).toSet), noisySchema = true, noisyInstances = false)

    // Semantically-joinable: same split, but the target side re-encodes
    // values (and gets typo noise) so the equality join breaks.
    val (_, sbAlt) = Splitter.horizontal(altT, idCol, 0.6, 43)
    val sb = rename(Noise.noisyInstances(Splitter.project(sbAlt, shared ++ uniqueB), 47, prob = 0.3))
    val semJoinable = DatasetPair("wikidata/semantically-joinable", Scenario.SemanticallyJoinable,
      TableRef("singers_a", ja), TableRef("singers_b", sb),
      GroundTruth(shared.map(c => c -> renames(c)).toSet), noisySchema = true, noisyInstances = true)

    Seq(unionable, viewUnionable, joinable, semJoinable)
  }
}
