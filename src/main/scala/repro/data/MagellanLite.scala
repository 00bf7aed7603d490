package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core._
import repro.fabricate.{Noise, Splitter}

/** Synthetic stand-in for the 7 Magellan repository pairs (§V-B): unionable
  * table pairs from real-world entity-matching data, with *identical column
  * names*, partial value overlap, minor instance discrepancies and the
  * occasional multi-valued attribute (e.g. actor lists). Sizes span 3–7
  * columns, a few hundred to ~1.5k rows.
  */
object MagellanLite {

  val idCol = "row_id"

  private def movies(spark: SparkSession, rows: Long, seed: Int): DataFrame = {
    val id = col("id")
    // Multi-valued attribute: pipe-joined actor list (order varies by side).
    val a1 = concat(Gen.pick(id, seed + 4, Gen.firstNames), lit(" "), Gen.pick(id, seed + 5, Gen.lastNames))
    val a2 = concat(Gen.pick(id, seed + 6, Gen.firstNames), lit(" "), Gen.pick(id, seed + 7, Gen.lastNames))
    spark.range(1, rows + 1).select(
      id.as(idCol),
      concat(Gen.pick(id, seed + 1, Gen.words), lit(" "), Gen.pick(id, seed + 2, Gen.words)).as("title"),
      (Gen.int(id, seed + 3, 40) + 1980).as("year"),
      concat(Gen.pick(id, seed + 8, Gen.firstNames), lit(" "), Gen.pick(id, seed + 9, Gen.lastNames)).as("director"),
      concat(a1, lit("|"), a2).as("actors"),
      round(Gen.int(id, seed + 10, 100).cast("double") / 10.0, 1).as("rating"),
      Gen.int(id, seed + 11, 120).cast("int").plus(60).as("duration"),
    )
  }

  private def restaurants(spark: SparkSession, rows: Long, seed: Int): DataFrame = {
    val id = col("id")
    spark.range(1, rows + 1).select(
      id.as(idCol),
      concat(lit("the "), Gen.pick(id, seed + 1, Gen.words), lit(" kitchen")).as("name"),
      concat(Gen.int(id, seed + 2, 999).cast("string"), lit(" "), Gen.pick(id, seed + 3, Gen.streets)).as("address"),
      Gen.pick(id, seed + 4, Gen.cities).as("city"),
      Gen.phone(id, seed + 5).as("phone"),
      Gen.pick(id, seed + 6, Seq("italian", "thai", "french", "indian", "mexican", "japanese")).as("cuisine"),
    )
  }

  private def songs(spark: SparkSession, rows: Long, seed: Int): DataFrame = {
    val id = col("id")
    spark.range(1, rows + 1).select(
      id.as(idCol),
      concat(Gen.pick(id, seed + 1, Gen.words), lit(" "), Gen.pick(id, seed + 2, Gen.words)).as("title"),
      concat(Gen.pick(id, seed + 3, Gen.firstNames), lit(" "), Gen.pick(id, seed + 4, Gen.lastNames)).as("artist"),
      concat(Gen.pick(id, seed + 5, Gen.words), lit(" album")).as("album"),
      (Gen.int(id, seed + 6, 50) + 1970).as("year"),
      Gen.pick(id, seed + 7, Seq("rock", "pop", "jazz", "hip hop", "electronic")).as("genre"),
      (Gen.int(id, seed + 8, 300) + 90).as("duration"),
    )
  }

  private def books(spark: SparkSession, rows: Long, seed: Int): DataFrame = {
    val id = col("id")
    spark.range(1, rows + 1).select(
      id.as(idCol),
      concat(Gen.pick(id, seed + 1, Gen.words), lit(" of "), Gen.pick(id, seed + 2, Gen.words)).as("title"),
      concat(Gen.pick(id, seed + 3, Gen.firstNames), lit(" "), Gen.pick(id, seed + 4, Gen.lastNames)).as("author"),
      Gen.pick(id, seed + 5, Seq("penguin", "harper", "random house", "macmillan", "scholastic")).as("publisher"),
      (Gen.int(id, seed + 6, 60) + 1960).as("year"),
      lpad(Gen.int(id, seed + 7, 999999999).cast("string"), 10, "9").as("isbn"),
    )
  }

  private def products(spark: SparkSession, rows: Long, seed: Int): DataFrame = {
    val id = col("id")
    spark.range(1, rows + 1).select(
      id.as(idCol),
      concat(Gen.pick(id, seed + 1, Gen.words), lit(" "), Gen.int(id, seed + 2, 900).cast("string")).as("name"),
      Gen.pick(id, seed + 3, Seq("acme", "globex", "initech", "umbrella", "stark")).as("brand"),
      Gen.money(id, seed + 4, 2000).as("price"),
      Gen.pick(id, seed + 5, Seq("electronics", "home", "garden", "toys", "sports")).as("category"),
    )
  }

  private def citations(spark: SparkSession, rows: Long, seed: Int): DataFrame = {
    val id = col("id")
    val au1 = concat(Gen.pick(id, seed + 3, Gen.lastNames), lit(", "),
      upper(substring(Gen.pick(id, seed + 4, Gen.firstNames), 1, 1)), lit("."))
    val au2 = concat(Gen.pick(id, seed + 5, Gen.lastNames), lit(", "),
      upper(substring(Gen.pick(id, seed + 6, Gen.firstNames), 1, 1)), lit("."))
    spark.range(1, rows + 1).select(
      id.as(idCol),
      concat(lit("on the "), Gen.pick(id, seed + 1, Gen.words), lit(" of "), Gen.pick(id, seed + 2, Gen.words)).as("title"),
      concat(au1, lit("; "), au2).as("authors"),
      Gen.pick(id, seed + 7, Seq("sigmod", "vldb", "icde", "kdd", "www", "cikm")).as("venue"),
      (Gen.int(id, seed + 8, 25) + 1998).as("year"),
    )
  }

  private def beers(spark: SparkSession, rows: Long, seed: Int): DataFrame = {
    val id = col("id")
    spark.range(1, rows + 1).select(
      id.as(idCol),
      concat(Gen.pick(id, seed + 1, Gen.words), lit(" "), Gen.pick(id, seed + 2, Seq("ipa", "lager", "stout", "ale", "pilsner"))).as("name"),
      concat(Gen.pick(id, seed + 3, Gen.cities), lit(" brewing")).as("brewery"),
      Gen.pick(id, seed + 4, Seq("ipa", "lager", "stout", "pale ale", "pilsner", "porter")).as("style"),
      round(Gen.int(id, seed + 5, 90).cast("double") / 10.0 + 3.0, 1).as("abv"),
    )
  }

  /** Build one unionable pair: 60% row overlap, identical column names,
    * light instance noise on the target side (real-world discrepancies).
    */
  private def pair(name: String, df: DataFrame, seed: Long): DatasetPair = {
    val (a, b0) = Splitter.horizontal(df, idCol, 0.6, seed)
    val b = Noise.noisyInstances(b0, seed + 1, prob = 0.25, rel = 0.05)
    DatasetPair(s"magellan/$name", Scenario.Unionable,
      TableRef(s"${name}_a", a), TableRef(s"${name}_b", b),
      GroundTruth(df.columns.map(c => c -> c).toSet),
      noisySchema = false, noisyInstances = true)
  }

  /** The 7 Magellan-style pairs. Row counts scaled from the paper's
    * 864–131099 range (DESIGN.md scale-downs).
    */
  def pairs(spark: SparkSession, scale: Double = 1.0): Seq[DatasetPair] = {
    def n(base: Long): Long = math.max(120L, (base * scale).toLong)
    Seq(
      pair("movies", movies(spark, n(1400), 511), 61),
      pair("restaurants", restaurants(spark, n(900), 523), 67),
      pair("songs", songs(spark, n(1200), 541), 71),
      pair("books", books(spark, n(800), 557), 73),
      pair("products", products(spark, n(1000), 569), 79),
      pair("citations", citations(spark, n(700), 577), 83),
      pair("beers", beers(spark, n(600), 593), 89),
    )
  }
}
