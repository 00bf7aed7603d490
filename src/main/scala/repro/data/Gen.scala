package repro.data

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{DateType, IntegerType, LongType}

/** Deterministic column-generation helpers shared by the synthetic dataset
  * sources. Every generator is a pure function of a surrogate id column and
  * a seed, so fabricated pairs and oracle checks are reproducible.
  */
object Gen {

  /** Pick from a fixed value pool, hash-uniform over ids. */
  def pick(id: Column, seed: Int, values: Seq[String]): Column =
    element_at(
      array(values.map(lit).toIndexedSeq: _*),
      (pmod(hash(id, lit(seed)), lit(values.size)) + 1).cast(IntegerType))

  /** Pick with a Zipf-ish skew: low ranks are much more frequent. */
  def pickSkewed(id: Column, seed: Int, values: Seq[String]): Column = {
    val u = pmod(hash(id, lit(seed)), lit(10000)).cast("double") / 10000.0
    val idx = (pow(u, lit(2.5)) * values.size).cast(IntegerType)
    element_at(array(values.map(lit).toIndexedSeq: _*),
      least(lit(values.size), idx + 1))
  }

  /** Integer in [0, max). */
  def int(id: Column, seed: Int, max: Int): Column =
    pmod(hash(id, lit(seed)), lit(max)).cast(IntegerType)

  /** Long in [lo, hi). */
  def long(id: Column, seed: Int, lo: Long, hi: Long): Column =
    (pmod(hash(id, lit(seed)), lit((hi - lo).toInt)).cast(LongType) + lo)

  /** Money-like double in [0, max) with two decimals. */
  def money(id: Column, seed: Int, max: Int): Column =
    round(pmod(hash(id, lit(seed)), lit(max * 100)).cast("double") / 100.0, 2)

  /** Approximately normal double around mean with given spread (sum of two
    * uniform hashes — triangular, close enough for distribution matching).
    */
  def gauss(id: Column, seed: Int, mean: Double, spread: Double): Column = {
    val u1 = pmod(hash(id, lit(seed)), lit(1000)).cast("double") / 1000.0
    val u2 = pmod(hash(id, lit(seed + 1)), lit(1000)).cast("double") / 1000.0
    round(lit(mean) + (u1 + u2 - 1.0) * spread, 2)
  }

  /** Date within `spanDays` of 2015-01-01. */
  def date(id: Column, seed: Int, spanDays: Int): Column =
    date_add(lit("2015-01-01").cast(DateType), pmod(hash(id, lit(seed)), lit(spanDays)).cast(IntegerType))

  /** Prefixed zero-padded numeric code, e.g. CHEMBL004217. */
  def code(id: Column, seed: Int, prefix: String, width: Int, max: Int): Column =
    concat(lit(prefix), lpad(pmod(hash(id, lit(seed)), lit(max)).cast("string"), width, "0"))

  /** Hex-ish hash token of the given length (commit hashes, GUID stubs). */
  def hex(id: Column, seed: Int, len: Int): Column =
    substring(md5(concat(id.cast("string"), lit(s"#$seed"))), 1, len)

  /** Phone-number-looking string. */
  def phone(id: Column, seed: Int): Column =
    concat(lit("+31-"), lpad(int(id, seed, 900).cast("string"), 3, "0"),
      lit("-"), lpad(int(id, seed + 1, 10000).cast("string"), 4, "0"))

  // ---- shared value pools --------------------------------------------------

  val firstNames: Seq[String] = Seq(
    "james", "mary", "john", "patricia", "robert", "jennifer", "michael", "linda",
    "william", "elizabeth", "david", "barbara", "richard", "susan", "joseph",
    "jessica", "thomas", "sarah", "charles", "karen", "daniel", "nancy", "matthew",
    "lisa", "anthony", "betty", "mark", "helen", "donald", "sandra", "steven",
    "donna", "paul", "carol", "andrew", "ruth", "joshua", "sharon", "kenneth", "laura")

  val lastNames: Seq[String] = Seq(
    "smith", "johnson", "williams", "brown", "jones", "garcia", "miller", "davis",
    "rodriguez", "martinez", "hernandez", "lopez", "gonzalez", "wilson", "anderson",
    "thomas", "taylor", "moore", "jackson", "martin", "lee", "perez", "thompson",
    "white", "harris", "sanchez", "clark", "ramirez", "lewis", "robinson", "walker",
    "young", "allen", "king", "wright", "scott", "torres", "nguyen", "hill", "flores")

  val cities: Seq[String] = Seq(
    "amsterdam", "rotterdam", "utrecht", "eindhoven", "delft", "london", "paris",
    "berlin", "madrid", "rome", "vienna", "lisbon", "dublin", "oslo", "helsinki",
    "prague", "budapest", "warsaw", "athens", "brussels", "copenhagen", "stockholm")

  val countries: Seq[String] = Seq(
    "netherlands", "germany", "france", "spain", "italy", "portugal", "ireland",
    "norway", "finland", "austria", "belgium", "denmark", "sweden", "greece",
    "poland", "hungary", "czechia", "switzerland", "usa", "canada")

  /** ISO-ish country codes aligned index-wise with [[countries]] — the
    * "semantically equal but differently encoded" twin pool.
    */
  val countryCodes: Seq[String] = Seq(
    "NL", "DE", "FR", "ES", "IT", "PT", "IE", "NO", "FI", "AT",
    "BE", "DK", "SE", "GR", "PL", "HU", "CZ", "CH", "US", "CA")

  val streets: Seq[String] = Seq(
    "main street", "oak avenue", "maple road", "station square", "park lane",
    "church street", "king street", "queen avenue", "harbor drive", "mill road",
    "bridge street", "garden lane", "canal street", "market square", "forest road")

  val departments: Seq[String] = Seq(
    "finance", "engineering", "marketing", "sales", "operations", "legal",
    "human resources", "research", "support", "security", "procurement", "audit")

  val words: Seq[String] = Seq(
    "alpha", "bravo", "delta", "echo", "falcon", "gamma", "horizon", "indigo",
    "jade", "karma", "lotus", "matrix", "nimbus", "onyx", "pulse", "quartz",
    "raven", "sigma", "titan", "umbra", "vertex", "wave", "xenon", "yonder", "zephyr")
}
