package repro.fabricate

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import scala.util.hashing.MurmurHash3

/** Instance-level noise (§IV "Noise in Data").
  *
  * Strings get random typos based on QWERTY keyboard proximity; numeric
  * values are perturbed relative to their magnitude so the overall value
  * distribution is approximately preserved (the eTuner-style perturbation the
  * paper describes). All noise is a deterministic function of (value, seed)
  * so fabricated pairs are reproducible and oracle-checkable.
  */
object Noise {

  /** QWERTY adjacency used to pick plausible typo substitutions. */
  val keyboardNeighbors: Map[Char, String] = Map(
    'q' -> "wa", 'w' -> "qes", 'e' -> "wrd", 'r' -> "etf", 't' -> "ryg",
    'y' -> "tuh", 'u' -> "yij", 'i' -> "uok", 'o' -> "ipl", 'p' -> "ol",
    'a' -> "qsz", 's' -> "awdx", 'd' -> "sefc", 'f' -> "drgv", 'g' -> "fthb",
    'h' -> "gyjn", 'j' -> "hukm", 'k' -> "jil", 'l' -> "kop",
    'z' -> "asx", 'x' -> "zsdc", 'c' -> "xdfv", 'v' -> "cfgb", 'b' -> "vghn",
    'n' -> "bhjm", 'm' -> "njk",
    '0' -> "19", '1' -> "02", '2' -> "13", '3' -> "24", '4' -> "35",
    '5' -> "46", '6' -> "57", '7' -> "68", '8' -> "79", '9' -> "80",
  )

  /** Deterministic pseudo-random double in [0,1) from (value, seed, salt). */
  private def unitHash(v: String, seed: Long, salt: Int): Double = {
    val h = MurmurHash3.stringHash(v, MurmurHash3.mix(seed.toInt, salt))
    (h & 0x7fffffff).toDouble / Int.MaxValue
  }

  /** Insert one keyboard-proximity typo into a string (identity for empty
    * strings). Position and substitute are hash-chosen.
    */
  def typo(v: String, seed: Long): String = {
    if (v == null || v.isEmpty) return v
    val pos = (unitHash(v, seed, 1) * v.length).toInt.min(v.length - 1)
    val c = v.charAt(pos)
    val lower = c.toLower
    keyboardNeighbors.get(lower) match {
      case Some(ns) =>
        val sub0 = ns.charAt((unitHash(v, seed, 2) * ns.length).toInt.min(ns.length - 1))
        val sub = if (c.isUpper) sub0.toUpper else sub0
        v.updated(pos, sub)
      case None => // non-alphanumeric char: duplicate it, still a typo
        v.substring(0, pos) + c + v.substring(pos)
    }
  }

  /** Typo a string value with probability `prob` (hash-decided). */
  def maybeTypo(v: String, seed: Long, prob: Double): String =
    if (v == null || unitHash(v, seed, 3) >= prob) v else typo(v, seed)

  /** Perturb a numeric value: v * (1 + u·rel) with u in [-1,1) hash-drawn,
    * applied with probability `prob`.
    */
  def maybePerturb(v: Double, seed: Long, prob: Double, rel: Double): Double = {
    val key = java.lang.Double.toString(v)
    if (unitHash(key, seed, 4) >= prob) v
    else {
      val u = unitHash(key, seed, 5) * 2.0 - 1.0
      val base = v * (1.0 + u * rel)
      // Integral inputs stay integral so the column's type pattern survives.
      if (v == math.rint(v)) math.rint(base + (if (u >= 0) 1 else -1)) else base
    }
  }

  /** Column expression applying string-typo noise. */
  def typoCol(c: Column, seed: Long, prob: Double): Column = {
    val f = udf((v: String) => maybeTypo(v, seed, prob))
    f(c)
  }

  /** Column expression applying numeric perturbation. */
  def perturbCol(c: Column, seed: Long, prob: Double, rel: Double): Column = {
    val f = udf((v: Double) => maybePerturb(v, seed, prob, rel))
    f(c.cast("double"))
  }

  /** Apply instance noise to every column of a table: numerics perturbed,
    * everything else typo'd, preserving column names and order.
    */
  def noisyInstances(df: DataFrame, seed: Long, prob: Double = 0.5, rel: Double = 0.1): DataFrame = {
    val numericTypes = Set("int", "bigint", "smallint", "tinyint", "double", "float")
    val exprs = df.schema.fields.map { f =>
      val c = col(s"`${f.name}`")
      val simple = f.dataType.simpleString
      val noised =
        if (numericTypes.contains(simple) || simple.startsWith("decimal"))
          perturbCol(c, seed, prob, rel)
        else typoCol(c.cast("string"), seed, prob)
      noised.as(f.name)
    }
    df.select(exprs.toIndexedSeq: _*)
  }
}
