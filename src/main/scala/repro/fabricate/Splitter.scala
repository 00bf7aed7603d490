package repro.fabricate

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import scala.util.hashing.MurmurHash3

/** Horizontal and vertical table splits (§IV), the mechanism behind all four
  * relatedness scenarios. Row membership is decided by a deterministic hash
  * of the table's surrogate id column, so splits are reproducible and the
  * union/join reconstruction can be oracle-checked against DuckDB.
  */
object Splitter {

  /** Split rows into two halves with approximately `overlap` fraction of the
    * original rows appearing in both. overlap=1 duplicates the table;
    * overlap=0 partitions it.
    *
    * A row with unit hash u goes to A iff u < 0.5 + overlap/2 and to B iff
    * u >= 0.5 - overlap/2, giving |A∩B| ≈ overlap·n and |A| ≈ |B|.
    */
  def horizontal(df: DataFrame, idCol: String, overlap: Double, seed: Long): (DataFrame, DataFrame) = {
    require(overlap >= 0 && overlap <= 1, s"overlap must be in [0,1], got $overlap")
    val u = (pmod(hash(col(s"`$idCol`"), lit(seed)), lit(100000)).cast("double") / 100000.0)
    val a = df.where(u < 0.5 + overlap / 2)
    val b = df.where(u >= 0.5 - overlap / 2)
    (a, b)
  }

  /** Split columns into (sharedWithA-unique, shared, sharedWithB-unique):
    * `shared` always contains `keyCols` plus a hash-chosen `sharedFraction`
    * of the remaining columns; the rest alternate between the two sides.
    */
  def verticalPlan(
      columns: Seq[String],
      keyCols: Seq[String],
      sharedFraction: Double,
      seed: Long,
  ): (Seq[String], Seq[String], Seq[String]) = {
    require(sharedFraction >= 0 && sharedFraction <= 1)
    val rest = columns.filterNot(keyCols.contains)
    val ranked = rest.sortBy(c => (MurmurHash3.stringHash(c, seed.toInt) & 0x7fffffff, c))
    val nShared = math.round(sharedFraction * rest.size).toInt
    val shared = keyCols ++ ranked.take(nShared)
    val leftover = ranked.drop(nShared)
    val (uniqueA, uniqueB) = leftover.zipWithIndex.partition(_._2 % 2 == 0)
    (uniqueA.map(_._1), shared, uniqueB.map(_._1))
  }

  /** Project a table to a column subset, preserving original column order. */
  def project(df: DataFrame, cols: Seq[String]): DataFrame = {
    val keep = df.columns.filter(cols.contains)
    df.select(keep.map(c => col(s"`$c`")).toIndexedSeq: _*)
  }
}
