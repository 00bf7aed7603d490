package repro.fabricate

import scala.util.hashing.MurmurHash3
import repro.text.Tokenizer

/** Schema-level noise (§IV "Noise in Schemata").
  *
  * Valentine perturbs one table's column names with a combination of three
  * transformation rules: (i) prefix with the table name, (ii) abbreviate,
  * (iii) drop vowels. Which rules apply to a given column is a deterministic
  * function of (column, seed), so the fabricated schemata are reproducible.
  */
object SchemaNoise {

  /** Rule (i): table-name prefix, a common DB design convention. */
  def prefixWithTable(table: String, column: String): String = s"${table}_$column"

  /** Rule (ii): abbreviate — keep the first 3 letters of each name token. */
  def abbreviate(column: String): String = {
    val ts = Tokenizer.tokens(column)
    if (ts.isEmpty) column else ts.map(_.take(3)).mkString("_")
  }

  /** Rule (iii): drop vowels, always keeping each token's first character. */
  def dropVowels(column: String): String = {
    val vowels = "aeiouAEIOU".toSet
    val out = column.zipWithIndex.collect {
      case (c, i) if i == 0 || !vowels.contains(c) || !c.isLetter => c
    }.mkString
    if (out.isEmpty) column else out
  }

  /** Apply a hash-chosen non-empty combination of the three rules. */
  def noisyName(table: String, column: String, seed: Long): String = {
    val h = MurmurHash3.stringHash(column, seed.toInt) & 0x7fffffff
    val combo = (h % 6) + 1 // 1..6, always at least one rule
    var name = column
    if ((combo & 1) != 0) name = dropVowels(name)
    if ((combo & 2) != 0) name = abbreviate(name)
    if ((combo & 4) != 0) name = prefixWithTable(table, name)
    if (name == column) prefixWithTable(table, name) else name
  }

  /** Rename map for a whole schema, de-duplicating collisions with a
    * positional suffix so the result is a valid schema.
    */
  def renameMap(table: String, columns: Seq[String], seed: Long): Map[String, String] = {
    val used = scala.collection.mutable.Set[String]()
    columns.map { c =>
      var n = noisyName(table, c, seed)
      var i = 2
      while (used.contains(n)) { n = s"${n}_$i"; i += 1 }
      used += n
      c -> n
    }.toMap
  }
}
