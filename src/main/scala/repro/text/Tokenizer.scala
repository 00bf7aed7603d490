package repro.text

/** Attribute-name tokenization shared by Cupid, COMA and SemProp.
  *
  * Splits on non-alphanumerics, underscores and camelCase boundaries, then
  * lowercases. `prospect_FirstName` -> Seq("prospect", "first", "name").
  */
object Tokenizer {

  private val CamelBoundary = "(?<=[a-z0-9])(?=[A-Z])|(?<=[A-Z])(?=[A-Z][a-z])".r

  /** Tokenize an identifier into lowercase word tokens. */
  def tokens(name: String): Seq[String] = {
    if (name == null || name.isEmpty) return Seq.empty
    name
      .split("[^A-Za-z0-9]+")
      .iterator
      .filter(_.nonEmpty)
      .flatMap(part => CamelBoundary.split(part))
      .filter(_.nonEmpty)
      .map(_.toLowerCase)
      .toSeq
  }

  /** Tokens with digit-runs kept as their own tokens ("addr2" -> addr, 2). */
  def tokensWithDigits(name: String): Seq[String] =
    tokens(name).flatMap { t =>
      "[a-z]+|[0-9]+".r.findAllIn(t).toSeq
    }
}
