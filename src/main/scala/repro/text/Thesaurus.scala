package repro.text

/** Built-in synonym thesaurus — the offline substitute for WordNet.
  *
  * Cupid's linguistic matcher consults a thesaurus to score non-syntactic
  * synonymy between name tokens; the original paper used WordNet, which is
  * not available offline. This dictionary covers the vocabulary emitted by
  * the synthetic dataset generators in `repro.data` plus common DB naming,
  * so the synonym code path is exercised exactly as WordNet would be.
  */
object Thesaurus {

  /** Synonym groups; every word in a group is a full synonym of the others. */
  val groups: Seq[Set[String]] = Seq(
    Set("client", "customer", "cust", "clnt"),
    Set("id", "identifier", "key", "code", "nr", "num", "number"),
    Set("name", "nm", "title", "label"),
    Set("first", "given", "fore"),
    Set("last", "family", "sur"),
    Set("phone", "tel", "telephone", "mobile"),
    Set("country", "cntr", "nation", "land"),
    Set("city", "town", "municipality"),
    Set("state", "province", "region"),
    Set("address", "addr", "street", "location"),
    Set("date", "dt", "day", "time"),
    Set("birth", "born", "dob"),
    Set("partner", "spouse", "mate"),
    Set("income", "salary", "earnings", "wage"),
    Set("networth", "wealth", "assets"),
    Set("employer", "company", "firm", "organization", "org"),
    Set("gender", "sex"),
    Set("marital", "marriage", "married"),
    Set("child", "children", "kids", "offspring"),
    Set("credit", "rating", "score"),
    Set("owner", "holder", "responsible"),
    Set("team", "squad", "group"),
    Set("task", "item", "ticket", "issue"),
    Set("sprint", "iteration", "cycle"),
    Set("application", "app", "software", "system"),
    Set("manager", "lead", "head", "boss"),
    Set("department", "dept", "division"),
    Set("description", "desc", "details", "info", "comment", "remarks"),
    Set("value", "val", "amount", "amt"),
    Set("type", "kind", "category", "class"),
    Set("status", "flag", "stage"),
    Set("start", "begin", "from"),
    Set("end", "finish", "until", "to"),
    Set("song", "track", "tune"),
    Set("artist", "singer", "performer", "musician"),
    Set("genre", "style"),
    Set("movie", "film", "picture"),
    Set("actor", "cast", "star"),
    Set("director", "filmmaker"),
    Set("year", "yr"),
    Set("price", "cost", "fee"),
    Set("assay", "experiment", "test"),
    Set("compound", "molecule", "chemical", "substance"),
    Set("target", "protein", "receptor"),
    Set("organism", "species"),
    Set("cellline", "cell"),
    Set("measurement", "measure", "reading"),
    Set("unit", "units", "uom"),
    Set("source", "src", "origin", "provider"),
    Set("doc", "document", "paper", "publication"),
  )

  private val wordToGroup: Map[String, Int] =
    groups.zipWithIndex.flatMap { case (g, i) => g.map(_ -> i) }.toMap

  /** True when the lowercase tokens belong to the same synonym group. */
  def synonyms(a: String, b: String): Boolean = {
    val la = a.toLowerCase; val lb = b.toLowerCase
    if (la == lb) return true
    (wordToGroup.get(la), wordToGroup.get(lb)) match {
      case (Some(ga), Some(gb)) => ga == gb
      case _                    => false
    }
  }

  /** Thesaurus-aware token similarity: 1.0 for synonyms, else scaled
    * Levenshtein similarity (a syntactic fallback, as Cupid prescribes).
    */
  def tokenSim(a: String, b: String): Double =
    if (synonyms(a, b)) 1.0 else 0.8 * Levenshtein.similarityIgnoreCase(a, b)

  /** The canonical representative of a word's synonym group (itself when the
    * word is unknown). Used by the pre-trained-embedding substrate so that
    * synonyms receive nearby vectors.
    */
  def canonical(word: String): String = {
    val lw = word.toLowerCase
    wordToGroup.get(lw).map(i => groups(i).toSeq.min).getOrElse(lw)
  }
}
