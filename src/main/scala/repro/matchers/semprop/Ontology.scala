package repro.matchers.semprop

/** A minimal domain ontology — the offline substitute for EFO that SemProp
  * links attribute names against. Classes carry a label set; the semantic
  * matcher embeds labels with the pre-trained-embedding substrate and links
  * attributes to classes by cosine similarity.
  */
final case class OntoClass(name: String, labels: Seq[String])

final class Ontology(val classes: Seq[OntoClass]) {
  def size: Int = classes.size
}

object Ontology {

  /** EFO-like mini ontology aligned with the ChEMBL-lite assay schema (the
    * paper evaluates SemProp only on ChEMBL, the one source with a
    * compatible ontology).
    */
  val chemblLite: Ontology = new Ontology(Seq(
    OntoClass("Assay",       Seq("assay", "experiment", "test", "screening")),
    OntoClass("Compound",    Seq("compound", "molecule", "chemical", "substance")),
    OntoClass("Target",      Seq("target", "protein", "receptor")),
    OntoClass("Organism",    Seq("organism", "species", "taxonomy")),
    OntoClass("Measurement", Seq("measurement", "value", "unit", "concentration", "result")),
    OntoClass("Document",    Seq("document", "doc", "publication", "journal", "reference")),
    OntoClass("CellLine",    Seq("cell", "cellline", "tissue", "culture")),
    OntoClass("Identifier",  Seq("id", "identifier", "code", "key")),
    OntoClass("Description", Seq("description", "comment", "details", "text")),
    OntoClass("Category",    Seq("type", "category", "class", "kind", "status")),
    OntoClass("Date",        Seq("date", "time", "year", "created", "updated")),
    OntoClass("Source",      Seq("source", "origin", "provider", "curator")),
  ))
}
