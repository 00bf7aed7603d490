package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.TableRef

/** Synthetic stand-in for the ChEMBL 22 `Assays` table (§V-A) — the one
  * source with a compatible ontology
  * ([[repro.matchers.semprop.Ontology.chemblLite]]), used to evaluate
  * SemProp exactly as the paper does. Column names use biochemical
  * vocabulary the mini ontology knows; *values* are domain-specific
  * identifiers (CHEMBL…, BAO…) that pre-trained embeddings cannot place,
  * reproducing the paper's "too-specific domain" effect.
  */
object ChemblLite {

  val idCol = "assay_id"

  private val organisms = Seq(
    "homo sapiens", "mus musculus", "rattus norvegicus", "escherichia coli",
    "saccharomyces cerevisiae", "danio rerio", "bos taurus", "sus scrofa")
  private val tissues = Seq("liver", "brain", "kidney", "lung", "heart", "plasma", "serum")
  private val units = Seq("nM", "uM", "mg/kg", "ug/mL", "percent", "mmol/L")
  private val assayTypes = Seq("B", "F", "A", "T", "P")
  private val bioTerms = Seq(
    "kinase", "protease", "transferase", "oxidase", "reductase", "phosphatase",
    "receptor", "channel", "transporter", "polymerase")

  def assays(spark: SparkSession, rows: Long = 2000, seed: Int = 303): DataFrame = {
    val id = col("id")
    spark.range(1, rows + 1).select(
      id.as(idCol),
      Gen.code(id, seed + 1, "CHEMBL", 7, 900000).as("assay_chembl_id"),
      Gen.pick(id, seed + 2, assayTypes).as("assay_type"),
      concat(lit("inhibition of "), Gen.pick(id, seed + 3, bioTerms), lit(" "),
        Gen.code(id, seed + 4, "TGT", 4, 2000)).as("description"),
      Gen.pick(id, seed + 5, organisms).as("assay_organism"),
      Gen.code(id, seed + 6, "STRAIN", 3, 40).as("assay_strain"),
      Gen.pick(id, seed + 7, tissues).as("assay_tissue"),
      Gen.code(id, seed + 8, "CL", 4, 300).as("assay_cell_type"),
      Gen.code(id, seed + 9, "CHEMBL", 7, 400000).as("target_chembl_id"),
      Gen.int(id, seed + 10, 500).as("compound_count"),
      Gen.gauss(id, seed + 11, 500.0, 450.0).as("standard_value"),
      Gen.pick(id, seed + 13, units).as("standard_units"),
      Gen.int(id, seed + 14, 10).as("confidence_score"),
      Gen.int(id, seed + 15, 40).as("src_id"),
      Gen.code(id, seed + 16, "DOC", 6, 60000).as("doc_chembl_id"),
      Gen.code(id, seed + 17, "BAO_", 7, 400).as("bao_format"),
      Gen.pick(id, seed + 18, Seq("expert", "autocuration", "intermediate")).as("curated_by"),
      Gen.pick(id, seed + 19, Seq("confirmatory", "screening", "panel", "other")).as("assay_category"),
      Gen.pick(id, seed + 20, Seq("in vivo", "in vitro", "ex vivo")).as("assay_test_type"),
      Gen.date(id, seed + 21, 2500).as("updated_date"),
    )
  }

  def ref(spark: SparkSession, rows: Long = 2000): TableRef =
    TableRef("chembl_assays", assays(spark, rows))
}
