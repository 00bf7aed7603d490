package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.TableRef

/** Synthetic stand-in for the Open Data source (§V-A): the paper used a
  * wide table from the Canada/USA/UK Open Data collection of [8] (26–51
  * columns after fabrication). This generator emits a 40-column
  * civic-spending-style table mixing codes, categories, free text, amounts,
  * percentages and dates.
  */
object OpenDataLite {

  val idCol = "record_id"

  def table(spark: SparkSession, rows: Long = 2000, seed: Int = 202): DataFrame = {
    val id = col("id")
    def cat(i: Int, pool: Seq[String]): Column = Gen.pick(id, seed + i, pool)

    val base = spark.range(1, rows + 1).select(
      id.as(idCol),
      Gen.code(id, seed + 1, "ORG", 5, 300).as("organization_code"),
      cat(2, Gen.departments).as("department"),
      cat(3, Seq("federal", "provincial", "municipal")).as("government_level"),
      cat(4, Gen.cities).as("city"),
      cat(5, Gen.countries).as("country"),
      (Gen.int(id, seed + 6, 10) + 2010).as("fiscal_year"),
      cat(7, Seq("Q1", "Q2", "Q3", "Q4")).as("quarter"),
      Gen.money(id, seed + 8, 500000).as("budget_amount"),
      Gen.money(id, seed + 9, 450000).as("spent_amount"),
      round(Gen.int(id, seed + 10, 1000).cast("double") / 10.0, 1).as("completion_pct"),
      cat(11, Seq("approved", "pending", "rejected", "review")).as("approval_status"),
      Gen.date(id, seed + 12, 2000).as("start_date"),
      Gen.date(id, seed + 13, 2400).as("end_date"),
      cat(14, Seq("grant", "contract", "transfer", "subsidy")).as("funding_type"),
      Gen.code(id, seed + 15, "PRJ", 6, 5000).as("project_code"),
      concat(cat(16, Gen.words), lit(" "), cat(17, Gen.words), lit(" initiative")).as("project_title"),
      cat(18, Seq("infrastructure", "health", "education", "transport", "environment",
        "culture", "housing")).as("sector"),
      Gen.pick(id, seed + 19, Gen.lastNames).as("program_manager"),
      Gen.phone(id, seed + 20).as("contact_phone"),
      concat(cat(21, Gen.firstNames), lit("."), cat(22, Gen.lastNames), lit("@gov.example")).as("contact_email"),
      Gen.int(id, seed + 23, 500).as("staff_count"),
      Gen.int(id, seed + 24, 50).as("contractor_count"),
      Gen.money(id, seed + 25, 90000).as("avg_salary"),
      cat(26, Seq("low", "medium", "high", "critical")).as("risk_level"),
      round(Gen.int(id, seed + 27, 50).cast("double") / 10.0, 1).as("risk_score"),
      cat(28, Seq("open", "closed", "archived")).as("record_status"),
      Gen.date(id, seed + 29, 3000).as("published_date"),
      Gen.date(id, seed + 30, 3200).as("updated_date"),
      cat(31, Seq("en", "fr", "nl", "de")).as("language"),
      Gen.code(id, seed + 32, "REG", 4, 100).as("region_code"),
      cat(33, Seq("north", "south", "east", "west", "central")).as("region_name"),
      lpad(Gen.int(id, seed + 34, 99999).cast("string"), 5, "0").as("postal_zone"),
      Gen.money(id, seed + 35, 25000).as("travel_expense"),
      Gen.money(id, seed + 36, 60000).as("equipment_expense"),
      Gen.int(id, seed + 37, 100).as("vendor_count"),
      concat(lit("note "), cat(38, Gen.words), lit(" "), cat(39, Gen.words)).as("remarks"),
      cat(40, Seq("public", "restricted", "confidential")).as("visibility"),
      Gen.pick(id, seed + 42, Seq("Y", "N")).as("audit_flag"),
      Gen.hex(id, seed + 41, 12).as("checksum"),
    )
    base
  }

  def ref(spark: SparkSession, rows: Long = 2000): TableRef =
    TableRef("opendata_base", table(spark, rows))
}
