package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.TableRef

/** Synthetic stand-in for the TPC-DI 1.1.0 `Prospect` table (§V-A): a wide
  * denormalized customer-prospect table. The paper's fabricated TPC-DI
  * datasets span 11–22 columns and 7.5–15k rows; this generator emits the
  * 22-column original at a configurable row count, and the fabricator does
  * the splitting.
  */
object TpcDiLite {

  /** Surrogate key column used by the fabricator for splits. */
  val idCol = "p_id"

  def prospect(spark: SparkSession, rows: Long = 2000, seed: Int = 101): DataFrame = {
    val id = col("id")
    spark.range(1, rows + 1).select(
      id.as(idCol),
      Gen.code(id, seed + 1, "AGY", 6, 500).as("agency_id"),
      Gen.pick(id, seed + 2, Gen.lastNames).as("last_name"),
      Gen.pick(id, seed + 3, Gen.firstNames).as("first_name"),
      upper(substring(Gen.pick(id, seed + 4, Gen.firstNames), 1, 1)).as("middle_initial"),
      Gen.pick(id, seed + 5, Seq("M", "F")).as("gender"),
      concat(Gen.int(id, seed + 6, 999).cast("string"), lit(" "),
        Gen.pick(id, seed + 7, Gen.streets)).as("address_line1"),
      Gen.pick(id, seed + 8, Seq("apt 1", "apt 2", "suite 10", "floor 3", "unit 7")).as("address_line2"),
      lpad(Gen.int(id, seed + 9, 99999).cast("string"), 5, "0").as("postal_code"),
      Gen.pick(id, seed + 10, Gen.cities).as("city"),
      Gen.pick(id, seed + 11, Seq("NH", "CA", "NY", "TX", "FL", "WA", "OR", "MA")).as("state"),
      Gen.pick(id, seed + 12, Gen.countries).as("country"),
      Gen.phone(id, seed + 13).as("phone"),
      Gen.gauss(id, seed + 14, 65000, 40000).as("income"),
      Gen.int(id, seed + 16, 4).as("number_cars"),
      Gen.int(id, seed + 17, 5).as("number_children"),
      Gen.pick(id, seed + 18, Seq("single", "married", "divorced", "widowed")).as("marital_status"),
      (Gen.int(id, seed + 19, 60) + 18).as("age"),
      Gen.pick(id, seed + 20, Seq("AAA", "AA", "A", "BBB", "BB", "B", "C")).as("credit_rating"),
      Gen.pick(id, seed + 21, Seq("own", "rent")).as("own_or_rent"),
      Gen.pick(id, seed + 22, Gen.departments.map(d => s"$d corp")).as("employer"),
      Gen.gauss(id, seed + 23, 250000, 200000).as("net_worth"),
    )
  }

  def ref(spark: SparkSession, rows: Long = 2000): TableRef =
    TableRef("tpcdi_prospect", prospect(spark, rows))
}
