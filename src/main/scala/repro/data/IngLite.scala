package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core._

/** Synthetic stand-in for the two proprietary ING Bank pairs (§V-B), which
  * cannot be published; these generators mimic the structural properties the
  * paper describes so the same matcher behaviours are exercised:
  *
  *  - ING#1 (SCRUM backlogs, 33×935 vs 16×972): matching columns have
  *    identical or very similar names; values are hashes, descriptions and
  *    words reused across contexts (false-positive bait); matching columns
  *    share near-identical value distributions.
  *  - ING#2 (application inventory, 59×1000 vs 25×1000): the small table's
  *    column names carry suffixes (_nm, _cd, …); the ground truth maps each
  *    small-table column to *multiple* wide-table columns (1-to-many);
  *    matching columns draw from the same pools — instances "even more
  *    similar than ING#1" — but only one wide column per concept shares the
  *    exact values, the others only the distribution.
  */
object IngLite {

  // ---- ING#1 ---------------------------------------------------------------

  /** (A column, B column, generator) — same generator+seed on both sides so
    * distributions align and values overlap across the id ranges.
    */
  private def ing1Concepts(seed: Int): Seq[(String, String, Column => Column)] = Seq(
    ("sprint_id", "sprint_id", id => Gen.code(id, seed + 1, "SPR", 4, 120)),
    ("sprint_title", "sprint_name", id => concat(lit("sprint "), Gen.pick(id, seed + 2, Gen.words))),
    ("team_id", "team_id", id => Gen.code(id, seed + 3, "TEAM", 3, 40)),
    ("owner_team", "owner_team", id => concat(Gen.pick(id, seed + 4, Gen.words), lit(" squad"))),
    ("epic_name", "epic_name", id => concat(lit("epic "), Gen.pick(id, seed + 5, Gen.words), lit(" "), Gen.pick(id, seed + 6, Gen.words))),
    ("task_id", "task_id", id => Gen.code(id, seed + 7, "TASK", 6, 90000)),
    ("task_description", "task_summary", id => concat(lit("fix "), Gen.pick(id, seed + 8, Gen.words), lit(" in "), Gen.pick(id, seed + 9, Gen.words))),
    ("story_points", "story_points", id => Gen.pick(id, seed + 10, Seq("1", "2", "3", "5", "8", "13")).cast("int")),
    ("status", "task_status", id => Gen.pick(id, seed + 11, Seq("todo", "in progress", "review", "done", "blocked"))),
    ("start_date", "start_date", id => Gen.date(id, seed + 12, 900)),
    ("end_date", "end_date", id => Gen.date(id, seed + 13, 1000)),
    ("created_by", "created_by", id => concat(Gen.pick(id, seed + 14, Gen.firstNames), lit("."), Gen.pick(id, seed + 15, Gen.lastNames))),
    ("commit_hash", "commit_hash", id => Gen.hex(id, seed + 16, 12)),
    ("board_id", "board_id", id => Gen.code(id, seed + 17, "BRD", 3, 25)),
    ("project_key", "project_key", id => Gen.code(id, seed + 18, "PRJ", 3, 30)),
    ("hours_spent", "time_spent", id => Gen.int(id, seed + 19, 80)),
  )

  /** Extra wide-table columns: same kinds of values in other contexts. */
  private def ing1Extras(seed: Int): Seq[(String, Column => Column)] = Seq(
    ("release_hash", id => Gen.hex(id, seed + 30, 12)),
    ("review_hash", id => Gen.hex(id, seed + 31, 12)),
    ("epic_description", id => concat(lit("improve "), Gen.pick(id, seed + 32, Gen.words), lit(" for "), Gen.pick(id, seed + 33, Gen.words))),
    ("subtask_count", id => Gen.int(id, seed + 34, 12)),
    ("blocked_flag", id => Gen.pick(id, seed + 35, Seq("Y", "N"))),
    ("priority", id => Gen.pick(id, seed + 36, Seq("low", "medium", "high", "urgent"))),
    ("assignee", id => concat(Gen.pick(id, seed + 37, Gen.firstNames), lit("."), Gen.pick(id, seed + 38, Gen.lastNames))),
    ("reporter", id => concat(Gen.pick(id, seed + 39, Gen.firstNames), lit("."), Gen.pick(id, seed + 40, Gen.lastNames))),
    ("resolution", id => Gen.pick(id, seed + 41, Seq("fixed", "wontfix", "duplicate", "open"))),
    ("environment", id => Gen.pick(id, seed + 42, Seq("dev", "test", "acc", "prod"))),
    ("component", id => Gen.pick(id, seed + 43, Gen.words)),
    ("sprint_goal", id => concat(lit("deliver "), Gen.pick(id, seed + 44, Gen.words))),
    ("velocity", id => Gen.int(id, seed + 45, 60)),
    ("capacity", id => Gen.int(id, seed + 46, 100)),
    ("retro_notes", id => concat(lit("went well: "), Gen.pick(id, seed + 47, Gen.words))),
    ("updated_at", id => Gen.date(id, seed + 48, 1100)),
    ("closed_at", id => Gen.date(id, seed + 49, 1200)),
  )

  /** ING#1 pair: 33×935 wide table vs 16×972 narrow table. */
  def ing1(spark: SparkSession, seed: Int = 606): DatasetPair = {
    val concepts = ing1Concepts(seed)
    val extras = ing1Extras(seed)
    val id = col("id")
    val wide = spark.range(1, 936).select(
      (concepts.map { case (a, _, g) => g(id).as(a) } ++
        extras.map { case (n, g) => g(id).as(n) }).toIndexedSeq: _*)
    // Narrow table over an overlapping id range: high value overlap, near-
    // identical distributions (the paper's "almost-identical values").
    val narrow = spark.range(30, 1002).select(
      concepts.map { case (_, b, g) => g(id).as(b) }.toIndexedSeq: _*)
    DatasetPair("ing/ing1", Scenario.Unionable,
      TableRef("ing1_wide", wide), TableRef("ing1_narrow", narrow),
      GroundTruth(concepts.map { case (a, b, _) => a -> b }.toSet),
      noisySchema = false, noisyInstances = false)
  }

  // ---- ING#2 ---------------------------------------------------------------

  /** A concept: the narrow-table column plus the wide-table columns it
    * matches. The first wide column shares the narrow column's exact seed
    * (value overlap); the rest share only the generator (distribution
    * overlap) — "almost-identical values, very similar distributions".
    */
  private final case class Concept(bCol: String, aCols: Seq[String], gen: (Column, Int) => Column, poolSeed: Int)

  private def ing2Concepts(seed: Int): Seq[Concept] = {
    def app(id: Column, s: Int) = concat(Gen.pick(id, s, Gen.words), lit("-"), Gen.code(id, s + 1, "APP", 3, 400))
    def team(id: Column, s: Int) = concat(Gen.pick(id, s, Gen.words), lit(" team"))
    def person(id: Column, s: Int) = concat(Gen.pick(id, s, Gen.firstNames), lit(" "), Gen.pick(id, s + 1, Gen.lastNames))
    def dept(id: Column, s: Int) = Gen.pick(id, s, Gen.departments)
    def hw(id: Column, s: Int) = Gen.pick(id, s, Seq("x86 server", "mainframe", "vm cluster", "container", "appliance"))
    def os(id: Column, s: Int) = Gen.pick(id, s, Seq("rhel 7", "rhel 8", "windows 2016", "windows 2019", "aix", "zos"))
    def ver(id: Column, s: Int) = concat(Gen.int(id, s, 9).cast("string"), lit("."), Gen.int(id, s + 1, 20).cast("string"))
    def status(id: Column, s: Int) = Gen.pick(id, s, Seq("active", "deprecated", "planned", "retired"))
    def crit(id: Column, s: Int) = Gen.pick(id, s, Seq("mission critical", "business critical", "standard", "low"))
    def loc(id: Column, s: Int) = Gen.pick(id, s, Gen.cities)
    def vendor(id: Column, s: Int) = Gen.pick(id, s, Seq("ibm", "oracle", "sap", "microsoft", "internal", "redhat"))
    def cost(id: Column, s: Int) = Gen.money(id, s, 300000)
    def dt(id: Column, s: Int) = Gen.date(id, s, 2500).cast("string")
    def env(id: Column, s: Int) = Gen.pick(id, s, Seq("dev", "test", "acceptance", "production"))
    def flag(id: Column, s: Int) = Gen.pick(id, s, Seq("Y", "N"))
    def mail(id: Column, s: Int) = concat(Gen.pick(id, s, Gen.firstNames), lit("."), Gen.pick(id, s + 1, Gen.lastNames), lit("@bank.example"))
    def note(id: Column, s: Int) = concat(lit("see "), Gen.pick(id, s, Gen.words), lit(" "), Gen.code(id, s + 1, "DOC", 4, 3000))
    def compliance(id: Column, s: Int) = Gen.pick(id, s, Seq("sox", "gdpr", "pci", "none"))
    def license(id: Column, s: Int) = Gen.pick(id, s, Seq("perpetual", "subscription", "open source"))
    def dc(id: Column, s: Int) = Gen.code(id, s, "DC", 2, 8)

    Seq(
      Concept("application_nm", Seq("application_name", "app_alias", "app_short_name"), app, seed + 100),
      Concept("owner_team_cd", Seq("owner_team", "responsible_team", "support_group"), team, seed + 110),
      Concept("manager_nm", Seq("manager_name", "delivery_manager", "product_owner"), person, seed + 120),
      Concept("department_cd", Seq("department", "business_unit", "org_unit"), dept, seed + 130),
      Concept("hardware_typ", Seq("hardware_type", "platform_class"), hw, seed + 140),
      Concept("os_nm", Seq("operating_system", "os_version_base"), os, seed + 150),
      Concept("version_txt", Seq("app_version", "release_version"), ver, seed + 160),
      Concept("status_cd", Seq("lifecycle_status", "operational_status"), status, seed + 170),
      Concept("criticality_cd", Seq("criticality", "business_impact"), crit, seed + 180),
      Concept("location_cd", Seq("location", "site_city"), loc, seed + 190),
      Concept("vendor_nm", Seq("vendor", "supplier_name", "maintainer"), vendor, seed + 200),
      Concept("cost_amt", Seq("annual_cost", "run_cost"), cost, seed + 210),
      Concept("install_dt", Seq("install_date", "go_live_date"), dt, seed + 220),
      Concept("decom_dt", Seq("decommission_date", "end_of_life_date"), dt, seed + 230),
      Concept("support_team_nm", Seq("support_team", "ops_team", "oncall_team"), team, seed + 240),
      Concept("env_cd", Seq("environment", "deployment_env"), env, seed + 250),
      Concept("uses_app_nm", Seq("uses_application", "upstream_app", "depends_on_app"), app, seed + 260),
      Concept("used_by_app_nm", Seq("used_by_application", "downstream_app", "consumer_app"), app, seed + 270),
      Concept("datacenter_cd", Seq("datacenter", "dc_code", "hosting_site"), dc, seed + 280),
      Concept("backup_flg", Seq("backup_enabled", "dr_enabled"), flag, seed + 290),
      Concept("compliance_cd", Seq("compliance_scope", "regulatory_scope"), compliance, seed + 300),
      Concept("license_typ", Seq("license_type", "license_model"), license, seed + 310),
      Concept("contact_mail", Seq("contact_email", "escalation_email"), mail, seed + 320),
      Concept("review_dt", Seq("last_review_date", "next_review_date"), dt, seed + 330),
      Concept("notes_txt", Seq("notes", "remarks_text"), note, seed + 340),
    )
  }

  /** ING#2 pair: the 59-column wide table vs the 25-column business view.
    * Ground truth is 1-to-many: every narrow column matches all of its
    * concept's wide columns (59 pairs).
    */
  def ing2(spark: SparkSession, seed: Int = 707): DatasetPair = {
    val concepts = ing2Concepts(seed)
    val id = col("id")
    val wideCols = concepts.flatMap { c =>
      c.aCols.zipWithIndex.map { case (a, k) =>
        // k=0 shares the narrow column's seed (value overlap); k>0 same
        // generator, shifted seed (distribution overlap only).
        c.gen(id, c.poolSeed + k * 1000).as(a)
      }
    }
    val wide = spark.range(1, 1001).select(wideCols.toIndexedSeq: _*)
    val narrow = spark.range(1, 1001).select(
      concepts.map(c => c.gen(id, c.poolSeed).as(c.bCol)).toIndexedSeq: _*)
    val gt = concepts.flatMap(c => c.aCols.map(a => a -> c.bCol)).toSet
    DatasetPair("ing/ing2", Scenario.Unionable,
      TableRef("ing2_wide", wide), TableRef("ing2_narrow", narrow),
      GroundTruth(gt), noisySchema = true, noisyInstances = false)
  }

  def pairs(spark: SparkSession): Seq[DatasetPair] = Seq(ing1(spark), ing2(spark))
}
