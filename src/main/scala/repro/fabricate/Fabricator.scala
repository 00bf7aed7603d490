package repro.fabricate

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.core.{DatasetPair, GroundTruth, Scenario, TableRef}

/** Fabricates dataset pairs for the four relatedness scenarios of §III by
  * splitting a single source table (eTuner-style, §IV):
  *
  *  - unionable: horizontal split, varying row overlap, all columns shared
  *  - view-unionable: horizontal (zero row overlap) + vertical split
  *  - joinable: vertical split with varying column overlap, verbatim rows
  *  - semantically-joinable: joinable + instance noise on the target
  */
object Fabricator {

  /** Rename target columns with schema noise; returns (renamedDf, renames). */
  private def applySchemaNoise(
      table: String, df: DataFrame, enabled: Boolean, seed: Long,
  ): (DataFrame, Map[String, String]) = {
    if (!enabled) (df, df.columns.map(c => c -> c).toMap)
    else {
      val renames = SchemaNoise.renameMap(table, df.columns.toSeq, seed)
      val out = df.select(df.columns.map(c => col(s"`$c`").as(renames(c))).toIndexedSeq: _*)
      (out, renames)
    }
  }

  private def applyInstanceNoise(df: DataFrame, enabled: Boolean, seed: Long): DataFrame =
    if (enabled) Noise.noisyInstances(df, seed) else df

  /** Unionable pair: same columns, `rowOverlap` fraction of shared rows. */
  def unionable(
      ref: TableRef, idCol: String, rowOverlap: Double,
      noisySchema: Boolean, noisyInstances: Boolean, seed: Long = 7,
  ): DatasetPair = {
    val (a, b0) = Splitter.horizontal(ref.df, idCol, rowOverlap, seed)
    val b1 = applyInstanceNoise(b0, noisyInstances, seed + 1)
    val (b, renames) = applySchemaNoise(s"${ref.name}_b", b1, noisySchema, seed + 2)
    val gt = GroundTruth(ref.df.columns.map(c => c -> renames(c)).toSet)
    DatasetPair(
      s"${ref.name}/union_ro${pct(rowOverlap)}${suffix(noisySchema, noisyInstances)}",
      Scenario.Unionable,
      TableRef(s"${ref.name}_a", a), TableRef(s"${ref.name}_b", b),
      gt, noisySchema, noisyInstances)
  }

  /** View-unionable pair: zero row overlap, `colOverlap` of shared columns
    * (plus side-unique columns on each).
    */
  def viewUnionable(
      ref: TableRef, idCol: String, colOverlap: Double,
      noisySchema: Boolean, noisyInstances: Boolean, seed: Long = 11,
  ): DatasetPair = {
    val (a0, b0) = Splitter.horizontal(ref.df, idCol, 0.0, seed)
    val (uniqueA, shared, uniqueB) =
      Splitter.verticalPlan(ref.df.columns.toSeq, Seq(idCol), colOverlap, seed + 1)
    val a = Splitter.project(a0, uniqueA ++ shared)
    val bProj = Splitter.project(b0, shared ++ uniqueB)
    val b1 = applyInstanceNoise(bProj, noisyInstances, seed + 2)
    val (b, renames) = applySchemaNoise(s"${ref.name}_b", b1, noisySchema, seed + 3)
    val gt = GroundTruth(shared.map(c => c -> renames(c)).toSet)
    DatasetPair(
      s"${ref.name}/viewunion_co${pct(colOverlap)}${suffix(noisySchema, noisyInstances)}",
      Scenario.ViewUnionable,
      TableRef(s"${ref.name}_a", a), TableRef(s"${ref.name}_b", b),
      gt, noisySchema, noisyInstances)
  }

  /** Joinable pair: vertical split sharing the key plus `colOverlap` of the
    * other columns; `rowOverlap` of shared rows (1.0 = same rows); verbatim
    * instances (the "classical" join case).
    */
  def joinable(
      ref: TableRef, idCol: String, colOverlap: Double, rowOverlap: Double,
      noisySchema: Boolean, seed: Long = 13,
  ): DatasetPair =
    joinLike(ref, idCol, colOverlap, rowOverlap, noisySchema,
      noisyInstances = false, Scenario.Joinable, "join", seed)

  /** Semantically-joinable pair: joinable fabrication + instance noise, so
    * an equality join on the shared columns no longer reconstructs the
    * original table.
    */
  def semanticallyJoinable(
      ref: TableRef, idCol: String, colOverlap: Double, rowOverlap: Double,
      noisySchema: Boolean, seed: Long = 17,
  ): DatasetPair =
    joinLike(ref, idCol, colOverlap, rowOverlap, noisySchema,
      noisyInstances = true, Scenario.SemanticallyJoinable, "semjoin", seed)

  private def joinLike(
      ref: TableRef, idCol: String, colOverlap: Double, rowOverlap: Double,
      noisySchema: Boolean, noisyInstances: Boolean,
      scenario: Scenario, tag: String, seed: Long,
  ): DatasetPair = {
    val (a0, b0) =
      if (rowOverlap >= 1.0) (ref.df, ref.df)
      else Splitter.horizontal(ref.df, idCol, rowOverlap, seed)
    val (uniqueA, shared, uniqueB) =
      Splitter.verticalPlan(ref.df.columns.toSeq, Seq(idCol), colOverlap, seed + 1)
    val a = Splitter.project(a0, uniqueA ++ shared)
    val bProj = Splitter.project(b0, shared ++ uniqueB)
    val b1 = applyInstanceNoise(bProj, noisyInstances, seed + 2)
    val (b, renames) = applySchemaNoise(s"${ref.name}_b", b1, noisySchema, seed + 3)
    val gt = GroundTruth(shared.map(c => c -> renames(c)).toSet)
    DatasetPair(
      s"${ref.name}/${tag}_co${pct(colOverlap)}_ro${pct(rowOverlap)}${suffix(noisySchema, noisyInstances)}",
      scenario,
      TableRef(s"${ref.name}_a", a), TableRef(s"${ref.name}_b", b),
      gt, noisySchema, noisyInstances)
  }

  /** The standard variant battery Valentine fabricates per source, scaled
    * down from the paper's 180 pairs/source (see DESIGN.md "Scale-downs"):
    * every noise combination per scenario at one representative overlap.
    */
  def suite(ref: TableRef, idCol: String, seed: Long = 23): Seq[DatasetPair] = {
    val noiseCombos = Seq((false, false), (true, false), (false, true), (true, true))
    val unionables = noiseCombos.map { case (ns, ni) =>
      unionable(ref, idCol, rowOverlap = 0.5, ns, ni, seed)
    }
    val viewUnionables = noiseCombos.map { case (ns, ni) =>
      viewUnionable(ref, idCol, colOverlap = 0.5, ns, ni, seed + 1)
    }
    // Joinable/semantically-joinable: schema-noise on/off at two column
    // overlaps; instances verbatim vs noisy is what separates the scenarios.
    val joinables = for {
      ns <- Seq(false, true); co <- Seq(0.3, 0.7)
    } yield joinable(ref, idCol, co, rowOverlap = 0.5, ns, seed + 2)
    val semJoinables = for {
      ns <- Seq(false, true); co <- Seq(0.3, 0.7)
    } yield semanticallyJoinable(ref, idCol, co, rowOverlap = 0.5, ns, seed + 3)
    unionables ++ viewUnionables ++ joinables ++ semJoinables
  }

  private def pct(f: Double): String = s"${math.round(f * 100)}"
  private def suffix(ns: Boolean, ni: Boolean): String =
    (if (ns) "_nschema" else "") + (if (ni) "_ninst" else "")
}
