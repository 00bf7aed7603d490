package repro.data

import repro.SparkSpec
import repro.core.Scenario

class SourcesSpec extends SparkSpec {

  test("tpcdi prospect has 22 columns like the paper's upper bound") {
    val df = TpcDiLite.prospect(spark, 100)
    assert(df.columns.length == 22)
    assert(df.columns.contains(TpcDiLite.idCol))
    assert(df.count() == 100)
  }

  test("tpcdi generation is deterministic") {
    val a = TpcDiLite.prospect(spark, 50)
    val b = TpcDiLite.prospect(spark, 50)
    assert(a.exceptAll(b).count() == 0)
  }

  test("opendata table is wide (40+ columns) with mixed types") {
    val df = OpenDataLite.table(spark, 100)
    assert(df.columns.length >= 40)
    val types = df.schema.fields.map(_.dataType.simpleString).toSet
    assert(types.exists(_.startsWith("date")))
    assert(types.contains("string"))
    assert(types.exists(t => t == "int" || t == "double" || t == "bigint"))
  }

  test("chembl assays has ontology-aligned vocabulary in names, codes in values") {
    val df = ChemblLite.assays(spark, 100)
    assert(df.columns.length == 20)
    val ids = df.select("assay_chembl_id").collect().map(_.getString(0))
    assert(ids.forall(_.startsWith("CHEMBL")))
  }

  test("wikidata pairs cover all four scenarios") {
    val ps = WikiDataLite.pairs(spark, rows = 200)
    assert(ps.map(_.scenario).toSet == Scenario.all.toSet)
    assert(ps.size == 4)
  }

  test("wikidata variant renames the expected columns") {
    val ps = WikiDataLite.pairs(spark, rows = 150)
    val union = ps.find(_.scenario == Scenario.Unionable).get
    assert(union.target.df.columns.contains("spouse"))
    assert(!union.target.df.columns.contains("partner"))
    assert(union.groundTruth.pairs.contains("partner" -> "spouse"))
  }

  test("wikidata alternative encodings differ from base values") {
    val base = WikiDataLite.singers(spark, 50, alt = false)
    val alt = WikiDataLite.singers(spark, 50, alt = true)
    val b = base.select("artist_name").collect().map(_.getString(0)).toSet
    val a = alt.select("artist_name").collect().map(_.getString(0)).toSet
    assert((a -- b).nonEmpty) // middle names inserted
    val cit = alt.select("citizenship").distinct().collect().map(_.getString(0)).toSet
    assert(cit == Set("United States"))
  }

  test("wikidata joinable pair shares verbatim values on shared columns") {
    val join = WikiDataLite.pairs(spark, 200).find(_.scenario == Scenario.Joinable).get
    val shared = join.groundTruth.pairs.find(p => p._1 == p._2 || p._1 == "birth_place")
    assert(shared.nonEmpty)
  }

  test("magellan provides 7 unionable pairs with identical column names") {
    val ps = MagellanLite.pairs(spark, scale = 0.2)
    assert(ps.size == 7)
    assert(ps.forall(_.scenario == Scenario.Unionable))
    ps.foreach { p =>
      assert(p.groundTruth.pairs.forall { case (s, t) => s == t })
      assert(p.source.df.columns.toSet == p.target.df.columns.toSet)
    }
  }

  test("magellan sizes span 3-7 non-key columns") {
    val ps = MagellanLite.pairs(spark, scale = 0.2)
    val widths = ps.map(_.source.df.columns.length - 1)
    assert(widths.min >= 3 && widths.max <= 7)
  }

  test("magellan movies carries a multi-valued attribute") {
    val movies = MagellanLite.pairs(spark, 0.2).find(_.name.contains("movies")).get
    val actors = movies.source.df.select("actors").limit(5).collect().map(_.getString(0))
    assert(actors.forall(_.contains("|")))
  }

  test("ing1 has the paper's shape: 33x935 vs 16x972") {
    val p = IngLite.ing1(spark)
    assert(p.source.df.columns.length == 33)
    assert(p.target.df.columns.length == 16)
    assert(p.source.df.count() == 935)
    assert(p.target.df.count() == 972)
    assert(p.groundTruth.size == 16)
  }

  test("ing1 matching columns share values across the id overlap") {
    val p = IngLite.ing1(spark)
    val a = p.source.df.select("commit_hash").distinct()
    val b = p.target.df.select("commit_hash").distinct()
    assert(a.join(b, "commit_hash").count() > 500)
  }

  test("ing2 has the paper's shape: 59x1000 vs 25x1000 with 1-to-many GT") {
    val p = IngLite.ing2(spark)
    assert(p.source.df.columns.length == 59)
    assert(p.target.df.columns.length == 25)
    assert(p.groundTruth.size == 59)
    // Every narrow column matches at least 2 wide columns.
    val perNarrow = p.groundTruth.pairs.groupBy(_._2).view.mapValues(_.size)
    assert(perNarrow.values.forall(_ >= 2))
  }

  test("ing2 primary wide columns share exact values with the narrow table") {
    val p = IngLite.ing2(spark)
    val a = p.source.df.select("application_name").distinct().toDF("v")
    val b = p.target.df.select("application_nm").distinct().toDF("v")
    val inter = a.join(b, "v").count()
    assert(inter > a.count() / 2)
  }

  test("ing2 secondary wide columns share distribution but few values") {
    val p = IngLite.ing2(spark)
    val a = p.source.df.select("app_alias").distinct().toDF("v")
    val b = p.target.df.select("application_nm").distinct().toDF("v")
    // Codes come from a 400-value space: different seeds -> sparse overlap.
    assert(a.join(b, "v").count() < a.count() / 2)
  }
}
