package repro.integration

import repro.SparkSpec
import repro.core._
import repro.data._
import repro.fabricate.Fabricator
import repro.matchers.JaccardLevenshtein
import repro.matchers.coma.Coma
import repro.matchers.cupid.Cupid
import repro.matchers.dist.DistributionBased
import repro.matchers.embdi.EmbDI
import repro.matchers.semprop.SemProp
import repro.matchers.simflood.SimilarityFlooding

/** End-to-end sanity: every matcher runs over fabricated pairs from every
  * source and behaves per the paper's qualitative expectations.
  */
class EndToEndSpec extends SparkSpec {

  private val cap = 40
  private lazy val tpcdi = TpcDiLite.ref(spark, rows = 250)

  private def recall(pair: DatasetPair, m: Matcher): Double =
    Runner.runPair(spark, pair, Seq(m), cap).head.recall

  test("schema-based methods are accurate on verbatim schemata (paper §VII-A1)") {
    val p = Fabricator.unionable(tpcdi, TpcDiLite.idCol, 0.5, noisySchema = false, noisyInstances = false)
    assert(recall(p, Coma.schemaBased) == 1.0)
    assert(recall(p, Cupid.default) >= 0.9)
    assert(recall(p, SimilarityFlooding.default) >= 0.9)
  }

  test("schema-based methods degrade under noisy schemata") {
    val clean = Fabricator.unionable(tpcdi, TpcDiLite.idCol, 0.5, noisySchema = false, noisyInstances = false)
    val noisy = Fabricator.unionable(tpcdi, TpcDiLite.idCol, 0.5, noisySchema = true, noisyInstances = false)
    assert(recall(noisy, Coma.schemaBased) < recall(clean, Coma.schemaBased))
  }

  test("instance-based methods are effective on joinable pairs (paper §VII-A2)") {
    val p = Fabricator.joinable(tpcdi, TpcDiLite.idCol, 0.5, 0.5, noisySchema = true)
    assert(recall(p, Coma.instanceBased) >= 0.5)
    assert(recall(p, JaccardLevenshtein(0.8)) >= 0.5)
  }

  test("view-unionable is harder than unionable for instance-based methods") {
    val u = Fabricator.unionable(tpcdi, TpcDiLite.idCol, 0.5, noisySchema = true, noisyInstances = false)
    val v = Fabricator.viewUnionable(tpcdi, TpcDiLite.idCol, 0.5, noisySchema = true, noisyInstances = false)
    assert(recall(v, JaccardLevenshtein(0.8)) <= recall(u, JaccardLevenshtein(0.8)) + 1e-9)
  }

  test("semantically-joinable is harder than joinable for instance-based methods") {
    val j = Fabricator.joinable(tpcdi, TpcDiLite.idCol, 0.5, 0.5, noisySchema = true)
    val s = Fabricator.semanticallyJoinable(tpcdi, TpcDiLite.idCol, 0.5, 0.5, noisySchema = true)
    assert(recall(s, JaccardLevenshtein(0.9)) <= recall(j, JaccardLevenshtein(0.9)) + 1e-9)
  }

  test("every matcher completes on an opendata fabricated pair") {
    val od = OpenDataLite.ref(spark, rows = 200)
    val p = Fabricator.viewUnionable(od, OpenDataLite.idCol, 0.5, noisySchema = true, noisyInstances = true)
    val fast = EmbDI(sentenceLength = 15, nDimensions = 16, rowCap = 50, walksPerColumn = 5)
    val ms = Seq(Cupid.default, SimilarityFlooding.default, Coma.schemaBased,
      Coma.instanceBased, DistributionBased.default, JaccardLevenshtein(0.6), fast)
    val rs = Runner.runPair(spark, p, ms, cap)
    assert(rs.size == ms.size)
    rs.foreach(r => assert(r.recall >= 0.0 && r.recall <= 1.0))
  }

  test("semprop runs on the chembl source and stays weak (paper §VII-A3)") {
    val ch = ChemblLite.ref(spark, rows = 200)
    val p = Fabricator.unionable(ch, ChemblLite.idCol, 0.5, noisySchema = true, noisyInstances = false)
    val r = recall(p, SemProp.default)
    assert(r >= 0.0 && r <= 1.0)
  }

  test("wikidata joinable: instance-based methods find all matches (paper §VII-B1)") {
    val join = WikiDataLite.pairs(spark, rows = 250).find(_.scenario == Scenario.Joinable).get
    assert(recall(join, Coma.instanceBased) >= 0.8)
    assert(recall(join, JaccardLevenshtein(0.8)) >= 0.8)
  }

  test("magellan: schema-based methods are perfect (identical names, paper §VII-B2)") {
    val p = MagellanLite.pairs(spark, scale = 0.15).head
    assert(recall(p, Coma.schemaBased) == 1.0)
    assert(recall(p, Cupid.default) == 1.0)
    assert(recall(p, SimilarityFlooding.default) == 1.0)
  }

  test("ing2: distribution-based beats COMA on 1-to-many ground truth (paper §VII-B3)") {
    val p = IngLite.ing2(spark)
    val dist = recall(p, DistributionBased(0.3, 0.3))
    val coma = recall(p, Coma.instanceBased)
    assert(dist > coma, s"dist=$dist coma=$coma")
  }
}
