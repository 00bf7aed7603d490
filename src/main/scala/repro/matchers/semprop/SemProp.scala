package repro.matchers.semprop

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.embed.PretrainedEmbeddings
import repro.minhash.MinHash

/** SemProp [Fernandez, Mansour et al. — ICDE'18], hybrid (part of Aurum).
  *
  * A *semantic matcher* links attribute names to ontology classes through
  * pre-trained word embeddings (substituted by
  * [[repro.embed.PretrainedEmbeddings]]; see DESIGN.md) and relates two
  * attributes transitively when they link to the same class; a link only
  * counts when the attribute's sampled values are semantically *coherent*
  * (average pairwise embedding cosine clears `cohSemThreshold`). Attribute
  * pairs the semantic matcher cannot relate fall through to a *syntactic
  * matcher*: MinHash-estimated value-set Jaccard against `minhThreshold`.
  *
  * @param minhThreshold   syntactic MinHash Jaccard acceptance (Table II)
  * @param semThreshold    name-to-class embedding cosine acceptance
  * @param cohSemThreshold value-coherence gate for semantic links
  */
final case class SemProp(
    minhThreshold: Double,
    semThreshold: Double,
    cohSemThreshold: Double,
    ontology: Ontology = Ontology.chemblLite,
) extends Matcher {

  override val name: String =
    f"SemProp(minh=$minhThreshold%.1f,sem=$semThreshold%.1f,coh=$cohSemThreshold%.1f)"
  override val family: String = "SemProp"
  override val matchTypes: Set[MatchType] =
    Set(MatchType.AttributeOverlap, MatchType.ValueOverlap, MatchType.Embeddings)

  private val classVectors: Seq[(String, Array[Double])] =
    ontology.classes.map(c => c.name -> PretrainedEmbeddings.phraseVector(c.labels.mkString(" ")))

  /** Best ontology class for an attribute name, if above `semThreshold`. */
  def linkToClass(attr: String): Option[(String, Double)] = {
    val v = PretrainedEmbeddings.phraseVector(attr)
    val scored = classVectors.map { case (n, cv) => (n, PretrainedEmbeddings.cosine(v, cv)) }
    scored.maxByOption(_._2).filter(_._2 >= semThreshold)
  }

  /** Semantic coherence of a column's sampled values: mean pairwise cosine
    * of value embeddings (capped sample for O(k²) driver cost). This is the
    * instance-heavy part of SemProp — it embeds data values, not just names.
    */
  def coherence(values: Seq[String]): Double = {
    val vs = values.take(60).map(PretrainedEmbeddings.phraseVector)
    if (vs.size < 2) return 0.0
    val sims = for (i <- vs.indices; j <- i + 1 until vs.size)
      yield PretrainedEmbeddings.cosine(vs(i), vs(j))
    sims.sum / sims.size
  }

  override def matchColumns(spark: SparkSession, src: TableData, tgt: TableData): Seq[ScoredMatch] = {
    def semanticLinks(t: TableData): Map[String, (String, Double)] =
      t.columns.flatMap { c =>
        linkToClass(c) match {
          case Some(link) if coherence(t.profile(c).sample) >= cohSemThreshold => Some(c -> link)
          case _ => None
        }
      }.toMap

    val srcLinks = semanticLinks(src)
    val tgtLinks = semanticLinks(tgt)

    // Semantic stage: same-class attributes match; scores land in [0.5, 1].
    val semantic = for {
      (sc, (cls1, s1)) <- srcLinks.toSeq
      (tc, (cls2, s2)) <- tgtLinks.toSeq if cls1 == cls2
    } yield ScoredMatch(sc, tc, 0.5 + 0.5 * (s1 + s2) / 2.0)
    val covered = semantic.map(m => (m.srcCol, m.tgtCol)).toSet

    // Syntactic stage: MinHash-estimated Jaccard for the leftovers. Aurum's
    // syntactic matcher emits *relations* (graph edges), not calibrated
    // rankings, so qualifying pairs land in a flat band below the semantic
    // ones with hash-jittered tie order — the ranked-list adaptation of §VI.
    // This set-not-ranking output is why SemProp's Recall@k is low.
    def jitter(sc: String, tc: String): Double =
      ((scala.util.hashing.MurmurHash3.stringHash(s"$sc→$tc") & 0xffff).toDouble / 0xffff) * 0.2
    val syntactic = for {
      sc <- src.columns
      tc <- tgt.columns if !covered.contains((sc, tc))
      est = MinHash.estimate(src.profile(sc).minhash, tgt.profile(tc).minhash)
      if est >= minhThreshold
    } yield ScoredMatch(sc, tc, 0.05 + jitter(sc, tc))

    Matcher.ranked(semantic ++ syntactic)
  }
}

object SemProp {
  /** Table II grid: minh in [0.2, 0.3] step 0.1; sem in [0.4, 0.6] step 0.1;
    * coherence in [0.2, 0.4] step 0.2.
    */
  def grid: Seq[SemProp] = for {
    minh <- Seq(0.2, 0.3)
    sem  <- Seq(0.4, 0.5, 0.6)
    coh  <- Seq(0.2, 0.4)
  } yield SemProp(minh, sem, coh)

  def default: SemProp = SemProp(0.2, 0.5, 0.2)
}
