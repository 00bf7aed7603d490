package repro.matchers.embdi

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import scala.collection.mutable
import scala.util.hashing.MurmurHash3
import repro.core._
import repro.embed.Word2Vec

/** EmbDI [Cappuzzo, Papotti, Thirumuruganathan — SIGMOD'20], hybrid.
  *
  * Builds *local* relational embeddings from scratch (no pre-trained model):
  * the two tables are compiled into a tripartite graph of record ids, column
  * ids and value tokens (values shared across tables bridge the graph);
  * seeded random walks over the graph form sentences; a skip-gram model
  * ([[repro.embed.Word2Vec]], our gensim substitute) is trained on them; and
  * columns are matched by cosine similarity of their column-node embeddings.
  *
  * Table II parameters: training algorithm word2vec, sentence_length 60,
  * window_size 3, n_dimensions 300 (scaled to 64 here — DESIGN.md).
  * Walk counts and row caps are scaled for driver-side training; the
  * method's characteristic costs (walk generation, embedding training) and
  * behaviours (dependence on overlapping instances, randomness in training
  * data) are preserved.
  */
final case class EmbDI(
    sentenceLength: Int = 60,
    windowSize: Int = 3,
    nDimensions: Int = 64,
    rowCap: Int = 200,
    walksPerColumn: Int = 30,
    walksPerRow: Int = 1,
    epochs: Int = 5, // gensim's default — EmbDI trains its word2vec fully
    seed: Long = 42,
    walkBudget: Int = 800,
) extends Matcher {

  override val name: String = s"EmbDI(w2v,len=$sentenceLength,win=$windowSize,dim=$nDimensions)"
  override val family: String = "EmbDI"
  override val matchTypes: Set[MatchType] = Set(MatchType.Embeddings)

  private def cidToken(table: String, col: String) = s"cid__${table}__$col"
  private def ridToken(table: String, i: Int) = s"rid__${table}__$i"
  private def valueToken(v: String) = s"tt__${v.trim.toLowerCase}"

  /** Deterministically sampled rows as string cells (null-safe). */
  private def sampleRows(t: TableData): Seq[Seq[Option[String]]] = {
    val cols = t.columns
    val strCols = cols.map(c => col(s"`$c`").cast("string"))
    val ordered = t.df
      .select(strCols.toIndexedSeq: _*)
      .withColumn("__h", hash(cols.map(c => col(s"`$c`")).toIndexedSeq: _*))
      .orderBy(col("__h"))
      .drop("__h")
      .limit(rowCap)
    ordered.collect().toSeq.map(r => cols.indices.map(i => Option(r.getString(i))))
  }

  override def matchColumns(spark: SparkSession, src: TableData, tgt: TableData): Seq[ScoredMatch] = {
    // --- graph construction ------------------------------------------------
    val adj = mutable.HashMap[String, mutable.ArrayBuffer[String]]()
    def addEdge(a: String, b: String): Unit = {
      adj.getOrElseUpdate(a, mutable.ArrayBuffer()) += b
      adj.getOrElseUpdate(b, mutable.ArrayBuffer()) += a
    }
    def ingest(t: TableData): Unit = {
      val rows = sampleRows(t)
      rows.zipWithIndex.foreach { case (cells, i) =>
        val rid = ridToken(t.name, i)
        t.columns.zip(cells).foreach {
          case (c, Some(v)) if v.nonEmpty =>
            val vt = valueToken(v)
            addEdge(rid, vt)
            addEdge(cidToken(t.name, c), vt)
          case _ => ()
        }
      }
    }
    ingest(src); ingest(tgt)
    if (adj.isEmpty) return Seq.empty

    // --- random walks ------------------------------------------------------
    val sentences = mutable.ArrayBuffer[Array[String]]()
    def walk(start: String, walkSeed: Int): Array[String] = {
      val rng = new scala.util.Random(MurmurHash3.mix(seed.toInt, walkSeed))
      val sent = new Array[String](sentenceLength)
      var cur = start
      var i = 0
      while (i < sentenceLength) {
        sent(i) = cur
        val ns = adj(cur)
        cur = ns(rng.nextInt(ns.size))
        i += 1
      }
      sent
    }
    val cids = (src.columns.map(cidToken(src.name, _)) ++ tgt.columns.map(cidToken(tgt.name, _)))
      .filter(adj.contains)
    // EmbDI generates a fixed walk corpus; per-column coverage thins out as
    // the schema widens — the source of its degradation on wide tables.
    val perColumn = math.min(walksPerColumn, math.max(3, walkBudget / math.max(1, cids.size)))
    cids.zipWithIndex.foreach { case (c, ci) =>
      (0 until perColumn).foreach(w => sentences += walk(c, ci * 1000 + w))
    }
    val rids = adj.keys.filter(_.startsWith("rid__")).toSeq.sorted
    rids.zipWithIndex.foreach { case (r, ri) =>
      (0 until walksPerRow).foreach(w => sentences += walk(r, 7_000_000 + ri * 10 + w))
    }

    // --- embedding training ------------------------------------------------
    val w2v = new Word2Vec(
      dim = nDimensions, window = windowSize, negatives = 5,
      epochs = epochs, seed = seed)
    val vectors = w2v.train(sentences.toSeq)

    // --- column similarity -------------------------------------------------
    val ms = for {
      sc <- src.columns
      tc <- tgt.columns
    } yield {
      val score = (vectors.get(cidToken(src.name, sc)), vectors.get(cidToken(tgt.name, tc))) match {
        case (Some(a), Some(b)) => (1.0 + Word2Vec.cosine(a, b)) / 2.0
        case _                  => 0.0
      }
      ScoredMatch(sc, tc, score)
    }
    Matcher.ranked(ms)
  }
}

object EmbDI {
  /** Table II: one fixed configuration (word2vec, 60, 3, 300→64). */
  def grid: Seq[EmbDI] = Seq(EmbDI())
  def default: EmbDI = EmbDI()
}
