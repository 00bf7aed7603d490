package repro.embed

import scala.collection.mutable
import scala.util.hashing.MurmurHash3

/** From-scratch skip-gram word2vec with negative sampling — the offline
  * substitute for gensim that EmbDI trains its *local* relational embeddings
  * with. Deterministic in (corpus, seed).
  *
  * @param dim       embedding dimensionality (EmbDI uses 300; we default to a
  *                  driver-friendly size, see DESIGN.md scale-downs)
  * @param window    symmetric context window (Table II: 3)
  * @param negatives negative samples per positive pair
  * @param epochs    passes over the corpus
  */
final class Word2Vec(
    val dim: Int = 64,
    val window: Int = 3,
    val negatives: Int = 5,
    val epochs: Int = 3,
    val learningRate: Double = 0.05,
    val seed: Long = 42,
) {

  /** Train on sentences (token arrays); returns token -> input vector. */
  def train(sentences: Seq[Array[String]]): Map[String, Array[Float]] = {
    val counts = mutable.LinkedHashMap[String, Int]()
    sentences.foreach(_.foreach(t => counts.update(t, counts.getOrElse(t, 0) + 1)))
    val vocab = counts.keys.toArray
    if (vocab.isEmpty) return Map.empty
    val index = vocab.zipWithIndex.toMap
    val v = vocab.length

    // Unigram^0.75 negative-sampling table.
    val table = {
      val weights = vocab.map(w => math.pow(counts(w).toDouble, 0.75))
      val total = weights.sum
      val size = math.min(1 << 18, math.max(v * 8, 1024))
      val t = new Array[Int](size)
      var wi = 0; var acc = weights(0) / total
      var i = 0
      while (i < size) {
        t(i) = wi
        if (i.toDouble / size > acc && wi < v - 1) { wi += 1; acc += weights(wi) / total }
        i += 1
      }
      t
    }

    val rng = new scala.util.Random(MurmurHash3.mix(seed.toInt, 0x3c6e))
    val in = Array.fill(v * dim)((rng.nextFloat() - 0.5f) / dim)
    val out = new Array[Float](v * dim)
    var alpha = learningRate.toFloat

    val encoded = sentences.map(_.map(index)).toArray
    var epoch = 0
    while (epoch < epochs) {
      var si = 0
      while (si < encoded.length) {
        val sent = encoded(si)
        var pos = 0
        while (pos < sent.length) {
          val center = sent(pos)
          val cBase = center * dim
          var off = -window
          while (off <= window) {
            val p = pos + off
            if (off != 0 && p >= 0 && p < sent.length) {
              val context = sent(p)
              // One positive + `negatives` negative updates on `context`'s row.
              var k = 0
              val grad = new Array[Float](dim)
              while (k <= negatives) {
                val (tgt, label) =
                  if (k == 0) (context, 1.0f)
                  else (table(rng.nextInt(table.length)), 0.0f)
                if (k == 0 || tgt != context) {
                  val tBase = tgt * dim
                  var dot = 0.0f
                  var i = 0
                  while (i < dim) { dot += in(cBase + i) * out(tBase + i); i += 1 }
                  val g = (label - sigmoid(dot)) * alpha
                  i = 0
                  while (i < dim) {
                    grad(i) += g * out(tBase + i)
                    out(tBase + i) += g * in(cBase + i)
                    i += 1
                  }
                }
                k += 1
              }
              var i = 0
              while (i < dim) { in(cBase + i) += grad(i); i += 1 }
            }
            off += 1
          }
          pos += 1
        }
        si += 1
      }
      alpha = math.max(alpha * 0.7f, (learningRate * 0.05).toFloat)
      epoch += 1
    }

    vocab.zipWithIndex.map { case (w, i) =>
      w -> java.util.Arrays.copyOfRange(in, i * dim, (i + 1) * dim)
    }.toMap
  }

  private def sigmoid(x: Float): Float = {
    val c = math.max(-8f, math.min(8f, x))
    (1.0 / (1.0 + math.exp(-c))).toFloat
  }
}

object Word2Vec {
  /** Cosine similarity of two float vectors. */
  def cosine(a: Array[Float], b: Array[Float]): Double = {
    var dot = 0.0; var na = 0.0; var nb = 0.0
    var i = 0
    while (i < a.length) { dot += a(i) * b(i); na += a(i) * a(i); nb += b(i) * b(i); i += 1 }
    if (na == 0 || nb == 0) 0.0 else dot / math.sqrt(na * nb)
  }
}
