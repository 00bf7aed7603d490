package repro.embed

import scala.util.hashing.MurmurHash3
import repro.text.{Thesaurus, Tokenizer}

/** Offline stand-in for pre-trained word2vec/GloVe vectors (SemProp's
  * dependency).
  *
  * Behaviourally faithful substitution: words in the same synonym group share
  * a base vector plus a small per-word jitter (high cosine, like distributed
  * representations of common English); words outside the thesaurus —
  * including domain-specific identifiers such as ChEMBL codes — get
  * hash-seeded random vectors that are near-orthogonal to everything, which
  * reproduces the paper's finding that pre-trained embeddings "cannot help
  * when the data domain is too specific".
  */
object PretrainedEmbeddings {

  /** Embedding dimensionality (paper methods use 300; scaled for driver). */
  val Dim = 50

  private val cache = new java.util.concurrent.ConcurrentHashMap[String, Array[Double]]()

  private def gaussianVector(key: String, salt: Int): Array[Double] = {
    val rng = new scala.util.Random(MurmurHash3.stringHash(key, salt))
    Array.fill(Dim)(rng.nextGaussian())
  }

  /** Vector for a single lowercase token. */
  def vector(word: String): Array[Double] = {
    val w = word.toLowerCase
    cache.computeIfAbsent(w, { _ =>
      val canon = Thesaurus.canonical(w)
      val base = gaussianVector(canon, 0x5eed)
      val jitter = gaussianVector(w, 0x7e57)
      val v = Array.tabulate(Dim)(i => base(i) + 0.15 * jitter(i))
      normalize(v)
    })
  }

  /** Phrase vector: normalized mean of token vectors (empty -> zero). */
  def phraseVector(phrase: String): Array[Double] = {
    val ts = Tokenizer.tokensWithDigits(phrase)
    if (ts.isEmpty) return new Array[Double](Dim)
    val acc = new Array[Double](Dim)
    ts.foreach { t =>
      val v = vector(t)
      var i = 0; while (i < Dim) { acc(i) += v(i); i += 1 }
    }
    normalize(acc)
  }

  /** Cosine similarity of two vectors (0 when either is zero). */
  def cosine(a: Array[Double], b: Array[Double]): Double = {
    var dot = 0.0; var na = 0.0; var nb = 0.0
    var i = 0
    while (i < a.length) { dot += a(i) * b(i); na += a(i) * a(i); nb += b(i) * b(i); i += 1 }
    if (na == 0 || nb == 0) 0.0 else dot / math.sqrt(na * nb)
  }

  /** Cosine between the phrase embeddings of two strings. */
  def similarity(a: String, b: String): Double =
    cosine(phraseVector(a), phraseVector(b))

  private def normalize(v: Array[Double]): Array[Double] = {
    var n = 0.0; var i = 0
    while (i < v.length) { n += v(i) * v(i); i += 1 }
    val inv = if (n == 0) 0.0 else 1.0 / math.sqrt(n)
    i = 0; while (i < v.length) { v(i) *= inv; i += 1 }
    v
  }
}
