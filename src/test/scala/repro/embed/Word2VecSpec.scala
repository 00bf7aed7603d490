package repro.embed

import org.scalatest.funsuite.AnyFunSuite

class Word2VecSpec extends AnyFunSuite {

  private def corpus: Seq[Array[String]] = {
    // Two interleaved "topics": (a*, b*) tokens co-occur within a topic.
    val rng = new scala.util.Random(11)
    (0 until 300).map { i =>
      val topic = if (i % 2 == 0) "a" else "b"
      Array.fill(12)(s"$topic${rng.nextInt(5)}")
    }
  }

  test("training is deterministic in the seed") {
    val w2v1 = new Word2Vec(dim = 16, epochs = 1, seed = 9)
    val w2v2 = new Word2Vec(dim = 16, epochs = 1, seed = 9)
    val m1 = w2v1.train(corpus)
    val m2 = w2v2.train(corpus)
    assert(m1.keySet == m2.keySet)
    m1.keys.foreach(k => assert(m1(k).toSeq == m2(k).toSeq))
  }

  test("empty corpus yields empty model") {
    assert(new Word2Vec().train(Seq.empty).isEmpty)
  }

  test("all corpus tokens get vectors of the right dimension") {
    val model = new Word2Vec(dim = 16, epochs = 1).train(corpus)
    val vocab = corpus.flatten.toSet
    assert(model.keySet == vocab)
    assert(model.values.forall(_.length == 16))
  }

  test("co-occurring tokens are more similar than cross-topic tokens") {
    val model = new Word2Vec(dim = 24, epochs = 4, seed = 13).train(corpus)
    val within = Word2Vec.cosine(model("a0"), model("a1"))
    val across = Word2Vec.cosine(model("a0"), model("b1"))
    assert(within > across, s"within=$within across=$across")
  }

  test("cosine of a vector with itself is 1") {
    val model = new Word2Vec(dim = 8, epochs = 1).train(corpus)
    val v = model("a0")
    assert(math.abs(Word2Vec.cosine(v, v) - 1.0) < 1e-6)
  }

  test("cosine of zero vector is 0") {
    assert(Word2Vec.cosine(new Array[Float](4), Array(1f, 0f, 0f, 0f)) == 0.0)
  }
}
