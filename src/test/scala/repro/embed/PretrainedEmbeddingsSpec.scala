package repro.embed

import org.scalatest.funsuite.AnyFunSuite

class PretrainedEmbeddingsSpec extends AnyFunSuite {

  test("vectors are unit-normalized") {
    val v = PretrainedEmbeddings.vector("country")
    val norm = math.sqrt(v.map(x => x * x).sum)
    assert(math.abs(norm - 1.0) < 1e-9)
  }

  test("vector lookup is deterministic") {
    assert(PretrainedEmbeddings.vector("team").toSeq == PretrainedEmbeddings.vector("team").toSeq)
  }

  test("synonyms are highly similar") {
    assert(PretrainedEmbeddings.similarity("country", "nation") > 0.8)
  }

  test("same word has similarity ~1") {
    assert(PretrainedEmbeddings.similarity("customer", "customer") > 0.999)
  }

  test("unrelated common words are dissimilar") {
    assert(PretrainedEmbeddings.similarity("country", "telephone") < 0.5)
  }

  test("domain-specific identifiers are near-orthogonal to English") {
    // The ChEMBL effect: pre-trained vectors are useless for domain codes.
    assert(math.abs(PretrainedEmbeddings.similarity("chembl120394", "assay")) < 0.4)
  }

  test("phrase vector of multiword names averages tokens") {
    val s = PretrainedEmbeddings.similarity("first name", "given name")
    assert(s > 0.6) // "first"~"given" are synonyms, "name" shared
  }

  test("empty phrase yields zero vector with zero cosine") {
    val z = PretrainedEmbeddings.phraseVector("")
    assert(z.forall(_ == 0.0))
    assert(PretrainedEmbeddings.cosine(z, PretrainedEmbeddings.vector("x")) == 0.0)
  }

  test("cosine bounds") {
    val a = PretrainedEmbeddings.vector("alpha")
    val b = PretrainedEmbeddings.vector("omega")
    val c = PretrainedEmbeddings.cosine(a, b)
    assert(c >= -1.0001 && c <= 1.0001)
  }
}
