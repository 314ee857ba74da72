package repro.ir

import org.scalatest.funsuite.AnyFunSuite

class HashEmbSpec extends AnyFunSuite {
  private val emb = new HashEmb(64)

  test("word vectors are deterministic and unit-norm") {
    val a = emb.word("coldplay")
    val b = new HashEmb(64).word("coldplay")
    assert(a.toSeq == b.toSeq)
    val norm = math.sqrt(a.map(x => x * x).sum)
    assert(math.abs(norm - 1.0) < 1e-9)
  }

  test("typos stay close, unrelated words stay far") {
    val clean = emb.word("restaurant")
    val typo  = emb.word("restaurnt")   // dropped character
    val other = emb.word("zebra")
    val simTypo  = HashEmb.cosine(clean, typo)
    val simOther = HashEmb.cosine(clean, other)
    assert(simTypo > 0.35, s"typo similarity $simTypo")
    assert(simTypo > simOther + 0.3, s"typo=$simTypo other=$simOther")
  }

  test("different salts decorrelate embeddings") {
    val a = new HashEmb(64, salt = 1).word("coldplay")
    val b = new HashEmb(64, salt = 2).word("coldplay")
    assert(math.abs(HashEmb.cosine(a, b)) < 0.5)
  }

  test("sentence vector is the normalized mean of word vectors") {
    val s = emb.sentence("charlie brown")
    val norm = math.sqrt(s.map(x => x * x).sum)
    assert(math.abs(norm - 1.0) < 1e-9)
    // direction matches mean of word vectors
    val m = emb.word("charlie").zip(emb.word("brown")).map { case (a, b) => (a + b) / 2 }
    assert(HashEmb.cosine(s, m) > 0.999)
  }

  test("empty sentence maps to the zero vector") {
    assert(emb.sentence("").forall(_ == 0.0))
    assert(emb.sentence("!!!").forall(_ == 0.0))
  }

  test("sentences sharing words are closer than disjoint ones") {
    val a = emb.sentence("stone ipa brewing")
    val b = emb.sentence("stone ipa company")
    val c = emb.sentence("quarterly revenue forecast")
    assert(HashEmb.cosine(a, b) > HashEmb.cosine(a, c) + 0.3)
  }

  test("l2normalize leaves zero vector untouched and scales others to 1") {
    val z = new Array[Double](4)
    HashEmb.l2normalize(z)
    assert(z.forall(_ == 0.0))
    val v = Array(3.0, 4.0, 0.0, 0.0)
    HashEmb.l2normalize(v)
    assert(math.abs(math.sqrt(v.map(x => x * x).sum) - 1.0) < 1e-12)
  }

  test("euclidean and cosine helpers agree on unit vectors") {
    val a = emb.word("alpha"); val b = emb.word("beta")
    val cos = HashEmb.cosine(a, b)
    val d   = HashEmb.euclidean(a, b)
    // for unit vectors: d^2 = 2 - 2cos
    assert(math.abs(d * d - (2 - 2 * cos)) < 1e-9)
  }
}
