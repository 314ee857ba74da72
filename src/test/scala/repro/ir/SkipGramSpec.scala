package repro.ir

import org.scalatest.funsuite.AnyFunSuite
import repro.nn.Rng

class SkipGramSpec extends AnyFunSuite {

  test("unigram table covers all words proportionally") {
    val tbl = SkipGram.unigramTable(Array(100L, 10L, 1L), size = 10000)
    val counts = tbl.groupBy(identity).view.mapValues(_.length).toMap
    assert(counts(0) > counts(1))
    assert(counts(1) > counts.getOrElse(2, 0))
    assert(counts.keySet.subsetOf(Set(0, 1, 2)))
  }

  test("training loss decreases over epochs") {
    val rng = new Rng(1)
    // Two token clusters: 0-3 co-occur, 4-7 co-occur.
    val walks = (0 until 200).map { i =>
      val base = if (i % 2 == 0) 0 else 4
      Array.fill(8)(base + rng.nextInt(4))
    }
    val counts = Array.fill(8)(100L)
    val sg = new SkipGram(8, 16, new Rng(2))
    val losses = sg.train(walks, counts, epochs = 4)
    assert(losses.head > losses.last, s"losses=$losses")
  }

  test("co-occurring tokens end up closer than cross-cluster tokens") {
    val rng = new Rng(3)
    val walks = (0 until 400).map { i =>
      val base = if (i % 2 == 0) 0 else 4
      Array.fill(10)(base + rng.nextInt(4))
    }
    val sg = new SkipGram(8, 16, new Rng(4))
    sg.train(walks, Array.fill(8)(100L), epochs = 5)
    val within = HashEmb.cosine(sg.vector(0), sg.vector(1))
    val cross  = HashEmb.cosine(sg.vector(0), sg.vector(5))
    assert(within > cross, s"within=$within cross=$cross")
  }

  test("vectors are unit-normalized") {
    val sg = new SkipGram(4, 8, new Rng(5))
    sg.train(Seq(Array(0, 1, 2, 3)), Array.fill(4)(1L), epochs = 1)
    val n = math.sqrt(sg.vector(0).map(x => x * x).sum)
    assert(math.abs(n - 1.0) < 1e-9)
  }

  test("deterministic given seeds") {
    def run(): Seq[Double] = {
      val sg = new SkipGram(6, 8, new Rng(6))
      sg.train((0 until 50).map(i => Array(i % 6, (i + 1) % 6, (i + 2) % 6)),
        Array.fill(6)(10L), epochs = 2)
      sg.vector(3).toSeq
    }
    assert(run() == run())
  }
}
