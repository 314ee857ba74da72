package repro.ir

import repro.nn.Rng

/** Skip-gram with negative sampling (word2vec), trained from scratch.
  *
  * Used by the EmbDI-style IR provider to embed the tokens of the random
  * walks over the relational graph. Classic SGNS update loop on flat arrays
  * (this is a hot path; autodiff would be overkill for the two-vector
  * update rule). Deterministic given the seed.
  */
final class SkipGram(vocabSize: Int, val dim: Int, rng: Rng,
                     window: Int = 3, negatives: Int = 5, lr: Double = 0.025) {
  // Input (center) and output (context) vectors.
  val in:  Array[Double] = Array.fill(vocabSize * dim)((rng.nextDouble() - 0.5) / dim)
  val out: Array[Double] = new Array[Double](vocabSize * dim)

  private def sigmoid(x: Double): Double =
    if (x > 8) 1.0 else if (x < -8) 0.0 else 1.0 / (1.0 + math.exp(-x))

  /** One pass over the walk corpus; `unigram` is the negative-sampling table. */
  def epoch(walks: Seq[Array[Int]], unigram: Array[Int], epochLr: Double): Double = {
    var loss = 0.0
    var seen = 0L
    val hidden = new Array[Double](dim)
    walks.foreach { walk =>
      var pos = 0
      while (pos < walk.length) {
        val center = walk(pos)
        val w      = 1 + rng.nextInt(window)
        var c = math.max(0, pos - w)
        val end = math.min(walk.length - 1, pos + w)
        while (c <= end) {
          if (c != pos) {
            val ctx = walk(c)
            java.util.Arrays.fill(hidden, 0.0)
            // positive + negative updates on (center -> ctx)
            var k = 0
            while (k <= negatives) {
              val (target, label) =
                if (k == 0) (ctx, 1.0)
                else (unigram(rng.nextInt(unigram.length)), 0.0)
              if (k == 0 || target != ctx) {
                var dot = 0.0; var j = 0
                while (j < dim) { dot += in(center * dim + j) * out(target * dim + j); j += 1 }
                val pred = sigmoid(dot)
                val g    = (label - pred) * epochLr
                loss += -math.log(math.max(1e-10, if (label == 1.0) pred else 1.0 - pred))
                j = 0
                while (j < dim) {
                  hidden(j) += g * out(target * dim + j)
                  out(target * dim + j) += g * in(center * dim + j)
                  j += 1
                }
              }
              k += 1
            }
            var j = 0
            while (j < dim) { in(center * dim + j) += hidden(j); j += 1 }
            seen += 1
          }
          c += 1
        }
        pos += 1
      }
    }
    if (seen == 0) 0.0 else loss / seen
  }

  /** Train for `epochs` passes with linear LR decay; returns per-epoch losses. */
  def train(walks: Seq[Array[Int]], counts: Array[Long], epochs: Int): Seq[Double] = {
    val unigram = SkipGram.unigramTable(counts)
    (0 until epochs).map { e =>
      val epochLr = lr * (1.0 - e.toDouble / epochs).max(0.1)
      epoch(walks, unigram, epochLr)
    }
  }

  def vector(id: Int): Array[Double] = {
    val v = java.util.Arrays.copyOfRange(in, id * dim, (id + 1) * dim)
    HashEmb.l2normalize(v)
    v
  }
}

object SkipGram {
  /** Unigram^0.75 negative-sampling table (word2vec convention). */
  def unigramTable(counts: Array[Long], size: Int = 100000): Array[Int] = {
    val pow   = counts.map(c => math.pow(c.toDouble.max(1.0), 0.75))
    val total = pow.sum
    val table = new Array[Int](size)
    var i = 0; var cum = pow(0) / total; var w = 0
    while (i < size) {
      table(i) = w
      if (i.toDouble / size > cum && w < counts.length - 1) { w += 1; cum += pow(w) / total }
      i += 1
    }
    table
  }
}
