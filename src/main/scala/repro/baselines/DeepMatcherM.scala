package repro.baselines

import repro.nn._

/** DeepMatcher hybrid analogue (Mudgal et al., SIGMOD'18).
  *
  * Per attribute, decomposable soft-attention alignment between the two
  * token sequences (the core of DM's attention-based summarization): raw
  * scores S Tᵀ/√d, softmax alignment in both directions, a shared comparison
  * network over `[token ; aligned-context]`, mean aggregation, then a dense
  * classifier over the concatenated per-attribute summaries. End-to-end
  * trained including embeddings — the most expensive baseline, as in the
  * paper's Table VI.
  */
final class DeepMatcherM(corpus: TokenCorpus, arity: Int, rng: Rng,
                         dim: Int = 64, hidden: Int = 32, override val epochs: Int = 15,
                         override val earlyStopLoss: Double = 0.0)
    extends BaselineMatcher {
  val name = "DM"

  private val emb     = corpus.pretrainedEmbedding(dim, rng, "dm.emb")
  private val compare = new Dense(2 * dim, dim, rng, "relu", "dm.cmp")
  // DM's hybrid model aggregates the compared vectors with a recurrent
  // summarizer, not a plain mean — this is also what makes it the most
  // expensive baseline, as in the paper's Table VI.
  private val aggW = new Param("dm.agg.w", Mat.randn(dim, dim, rng, math.sqrt(1.0 / dim)))
  private val aggU = new Param("dm.agg.u", Mat.randn(dim, dim, rng, math.sqrt(1.0 / dim)))
  private val aggB = new Param("dm.agg.b", Mat.zeros(1, dim))
  private val classifier = new Mlp(Seq(arity * 2 * dim, hidden, 1), Seq("relu", "linear"), rng, "dm.cls")
  private val invSqrtD = 1.0 / math.sqrt(dim)

  protected def allParams: Seq[Param] =
    emb.params ++ compare.params ++ Seq(aggW, aggU, aggB) ++ classifier.params

  /** One direction of the decomposable attention: summarize `a` against `b`. */
  private def summarize(t: Tape, a: Node, b: Node): Node = {
    val scores  = t.scale(t.matmulT(a, b), invSqrtD)
    val aligned = t.matmul(t.softmaxRows(scores), b)
    val cmp     = compare(t, t.concatCols(Seq(a, aligned)))
    // recurrent aggregation over the compared token vectors
    var h = t.const(Mat.zeros(1, dim))
    var i = 0
    while (i < cmp.value.rows) {
      val ci = t.sliceRows(cmp, i, i + 1)
      h = t.tanh(t.add(t.add(t.matmul(ci, t.param(aggW)), t.matmul(h, t.param(aggU))), t.param(aggB)))
      i += 1
    }
    h
  }

  protected def forwardLogit(t: Tape, ex: TokenPair): Node = {
    val feats = (0 until arity).map { ai =>
      val s = emb(t, ex.s(ai))
      val u = emb(t, ex.t(ai))
      t.concatCols(Seq(summarize(t, s, u), summarize(t, u, s)))
    }
    classifier(t, t.concatCols(feats))
  }
}
