package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.nn.Rng

class SiameseSpec extends AnyFunSuite {

  private val cfg = VaerConfig(irDim = 8, hidden = 16, latent = 4,
    matchEpochs = 40, matchBatch = 8, matchHidden = 8)

  /** Synthetic matching task: positives are near-identical attribute vectors,
    * negatives are independent ones.
    */
  private def taskPairs(n: Int, arity: Int, seed: Long): IndexedSeq[PairExample] = {
    val rng = new Rng(seed)
    IndexedSeq.tabulate(n) { i =>
      val s = Array.fill(arity)(Array.fill(8)(rng.nextGaussian()))
      if (i % 2 == 0) {
        val t = s.map(_.map(_ + rng.nextGaussian() * 0.05))
        PairExample(s, t, 1)
      } else {
        val t = Array.fill(arity)(Array.fill(8)(rng.nextGaussian()))
        PairExample(s, t, 0)
      }
    }
  }

  test("training reduces the loss") {
    val rng = new Rng(1)
    val m = new Siamese(cfg, 3, rng.split())
    val losses = m.train(taskPairs(64, 3, 2), rng.split())
    assert(losses.head > losses.last, s"first=${losses.head} last=${losses.last}")
  }

  test("learns to separate positives from negatives") {
    val rng = new Rng(3)
    val m = new Siamese(cfg, 3, rng.split())
    m.train(taskPairs(96, 3, 4), rng.split())
    val test = taskPairs(32, 3, 5)
    val probs = m.predict(test)
    val acc = test.zip(probs).count { case (ex, p) => (p > 0.5) == (ex.label == 1) }.toDouble / test.length
    assert(acc > 0.85, s"accuracy $acc")
  }

  test("initFromVae copies the encoder weights (deep copy)") {
    val rng = new Rng(6)
    val vae = new VaeModel(cfg, rng.split())
    val m   = new Siamese(cfg, 2, rng.split())
    m.initFromVae(vae)
    assert(m.encHidden.w.value.data.toSeq == vae.encHidden.w.value.data.toSeq)
    assert(m.encMu.w.value.data.toSeq == vae.encMu.w.value.data.toSeq)
    // mutation must not leak back into the VAE
    m.encHidden.w.value.data(0) += 1.0
    assert(m.encHidden.w.value.data(0) != vae.encHidden.w.value.data(0))
  }

  test("predict agrees with the tape forward pass") {
    val rng = new Rng(7)
    val m = new Siamese(cfg, 2, rng.split())
    val pairs = taskPairs(4, 2, 8)
    val probs = m.predict(pairs)
    val t = new repro.nn.Tape
    val sB = IndexedSeq.tabulate(2)(ai => repro.nn.Mat.fromRows(pairs.map(_.sIrs(ai))))
    val tB = IndexedSeq.tabulate(2)(ai => repro.nn.Mat.fromRows(pairs.map(_.tIrs(ai))))
    val (node, _) = m.forward(t, sB, tB)
    probs.zip(node.value.data).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9) }
  }

  test("margin dampens the gradient pressure on already-distant negatives") {
    // loss for a far-apart negative should equal its BCE part only (hinge 0)
    val rng = new Rng(9)
    val m = new Siamese(cfg.copy(margin = 0.001), 1, rng.split())
    val far = PairExample(Array(Array.fill(8)(5.0)), Array(Array.fill(8)(-5.0)), 0)
    val t = new repro.nn.Tape
    val sB = IndexedSeq(repro.nn.Mat.fromRows(Seq(far.sIrs(0))))
    val tB = IndexedSeq(repro.nn.Mat.fromRows(Seq(far.tIrs(0))))
    val (prob, w2s) = m.forward(t, sB, tB)
    val loss = m.lossNode(t, prob, w2s, Array(0.0))
    val p = prob.value.data(0)
    val bce = -math.log(1.0 - p + 1e-7)
    assert(math.abs(loss.value.data(0) - bce) < 1e-6,
      s"loss=${loss.value.data(0)} bce=$bce w2=${w2s.head.value.data(0)}")
  }

  test("contrastive term improves the positive/negative distance separation") {
    val rng = new Rng(10)
    val m = new Siamese(cfg, 1, rng.split())
    val pairs = taskPairs(64, 1, 11)
    def meanW2(label: Int): Double = {
      val sel = pairs.filter(_.label == label)
      sel.map { ex =>
        val (muS, sigS) = m.encodeBatch(repro.nn.Mat.fromRows(Seq(ex.sIrs(0))))
        val (muT, sigT) = m.encodeBatch(repro.nn.Mat.fromRows(Seq(ex.tIrs(0))))
        Wasserstein.w2sq(muS.row(0), sigS.row(0), muT.row(0), sigT.row(0))
      }.sum / sel.length
    }
    val ratioBefore = meanW2(1) / meanW2(0)
    m.train(pairs, rng.split())
    val ratioAfter = meanW2(1) / meanW2(0)
    assert(ratioAfter < ratioBefore, s"before=$ratioBefore after=$ratioAfter")
  }

  test("empty training set is rejected") {
    val m = new Siamese(cfg, 1, new Rng(12))
    intercept[IllegalArgumentException](m.train(IndexedSeq.empty, new Rng(13)))
  }

  test("predict on empty input returns empty") {
    val m = new Siamese(cfg, 1, new Rng(14))
    assert(m.predict(IndexedSeq.empty).isEmpty)
  }
}
