package repro.core

import repro.SparkSpec
import repro.data.ErSynth
import repro.ir.W2vIr
import repro.nn.Rng

class AlBootstrapSpec extends SparkSpec {
  private implicit def s: org.apache.spark.sql.SparkSession = spark

  private val cfg = VaerConfig(irDim = 16, hidden = 16, latent = 8, vaeEpochs = 8)

  private lazy val ds    = ErSynth.generateTiny(spark, "Rest.")
  private lazy val irs   = new W2vIr(16).compute(ds)
  private lazy val vae   = Vaer.trainVae(irs, cfg)
  private lazy val reprs = Represent.encodeAll(vae, irs)
  private lazy val truth =
    ds.matches.collect().map(r => (r.getLong(0), r.getLong(1))).toSet

  test("bootstrap produces positives, negatives, and a candidate pool") {
    val b = AlBootstrap.run(spark, reprs, k = 5)
    assert(b.pos.nonEmpty, "no seed positives")
    assert(b.neg.nonEmpty, "no seed negatives")
    assert(b.unlabeled.nonEmpty, "empty unlabeled pool")
    assert(b.pos.size <= 15 && b.neg.size <= 15)
  }

  test("seeds are disjoint from the unlabeled pool") {
    val b = AlBootstrap.run(spark, reprs, k = 5)
    val seeds = (b.pos ++ b.neg).toSet
    assert(b.unlabeled.forall(!seeds.contains(_)))
  }

  test("seed positives are mostly true duplicates (closest pairs)") {
    val b = AlBootstrap.run(spark, reprs, k = 5)
    val hit = b.pos.count(truth.contains)
    assert(hit.toDouble / b.pos.size > 0.5, s"$hit/${b.pos.size} seed positives are true")
  }

  test("seed negatives are overwhelmingly true non-duplicates") {
    val b = AlBootstrap.run(spark, reprs, k = 5)
    val wrong = b.neg.count(truth.contains)
    assert(wrong == 0, s"$wrong seed negatives are actually duplicates")
  }

  test("verifyPos removes false positives and counts them") {
    val b = AlBootstrap.run(spark, reprs, k = 5, verifyPos = Some(truth.contains))
    assert(b.pos.forall(truth.contains))
    val unverified = AlBootstrap.run(spark, reprs, k = 5)
    assert(b.removedFalsePositives == unverified.pos.count(p => !truth.contains(p)))
  }

  test("W2 ordering holds: every seed positive closer than every seed negative") {
    val b = AlBootstrap.run(spark, reprs, k = 5)
    val maxPos = b.pos.map(p => Wasserstein.tupleW2sq(reprs(("A", p._1)), reprs(("B", p._2)))).max
    val minNeg = b.neg.map(p => Wasserstein.tupleW2sq(reprs(("A", p._1)), reprs(("B", p._2)))).min
    assert(maxPos < minNeg, s"maxPos=$maxPos minNeg=$minNeg")
  }
}
