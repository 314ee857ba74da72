package repro.core

import repro.SparkSpec
import repro.data.ErSynth
import repro.er.TopKEval
import repro.ir.{LsaIr, W2vIr}

/** End-to-end integration: unsupervised representations, supervised matching
  * and transferability on tiny domains.
  */
class VaerPipelineSpec extends SparkSpec {
  private implicit def s: org.apache.spark.sql.SparkSession = spark

  private val cfg = VaerConfig(irDim = 32, hidden = 32, latent = 16,
    vaeEpochs = 10, matchEpochs = 20)

  private lazy val ds = ErSynth.generateTiny(spark, "Rest.")

  test("supervised VAER achieves strong F1 on the tiny clean domain") {
    val (prf, _, _, _) = Vaer.runSupervised(ds, new LsaIr(32), cfg)
    assert(prf.f1 > 0.75, s"end-to-end F1 ${prf.f1}")
  }

  test("VAE representations achieve high recall @ K=10 (blocking quality)") {
    val irs = new LsaIr(32).compute(ds)
    val vae = Vaer.trainVae(irs, cfg)
    val reprs = Represent.encodeAll(vae, irs)
    val test = Vaer.collectPairs(ds.test)
    val prf = TopKEval.evaluate(reprs, test, k = 10, rerankW2 = true)
    assert(prf.r > 0.7, s"repr recall@10 = ${prf.r}")
  }

  test("matching with a transferred representation model stays close to local") {
    val cit = ErSynth.generateTiny(spark, "Cit. 1")
    val citIrs = new W2vIr(32).compute(cit)
    val transferredVae = Vaer.trainVae(citIrs, cfg)

    val irs = new W2vIr(32).compute(ds)
    val localVae = Vaer.trainVae(irs, cfg)

    val train = Vaer.collectPairs(ds.train)
    val test  = Vaer.collectPairs(ds.test)
    val localF1 = Vaer.evaluateMatcher(Vaer.trainMatcher(localVae, irs, train, cfg), irs, test).f1
    val transfF1 = Vaer.evaluateMatcher(Vaer.trainMatcher(transferredVae, irs, train, cfg), irs, test).f1
    assert(transfF1 > localF1 - 0.15, s"local=$localF1 transferred=$transfF1")
  }

  test("collectPairs round-trips the split DataFrames") {
    val train = Vaer.collectPairs(ds.train)
    assert(train.size == ds.train.count())
    assert(train.forall(p => p.label == 0 || p.label == 1))
  }

  test("matcher trained on VAE init beats an untrained matcher") {
    val irs = new LsaIr(32).compute(ds)
    val vae = Vaer.trainVae(irs, cfg)
    val test = Vaer.collectPairs(ds.test)
    val untrained = new Siamese(cfg, irs.arity, new repro.nn.Rng(1))
    val untrainedF1 = Vaer.evaluateMatcher(untrained, irs, test).f1
    val trained = Vaer.trainMatcher(vae, irs, Vaer.collectPairs(ds.train), cfg)
    val trainedF1 = Vaer.evaluateMatcher(trained, irs, test).f1
    assert(trainedF1 > untrainedF1, s"trained=$trainedF1 untrained=$untrainedF1")
  }
}
