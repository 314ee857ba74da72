package repro.core

import org.apache.spark.sql.SparkSession
import repro.lsh.EuclideanLsh

/** Algorithm 1 — active-learning bootstrap.
  *
  * Generates the unlabeled candidate pool U by LSH k-NN over the latent μ
  * vectors (Euclidean distance is a surrogate for W2² as §V-A observes),
  * then seeds L⁺ with the W2²-closest pairs and L⁻ with the farthest.
  * `verifyPos` plays the paper's "manually removed false positives" step
  * (the ‡-marked domains of Table VIII): when provided, seed positives
  * failing it are dropped (and counted).
  */
object AlBootstrap {

  final case class Bootstrap(
      pos: Seq[(Long, Long)], neg: Seq[(Long, Long)], unlabeled: Seq[(Long, Long)],
      removedFalsePositives: Int)

  def run(spark: SparkSession,
          reprs: Map[(String, Long), TupleRepr],
          k: Int,
          maxSeeds: Int = 15,
          bandFraction: Double = 0.05,
          verifyPos: Option[((Long, Long)) => Boolean] = None,
          lshSeed: Long = 0x415EEDL): Bootstrap = {

    val aVecs = reprs.collect { case (("A", id), r) => (id, r.muFlat) }.toSeq.sortBy(_._1)
    val bVecs = reprs.collect { case (("B", id), r) => (id, r.muFlat) }.toSeq.sortBy(_._1)
    require(aVecs.nonEmpty && bVecs.nonEmpty, "bootstrap needs both sides")
    val dim = aVecs.head._2.length

    // LSH candidate pool (lines 3-10): DataFrame bucket join, then top-k.
    // The p-stable bucket width must sit on the scale of typical pair
    // distances or buckets become singletons; estimate it from a sample.
    val sampler = new repro.nn.Rng(lshSeed ^ 0x5A5A5AL)
    val sampleDists = IndexedSeq.fill(256) {
      val a = aVecs(sampler.nextInt(aVecs.length))._2
      val b = bVecs(sampler.nextInt(bVecs.length))._2
      math.sqrt(repro.er.Knn.sqDist(a, b))
    }.sorted
    val medianDist = math.max(sampleDists(sampleDists.length / 2), 1e-6)
    val cfg = EuclideanLsh.Config(dim, nTables = 8, nBits = 4, width = medianDist, seed = lshSeed)
    val qDf  = EuclideanLsh.vecDf(spark, aVecs)
    val iDf  = EuclideanLsh.vecDf(spark, bVecs)
    val cand = EuclideanLsh.topK(qDf, iDf, k, cfg)
      .select("qid", "iid").collect().map(r => (r.getLong(0), r.getLong(1))).toSeq

    // W2² for every candidate (lines 11-12 thresholds).
    val withDist = cand.map { case (ia, ib) =>
      ((ia, ib), Wasserstein.tupleW2sq(reprs(("A", ia)), reprs(("B", ib))))
    }.sortBy(_._2)

    if (withDist.isEmpty) return Bootstrap(Seq.empty, Seq.empty, Seq.empty, 0)

    val wMin  = withDist.head._2
    val wMax  = withDist.last._2
    val band  = bandFraction * math.max(wMax - wMin, 1e-12)

    val posRaw = withDist.takeWhile(_._2 <= wMin + band).take(maxSeeds).map(_._1)
    val neg    = withDist.reverse.takeWhile(_._2 >= wMax - band).take(maxSeeds).map(_._1)

    val (pos, removed) = verifyPos match {
      case Some(check) =>
        val (keep, drop) = posRaw.partition(check)
        (keep, drop.length)
      case None => (posRaw, 0)
    }

    val seeded = (pos ++ neg).toSet
    Bootstrap(pos, neg, withDist.map(_._1).filterNot(seeded), removed)
  }
}
