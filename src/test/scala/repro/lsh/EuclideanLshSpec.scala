package repro.lsh

import repro.SparkSpec
import repro.nn.Rng
import repro.er.Knn

class EuclideanLshSpec extends SparkSpec {

  private def randomVecs(n: Int, dim: Int, seed: Long): Seq[(Long, Array[Double])] = {
    val rng = new Rng(seed)
    (0 until n).map(i => (i.toLong, Array.fill(dim)(rng.nextGaussian())))
  }

  test("projections are deterministic in the seed") {
    val cfg = EuclideanLsh.Config(8, seed = 99)
    val a = EuclideanLsh.projections(cfg)
    val b = EuclideanLsh.projections(cfg)
    assert(a.flatten.map(_._1.toSeq) sameElements b.flatten.map(_._1.toSeq))
  }

  test("bucketize emits one row per (vector, table)") {
    val cfg = EuclideanLsh.Config(4, nTables = 3)
    val df  = EuclideanLsh.vecDf(spark, randomVecs(10, 4, 1))
    val b   = EuclideanLsh.bucketize(df, "vec", cfg)
    assert(b.count() == 30)
    assert(b.select("table").distinct().count() == 3)
  }

  test("identical vectors always share every bucket") {
    val cfg = EuclideanLsh.Config(4, nTables = 4)
    val v   = Array(0.5, -1.0, 2.0, 0.0)
    val q   = EuclideanLsh.vecDf(spark, Seq((1L, v)))
    val i   = EuclideanLsh.vecDf(spark, Seq((2L, v.clone())))
    val cand = EuclideanLsh.candidates(q, i, cfg)
    assert(cand.count() == 1)
  }

  test("near neighbours are found with high recall") {
    // index points; queries are tiny perturbations of the first 20 points
    val rng   = new Rng(2)
    val index = randomVecs(200, 8, 3)
    val queries = index.take(20).map { case (id, v) =>
      (id + 1000L, v.map(_ + rng.nextGaussian() * 0.01))
    }
    val cfg  = EuclideanLsh.Config(8, nTables = 8, nBits = 6, width = 2.0)
    val cand = EuclideanLsh.candidates(
      EuclideanLsh.vecDf(spark, queries), EuclideanLsh.vecDf(spark, index), cfg)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val found = queries.count { case (qid, _) => cand.contains((qid, qid - 1000L)) }
    assert(found >= 18, s"LSH recalled only $found/20 perturbed twins")
  }

  test("topK ranks the true nearest first for perturbed twins") {
    val index   = randomVecs(100, 8, 4)
    val queries = index.take(10).map { case (id, v) => (id + 500L, v.map(_ + 1e-4)) }
    val cfg = EuclideanLsh.Config(8, nTables = 10, nBits = 4, width = 3.0)
    val top = EuclideanLsh.topK(
      EuclideanLsh.vecDf(spark, queries), EuclideanLsh.vecDf(spark, index), 3, cfg)
      .where(org.apache.spark.sql.functions.col("rank") === 1)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toMap
    queries.foreach { case (qid, _) =>
      assert(top.get(qid).contains(qid - 500L), s"query $qid top-1 = ${top.get(qid)}")
    }
  }

  test("exactTopK agrees with driver-side Knn reference") {
    val index   = randomVecs(50, 6, 5)
    val queries = randomVecs(8, 6, 6).map { case (id, v) => (id + 100, v) }
    val spark_  = EuclideanLsh.exactTopK(
      EuclideanLsh.vecDf(spark, queries), EuclideanLsh.vecDf(spark, index), 5)
      .collect().groupBy(_.getLong(0)).view
      .mapValues(_.sortBy(_.getInt(3)).map(_.getLong(1)).toSeq).toMap
    val ref = Knn.topK(queries.toIndexedSeq, index.toIndexedSeq, 5)
      .view.mapValues(_.map(_._1)).toMap
    queries.foreach { case (qid, _) =>
      assert(spark_(qid) == ref(qid), s"query $qid: spark=${spark_(qid)} ref=${ref(qid)}")
    }
  }

  test("LSH topK recall vs exact on clustered data is reasonable") {
    val rng = new Rng(7)
    // clustered points so LSH has structure to exploit
    val index = (0 until 300).map { i =>
      val center = (i % 10).toDouble
      (i.toLong, Array.fill(8)(center + rng.nextGaussian() * 0.3))
    }
    val queries = (0 until 30).map { i =>
      val center = (i % 10).toDouble
      (1000L + i, Array.fill(8)(center + rng.nextGaussian() * 0.3))
    }
    val cfg = EuclideanLsh.Config(8, nTables = 8, nBits = 6, width = 4.0)
    val lsh = EuclideanLsh.topK(
      EuclideanLsh.vecDf(spark, queries), EuclideanLsh.vecDf(spark, index), 5, cfg)
      .collect().groupBy(_.getLong(0)).view.mapValues(_.map(_.getLong(1)).toSet).toMap
    val exact = Knn.topK(queries.toIndexedSeq, index.toIndexedSeq, 5)
      .view.mapValues(_.map(_._1).toSet).toMap
    val recalls = queries.map { case (qid, _) =>
      val e = exact(qid)
      lsh.getOrElse(qid, Set.empty).intersect(e).size.toDouble / e.size
    }
    val mean = recalls.sum / recalls.length
    assert(mean > 0.8, s"mean LSH recall@5 = $mean")
  }
}
