package repro.lsh

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.nn.Rng

/** p-stable (Gaussian) Euclidean LSH over DataFrames (Datar et al., SoCG'04).
  *
  * Vectors live in DataFrames as `array<double>` columns. Each of `nTables`
  * hash tables concatenates `nBits` hashes `floor((a·v + b) / w)`; candidate
  * pairs are produced by a bucket equi-join between the query side and the
  * index side — the paper's blocking/bootstrap substrate (§V-A, Alg. 1
  * `lsh_index` / `lookup`). Exact re-ranking on the candidates then yields
  * top-K neighbours; [[exactTopK]] is the brute-force cross-join reference
  * used by tests and by the small-scale evaluation.
  */
object EuclideanLsh {

  final case class Config(dim: Int, nTables: Int = 8, nBits: Int = 10,
                          width: Double = 1.5, seed: Long = 0x15489L)

  private def sqDist = udf { (a: Seq[Double], b: Seq[Double]) =>
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  /** Deterministic projections: (table, bit) -> (a-vector, offset b). */
  private[lsh] def projections(cfg: Config): Array[Array[(Array[Double], Double)]] = {
    val rng = new Rng(cfg.seed)
    Array.fill(cfg.nTables)(Array.fill(cfg.nBits)(
      (Array.fill(cfg.dim)(rng.nextGaussian()), rng.nextDouble() * cfg.width)
    ))
  }

  /** Add one row per (vector, table) with the concatenated bucket key. */
  def bucketize(df: DataFrame, vecCol: String, cfg: Config): DataFrame = {
    val proj = projections(cfg)
    val bucketUdf = udf { (v: Seq[Double], table: Int) =>
      val hs = proj(table).map { case (a, b) =>
        var dot = 0.0; var i = 0
        while (i < v.length) { dot += a(i) * v(i); i += 1 }
        math.floor((dot + b) / cfg.width).toLong
      }
      hs.mkString(":")
    }
    df.withColumn("table", explode(lit((0 until cfg.nTables).toArray)))
      .withColumn("bucket", bucketUdf(col(vecCol), col("table")))
  }

  /** Distinct candidate pairs (qid, iid) sharing a bucket in any table. */
  def candidates(queries: DataFrame, index: DataFrame, cfg: Config): DataFrame = {
    val q = bucketize(queries.select(col("id") as "qid", col("vec") as "qvec"), "qvec", cfg)
    val i = bucketize(index.select(col("id") as "iid", col("vec") as "ivec"), "ivec", cfg)
    q.join(i, Seq("table", "bucket"))
      .select("qid", "iid", "qvec", "ivec")
      .dropDuplicates("qid", "iid")
  }

  /** LSH candidates re-ranked exactly; keeps top-k per query by L2 distance. */
  def topK(queries: DataFrame, index: DataFrame, k: Int, cfg: Config): DataFrame = {
    val cand = candidates(queries, index, cfg)
      .withColumn("dist", sqDist(col("qvec"), col("ivec")))
    val w = Window.partitionBy("qid").orderBy(col("dist").asc, col("iid").asc)
    cand.withColumn("rank", row_number().over(w))
      .where(col("rank") <= k)
      .select("qid", "iid", "dist", "rank")
  }

  /** Brute-force exact top-k (cross join); reference for tests and small data. */
  def exactTopK(queries: DataFrame, index: DataFrame, k: Int): DataFrame = {
    val q = queries.select(col("id") as "qid", col("vec") as "qvec")
    val i = index.select(col("id") as "iid", col("vec") as "ivec")
    val cand = q.crossJoin(i).withColumn("dist", sqDist(col("qvec"), col("ivec")))
    val w = Window.partitionBy("qid").orderBy(col("dist").asc, col("iid").asc)
    cand.withColumn("rank", row_number().over(w))
      .where(col("rank") <= k)
      .select("qid", "iid", "dist", "rank")
  }

  /** Helper: DataFrame (id, vec) from driver-side vectors. */
  def vecDf(spark: SparkSession, vecs: Seq[(Long, Array[Double])]): DataFrame = {
    import spark.implicits._
    vecs.map { case (id, v) => (id, v.toSeq) }.toDF("id", "vec")
  }
}
