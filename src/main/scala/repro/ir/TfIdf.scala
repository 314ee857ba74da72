package repro.ir

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Spark-side TF-IDF over a corpus of documents.
  *
  * Input: DataFrame (docId: Long, text: String). Output of [[weights]]:
  * (docId, term, tf, df, tfidf) with `tfidf = tf * (ln((N+1)/(df+1)) + 1)`
  * (smoothed IDF — never negative, never division by zero). The token
  * explosion and the document-frequency aggregation are plain Spark SQL and
  * are oracle-checked against DuckDB in `TfIdfSpec`.
  */
object TfIdf {

  private val tokensUdf = udf((s: String) => Tokenize.tokens(s))

  /** Exploded (docId, term, tf) term frequencies. */
  def termFreq(docs: DataFrame): DataFrame =
    docs
      .select(col("docId"), explode(tokensUdf(col("text"))) as "term")
      .groupBy("docId", "term")
      .agg(count(lit(1)) as "tf")

  /** (term, df) document frequencies. */
  def docFreq(tf: DataFrame): DataFrame =
    tf.groupBy("term").agg(countDistinct("docId") as "df")

  /** Full (docId, term, tf, df, tfidf) weights. */
  def weights(docs: DataFrame): DataFrame = {
    val n  = docs.count()
    val tf = termFreq(docs)
    val df = docFreq(tf)
    tf.join(df, "term")
      .withColumn("tfidf", col("tf") * (log((lit(n) + 1.0) / (col("df") + 1.0)) + 1.0))
      .select("docId", "term", "tf", "df", "tfidf")
  }

  /** Dense term index (term -> column id), deterministic (sorted by term). */
  def vocab(weightsDf: DataFrame): Map[String, Int] =
    weightsDf.select("term").distinct().collect().map(_.getString(0)).sorted.zipWithIndex.toMap

  /** Collect sparse doc vectors: docId -> Seq[(termIdx, tfidf)]. */
  def sparseDocs(weightsDf: DataFrame, vocabIdx: Map[String, Int]): Map[Long, Seq[(Int, Double)]] =
    weightsDf
      .select("docId", "term", "tfidf")
      .collect()
      .groupBy(_.getLong(0))
      .map { case (id, rows) =>
        id -> rows.toSeq.map(r => (vocabIdx(r.getString(1)), r.getDouble(2)))
      }

  /** Convenience: docs DataFrame from driver-side (id, text) pairs. */
  def docsDf(spark: SparkSession, docs: Seq[(Long, String)]): DataFrame = {
    import spark.implicits._
    docs.toDF("docId", "text")
  }
}
