package repro.ir

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class TfIdfSpec extends SparkSpec {

  private lazy val docs = TfIdf.docsDf(spark, Seq(
    (0L, "charlie brown coldplay"),
    (1L, "charlie brown coldplay grammy"),
    (2L, "stone ipa stone brewing"),
    (3L, "ipa"),
    (4L, "brown stone house"),
  ))

  test("termFreq matches DuckDB aggregation (oracle)") {
    val tf = TfIdf.termFreq(docs).select(col("docId"), col("term"), col("tf"))
    Oracle.assertEquivalent(tf,
      """SELECT docId, term, count(*) AS tf
        |FROM (SELECT docId, unnest(string_split(text, ' ')) AS term FROM docs)
        |GROUP BY docId, term""".stripMargin,
      "docs" -> docs)
  }

  test("docFreq matches DuckDB aggregation (oracle)") {
    val df = TfIdf.docFreq(TfIdf.termFreq(docs))
    Oracle.assertEquivalent(df,
      """SELECT term, count(DISTINCT docId) AS df
        |FROM (SELECT docId, unnest(string_split(text, ' ')) AS term FROM docs)
        |GROUP BY term""".stripMargin,
      "docs" -> docs)
  }

  test("repeated term counts as tf > 1 and df = 1") {
    val rows = TfIdf.termFreq(docs).where(col("term") === "stone").collect()
    val byDoc = rows.map(r => r.getLong(0) -> r.getLong(2)).toMap
    assert(byDoc(2L) == 2L && byDoc(4L) == 1L)
    val df = TfIdf.docFreq(TfIdf.termFreq(docs)).where(col("term") === "stone").collect()
    assert(df.head.getLong(1) == 2L)
  }

  test("tfidf weighs rare terms above common ones") {
    val w = TfIdf.weights(docs).collect()
      .map(r => (r.getLong(0), r.getString(1), r.getDouble(4))).toSeq
    val brownW  = w.find(x => x._1 == 0L && x._2 == "brown").get._3
    val grammyW = w.find(x => x._1 == 1L && x._2 == "grammy").get._3
    assert(grammyW > brownW, s"grammy=$grammyW brown=$brownW")
  }

  test("vocab is a dense deterministic index") {
    val w = TfIdf.weights(docs)
    val v = TfIdf.vocab(w)
    assert(v.values.toSeq.sorted == (0 until v.size))
    assert(v == TfIdf.vocab(w))
  }

  test("sparseDocs round-trips every (doc, term) weight") {
    val w  = TfIdf.weights(docs)
    val v  = TfIdf.vocab(w)
    val sd = TfIdf.sparseDocs(w, v)
    assert(sd.keySet == Set(0L, 1L, 2L, 3L, 4L))
    // doc 2 has 3 distinct terms: stone, ipa, brewing
    assert(sd(2L).size == 3)
    val stoneIdx = v("stone")
    assert(sd(2L).exists(_._1 == stoneIdx))
  }
}
