package repro.er

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Precision / recall / F1 as defined in §VI-A.2 of the paper. */
final case class Prf(p: Double, r: Double, f1: Double) {
  override def toString: String = f"P=$p%.2f R=$r%.2f F1=$f1%.2f"
}

object Metrics {

  /** Compute P/R/F1 from per-pair predictions against labeled pairs.
    *
    * `labeled`: (idA, idB, label); `predicted`: set of (idA, idB) the system
    * marked as duplicates. tp = labeled positive ∧ predicted; fp = labeled
    * negative ∧ predicted; fn = labeled positive ∧ not predicted.
    */
  def prf(labeled: DataFrame, predicted: DataFrame): Prf = {
    val joined = labeled
      .join(predicted.select(col("idA"), col("idB"), lit(1) as "pred"), Seq("idA", "idB"), "left")
      .na.fill(0, Seq("pred"))
    val agg = joined.agg(
      sum(when(col("label") === 1 && col("pred") === 1, 1).otherwise(0)) as "tp",
      sum(when(col("label") === 0 && col("pred") === 1, 1).otherwise(0)) as "fp",
      sum(when(col("label") === 1 && col("pred") === 0, 1).otherwise(0)) as "fn",
    ).collect()(0)
    fromCounts(agg.getLong(0), agg.getLong(1), agg.getLong(2))
  }

  /** Driver-side variant over collected pairs (for model-loop inner use). */
  def prfLocal(labeled: Seq[LabeledPair], predictedPositive: Set[(Long, Long)]): Prf = {
    var tp = 0L; var fp = 0L; var fn = 0L
    labeled.foreach { lp =>
      val pred = predictedPositive.contains((lp.idA, lp.idB))
      if (lp.label == 1 && pred) tp += 1
      else if (lp.label == 0 && pred) fp += 1
      else if (lp.label == 1 && !pred) fn += 1
    }
    fromCounts(tp, fp, fn)
  }

  def fromCounts(tp: Long, fp: Long, fn: Long): Prf = {
    val p  = if (tp + fp == 0) 0.0 else tp.toDouble / (tp + fp)
    val r  = if (tp + fn == 0) 0.0 else tp.toDouble / (tp + fn)
    val f1 = if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    Prf(p, r, f1)
  }

  /** DataFrame of labeled pairs from driver pairs (test-support helper). */
  def pairsDf(spark: SparkSession, pairs: Seq[LabeledPair]): DataFrame = {
    import spark.implicits._
    pairs.map(p => (p.idA, p.idB, p.label)).toDF("idA", "idB", "label")
  }
}
