package repro.er

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class MetricsSpec extends SparkSpec {

  private lazy val labeled = Metrics.pairsDf(spark, Seq(
    LabeledPair(1, 10, 1), LabeledPair(2, 20, 1), LabeledPair(3, 30, 1),
    LabeledPair(4, 40, 0), LabeledPair(5, 50, 0), LabeledPair(6, 60, 0),
  ))

  private lazy val predicted = {
    import spark.implicits._
    // predicts: 2 tp (1,10)(2,20), 1 fp (4,40); misses (3,30)
    Seq((1L, 10L), (2L, 20L), (4L, 40L)).toDF("idA", "idB")
  }

  test("prf matches hand-computed counts") {
    val prf = Metrics.prf(labeled, predicted)
    assert(math.abs(prf.p - 2.0 / 3.0) < 1e-9)
    assert(math.abs(prf.r - 2.0 / 3.0) < 1e-9)
    assert(math.abs(prf.f1 - 2.0 / 3.0) < 1e-9)
  }

  test("tp/fp/fn aggregation matches DuckDB (oracle)") {
    val joined = labeled
      .join(predicted.select(col("idA"), col("idB"), lit(1) as "pred"), Seq("idA", "idB"), "left")
      .na.fill(0, Seq("pred"))
      .agg(
        sum(when(col("label") === 1 && col("pred") === 1, 1).otherwise(0)) as "tp",
        sum(when(col("label") === 0 && col("pred") === 1, 1).otherwise(0)) as "fp",
        sum(when(col("label") === 1 && col("pred") === 0, 1).otherwise(0)) as "fn")
    Oracle.assertEquivalent(joined,
      """SELECT
        |  sum(CASE WHEN l.label = '1' AND p.idA IS NOT NULL THEN 1 ELSE 0 END) AS tp,
        |  sum(CASE WHEN l.label = '0' AND p.idA IS NOT NULL THEN 1 ELSE 0 END) AS fp,
        |  sum(CASE WHEN l.label = '1' AND p.idA IS NULL THEN 1 ELSE 0 END) AS fn
        |FROM labeled l LEFT JOIN predicted p
        |  ON l.idA = p.idA AND l.idB = p.idB""".stripMargin,
      "labeled" -> labeled, "predicted" -> predicted)
  }

  test("prfLocal agrees with DataFrame prf") {
    val pairs = Seq(
      LabeledPair(1, 10, 1), LabeledPair(2, 20, 1), LabeledPair(3, 30, 1),
      LabeledPair(4, 40, 0), LabeledPair(5, 50, 0), LabeledPair(6, 60, 0))
    val local = Metrics.prfLocal(pairs, Set((1L, 10L), (2L, 20L), (4L, 40L)))
    val df    = Metrics.prf(labeled, predicted)
    assert(local == df)
  }

  test("edge cases: nothing predicted, everything predicted") {
    val pairs = Seq(LabeledPair(1, 1, 1), LabeledPair(2, 2, 0))
    val none = Metrics.prfLocal(pairs, Set.empty)
    assert(none.p == 0.0 && none.r == 0.0 && none.f1 == 0.0)
    val all = Metrics.prfLocal(pairs, Set((1L, 1L), (2L, 2L)))
    assert(all.r == 1.0 && math.abs(all.p - 0.5) < 1e-9)
  }

  test("fromCounts handles zero denominators") {
    assert(Metrics.fromCounts(0, 0, 0) == Prf(0, 0, 0))
    assert(Metrics.fromCounts(5, 0, 0).f1 == 1.0)
  }

  test("perfect prediction scores 1/1/1") {
    val pairs = Seq(LabeledPair(1, 1, 1), LabeledPair(2, 2, 0), LabeledPair(3, 3, 1))
    val prf = Metrics.prfLocal(pairs, Set((1L, 1L), (3L, 3L)))
    assert(prf == Prf(1.0, 1.0, 1.0))
  }
}
