package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided TPC-H-lite generators and the DuckDB oracle
  * plumbing they feed (the repo's shared correctness substrate).
  */
class SynthDataSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001).cache()

  test("lineitem generates the declared row count and schema") {
    assert(li.count() == 6000L)
    assert(li.columns.contains("l_orderkey") && li.columns.contains("l_shipdate"))
  }

  test("lineitem aggregation matches DuckDB (oracle)") {
    // project to the needed scalar columns — DateType rows fail external-row
    // decoding on collect() in this Spark build, and the oracle collects its
    // input tables
    val slim = li.select("l_returnflag", "l_quantity")
    val agg = slim.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum("l_quantity"), 2) as "qty")
    Oracle.assertEquivalent(agg,
      """SELECT l_returnflag, count(*) AS cnt,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> slim)
  }

  test("orders join customer matches DuckDB (oracle)") {
    val o = SynthData.orders(spark, sf = 0.001).select("o_custkey")
    val c = SynthData.customer(spark, sf = 0.001).select("c_custkey", "c_mktsegment")
    val joined = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(joined,
      """SELECT c_mktsegment, count(*) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.part(spark, sf = 0.001, seed = 9).collect().map(_.toString).sorted
    val b = SynthData.part(spark, sf = 0.001, seed = 9).collect().map(_.toString).sorted
    assert(a.toSeq == b.toSeq)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(z > u * 3, s"zipf top freq $z not ≫ uniform top freq $u")
  }
}
