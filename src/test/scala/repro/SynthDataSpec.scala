package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators: determinism, shapes, and a
  * representative RA preprocessing query checked against DuckDB — the same
  * oracle path the hybrid benchmark's RA stage uses.
  */
class SynthDataSpec extends SparkSpec {

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 3).agg(sum("l_quantity")).collect()(0)
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 3).agg(sum("l_quantity")).collect()(0)
    assert(a == b)
  }

  test("row counts scale with sf") {
    assert(SynthData.orders(spark, sf = 0.001).count() == 1500)
    assert(SynthData.customer(spark, sf = 0.001).count() == 150)
    assert(SynthData.part(spark, sf = 0.001).count() == 200)
  }

  test("TPC-H-lite join/aggregate preprocessing matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.0005)
    val o  = SynthData.orders(spark, sf = 0.0005)
    val got = li.join(o, li("l_orderkey") === o("o_orderkey"))
      .groupBy("o_orderstatus")
      .agg(sum("l_quantity") as "qty", count(lit(1)) as "cnt")
      .select("o_orderstatus", "qty", "cnt")
    Oracle.assertEquivalent(
      got,
      """SELECT o_orderstatus, SUM(CAST(l_quantity AS DOUBLE)) AS qty, COUNT(*) AS cnt
        |FROM lineitem JOIN orders ON CAST(l_orderkey AS BIGINT) = CAST(o_orderkey AS BIGINT)
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> o)
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    assert(zTop > uTop * 3, s"zipf top=$zTop uniform top=$uTop")
  }
}
