package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators and the DuckDB Oracle on
  * representative aggregations — the substrate correctness harness the
  * other DataFrame pipelines rely on.
  */
class SynthDataSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001).cache()
  private lazy val o  = SynthData.orders(spark, sf = 0.001).cache()

  test("lineitem generator is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = SynthData.lineitem(spark, 0.001).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("scale factor controls row counts") {
    assert(SynthData.lineitem(spark, 0.001).count() == 6000)
    assert(SynthData.orders(spark, 0.001).count() == 1500)
    assert(SynthData.customer(spark, 0.001).count() == 150)
  }

  test("Oracle validates a grouped aggregation over lineitem") {
    val q = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 4).as("qty"))
    Oracle.assertEquivalent(q,
      "SELECT l_returnflag, CAST(COUNT(*) AS BIGINT) AS cnt, " +
      "ROUND(SUM(CAST(l_quantity AS DOUBLE)), 4) AS qty FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("Oracle validates a join between lineitem and orders") {
    val q = li.join(o, li("l_orderkey") === o("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(q,
      "SELECT o_orderstatus, CAST(COUNT(*) AS BIGINT) AS cnt FROM lineitem l " +
      "JOIN orders o ON CAST(l.l_orderkey AS BIGINT) = CAST(o.o_orderkey AS BIGINT) " +
      "GROUP BY o_orderstatus",
      "lineitem" -> li, "orders" -> o)
  }

  test("Oracle catches wrong results") {
    val wrong = li.groupBy("l_returnflag").agg((count(lit(1)) + 1).as("cnt"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, CAST(COUNT(*) AS BIGINT) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, seed = 1)
    val u = SynthData.uniformKeys(spark, 20000, 1000, seed = 1)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(zTop > 4 * uTop, s"zipf top $zTop vs uniform top $uTop")
  }
}
