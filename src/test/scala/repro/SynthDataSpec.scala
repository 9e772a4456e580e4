package repro

import org.apache.spark.sql.functions._

/** Tests for the provided TPC-H-lite generators and the DuckDB oracle
  * harness itself (the oracle must catch real result differences, not just
  * run).
  */
class SynthDataSpec extends SparkSpec {

  private lazy val li  = SynthData.lineitem(spark, sf = 0.001).cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.001).cache()

  test("lineitem row count scales with sf") {
    assert(li.count() === 6000L)
  }

  test("orders keys are dense 1..N") {
    val n = ord.count()
    assert(ord.agg(min("o_orderkey"), max("o_orderkey")).head() ===
      org.apache.spark.sql.Row(1L, n))
  }

  test("aggregation query matches DuckDB (oracle round trip)") {
    val q = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum(col("l_quantity")), 2) as "qty")
      .select(col("l_returnflag"), col("cnt"), col("qty"))
    Oracle.assertEquivalent(q,
      """SELECT l_returnflag, COUNT(*) AS cnt,
                ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
         FROM lineitem GROUP BY l_returnflag""",
      "lineitem" -> li)
  }

  test("join query matches DuckDB (oracle round trip)") {
    val q = li.join(ord, col("l_orderkey") === col("o_orderkey"))
      .groupBy("o_orderstatus")
      .agg(count(lit(1)) as "cnt")
      .select(col("o_orderstatus"), col("cnt"))
    Oracle.assertEquivalent(q,
      """SELECT o_orderstatus, COUNT(*) AS cnt
         FROM lineitem JOIN orders ON CAST(l_orderkey AS BIGINT) = CAST(o_orderkey AS BIGINT)
         GROUP BY o_orderstatus""",
      "lineitem" -> li, "orders" -> ord)
  }

  test("the oracle rejects wrong results") {
    val s = spark
    import s.implicits._
    val df = Seq(("a", 1L)).toDF("k", "n")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT 'a' AS k, 2 AS n")
    }
  }

  test("the oracle rejects mismatched column sets") {
    val s = spark
    import s.implicits._
    val df = Seq(("a", 1L)).toDF("k", "wrong")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT 'a' AS k, 1 AS n")
    }
  }

  test("zipf keys are skewed toward small ranks") {
    val keys = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top  = keys.where(col("k") <= 10).count()
    assert(top > keys.count() / 10, s"only $top of ${keys.count()} rows in top-10 keys")
  }

  test("uniform keys cover the domain roughly evenly") {
    val keys = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val perKey = keys.groupBy("k").count().collect().map(_.getLong(1))
    assert(perKey.forall(c => c > 1000 && c < 3000))
  }
}
