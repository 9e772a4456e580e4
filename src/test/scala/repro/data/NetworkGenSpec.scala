package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** Tests for the synthetic interaction-network generators (the Bitcoin /
  * CTU-13 / Prosper substitutes of DESIGN.md §3).
  */
class NetworkGenSpec extends SparkSpec {

  private lazy val small = NetworkGen.generate(spark, NetworkGen.ctuLike, 0.002).cache()

  test("row count matches the scaled interaction count") {
    assert(small.count() === NetworkGen.ctuLike.interactions(0.002))
  }

  test("schema is (src int, dst int, ts long, qty double)") {
    val f = small.schema.fields.map(f => f.name -> f.dataType.typeName).toMap
    assert(f("src") === "integer")
    assert(f("dst") === "integer")
    assert(f("ts") === "long")
    assert(f("qty") === "double")
  }

  test("no self loops") {
    assert(small.where(col("src") === col("dst")).count() === 0)
  }

  test("timestamps are globally unique (the paper's implicit assumption)") {
    assert(small.select("ts").distinct().count() === small.count())
  }

  test("endpoints stay within [1, nodes]") {
    val n = NetworkGen.ctuLike.nodes(0.002)
    assert(small.where(col("src") < 1 || col("src") > n || col("dst") < 1 || col("dst") > n).count() === 0)
  }

  test("quantities are positive") {
    assert(small.where(col("qty") <= 0).count() === 0)
  }

  test("mean quantity is near the Table 4 calibration target") {
    val mean = small.agg(avg("qty")).head().getDouble(0)
    val target = NetworkGen.ctuLike.qtyMean
    assert(mean > target * 0.5 && mean < target * 2.0, s"mean=$mean target=$target")
  }

  test("generation is deterministic") {
    val a = NetworkGen.generate(spark, NetworkGen.bitcoinLike, 0.0002).collect().toSeq
    val b = NetworkGen.generate(spark, NetworkGen.bitcoinLike, 0.0002).collect().toSeq
    assert(a === b)
  }

  test("degree distribution is skewed (hubs exist)") {
    val degs = small.groupBy("src").count().select("count").collect().map(_.getLong(0))
    val max  = degs.max.toDouble
    val mean = degs.sum.toDouble / degs.length
    assert(max > 4 * mean, s"max=$max mean=$mean — expected heavy tail")
  }

  test("stats reports Table 4 shaped columns") {
    val r = NetworkGen.stats(small).head()
    assert(r.getLong(2) === small.count())          // interactions
    assert(r.getLong(0) > 0 && r.getLong(1) > 0)    // nodes, edges
  }

  test("byName resolves all three datasets and rejects unknowns") {
    assert(NetworkGen.byName("bitcoin").name === "bitcoin")
    assert(NetworkGen.byName("ctu13").name === "ctu13")
    assert(NetworkGen.byName("prosper").name === "prosper")
    intercept[RuntimeException] { NetworkGen.byName("nope") }
  }
}
