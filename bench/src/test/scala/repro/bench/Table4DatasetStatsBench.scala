package repro.bench

import repro.SparkSpec
import repro.data.NetworkGen
import repro.harness.Timing

/** Table 4 — characteristics of the (synthetic stand-in) datasets.
  *
  * Paper (real data):   Bitcoin 12M/27.7M/45.5M/34.4B,
  *                      CTU-13 607K/697K/2.8M/19.2KB,
  *                      Prosper 88K/3M/3.04M/$76.
  * Ours are the same generators the flow/pattern benches run on, at the
  * bench scale factors — recorded side by side in EXPERIMENTS.md.
  */
class Table4DatasetStatsBench extends SparkSpec {

  test("Table 4: dataset characteristics") {
    val rows = BenchConfig.all.map { case (spec, sf) =>
      val df = NetworkGen.generate(spark, spec, sf)
      val r  = NetworkGen.stats(df).head()
      Seq(spec.name, s"sf=$sf", r.getLong(0).toString, r.getLong(1).toString,
          r.getLong(2).toString, f"${r.getDouble(3)}%.2f")
    }
    println("\n=== Table 4: Characteristics of datasets (synthetic stand-ins) ===")
    println(Timing.table(Seq("Dataset", "scale", "#nodes", "#edges", "#interactions", "avg flow"), rows))
    assert(rows.size === 3)
  }
}
