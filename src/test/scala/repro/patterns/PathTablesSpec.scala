package repro.patterns

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.{Greedy, Interaction}

/** Tests for the precomputed path tables (Section 5.2): structure checked
  * against DuckDB joins, flows against the in-memory chain greedy.
  */
class PathTablesSpec extends SparkSpec {

  /** 1↔2, 1↔3, 3→4→5→3, 2→4, plus multi-interaction edges. */
  private lazy val net = {
    val s = spark
    import s.implicits._
    Seq(
      Interaction(1, 2, 1L, 5.0),
      Interaction(2, 1, 4L, 3.0),
      Interaction(1, 2, 7L, 2.0),
      Interaction(1, 3, 2L, 6.0),
      Interaction(3, 1, 5L, 4.0),
      Interaction(3, 4, 3L, 7.0),
      Interaction(4, 5, 6L, 4.0),
      Interaction(5, 3, 8L, 2.0),
      Interaction(2, 4, 9L, 1.0),
    ).toDF()
  }

  private lazy val adj = AdjacencyIndex.fromInteractions(
    net.as[Interaction](org.apache.spark.sql.Encoders.product[Interaction]).collect().toSeq)

  test("edgeInteractions aggregates and sorts per edge") {
    val e12 = PathTables.edgeInteractions(net)
      .where(col("src") === 1 && col("dst") === 2)
      .select(col("es")).head().getSeq[org.apache.spark.sql.Row](0)
    assert(e12.map(_.getLong(0)) === Seq(1L, 7L))
  }

  test("L2 vertex pairs match the DuckDB self-join (oracle)") {
    val l2 = PathTables.l2(net).select(col("a").cast("string") as "a", col("b").cast("string") as "b")
    Oracle.assertEquivalent(l2,
      """
      WITH e AS (SELECT DISTINCT src, dst FROM net)
      SELECT e1.src AS a, e1.dst AS b
      FROM e e1 JOIN e e2 ON e1.dst = e2.src AND e2.dst = e1.src
      WHERE e1.src <> e1.dst
      """,
      "net" -> net)
  }

  test("L3 vertex triples match the DuckDB self-join (oracle)") {
    val l3 = PathTables.l3(net).select(col("a").cast("string") as "a",
      col("b").cast("string") as "b", col("c").cast("string") as "c")
    Oracle.assertEquivalent(l3,
      """
      WITH e AS (SELECT DISTINCT src, dst FROM net)
      SELECT e1.src AS a, e1.dst AS b, e2.dst AS c
      FROM e e1
      JOIN e e2 ON e1.dst = e2.src AND e2.dst <> e1.src
      JOIN e e3 ON e2.dst = e3.src AND e3.dst = e1.src
      WHERE e1.src <> e1.dst AND e2.dst <> e1.dst
      """,
      "net" -> net)
  }

  test("C2 chain triples match the DuckDB self-join (oracle)") {
    val c2 = PathTables.c2(net).select(col("a").cast("string") as "a",
      col("b").cast("string") as "b", col("c").cast("string") as "c")
    Oracle.assertEquivalent(c2,
      """
      WITH e AS (SELECT DISTINCT src, dst FROM net)
      SELECT e1.src AS a, e1.dst AS b, e2.dst AS c
      FROM e e1 JOIN e e2 ON e1.dst = e2.src AND e2.dst <> e1.src AND e2.dst <> e1.dst
      WHERE e1.src <> e1.dst
      """,
      "net" -> net)
  }

  test("L2 flows equal the in-memory chain greedy") {
    PathTables.l2(net).collect().foreach { r =>
      val a = r.getInt(0); val b = r.getInt(1)
      val expected = Greedy.chain(Seq(adj.interactions(a, b), adj.interactions(b, a))).flow
      assert(math.abs(r.getDouble(2) - expected) < 1e-9, s"L2 flow mismatch for ($a,$b)")
    }
  }

  test("L3 flows equal the in-memory chain greedy") {
    PathTables.l3(net).collect().foreach { r =>
      val a = r.getInt(0); val b = r.getInt(1); val c = r.getInt(2)
      val expected = Greedy.chain(Seq(
        adj.interactions(a, b), adj.interactions(b, c), adj.interactions(c, a))).flow
      assert(math.abs(r.getDouble(3) - expected) < 1e-9, s"L3 flow mismatch for ($a,$b,$c)")
    }
  }

  test("arrivals stored in L2 are the Lemma 3 reduced-edge interactions") {
    val r12 = PathTables.l2(net).where(col("a") === 1 && col("b") === 2).head()
    val arrivals = r12.getSeq[org.apache.spark.sql.Row](3).map(x => (x.getLong(0), x.getDouble(1)))
    val expected = Greedy.chain(Seq(adj.interactions(1, 2), adj.interactions(2, 1))).sinkArrivals
    assert(arrivals === expected)
  }

  test("concrete L2 flow value: cycle 1->2->1") {
    // (1,5) out; (4,3) back transfers 3; (7,2) out again (ignored for flow into 1).
    val f = PathTables.l2(net).where(col("a") === 1 && col("b") === 2).head().getDouble(2)
    assert(f === 3.0)
  }

  test("concrete L3 flow value: cycle 3->4->5->3") {
    // (3,7): B4=7; (6,4): transfers 4 to 5; (8,2): transfers 2 back to 3.
    val f = PathTables.l3(net).where(col("a") === 3).head().getDouble(3)
    assert(f === 2.0)
  }

  test("tables contain no degenerate rows (a<>b, distinct triples)") {
    assert(PathTables.l2(net).where(col("a") === col("b")).count() === 0)
    assert(PathTables.l3(net).where(col("a") === col("b") || col("b") === col("c") || col("a") === col("c")).count() === 0)
    assert(PathTables.c2(net).where(col("a") === col("b") || col("b") === col("c") || col("a") === col("c")).count() === 0)
  }
}
