package repro.patterns

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.functions._
import repro.core.{FlowGraph, FlowPipeline}
import repro.patterns.PathTables.TsQty

/** Preprocessing-based pattern enumeration (PB, Section 5.2): instances are
  * assembled by joining the precomputed path tables (merge joins in the
  * paper; Catalyst sort-merge joins here — broadcast is disabled in the test
  * config), and flows of independent parallel paths are sums of the
  * precomputed chain flows (Lemma 3). Only P4, whose chords make the cycle
  * non-independent, must fall back to per-instance LP flow computation —
  * exactly the paper's observation for Bitcoin P4*.
  *
  * Every function returns `(instances, avgFlow)` for one pattern of
  * Tables 9–11.
  */
object PatternEnum {

  final case class PatternResult(pattern: String, instances: Long, avgFlow: Double)

  private def countAvg(df: DataFrame, flowCol: String): (Long, Double) = {
    val r = df.agg(count(lit(1)), avg(col(flowCol))).head()
    (r.getLong(0), if (r.isNullAt(1)) 0.0 else r.getDouble(1))
  }

  /** P1 — 2-hop chains: a straight scan of C2. */
  def p1(c2: DataFrame): (Long, Double) = countAvg(c2, "flow")

  /** P2 — pairs of 2-hop cycles sharing `a` (unordered). The intermediates
    * of two L2 rows at the same `a` are distinct by construction, so the
    * pair join collapses to per-`a` combinatorics: `C(n_a, 2)` instances
    * with total flow `(n_a - 1) * Σ flow_a` — this closed form is what lets
    * PB report tens of billions of instances in seconds (the paper's
    * Bitcoin P2 row: 22.3G instances, 30.59 s).
    */
  def p2(l2: DataFrame): (Long, Double) = {
    val perA = l2.groupBy(col("a")).agg(count(lit(1)) as "n", sum(col("flow")) as "f")
    val r = perA
      .select((col("n") * (col("n") - 1) / 2).cast("long") as "pairs",
              ((col("n") - 1) * col("f")) as "flowsum")
      .agg(sum(col("pairs")), sum(col("flowsum")))
      .head()
    val pairs = if (r.isNullAt(0)) 0L else r.getLong(0)
    val fsum  = if (r.isNullAt(1)) 0.0 else r.getDouble(1)
    (pairs, if (pairs == 0) 0.0 else fsum / pairs)
  }

  /** P3 — 3-hop cycles: a straight scan of L3. */
  def p3(l3: DataFrame): (Long, Double) = countAvg(l3, "flow")

  /** Raw interaction arrays of one P4 instance (public: Spark codegen needs
    * access to the encoder's target class).
    */
  final case class P4Row(
      a: Int, b: Int, c: Int,
      e1: Seq[TsQty], e2: Seq[TsQty], e3: Seq[TsQty], e4: Seq[TsQty], e5: Seq[TsQty])

  /** P4 — 3-hop cycle plus chords `a→c`, `b→a`. The chords couple the paths,
    * so precomputed flows are unusable: each instance's raw interactions are
    * gathered and the max flow runs through the Section 4 pipeline
    * (PreSim → LP) per instance.
    */
  def p4(net: DataFrame, cap: Option[Long] = None): (Long, Double) = {
    val spark = net.sparkSession
    import spark.implicits._
    val e = PathTables.edgeInteractions(net)
    val joined0 = e.as("e1")
      .join(e.as("e2"), $"e1.dst" === $"e2.src" && $"e2.dst" =!= $"e1.src")
      .join(e.as("e3"), $"e2.dst" === $"e3.src" && $"e3.dst" === $"e1.src")
      .join(e.as("e4"), $"e4.src" === $"e1.src" && $"e4.dst" === $"e2.dst")
      .join(e.as("e5"), $"e5.src" === $"e1.dst" && $"e5.dst" === $"e1.src")
      .where($"e1.src" =!= $"e1.dst" && $"e2.dst" =!= $"e1.dst")
      .select(
        $"e1.src" as "a", $"e1.dst" as "b", $"e2.dst" as "c",
        $"e1.es" as "e1", $"e2.es" as "e2", $"e3.es" as "e3", $"e4.es" as "e4", $"e5.es" as "e5",
      )
      .as[P4Row]
    val joined = cap.fold(joined0)(c => joined0.limit(c.toInt))
    val flows: Dataset[Double] = joined.map { r =>
      // Pattern vertex ids: 0=a, 1=b, 2=c, 3=a' (split sink).
      def es(s: Seq[TsQty]) = s.map(t => (t.ts, t.qty))
      val g = FlowGraph.fromEdges(0, 3, Map(
        (0, 1) -> es(r.e1), (1, 2) -> es(r.e2), (2, 3) -> es(r.e3),
        (0, 2) -> es(r.e4), (1, 3) -> es(r.e5),
      ))
      FlowPipeline.preSim(g).flow
    }
    countAvg(flows.toDF("flow"), "flow")
  }

  /** P4 capped at the first `cap` instances (the paper's starred protocol:
    * "search … was terminated after finding the first 3000 instances").
    */
  def p4Limited(net: DataFrame, cap: Long): (Long, Double) = p4(net, Some(cap))

  /** P5 — one 2-hop and one 3-hop cycle sharing `a`, intermediates distinct:
    * the merge-join of L2 and L3 described for Figure 8(a).
    */
  def p5(l2: DataFrame, l3: DataFrame): (Long, Double) = {
    val joined = l2.as("x")
      .join(l3.as("y"), col("x.a") === col("y.a")
        && col("x.b") =!= col("y.b") && col("x.b") =!= col("y.c"))
      .select((col("x.flow") + col("y.flow")) as "flow")
    countAvg(joined, "flow")
  }

  /** P6 — pairs of 3-hop cycles sharing `a`, all intermediates distinct
    * (unordered: `b1 < b2`).
    */
  def p6(l3: DataFrame): (Long, Double) = {
    val paired = l3.as("x")
      .join(l3.as("y"), col("x.a") === col("y.a") && col("x.b") < col("y.b")
        && col("x.c") =!= col("y.b") && col("x.c") =!= col("y.c") && col("y.c") =!= col("x.b"))
      .select((col("x.flow") + col("y.flow")) as "flow")
    countAvg(paired, "flow")
  }

  /** RP1 — non-rigid parallel 2-hop chains: aggregate C2 per `(a, c)`. */
  def rp1(c2: DataFrame): (Long, Double) =
    countAvg(c2.groupBy(col("a"), col("c")).agg(sum(col("flow")) as "flow"), "flow")

  /** RP2 — non-rigid parallel 2-hop cycles (Fig. 9(b)): aggregate L2 per `a`. */
  def rp2(l2: DataFrame): (Long, Double) =
    countAvg(l2.groupBy(col("a")).agg(sum(col("flow")) as "flow"), "flow")

  /** RP3 — non-rigid parallel 3-hop cycles: aggregate L3 per `a`. */
  def rp3(l3: DataFrame): (Long, Double) =
    countAvg(l3.groupBy(col("a")).agg(sum(col("flow")) as "flow"), "flow")
}
