package repro.core

import repro.SparkSpec

/** Tests for the Spark dataflow formulation of the greedy scan. */
class GreedySparkSpec extends SparkSpec {

  private def toDf(g: FlowGraph) = {
    val s = spark
    import s.implicits._
    g.interactions.toDF()
  }

  test("single-graph DataFrame scan matches the in-memory greedy (fig3)") {
    assert(GreedySpark.flow(toDf(TestGraphs.fig3), 0, 3) === Greedy.flow(TestGraphs.fig3))
  }

  test("single-graph DataFrame scan matches on the chain fixture") {
    assert(GreedySpark.flow(toDf(TestGraphs.chain4), 0, 3) === Greedy.flow(TestGraphs.chain4))
  }

  test("scan is insensitive to input row order") {
    val s = spark
    import s.implicits._
    val shuffled = TestGraphs.lemma2Dag.interactions.reverse.toDF()
    assert(GreedySpark.flow(shuffled, 0, 4) === Greedy.flow(TestGraphs.lemma2Dag))
  }

  test("empty DataFrame yields zero flow") {
    val s = spark
    import s.implicits._
    assert(GreedySpark.flow(Seq.empty[Interaction].toDF(), 0, 1) === 0.0)
  }

  test("flowPerGroup computes every subgraph independently") {
    val s = spark
    import s.implicits._
    val tagged = (TestGraphs.fig3.interactions.map(i =>
      GreedySpark.TaggedInteraction(1L, i.src, i.dst, i.ts, i.qty)) ++
      TestGraphs.chain4.interactions.map(i =>
        GreedySpark.TaggedInteraction(2L, i.src, i.dst, i.ts, i.qty))).toDS()
    val res = GreedySpark.flowPerGroup(tagged, 0, 3).collect().map(r => r.gid -> r.flow).toMap
    assert(res(1L) === Greedy.flow(TestGraphs.fig3))
    assert(res(2L) === Greedy.flow(TestGraphs.chain4))
  }

  test("flowPerGroup reports interaction counts") {
    val s = spark
    import s.implicits._
    val tagged = TestGraphs.fig3.interactions.map(i =>
      GreedySpark.TaggedInteraction(7L, i.src, i.dst, i.ts, i.qty)).toDS()
    val row = GreedySpark.flowPerGroup(tagged, 0, 3).collect().head
    assert(row.interactions === TestGraphs.fig3.interactionCount)
  }
}
