package repro.core

import repro.SparkSpec

/** Tests for the FlowGraph model: construction, degrees, topological order,
  * synthetic endpoints (Figure 4) and seed splitting.
  */
class FlowGraphSpec extends SparkSpec {

  test("apply groups and sorts interactions per edge") {
    val g = FlowGraph(0, 1, Seq(
      Interaction(0, 1, 5L, 2.0),
      Interaction(0, 1, 1L, 3.0),
    ))
    assert(g.edges((0, 1)) === Vector((1L, 3.0), (5L, 2.0)))
  }

  test("vertices include isolated source and sink") {
    val g = new FlowGraph(7, 9, Map((1, 2) -> Vector((1L, 1.0))))
    assert(g.vertices === Set(1, 2, 7, 9))
  }

  test("degrees count distinct neighbours, not interactions") {
    val g = FlowGraph.fromEdges(0, 2, Map(
      (0, 1) -> Seq((1L, 1.0), (2L, 1.0), (3L, 1.0)),
      (1, 2) -> Seq((4L, 1.0)),
    ))
    assert(g.outDegree(0) === 1)
    assert(g.outDegree(1) === 1)
    assert(g.inDegree(2) === 1)
    assert(g.interactionCount === 4)
  }

  test("global interaction order is by timestamp") {
    val ts = TestGraphs.fig3.interactions.map(_.ts)
    assert(ts === ts.sorted)
  }

  test("topological order exists for DAGs and respects edges") {
    val order = TestGraphs.fig3.topologicalOrder.get
    val pos   = order.zipWithIndex.toMap
    TestGraphs.fig3.edges.keys.foreach { case (a, b) => assert(pos(a) < pos(b)) }
  }

  test("topological order is None for cyclic graphs") {
    val g = FlowGraph.fromEdges(0, 3, Map(
      (0, 1) -> Seq((1L, 1.0)),
      (1, 2) -> Seq((2L, 1.0)),
      (2, 1) -> Seq((3L, 1.0)),
    ))
    assert(g.topologicalOrder.isEmpty)
    assert(!g.isDag)
  }

  test("Figure 4: synthetic endpoints wire all sources and sinks") {
    val inters = Seq(
      Interaction(1, 2, 5L, 3.0),
      Interaction(3, 2, 6L, 4.0),
      Interaction(2, 4, 7L, 5.0),
      Interaction(2, 5, 8L, 6.0),
    )
    val g = FlowGraph.withSyntheticEndpoints(inters, sources = Seq(1, 3), sinks = Seq(4, 5),
      syntheticSource = -1, syntheticSink = -2)
    assert(g.source === -1 && g.sink === -2)
    assert(g.edges((-1, 1)).head._1 === Long.MinValue)
    assert(g.edges((4, -2)).head._1 === Long.MaxValue)
    assert(g.edges((-1, 3)).head._2.isPosInfinity)
    // Flow through the synthetic graph equals what reaches original sinks:
    // vertex 2 buffers 3+4=7, forwards 5 at t=7 and min(6,2)=2 at t=8.
    assert(Greedy.flow(g) === 7.0)
  }

  test("splitVertex separates a seed's outgoing and incoming interactions") {
    val inters = Seq(
      Interaction(9, 1, 1L, 5.0),
      Interaction(1, 9, 2L, 3.0),
      Interaction(9, 2, 3L, 4.0),
      Interaction(2, 9, 4L, 2.0),
    )
    val g = FlowGraph.splitVertex(9, inters, sourceId = -1, sinkId = -2)
    assert(g.edges.keySet === Set((-1, 1), (1, -2), (-1, 2), (2, -2)))
    assert(Greedy.flow(g) === 3.0 + 2.0)
  }

  test("normalizeTimestamps makes timestamps strictly increasing, preserving order") {
    val inters = Seq(
      Interaction(0, 1, 5L, 1.0),
      Interaction(0, 2, 5L, 2.0),
      Interaction(1, 2, 7L, 3.0),
    )
    val n = FlowGraph.normalizeTimestamps(inters)
    assert(n.map(_.ts) === Seq(0L, 1L, 2L))
    assert(n.map(_.qty) === Seq(1.0, 2.0, 3.0))
  }

  test("withEdges keeps source and sink") {
    val g = TestGraphs.fig3.withEdges(Map((0, 3) -> Vector((1L, 1.0))))
    assert(g.source === 0 && g.sink === 3)
    assert(g.edgeCount === 1)
  }

  test("equality is structural") {
    val a = FlowGraph.fromEdges(0, 1, Map((0, 1) -> Seq((1L, 2.0))))
    val b = FlowGraph.fromEdges(0, 1, Map((0, 1) -> Seq((1L, 2.0))))
    assert(a === b)
  }
}
