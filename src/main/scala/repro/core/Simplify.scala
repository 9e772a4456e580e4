package repro.core

import scala.collection.mutable

/** Graph simplification (Section 4.2.4, Algorithm 2, Lemma 3).
  *
  * Any chain `s -> v1 -> … -> vk` hanging off the source — every `vi`, `i<k`,
  * with in-degree and out-degree exactly 1 — can be replaced by a single edge
  * `(s, vk)` whose interactions are the arrivals into `vk` produced by
  * running the greedy algorithm on the chain (reserving quantity at the
  * source or at chain-interior vertices can never increase the flow reaching
  * the sink, so greedy is exact there). If an edge `(s, vk)` already exists,
  * the interaction sets are merged; merging may surface new reducible chains,
  * so the reduction iterates to a fixpoint (Figure 7's example).
  *
  * Each removed edge is processed once by a greedy scan, so the whole
  * procedure is linear in the number of interactions.
  */
object Simplify {

  final case class Result(graph: FlowGraph, chainsReduced: Int, removedInteractions: Int)

  def run(g: FlowGraph): Result = {
    val edges = mutable.Map.from(g.edges)
    val out   = mutable.Map.empty[Int, mutable.Set[Int]]
    val in    = mutable.Map.empty[Int, mutable.Set[Int]]
    g.edges.keysIterator.foreach { case (a, b) =>
      out.getOrElseUpdate(a, mutable.Set.empty) += b
      in.getOrElseUpdate(b, mutable.Set.empty) += a
    }
    def outOf(v: Int): Set[Int] = out.get(v).map(_.toSet).getOrElse(Set.empty)
    def inOf(v: Int): Set[Int]  = in.get(v).map(_.toSet).getOrElse(Set.empty)

    def removeEdge(a: Int, b: Int): Vector[(Long, Double)] = {
      val es = edges.remove((a, b)).getOrElse(Vector.empty)
      out.get(a).foreach(_ -= b)
      in.get(b).foreach(_ -= a)
      es
    }
    def addOrMergeEdge(a: Int, b: Int, es: Vector[(Long, Double)]): Unit =
      if (es.nonEmpty) {
        val merged = (edges.getOrElse((a, b), Vector.empty) ++ es).sortBy(_._1)
        edges((a, b)) = merged
        out.getOrElseUpdate(a, mutable.Set.empty) += b
        in.getOrElseUpdate(b, mutable.Set.empty) += a
      }

    var chains  = 0
    var removed = 0

    /** First vertex `v1` of a reducible chain off the source, if any:
      * `v1 ≠ sink`, `v1`'s only in-neighbour is `s`, out-degree 1, and it is
      * not a self-referential 2-cycle with the source.
      */
    def findChainStart(): Option[Int] =
      outOf(g.source).find { v1 =>
        v1 != g.sink && v1 != g.source &&
        inOf(v1) == Set(g.source) && outOf(v1).size == 1 &&
        outOf(v1).head != v1 && outOf(v1).head != g.source
      }

    var start = findChainStart()
    while (start.isDefined) {
      val v1 = start.get
      // Follow the chain: interior vertices have in-degree 1 and out-degree 1.
      val interior = mutable.ArrayBuffer(v1)
      var cur      = outOf(v1).head
      var go       = true
      while (go) {
        if (cur != g.sink && cur != g.source &&
            inOf(cur).size == 1 && outOf(cur).size == 1 &&
            outOf(cur).head != cur && outOf(cur).head != g.source &&
            !interior.contains(outOf(cur).head)) {
          interior += cur
          cur = outOf(cur).head
        } else go = false
      }
      val vk = cur
      // Collect the chain's edge sequences s -> v1 -> … -> vk.
      val pathVertices = g.source +: interior.toVector :+ vk
      val seqs = pathVertices.sliding(2).map(w => removeEdge(w(0), w(1))).toVector
      removed += seqs.map(_.size).sum
      interior.foreach { v => out.remove(v); in.remove(v) }
      // Greedy over the chain yields the arrivals into vk (Lemma 3).
      val arrivals = Greedy.chain(seqs).sinkArrivals
      addOrMergeEdge(g.source, vk, arrivals)
      removed -= arrivals.size
      chains += 1
      start = findChainStart()
    }

    Result(new FlowGraph(g.source, g.sink, edges.toMap), chains, removed)
  }
}
