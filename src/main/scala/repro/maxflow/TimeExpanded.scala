package repro.maxflow

import repro.core.{FlowGraph, Interaction}
import scala.collection.mutable

/** Maximum flow of a temporal interaction network via the time-expanded
  * static graph of Akrida et al. (the equivalence shown in Section 4.2.1).
  *
  * Construction:
  *   - the source and the sink stay single nodes `S`, `T`;
  *   - every other vertex `v` gets one node version `v@t` per distinct
  *     timestamp `t` at which some interaction **arrives** at `v`;
  *   - holdover arcs `v@t_k -> v@t_{k+1}` with infinite capacity model the
  *     unbounded buffer carrying quantity forward in time;
  *   - an interaction `(v, u, t, q)` becomes an arc of capacity `q` whose
  *     tail is `v`'s latest version **strictly before** `t` (constraint (2)
  *     allows only quantity received before `t_i` to be forwarded; if no such
  *     version exists the interaction can never carry flow and is dropped)
  *     and whose head is `u@t` (or `T` when `u` is the sink; tail is `S` when
  *     `v` is the source, which has infinite supply).
  *
  * Nodes and arcs are both linear in the number of interactions; Dinic then
  * yields the exact maximum flow. This is the oracle used to validate the
  * paper's LP formulation in the test suites, and an exact solver in its own
  * right.
  */
object TimeExpanded {

  def maxFlow(g: FlowGraph): Double = maxFlow(g.interactions, g.source, g.sink)

  def maxFlow(inters: Seq[Interaction], source: Int, sink: Int): Double = {
    if (inters.isEmpty) return 0.0

    // Arrival timestamps per intermediate vertex, sorted ascending.
    val arrivals = mutable.Map.empty[Int, mutable.SortedSet[Long]]
    inters.foreach { i =>
      if (i.dst != sink && i.dst != source)
        arrivals.getOrElseUpdate(i.dst, mutable.SortedSet.empty[Long]) += i.ts
    }

    val id      = mutable.Map.empty[(Int, Long), Int]
    var next    = 0
    def alloc(): Int = { val v = next; next += 1; v }
    val s = alloc()
    val t = alloc()
    val versions: Map[Int, Array[Long]] = arrivals.iterator.map { case (v, ts) =>
      val arr = ts.toArray
      arr.foreach(tm => id((v, tm)) = alloc())
      v -> arr
    }.toMap

    val dinic = new Dinic(next)

    // Holdover arcs between consecutive versions of each vertex.
    versions.foreach { case (v, ts) =>
      var i = 0
      while (i + 1 < ts.length) {
        dinic.addEdge(id((v, ts(i))), id((v, ts(i + 1))), Double.PositiveInfinity)
        i += 1
      }
    }

    /** Latest version of `v` strictly before time `tm`, or -1. */
    def versionBefore(v: Int, tm: Long): Int =
      versions.get(v) match {
        case None => -1
        case Some(ts) =>
          // binary search for greatest ts(i) < tm
          var lo = 0; var hi = ts.length - 1; var ans = -1
          while (lo <= hi) {
            val mid = (lo + hi) >>> 1
            if (ts(mid) < tm) { ans = mid; lo = mid + 1 } else hi = mid - 1
          }
          if (ans < 0) -1 else id((v, ts(ans)))
      }

    inters.foreach { i =>
      val tail =
        if (i.src == source) s
        else if (i.src == sink) -1 // sink must not forward; drop (no outgoing from sink by assumption)
        else versionBefore(i.src, i.ts)
      if (tail >= 0) {
        val head =
          if (i.dst == sink) t
          else if (i.dst == source) -1 // flow back into the infinite source is useless; drop
          else id((i.dst, i.ts))
        if (head >= 0) dinic.addEdge(tail, head, i.qty)
      }
    }

    dinic.maxFlow(s, t)
  }
}
