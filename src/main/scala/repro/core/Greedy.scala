package repro.core

import scala.collection.mutable

/** Greedy flow computation (Section 4.1, Definitions 4–5).
  *
  * All interactions are processed in a single pass in timestamp order; each
  * interaction `(t_i, q_i)` on edge `(v, u)` transfers `min(q_i, B_v)` from
  * `v`'s buffer to `u`'s. The source buffer is infinite; the greedy flow is
  * whatever the sink has buffered after the last interaction. Linear in the
  * number of interactions.
  *
  * Tie semantics (DESIGN.md §3): quantities arriving at timestamp `t` become
  * usable only by interactions with timestamp strictly greater than `t`
  * (constraint (2) of the LP uses `t_j < t_i`). Interactions sharing a
  * timestamp therefore see the buffer state as of the end of the previous
  * timestamp, while their own sends still debit the sender so that two
  * same-time sends cannot double-spend. On inputs with distinct timestamps —
  * the paper's implicit assumption — this is the textbook greedy scan.
  */
object Greedy {

  /** Outcome of a greedy scan.
    *
    * @param flow          total quantity buffered at the sink (Definition 5)
    * @param sinkArrivals  the `(ts, q)` events with `q > 0` that increased the
    *                      sink's buffer — exactly the interaction set that
    *                      Lemma 3 places on the reduced edge when the sink of
    *                      the scan is the last vertex of a chain
    * @param buffers       final buffer of every non-source vertex
    */
  final case class Result(
      flow: Double,
      sinkArrivals: Vector[(Long, Double)],
      buffers: Map[Int, Double],
  )

  /** Run the greedy scan over a pre-sorted interaction sequence. */
  def run(inters: IterableOnce[Interaction], source: Int, sink: Int): Result = {
    val buf      = mutable.Map.empty[Int, Double].withDefaultValue(0.0)
    val pending  = mutable.Map.empty[Int, Double].withDefaultValue(0.0)
    val arrivals = Vector.newBuilder[(Long, Double)]
    var lastTs   = Long.MinValue

    def flushPending(): Unit = {
      pending.foreach { case (v, q) => buf(v) += q }
      pending.clear()
    }

    val it = inters.iterator
    while (it.hasNext) {
      val i = it.next()
      if (i.ts != lastTs) { flushPending(); lastTs = i.ts }
      val avail = if (i.src == source) Double.PositiveInfinity else buf(i.src)
      val q     = math.min(i.qty, avail)
      if (q > 0) {
        if (i.src != source) buf(i.src) -= q
        pending(i.dst) += q
        if (i.dst == sink) arrivals += ((i.ts, q))
      }
    }
    flushPending()
    Result(buf(sink), arrivals.result(), buf.toMap)
  }

  /** Greedy flow of a graph: scan its interactions in time order. */
  def run(g: FlowGraph): Result = run(g.interactions, g.source, g.sink)

  /** Just the flow value `f(G)`. */
  def flow(g: FlowGraph): Double = run(g).flow

  /** Greedy scan of a chain given as consecutive edge interaction sequences
    * `edgeSeqs(0) = (s, v1)_S, edgeSeqs(1) = (v1, v2)_S, …`. Returns the
    * arrivals into the chain's last vertex and their total — the Lemma 3
    * reduction used by simplification and by the precomputed path tables.
    */
  def chain(edgeSeqs: Seq[Seq[(Long, Double)]]): Result = {
    val k = edgeSeqs.size
    require(k >= 1, "chain needs at least one edge")
    // Vertices are numbered 0 (source) .. k (chain end / scan sink).
    val inters = edgeSeqs.zipWithIndex.flatMap { case (es, i) =>
      es.map { case (t, q) => Interaction(i, i + 1, t, q) }
    }
    run(inters.sortBy(_.ts), source = 0, sink = k)
  }
}
