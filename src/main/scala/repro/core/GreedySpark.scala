package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}

/** The paper's "single scan of the interactions in time order" expressed as
  * Spark dataflow (the repro mapping for a distributed substrate).
  *
  * Two shapes:
  *
  *  - [[flow]]: one graph — globally sort the interaction DataFrame by
  *    timestamp, collapse to a single partition and fold the greedy scan over
  *    the sorted iterator. The scan is inherently sequential (each step reads
  *    the buffer state the previous step wrote), so a single ordered pass is
  *    both what the paper proves sufficient and the best any execution model
  *    can do; Spark contributes the scale-out sort.
  *
  *  - [[flowPerGroup]]: thousands of subgraphs at once — the evaluation's
  *    actual workload (48.7K Bitcoin subgraphs). Interactions are grouped by
  *    subgraph id and each group's scan runs independently in parallel
  *    executors via `groupByKey.mapGroups`.
  */
object GreedySpark {

  /** Input row for per-subgraph processing. */
  final case class TaggedInteraction(gid: Long, src: Int, dst: Int, ts: Long, qty: Double)

  /** Greedy flow per subgraph id. */
  final case class GroupFlow(gid: Long, flow: Double, interactions: Int)

  /** Greedy flow of a single graph held in a DataFrame with columns
    * `src:int, dst:int, ts:long, qty:double`.
    */
  def flow(df: DataFrame, source: Int, sink: Int): Double = {
    val spark = df.sparkSession
    import spark.implicits._
    df.select($"src".cast("int"), $"dst".cast("int"), $"ts".cast("long"), $"qty".cast("double"))
      .as[Interaction]
      .repartition(1)
      .sortWithinPartitions("ts")
      .mapPartitions(it => Iterator.single(Greedy.run(it, source, sink).flow))
      .collect()
      .headOption
      .getOrElse(0.0)
  }

  /** Greedy flow of every subgraph in a tagged interaction Dataset. Each
    * subgraph's source/sink ids are `sourceId`/`sinkId` (the extraction
    * pipeline already split the seed vertex into those).
    */
  def flowPerGroup(
      tagged: Dataset[TaggedInteraction],
      sourceId: Int,
      sinkId: Int,
  ): Dataset[GroupFlow] = {
    val spark = tagged.sparkSession
    import spark.implicits._
    tagged
      .groupByKey(_.gid)
      .mapGroups { (gid, rows) =>
        val inters = rows.map(r => Interaction(r.src, r.dst, r.ts, r.qty)).toVector.sortBy(_.ts)
        GroupFlow(gid, Greedy.run(inters, sourceId, sinkId).flow, inters.size)
      }
  }
}
