package repro.partition

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.CompactGraph

/** Work counters accumulated while a partitioner runs. The amortization
  * tables (paper Tables 4/5) need partitioning *time*; we count the actual
  * operations the algorithm performed and let
  * [[repro.gnn.CostModel.partitioningTime]] convert them to simulated
  * seconds on the paper's hardware profile (see DESIGN.md §2).
  *
  * @param edgesStreamed sequential edge/vertex visits (cheap per-item work)
  * @param scoreEvals    per-(item, partition) score evaluations (HDRF, LDG, …)
  * @param heavyOps      in-memory ops: matching, refinement moves scanned,
  *                      expansion steps, BFS visits
  * @param passes        full passes over the graph
  */
final case class PartitionCost(
    edgesStreamed: Long = 0,
    scoreEvals: Long = 0,
    heavyOps: Long = 0,
    passes: Int = 1,
) {
  def +(o: PartitionCost): PartitionCost =
    PartitionCost(
      edgesStreamed + o.edgesStreamed,
      scoreEvals + o.scoreEvals,
      heavyOps + o.heavyOps,
      passes + o.passes,
    )
}

/** Result of edge partitioning: `part(i)` is the partition of edge i (the
  * i-th entry of the graph's `src`/`dst` arrays).
  */
final case class EdgePartitionResult(part: Array[Int], cost: PartitionCost)

/** Result of vertex partitioning: `part(v)` is the partition of vertex v. */
final case class VertexPartitionResult(part: Array[Int], cost: PartitionCost)

/** Vertex-cut partitioner: assigns every edge to exactly one partition. */
trait EdgePartitioner {
  def name: String

  /** Category as in the paper's Table 2. */
  def category: String
  def partition(g: CompactGraph, k: Int, seed: Long): EdgePartitionResult
}

/** Edge-cut partitioner: assigns every vertex to exactly one partition.
  * `trainMask(v)` marks training vertices (used by ByteGNN-style
  * partitioners; others ignore it).
  */
trait VertexPartitioner {
  def name: String
  def category: String
  def partition(
      g: CompactGraph,
      k: Int,
      trainMask: Array[Boolean],
      seed: Long,
  ): VertexPartitionResult
}

/** Deterministic arithmetic hashes shared by the driver-side partitioners
  * and their pure-DataFrame twins, so both paths produce identical
  * assignments (tested). Multipliers are small enough that products stay
  * far below Long overflow under Spark 4's ANSI mode.
  */
object Mix {
  def edge(src: Long, dst: Long, seed: Long, k: Int): Int =
    (((src * 1000003L + dst * 19349663L + seed * 7919L) % k + k) % k).toInt

  def vertex(v: Long, seed: Long, k: Int): Int =
    (((v * 1000003L + seed * 7919L) % k + k) % k).toInt

  /** Spark column expression equal to [[edge]]. */
  def edgeCol(src: org.apache.spark.sql.Column, dst: org.apache.spark.sql.Column, seed: Long, k: Int) =
    pmod(src * 1000003L + dst * 19349663L + lit(seed * 7919L), lit(k.toLong)).cast("int")

  /** Spark column expression equal to [[vertex]]. */
  def vertexCol(v: org.apache.spark.sql.Column, seed: Long, k: Int) =
    pmod(v * 1000003L + lit(seed * 7919L), lit(k.toLong)).cast("int")
}

/** Driver assignment ⇄ DataFrame bridge: all partition-quality metrics and
  * the training simulators consume assignments as DataFrames.
  */
object PartitionBridge {

  /** `(src, dst, part)` — one row per edge, driver assignment attached. */
  def edgeDf(spark: SparkSession, g: CompactGraph, assign: Array[Int]): DataFrame = {
    import spark.implicits._
    val rows = g.src.indices.map(i => (g.src(i).toLong, g.dst(i).toLong, assign(i)))
    spark.createDataset(rows).toDF("src", "dst", "part")
  }

  /** `(vid, part)` — one row per vertex. */
  def vertexDf(spark: SparkSession, assign: Array[Int]): DataFrame = {
    import spark.implicits._
    spark.createDataset(assign.toIndexedSeq.zipWithIndex.map { case (p, v) => (v.toLong, p) })
      .toDF("vid", "part")
  }
}
