package repro.partition.edge

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.{CompactGraph, Graph, GraphOps}
import repro.partition._

/** Degree-Based Hashing (Xie et al., NIPS 2014). Stateless streaming
  * vertex-cut: each edge is assigned by hashing its *lower-degree*
  * endpoint, so hubs get cut (replicated) and low-degree vertices stay
  * whole — a provably good strategy on power-law graphs.
  */
object Dbh extends EdgePartitioner {
  val name = "DBH"
  val category = "Stateless streaming partitioning"

  def partition(g: CompactGraph, k: Int, seed: Long): EdgePartitionResult = {
    val deg = g.degree
    val part = new Array[Int](g.numEdges)
    var i = 0
    while (i < g.numEdges) {
      val s = g.src(i); val d = g.dst(i)
      val pick = if (deg(s) <= deg(d)) s else d
      part(i) = Mix.vertex(pick.toLong, seed, k)
      i += 1
    }
    EdgePartitionResult(part, PartitionCost(edgesStreamed = g.numEdges))
  }

  /** Pure-DataFrame twin: join edges with degrees, hash the smaller-degree
    * endpoint (ties break to `src`, matching the driver path).
    */
  def partitionDf(g: Graph, spark: SparkSession, k: Int, seed: Long): DataFrame = {
    val deg = GraphOps.degrees(g, spark)
    g.edges
      .join(deg.withColumnRenamed("vid", "src").withColumnRenamed("degree", "sdeg"), "src")
      .join(deg.withColumnRenamed("vid", "dst").withColumnRenamed("degree", "ddeg"), "dst")
      .select(
        col("src"),
        col("dst"),
        Mix.vertexCol(
          when(col("sdeg") <= col("ddeg"), col("src")).otherwise(col("dst")),
          seed,
          k,
        ) as "part",
      )
  }
}
