package repro.partition.edge

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.graph.{CompactGraph, Graph}
import repro.partition._

/** Stateless streaming vertex-cut baseline: each edge is hashed to a
  * partition independently. This is the paper's `Random` edge partitioner
  * and the baseline every speedup in Section 4 is measured against.
  */
object RandomEdge extends EdgePartitioner {
  val name = "Random"
  val category = "Stateless streaming partitioning"

  def partition(g: CompactGraph, k: Int, seed: Long): EdgePartitionResult = {
    val part = new Array[Int](g.numEdges)
    var i = 0
    while (i < g.numEdges) {
      part(i) = Mix.edge(g.src(i).toLong, g.dst(i).toLong, seed, k)
      i += 1
    }
    EdgePartitionResult(part, PartitionCost(edgesStreamed = g.numEdges))
  }

  /** Pure-DataFrame twin of [[partition]] — identical assignment, computed
    * distributed (tested for equality with the driver path).
    */
  def partitionDf(g: Graph, k: Int, seed: Long): DataFrame =
    g.edges.select(
      col("src"),
      col("dst"),
      Mix.edgeCol(col("src"), col("dst"), seed, k) as "part",
    )
}
