package repro.metrics

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.{Graph, GraphOps}

/** Per-partition load for a vertex-cut (edge partitioning):
  * @param edges     edges assigned to the partition
  * @param verts     vertices covered (owned or replicated), |V(p_i)|
  * @param syncVerts covered vertices with ≥ 2 copies cluster-wide — the
  *                  ones that must synchronize state over the network
  */
final case class EdgePartLoad(part: Int, edges: Long, verts: Long, syncVerts: Long)

/** Quality of one edge partitioning (paper §2.1 metrics). */
final case class EdgeCutQuality(
    k: Int,
    numVertices: Long,
    numEdges: Long,
    replicationFactor: Double,
    edgeBalance: Double,
    vertexBalance: Double,
    perPart: Seq[EdgePartLoad],
)

/** Per-partition load for an edge-cut (vertex partitioning). */
final case class VertexPartLoad(part: Int, verts: Long, trainVerts: Long, localEdges: Long)

/** Quality of one vertex partitioning (paper §2.1 metrics). */
final case class VertexCutQuality(
    k: Int,
    numVertices: Long,
    numEdges: Long,
    edgeCutRatio: Double,
    vertexBalance: Double,
    trainVertexBalance: Double,
    perPart: Seq[VertexPartLoad],
)

/** Partition-quality metrics, computed with Spark SQL aggregations over the
  * assignment DataFrames (`(src, dst, part)` for edge partitionings,
  * `(vid, part)` for vertex partitionings). Every metric here has a DuckDB
  * oracle test.
  */
object PartitionMetrics {

  /** Covered vertices per partition: `(part, vid)` distinct. */
  def covers(edgeDf: DataFrame): DataFrame =
    edgeDf
      .select(col("part"), col("src") as "vid")
      .union(edgeDf.select(col("part"), col("dst") as "vid"))
      .distinct()

  /** Metrics of an edge partitioning (vertex-cut). */
  def edgeCutQuality(g: Graph, edgeDf: DataFrame, k: Int): EdgeCutQuality = {
    val cov = covers(edgeDf).cache()
    val copies = cov.groupBy("vid").agg(count(lit(1)) as "r")
    val perPartRows = edgeDf
      .groupBy("part")
      .agg(count(lit(1)) as "edges")
      .join(cov.groupBy("part").agg(count(lit(1)) as "verts"), Seq("part"), "outer")
      .join(
        cov
          .join(copies.filter(col("r") >= 2), Seq("vid"))
          .groupBy("part")
          .agg(count(lit(1)) as "syncVerts"),
        Seq("part"),
        "outer",
      )
      .na
      .fill(0L)
      .collect()
    cov.unpersist()
    val loads0 = perPartRows.map { r =>
      EdgePartLoad(
        r.getAs[Int]("part"),
        r.getAs[Long]("edges"),
        r.getAs[Long]("verts"),
        r.getAs[Long]("syncVerts"),
      )
    }.toSeq
    // empty partitions still count toward the balance denominators
    val present = loads0.map(_.part).toSet
    val loads = (loads0 ++ (0 until k).filterNot(present).map(p => EdgePartLoad(p, 0, 0, 0)))
      .sortBy(_.part)
    val sumV = loads.map(_.verts).sum
    EdgeCutQuality(
      k = k,
      numVertices = g.numVertices,
      numEdges = loads.map(_.edges).sum,
      replicationFactor = sumV.toDouble / g.numVertices,
      edgeBalance = balance(loads.map(_.edges)),
      vertexBalance = balance(loads.map(_.verts)),
      perPart = loads,
    )
  }

  /** Metrics of a vertex partitioning (edge-cut). */
  def vertexCutQuality(
      g: Graph,
      spark: SparkSession,
      vertexDf: DataFrame,
      k: Int,
      splitSeed: Int = 42,
  ): VertexCutQuality = {
    val sp = vertexDf.withColumnRenamed("vid", "src").withColumnRenamed("part", "psrc")
    val dp = vertexDf.withColumnRenamed("vid", "dst").withColumnRenamed("part", "pdst")
    val edgesP = g.edges.join(sp, "src").join(dp, "dst").cache()
    val numE = edgesP.count()
    val cut = edgesP.filter(col("psrc") =!= col("pdst")).count()
    val localEdges = edgesP
      .filter(col("psrc") === col("pdst"))
      .groupBy(col("psrc") as "part")
      .agg(count(lit(1)) as "localEdges")
    val train = GraphOps
      .split(g, spark, splitSeed)
      .filter(col("role") === "train")
      .join(vertexDf, "vid")
      .groupBy("part")
      .agg(count(lit(1)) as "trainVerts")
    val perPartRows = vertexDf
      .groupBy("part")
      .agg(count(lit(1)) as "verts")
      .join(train, Seq("part"), "outer")
      .join(localEdges, Seq("part"), "outer")
      .na
      .fill(0L)
      .collect()
    edgesP.unpersist()
    val loads0 = perPartRows.map { r =>
      VertexPartLoad(
        r.getAs[Int]("part"),
        r.getAs[Long]("verts"),
        r.getAs[Long]("trainVerts"),
        r.getAs[Long]("localEdges"),
      )
    }.toSeq
    val present = loads0.map(_.part).toSet
    val loads = (loads0 ++ (0 until k).filterNot(present).map(p => VertexPartLoad(p, 0, 0, 0)))
      .sortBy(_.part)
    VertexCutQuality(
      k = k,
      numVertices = g.numVertices,
      numEdges = numE,
      edgeCutRatio = if (numE == 0) 0.0 else cut.toDouble / numE,
      vertexBalance = balance(loads.map(_.verts)),
      trainVertexBalance = balance(loads.map(_.trainVerts)),
      perPart = loads,
    )
  }

  /** max / mean — 1.0 is perfectly balanced. */
  def balance(xs: Seq[Long]): Double = {
    if (xs.isEmpty) 1.0
    else {
      val mean = xs.sum.toDouble / xs.size
      if (mean == 0.0) 1.0 else xs.max / mean
    }
  }
}
