package repro.partition

import repro.partition.edge._
import repro.partition.vertex._

/** Registry of the 12 partitioning algorithms of the study (paper Table 2). */
object Partitioners {

  /** The six vertex-cut (edge partitioning) algorithms used with DistGNN. */
  val edgePartitioners: Seq[EdgePartitioner] =
    Seq(RandomEdge, Dbh, Hdrf, TwoPsL, Hep.hep10, Hep.hep100)

  /** The six edge-cut (vertex partitioning) algorithms used with DistDGL. */
  val vertexPartitioners: Seq[VertexPartitioner] =
    Seq(RandomVertex, Ldg, Spinner, Multilevel.metis, ByteGnn, Multilevel.kahip)

  def edgePartitioner(name: String): EdgePartitioner =
    edgePartitioners.find(_.name == name).getOrElse(sys.error(s"unknown edge partitioner: $name"))

  def vertexPartitioner(name: String): VertexPartitioner =
    vertexPartitioners.find(_.name == name).getOrElse(sys.error(s"unknown vertex partitioner: $name"))

  /** Rows of the paper's Table 2: (partitioner, cut type, category). */
  def table2: Seq[(String, String, String)] =
    edgePartitioners.map(p => (p.name, "vertex-cut", p.category)) ++
      vertexPartitioners.map(p => (p.name, "edge-cut", p.category))
}
