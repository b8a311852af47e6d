package repro.partition

import repro.{SparkSpec, TestGraphs}
import repro.graph.GraphOps
import repro.metrics.PartitionMetrics

/** Quality *orderings* from the paper (Section 4.2 / 5.2) that must emerge
  * from the real algorithm implementations — e.g. HEP100 beats random by a
  * wide margin on replication factor, multilevel partitioners beat random
  * on edge-cut.
  */
class PartitionerQualitySpec extends SparkSpec {

  private def edgeQuality(algo: String, k: Int) = {
    val (g, cg) = TestGraphs.smallPowerLaw(spark)
    val res = Partitioners.edgePartitioner(algo).partition(cg, k, 3)
    PartitionMetrics.edgeCutQuality(g, PartitionBridge.edgeDf(spark, cg, res.part), k)
  }

  private def vertexQuality(algo: String, k: Int) = {
    val (g, cg) = TestGraphs.smallPowerLaw(spark)
    val mask = GraphOps.trainMask(g, spark)
    val res = Partitioners.vertexPartitioner(algo).partition(cg, k, mask, 3)
    PartitionMetrics.vertexCutQuality(g, spark, PartitionBridge.vertexDf(spark, res.part), k)
  }

  test("DBH replication factor beats Random on a power-law graph") {
    assert(edgeQuality("DBH", 8).replicationFactor < edgeQuality("Random", 8).replicationFactor)
  }

  test("HDRF replication factor beats Random") {
    assert(edgeQuality("HDRF", 8).replicationFactor < edgeQuality("Random", 8).replicationFactor)
  }

  test("the HEP family achieves the lowest replication factor (paper Fig. 2)") {
    val rfs = Partitioners.edgePartitioners.map(p => p.name -> edgeQuality(p.name, 8).replicationFactor).toMap
    val best = rfs.minBy(_._2)._1
    assert(best == "HEP100" || best == "HEP10", s"rfs=$rfs")
  }

  test("Random has the highest replication factor (paper Fig. 2)") {
    val rfs = Partitioners.edgePartitioners.map(p => p.name -> edgeQuality(p.name, 8).replicationFactor).toMap
    val worst = rfs.maxBy(_._2)._1
    assert(worst === "Random", s"rfs=$rfs")
  }

  test("replication factors grow with the number of partitions (paper Fig. 2)") {
    Seq("Random", "DBH", "HDRF").foreach { algo =>
      assert(
        edgeQuality(algo, 32).replicationFactor > edgeQuality(algo, 4).replicationFactor,
        algo)
    }
  }

  test("replication factor is always >= 1 and <= k") {
    Partitioners.edgePartitioners.foreach { p =>
      val rf = edgeQuality(p.name, 4).replicationFactor
      assert(rf >= 0.9 && rf <= 4.0, s"${p.name}: $rf")
    }
  }

  test("Metis edge-cut beats Random on a power-law graph (paper Fig. 12)") {
    assert(vertexQuality("Metis", 8).edgeCutRatio < vertexQuality("Random", 8).edgeCutRatio)
  }

  test("KaHIP edge-cut beats Random decisively") {
    assert(vertexQuality("KaHIP", 8).edgeCutRatio < 0.8 * vertexQuality("Random", 8).edgeCutRatio)
  }

  test("LDG edge-cut beats Random") {
    assert(vertexQuality("LDG", 8).edgeCutRatio < vertexQuality("Random", 8).edgeCutRatio)
  }

  test("Random has (near-)worst edge-cut of all vertex partitioners") {
    val cuts = Partitioners.vertexPartitioners.map(p => p.name -> vertexQuality(p.name, 8).edgeCutRatio).toMap
    val rnd = cuts("Random")
    // every in-memory partitioner should do better than random
    Seq("Metis", "KaHIP", "Spinner").foreach(a => assert(cuts(a) < rnd, s"$a: ${cuts(a)} vs $rnd"))
  }

  test("edge-cut grows with the number of partitions (paper §5.2)") {
    Seq("Random", "Metis").foreach { algo =>
      assert(vertexQuality(algo, 32).edgeCutRatio > vertexQuality(algo, 4).edgeCutRatio, algo)
    }
  }

  test("KaHIP edge-cut on the road graph is tiny (paper: <0.001 on DI)") {
    val (g, cg) = TestGraphs.smallGrid(spark)
    val mask = GraphOps.trainMask(g, spark)
    val kq = PartitionMetrics.vertexCutQuality(
      g, spark,
      PartitionBridge.vertexDf(spark, Partitioners.vertexPartitioner("KaHIP").partition(cg, 4, mask, 3).part),
      4)
    val rq = PartitionMetrics.vertexCutQuality(
      g, spark,
      PartitionBridge.vertexDf(spark, Partitioners.vertexPartitioner("Random").partition(cg, 4, mask, 3).part),
      4)
    assert(kq.edgeCutRatio < 0.15, s"KaHIP on grid: ${kq.edgeCutRatio}")
    assert(rq.edgeCutRatio > 0.5, s"Random on grid: ${rq.edgeCutRatio}")
  }

  test("2PS-L produces larger vertex imbalance than HDRF on a skewed graph (paper Fig. 4/8)") {
    val (g, cg) = TestGraphs.smallWeb(spark)
    def q(algo: String) = PartitionMetrics.edgeCutQuality(
      g, PartitionBridge.edgeDf(spark, cg, Partitioners.edgePartitioner(algo).partition(cg, 4, 3).part), 4)
    assert(q("2PS-L").vertexBalance > q("HDRF").vertexBalance)
  }

  test("edge balance stays modest for all edge partitioners (paper: alpha <= 1.11)") {
    Partitioners.edgePartitioners.foreach { p =>
      val eb = edgeQuality(p.name, 8).edgeBalance
      assert(eb <= 1.3, s"${p.name}: edge balance $eb")
    }
  }
}
