package repro.distgnn

import repro.{SparkSpec, TestGraphs}
import repro.gnn.GnnParams
import repro.metrics.{EdgeCutQuality, EdgePartLoad, PartitionMetrics}
import repro.partition.{PartitionBridge, Partitioners}

class DistGnnSimSpec extends SparkSpec {

  private def quality(algo: String, k: Int): EdgeCutQuality = {
    val (g, cg) = TestGraphs.smallPowerLaw(spark)
    val res = Partitioners.edgePartitioner(algo).partition(cg, k, 3)
    PartitionMetrics.edgeCutQuality(g, PartitionBridge.edgeDf(spark, cg, res.part), k)
  }

  /** Synthetic quality with explicit loads for closed-form checks. */
  private def synthetic(loads: Seq[(Long, Long, Long)]): EdgeCutQuality = {
    val per = loads.zipWithIndex.map { case ((e, v, s), i) => EdgePartLoad(i, e, v, s) }
    EdgeCutQuality(loads.size, 1000, per.map(_.edges).sum,
      per.map(_.verts).sum / 1000.0, 1.0, 1.0, per)
  }

  test("epoch time is positive and finite") {
    val e = DistGnnSim.epoch(quality("Random", 4), GnnParams())
    assert(e.epochTime > 0 && java.lang.Double.isFinite(e.epochTime))
  }

  test("a lower replication factor gives less network traffic (paper Fig. 3)") {
    val rnd = DistGnnSim.epoch(quality("Random", 8), GnnParams())
    val hep = DistGnnSim.epoch(quality("HEP100", 8), GnnParams())
    assert(hep.totalNetworkBytes < rnd.totalNetworkBytes)
  }

  test("a lower replication factor gives a smaller memory footprint (paper Fig. 9)") {
    val rnd = DistGnnSim.epoch(quality("Random", 8), GnnParams())
    val hep = DistGnnSim.epoch(quality("HEP100", 8), GnnParams())
    assert(hep.totalMemoryBytes < rnd.totalMemoryBytes)
  }

  test("HEP100 trains faster than Random (paper Fig. 7)") {
    val rnd = DistGnnSim.epoch(quality("Random", 8), GnnParams())
    val hep = DistGnnSim.epoch(quality("HEP100", 8), GnnParams())
    assert(hep.epochTime < rnd.epochTime)
  }

  test("network bytes scale with the feature size") {
    val q = quality("Random", 4)
    val small = DistGnnSim.epoch(q, GnnParams(featureSize = 16))
    val large = DistGnnSim.epoch(q, GnnParams(featureSize = 512))
    assert(large.totalNetworkBytes > small.totalNetworkBytes)
  }

  test("memory grows with hidden dimension and layers (paper Fig. 10)") {
    val q = quality("Random", 4)
    assert(DistGnnSim.epoch(q, GnnParams(hidden = 512)).totalMemoryBytes >
      DistGnnSim.epoch(q, GnnParams(hidden = 16)).totalMemoryBytes)
    assert(DistGnnSim.epoch(q, GnnParams(layers = 4)).totalMemoryBytes >
      DistGnnSim.epoch(q, GnnParams(layers = 2)).totalMemoryBytes)
  }

  test("memory-footprint effectiveness of a good partitioner grows with feature size (paper Fig. 10a)") {
    def ratio(f: Int): Double = {
      val hep = DistGnnSim.epoch(quality("HEP100", 8), GnnParams(featureSize = f)).totalMemoryBytes
      val rnd = DistGnnSim.epoch(quality("Random", 8), GnnParams(featureSize = f)).totalMemoryBytes
      hep / rnd
    }
    assert(ratio(512) < ratio(16)) // larger features => lower % of random
  }

  test("straggler: an imbalanced partitioning has a longer epoch than a balanced one with equal totals") {
    val balanced = synthetic(Seq((1000, 500, 100), (1000, 500, 100)))
    val skewed = synthetic(Seq((1600, 800, 160), (400, 200, 40)))
    val p = GnnParams()
    assert(DistGnnSim.epoch(skewed, p).epochTime > DistGnnSim.epoch(balanced, p).epochTime)
  }

  test("memory balance equals max/mean of machine memory (vertex-imbalance correlation, paper Fig. 5)") {
    val skewed = synthetic(Seq((1000, 900, 100), (1000, 300, 100)))
    val e = DistGnnSim.epoch(skewed, GnnParams())
    assert(e.memoryBalance > 1.0)
    val mems = e.machines.map(_.memoryBytes)
    assert(math.abs(e.memoryBalance - mems.max / (mems.sum / mems.size)) < 1e-9)
  }

  test("zero sync vertices => zero network traffic besides model sync") {
    val q = synthetic(Seq((1000, 500, 0), (1000, 500, 0)))
    val e = DistGnnSim.epoch(q, GnnParams())
    assert(e.totalNetworkBytes === 0.0)
    assert(e.modelSyncTime > 0)
  }

  test("OOM flag trips when a machine exceeds the budget") {
    val huge = synthetic(Seq((1000, 200000, 1000), (1000, 200000, 1000)))
    val e = DistGnnSim.epoch(huge, GnnParams(featureSize = 512, hidden = 512, layers = 4))
    assert(e.oom)
    val tiny = synthetic(Seq((100, 50, 0), (100, 50, 0)))
    assert(!DistGnnSim.epoch(tiny, GnnParams(featureSize = 16, hidden = 16, layers = 2)).oom)
  }

  test("GAT costs more compute than GraphSage for the same loads") {
    val q = synthetic(Seq((100000, 5000, 0)))
    val sage = DistGnnSim.epoch(q, GnnParams(model = "GraphSage"))
    val gat = DistGnnSim.epoch(q, GnnParams(model = "GAT"))
    assert(gat.machines.head.computeTime > sage.machines.head.computeTime)
  }
}
