package repro.distdgl

import repro.SparkSpec
import repro.gnn.GnnParams

class DistDglSimSpec extends SparkSpec {

  private def worker(
      w: Int,
      edges: Seq[Long],
      frontiers: Seq[Long],
      remoteExp: Long,
      inputs: Long,
      remote: Long,
  ) = WorkerSample(w, frontiers.head, edges, frontiers, remoteExp, inputs, remote)

  private val p3 = GnnParams(layers = 3)

  private def uniform(k: Int, remote: Long = 50): Seq[WorkerSample] =
    (0 until k).map(w => worker(w, Seq(100, 500, 1500), Seq(16, 90, 400, 1000), 20, 1200, remote))

  test("epoch time positive and scales with steps") {
    val a = DistDglSim.epoch(uniform(4), p3, 4, gbs = 64, totalTrainVerts = 64)
    val b = DistDglSim.epoch(uniform(4), p3, 4, gbs = 64, totalTrainVerts = 640)
    assert(a.epochTime > 0)
    assert(math.abs(b.epochTime / a.epochTime - 10.0) < 1e-6)
  }

  test("fewer remote inputs => faster epoch (feature fetch shrinks)") {
    val good = DistDglSim.epoch(uniform(4, remote = 10), p3, 4, 64, 64)
    val bad = DistDglSim.epoch(uniform(4, remote = 800), p3, 4, 64, 64)
    assert(good.epochTime < bad.epochTime)
    assert(good.phases.featureFetch < bad.phases.featureFetch)
  }

  test("feature fetch grows with feature size while sampling stays constant (paper Fig. 19)") {
    val s = uniform(4, remote = 400)
    val small = DistDglSim.epoch(s, GnnParams(featureSize = 16, layers = 3), 4, 64, 64)
    val large = DistDglSim.epoch(s, GnnParams(featureSize = 512, layers = 3), 4, 64, 64)
    assert(large.phases.featureFetch > 10 * small.phases.featureFetch)
    assert(math.abs(large.phases.sampling - small.phases.sampling) < 1e-12)
  }

  test("forward/backward grow with hidden dimension; sampling and fetch stay constant (paper §5.3(2))") {
    val s = uniform(4)
    val small = DistDglSim.epoch(s, GnnParams(hidden = 16, layers = 3), 4, 64, 64)
    val large = DistDglSim.epoch(s, GnnParams(hidden = 512, layers = 3), 4, 64, 64)
    assert(large.phases.forward > small.phases.forward)
    assert(large.phases.backward > small.phases.backward)
    assert(math.abs(large.phases.sampling - small.phases.sampling) < 1e-12)
  }

  test("straggler: one slow worker dominates the step time (paper Fig. 17)") {
    val balanced = uniform(4)
    val skewed = balanced.updated(0,
      worker(0, Seq(400, 2000, 6000), Seq(16, 90, 400, 1000), 80, 4800, 2000))
    val a = DistDglSim.epoch(balanced, p3, 4, 64, 64)
    val b = DistDglSim.epoch(skewed, p3, 4, 64, 64)
    assert(b.epochTime > a.epochTime)
  }

  test("input vertex balance reported as max/mean") {
    val skewed = uniform(4).updated(0,
      worker(0, Seq(100, 500, 1500), Seq(16, 90, 400, 1000), 20, 2400, 50))
    val e = DistDglSim.epoch(skewed, p3, 4, 64, 64)
    val inputs = Seq(2400L, 1200L, 1200L, 1200L)
    assert(math.abs(e.inputVertexBalance - inputs.max.toDouble / (inputs.sum / 4.0)) < 1e-9)
  }

  test("GAT step costs more than GraphSage (paper Fig. 25)") {
    val s = uniform(4)
    val sage = DistDglSim.epoch(s, GnnParams(model = "GraphSage", layers = 3), 4, 64, 64)
    val gat = DistDglSim.epoch(s, GnnParams(model = "GAT", layers = 3), 4, 64, 64)
    assert(gat.phases.forward > sage.phases.forward)
  }

  test("network bytes dominated by remote feature pulls") {
    val e = DistDglSim.epoch(uniform(4, remote = 1000), GnnParams(featureSize = 512, layers = 3), 4, 64, 64)
    val featBytes = 4.0 * 1000 * 512 * 4 // k workers * remote * f * bytes
    assert(e.totalNetworkBytes >= featBytes)
  }

  test("model update time is negligible versus the step (paper §5.3)") {
    val e = DistDglSim.epoch(uniform(4), p3, 4, 64, 64)
    assert(e.phases.modelUpdate < 0.05 * e.epochTime)
  }
}
