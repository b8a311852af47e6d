package repro.bench

import repro.harness.Experiments

/** Timing probe (not part of the study) — measures one vertexRun and one
  * sampler call at bench scale so the harness cost is known.
  */
class ProbeBench extends BenchSpec {
  test("probe: one vertexRun + sampler call timing") {
    def timed[A](label: String)(f: => A): A = {
      val t0 = System.nanoTime()
      val r = f
      println(f"[probe] $label: ${(System.nanoTime() - t0) / 1e9}%.1f s")
      r
    }
    timed("graph OR")(Experiments.graph(spark, "OR"))
    timed("adjacency OR")(Experiments.adjacency(spark, "OR"))
    timed("vertexRun OR/Metis/8")(Experiments.vertexRun(spark, "OR", "Metis", 8))
    timed("vertexRun OR/KaHIP/8")(Experiments.vertexRun(spark, "OR", "KaHIP", 8))
    timed("samples OR/Metis/8/L3")(Experiments.samples(spark, "OR", "Metis", 8, 3))
    timed("samples OR/KaHIP/8/L3")(Experiments.samples(spark, "OR", "KaHIP", 8, 3))
    timed("vertexRun DI/KaHIP/32")(Experiments.vertexRun(spark, "DI", "KaHIP", 32))
    timed("samples DI/KaHIP/32/L3")(Experiments.samples(spark, "DI", "KaHIP", 32, 3))
    assert(true)
  }
}
