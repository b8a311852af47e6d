package repro.harness

import org.apache.spark.sql.SparkSession
import repro.amortize.Amortization
import repro.distdgl.DistDglSim
import repro.distgnn.DistGnnSim
import repro.gnn.{GnnConfig, GnnParams}
import repro.graph.Datasets
import repro.partition.Partitioners

/** Harnesses that compute and print each table of the paper. Bench suites
  * call these, assert on the rows, and EXPERIMENTS.md records paper vs
  * measured values.
  */
object Tables {

  // ------------------------------------------------------------------ T1
  final case class Table1Row(key: String, name: String, gtype: String, directed: Boolean, edges: Long, vertices: Long)

  /** Table 1: the five graphs (analog sizes at the current bench scale). */
  def table1(spark: SparkSession): Seq[Table1Row] =
    Datasets.specs.map { s =>
      val (g, _) = Experiments.graph(spark, s.key)
      Table1Row(s.key, s.name, s.gtype, s.directed, g.numEdges, g.numVertices)
    }

  def renderTable1(rows: Seq[Table1Row]): String =
    ("Graph | Type | Dir. | |E| | |V|" +:
      rows.map(r => f"${r.key} (${r.name}) | ${r.gtype} | ${if (r.directed) "yes" else "no"} | ${r.edges}%d | ${r.vertices}%d"))
      .mkString("\n")

  // ------------------------------------------------------------------ T2
  /** Table 2: the twelve partitioning algorithms. */
  def table2: Seq[(String, String, String)] = Partitioners.table2

  def renderTable2: String =
    ("Partitioner | Cut-Type | Category" +:
      table2.map { case (n, c, cat) => s"$n | $c | $cat" }).mkString("\n")

  // ------------------------------------------------------------------ T3
  /** Table 3: the hyper-parameter grid. */
  def renderTable3: String =
    Seq(
      "Hyper-parameter | Values",
      "Hidden Dimension | 16, 64, 512",
      "Feature size | 16, 64, 512",
      "Number of layers | 2, 3, 4",
      s"(grid size = ${GnnConfig.grid().size} combinations)",
    ).mkString("\n")

  // ------------------------------------------------------------------ T4
  val table4Algos: Seq[String] = Seq("DBH", "2PS-L", "HDRF", "HEP10", "HEP100")

  /** DistGNN epoch time for one (graph, algo, k, params). */
  def distGnnEpochTime(spark: SparkSession, key: String, algo: String, k: Int, p: GnnParams): Double =
    DistGnnSim.epoch(Experiments.edgeRun(spark, key, algo, k).quality, p).epochTime

  /** Mean DistGNN speedup vs Random over the hyper-parameter grid. */
  def distGnnSpeedup(spark: SparkSession, key: String, algo: String, k: Int): Double = {
    val grid = GnnConfig.grid("GraphSage")
    val ratios = grid.map { p =>
      distGnnEpochTime(spark, key, "Random", k, p) / distGnnEpochTime(spark, key, algo, k, p)
    }
    ratios.sum / ratios.size
  }

  /** Table 4: epochs until amortization for DistGNN (full-batch GraphSage),
    * averaged over the hyper-parameter grid and the four cluster sizes.
    */
  def table4(spark: SparkSession): Map[(String, String), Option[Double]] = {
    val grid = GnnConfig.grid("GraphSage")
    (for {
      key <- Datasets.distGnnKeys
      algo <- table4Algos
    } yield {
      val perK = Experiments.machineCounts.map { k =>
        val tPart = Experiments.edgeRun(spark, key, algo, k).partTime
        val pairs = grid.map { p =>
          (distGnnEpochTime(spark, key, "Random", k, p), distGnnEpochTime(spark, key, algo, k, p))
        }
        Amortization.averageEpochs(tPart, pairs)
      }
      val defined = perK.flatten
      val avg =
        if (defined.size < perK.size / 2.0) None // mostly slowdown => "no"
        else Some(defined.sum / defined.size)
      (key, algo) -> avg
    }).toMap
  }

  def renderTable4(t: Map[(String, String), Option[Double]]): String = {
    val header = ("Graph" +: table4Algos).mkString(" | ")
    val rows = Datasets.distGnnKeys.map { key =>
      (key +: table4Algos.map(a => Amortization.format(t((key, a))))).mkString(" | ")
    }
    (header +: rows).mkString("\n")
  }

  // ------------------------------------------------------------------ T5
  val table5Algos: Seq[String] = Seq("ByteGNN", "KaHIP", "LDG", "Spinner", "Metis")

  /** Feature/hidden combinations evaluated for Table 5 (layers fixed to 3;
    * the paper itself finds the layer count barely moves the partitioners'
    * relative effectiveness, §5.3(3)).
    */
  val table5Grid: Seq[GnnParams] =
    for (f <- Seq(16, 64, 512); h <- Seq(16, 64, 512))
      yield GnnParams("GraphSage", f, h, 3)

  /** DistDGL epoch time for one (graph, algo, k, params) from measured samples. */
  def distDglEpochTime(
      spark: SparkSession,
      key: String,
      algo: String,
      k: Int,
      p: GnnParams,
      gbs: Int = Experiments.defaultGbs,
  ): Double = {
    val s = Experiments.samples(spark, key, algo, k, p.layers, gbs)
    DistDglSim.epoch(s, p, k, gbs, Experiments.totalTrainVerts(spark, key)).epochTime
  }

  /** Mean DistDGL speedup vs Random over the Table 5 grid. */
  def distDglSpeedup(spark: SparkSession, key: String, algo: String, k: Int): Double = {
    val ratios = table5Grid.map { p =>
      distDglEpochTime(spark, key, "Random", k, p) / distDglEpochTime(spark, key, algo, k, p)
    }
    ratios.sum / ratios.size
  }

  /** Table 5: epochs until amortization for DistDGL (mini-batch GraphSage). */
  def table5(spark: SparkSession): Map[(String, String), Option[Double]] = {
    (for {
      key <- Datasets.distDglKeys
      algo <- table5Algos
    } yield {
      val perK = Experiments.machineCounts.map { k =>
        val tPart = Experiments.vertexRun(spark, key, algo, k).partTime
        val pairs = table5Grid.map { p =>
          (distDglEpochTime(spark, key, "Random", k, p), distDglEpochTime(spark, key, algo, k, p))
        }
        Amortization.averageEpochs(tPart, pairs)
      }
      val defined = perK.flatten
      val avg =
        if (defined.size < perK.size / 2.0) None
        else Some(defined.sum / defined.size)
      (key, algo) -> avg
    }).toMap
  }

  def renderTable5(t: Map[(String, String), Option[Double]]): String = {
    val header = ("Graph" +: table5Algos).mkString(" | ")
    val rows = Datasets.distDglKeys.map { key =>
      (key +: table5Algos.map(a => Amortization.format(t((key, a))))).mkString(" | ")
    }
    (header +: rows).mkString("\n")
  }
}
