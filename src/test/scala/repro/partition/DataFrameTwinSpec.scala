package repro.partition

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestGraphs}
import repro.partition.edge.{Dbh, RandomEdge}
import repro.partition.vertex.RandomVertex

/** The stateless partitioners have pure-DataFrame implementations (the
  * distributed-dataflow path) — they must agree exactly with the
  * driver-side implementations used by the harness.
  */
class DataFrameTwinSpec extends SparkSpec {

  for (k <- Seq(4, 32)) {
    test(s"RandomEdge DataFrame twin matches driver assignment, k=$k") {
      val (g, cg) = TestGraphs.smallPowerLaw(spark)
      val driver = PartitionBridge.edgeDf(spark, cg, RandomEdge.partition(cg, k, 9).part)
      val df = RandomEdge.partitionDf(g, k, 9)
      assert(df.except(driver).count() === 0)
      assert(driver.except(df).count() === 0)
    }

    test(s"DBH DataFrame twin matches driver assignment, k=$k") {
      val (g, cg) = TestGraphs.smallWeb(spark)
      val driver = PartitionBridge.edgeDf(spark, cg, Dbh.partition(cg, k, 9).part)
      val df = Dbh.partitionDf(g, spark, k, 9)
      assert(df.except(driver).count() === 0)
      assert(driver.except(df).count() === 0)
    }

    test(s"RandomVertex DataFrame twin matches driver assignment, k=$k") {
      val (g, cg) = TestGraphs.smallGrid(spark)
      val driver = PartitionBridge.vertexDf(spark,
        RandomVertex.partition(cg, k, new Array[Boolean](cg.numVertices), 9).part)
      val df = RandomVertex.partitionDf(g, spark, k, 9)
      assert(df.except(driver).count() === 0)
      assert(driver.except(df).count() === 0)
    }
  }

  test("Mix.edgeCol stays within [0, k)") {
    val (g, _) = TestGraphs.smallPowerLaw(spark)
    val parts = RandomEdge.partitionDf(g, 7, 3).agg(min("part"), max("part")).head()
    assert(parts.getInt(0) >= 0 && parts.getInt(1) < 7)
  }
}
