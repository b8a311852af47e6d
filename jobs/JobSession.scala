package repro.jobs

import org.apache.spark.sql.SparkSession

/** SparkSession factory for the job entrypoints: under spark-submit the
  * master arrives as the `spark.master` system property and is respected;
  * under `sbt runMain` it falls back to local[*].
  */
object JobSession {
  def create(appName: String): SparkSession =
    SparkSession.builder
      .appName(appName)
      .config(
        "spark.master",
        sys.props.getOrElse("spark.master", sys.env.getOrElse("SPARK_MASTER", "local[*]")),
      )
      .getOrCreate()
}
