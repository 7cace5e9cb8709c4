package repro.jobs

import org.apache.spark.sql.SparkSession

/** Session bootstrap shared by the table jobs: under spark-submit the master
  * comes from the submit configuration; under `sbt runMain` (or a bare JVM)
  * it falls back to local[*] so the jobs stay runnable everywhere.
  */
object JobSession {
  def create(appName: String): SparkSession = {
    val builder = SparkSession.builder().appName(appName)
    if (!sys.props.contains("spark.master") && sys.env.get("MASTER").isEmpty)
      builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
    builder.getOrCreate()
  }
}
