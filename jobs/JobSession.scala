package repro.jobs

import org.apache.spark.sql.SparkSession

/** Session construction shared by all job entrypoints.
  *
  * Under spark-submit the master comes from the launcher (`--master` /
  * conf); when run directly (sbt runMain, IDE) we fall back to `local[*]`
  * so the jobs are usable in both environments.
  */
object JobSession {
  def apply(appName: String): SparkSession = {
    val builder = SparkSession.builder().appName(appName)
    if (sys.props.get("spark.master").isEmpty)
      builder.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
    val s = builder.getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}
