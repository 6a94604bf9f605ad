package repro.jobs

import org.apache.spark.sql.SparkSession

/** Session management shared by the spark-submit entrypoints: reuse an
  * already-running SparkSession (so the jobs are callable in-process, e.g.
  * from tests) and only stop a session this job itself created.
  */
object JobEnv {
  def withSpark(appName: String)(body: SparkSession => Unit): Unit = {
    val preExisting = SparkSession.getActiveSession.orElse(SparkSession.getDefaultSession)
    val spark = preExisting.getOrElse(
      SparkSession.builder.appName(appName).getOrCreate())
    try body(spark)
    finally if (preExisting.isEmpty) spark.stop()
  }
}
