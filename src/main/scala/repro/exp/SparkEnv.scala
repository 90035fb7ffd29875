package repro.exp

import org.apache.spark.sql.SparkSession

/** SparkSession factory for the jobs/ entrypoints: honours the master set
  * by spark-submit (via the spark.master system property) and falls back to
  * local[*] so `sbt "runMain repro.jobs.X"` works too.
  */
object SparkEnv {
  def session(appName: String): SparkSession =
    SparkSession.builder
      .appName(appName)
      .config("spark.master",
              sys.props.getOrElse("spark.master", sys.env.getOrElse("SPARK_MASTER", "local[*]")))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}
