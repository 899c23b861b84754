package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared bits for the spark-submit entrypoints. */
object JobUtil {

  /** Session for a job: respects a master set by spark-submit, falls back to
    * local[*] when launched directly (e.g. from sbt).
    */
  def session(app: String): SparkSession = {
    val b = SparkSession.builder().appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
    val withMaster =
      if (sys.props.contains("spark.master")) b
      else b.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
    withMaster.getOrCreate()
  }

  def arg(args: Array[String], i: Int, default: String): String =
    if (args.length > i) args(i) else default
}
