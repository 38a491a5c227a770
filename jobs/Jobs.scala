package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared scaffolding for the spark-submit entrypoints in this directory. */
object Jobs {

  def session(app: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.ui.enabled", "false")
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }

  def intArg(args: Array[String], i: Int, default: Int): Int =
    if (args.length > i) args(i).toInt else default
}
