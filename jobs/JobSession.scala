package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession setup for the spark-submit entrypoints — mirrors the
  * test harness (broadcast joins disabled so shuffle paths are exercised).
  */
object JobSession {
  def get(appName: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(appName)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  /** Graph subset from args (names like `AD EP`) or the full suite. */
  def configs(args: Array[String]): Seq[repro.graph.GraphGen.LiteConfig] =
    if (args.isEmpty) repro.graph.GraphGen.liteSuite
    else args.toSeq.map(repro.graph.GraphGen.lite)
}
