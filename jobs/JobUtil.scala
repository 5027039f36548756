package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared session builder for the spark-submit entrypoints (one per table;
  * run e.g. `spark-submit --class repro.jobs.Table2Buildup repro.jar [scale]`).
  */
object JobUtil {
  def session(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def scaleArg(args: Array[String], default: Double = 1.0): Double =
    args.headOption.map(_.toDouble).getOrElse(default)
}
