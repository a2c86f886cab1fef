package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession builder for the spark-submit entrypoints. Each job is
  * `spark-submit --class repro.jobs.<Name> repro-jobs.jar [scaleDiv]`.
  */
object JobSession {

  def build(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  /** Optional first CLI argument: the dataset scale divisor. */
  def divArg(args: Array[String], default: Int): Int =
    args.headOption.map(_.toInt).getOrElse(default)
}
