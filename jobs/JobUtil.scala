package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.tgraph.{GenConfig, TemporalGraphGen}

/** Shared plumbing for the spark-submit entrypoints in `jobs/`. */
object JobUtil {

  def session(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.ui.enabled", "false")
      .getOrCreate()

  /** Dataset selection: no args = all eight analogs, else names. */
  def pick(args: Array[String]): Seq[GenConfig] =
    if (args.isEmpty) TemporalGraphGen.datasets
    else args.toSeq.map(TemporalGraphGen.byName)
}
