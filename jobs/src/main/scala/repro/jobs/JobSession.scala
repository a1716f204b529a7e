package repro.jobs

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Shared session bootstrap for spark-submit entrypoints. */
object JobSession {
  def get(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "16"))
      .getOrCreate()

  /** Render a DataFrame fully to stdout (paper tables are small). */
  def dump(title: String, df: DataFrame): Unit = {
    println(s"== $title")
    df.show(1000, truncate = false)
  }
}
