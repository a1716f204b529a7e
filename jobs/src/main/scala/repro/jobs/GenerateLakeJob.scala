package repro.jobs

import repro.lake.{LakeGen, ParquetLake}

/** Generates the synthetic open data lake to Parquet (the paper's
  * "preprocessed data lake" substitute).
  *
  * `spark-submit --class repro.jobs.GenerateLakeJob repro-jobs.jar [dir] [sf]`
  */
object GenerateLakeJob {
  def main(args: Array[String]): Unit = {
    val dir = args.headOption.getOrElse("target/lake")
    val sf = args.lift(1).map(_.toDouble).getOrElse(0.1)
    val spark = JobSession.get("dialite-lake-gen")
    val gen = LakeGen.generate(spark, sf = sf)
    ParquetLake.write(gen.lake, dir)
    println(s"wrote ${gen.lake.tableNames.size} tables to $dir (sf=$sf)")
    gen.lake.tableNames.foreach(n => println(s"  $n (${gen.truth.family(n)})"))
    spark.stop()
  }
}
