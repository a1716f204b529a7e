package repro.jobs

import repro.gen.QueryTableGen

/** Reproduces Fig 5: query-table generation from a prompt (GPT-3
  * substituted by the deterministic KB-backed generator).
  *
  * `spark-submit --class repro.jobs.Fig5Job repro-jobs.jar [prompt]`
  */
object Fig5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("dialite-fig5")
    val prompt = if (args.nonEmpty) args.mkString(" ")
                 else "a table about COVID-19 cases with 5 columns and 5 rows"
    println(s"prompt: $prompt")
    JobSession.dump("Fig 5 — generated query table",
      QueryTableGen.generate(spark, prompt))
    spark.stop()
  }
}
