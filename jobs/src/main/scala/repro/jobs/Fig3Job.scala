package repro.jobs

import repro.core.FullDisjunction
import repro.demo.PaperTables

/** Reproduces Fig 2 → Fig 3: ALITE over the COVID integration set.
  *
  * `spark-submit --class repro.jobs.Fig3Job repro-jobs.jar`
  */
object Fig3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("dialite-fig3")
    val tables = PaperTables.fig2(spark)
    tables.foreach { case (n, df) => JobSession.dump(s"Fig 2 — $n", df) }
    val it = FullDisjunction.integrate(tables)
    JobSession.dump("Fig 3 — FD(T1, T2, T3) via ALITE", it.rendered)
    spark.stop()
  }
}
