package repro.jobs

import repro.core.{FullDisjunction, OuterJoinIntegration}
import repro.er.EntityResolver

import repro.demo.PaperTables

/** Reproduces Fig 7 → Fig 8: outer join vs ALITE FD, and entity
  * resolution over both results.
  *
  * `spark-submit --class repro.jobs.Fig8Job repro-jobs.jar`
  */
object Fig8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("dialite-fig8")
    val tables = PaperTables.fig7(spark)
    tables.foreach { case (n, df) => JobSession.dump(s"Fig 7 — $n", df) }

    val oj = OuterJoinIntegration.integrate(tables)
    JobSession.dump("Fig 8(a) — outer join T4 ⟗ T5 ⟗ T6", oj.rendered)
    val fd = FullDisjunction.integrate(tables)
    JobSession.dump("Fig 8(b) — FD(T4, T5, T6) via ALITE", fd.rendered)
    JobSession.dump("Fig 8(c) — ER over outer join", EntityResolver.resolve(oj).rendered)
    JobSession.dump("Fig 8(d) — ER over FD", EntityResolver.resolve(fd).rendered)
    spark.stop()
  }
}
