package repro.jobs

import repro.analyze.Analytics
import repro.core.FullDisjunction
import repro.demo.PaperTables

/** Reproduces Example 3: analysis over the Fig 3 integrated table —
  * extremes of the vaccination rate and the two correlations (paper:
  * 0.16 and 0.9).
  *
  * `spark-submit --class repro.jobs.Example3Job repro-jobs.jar`
  */
object Example3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("dialite-example3")
    val it = FullDisjunction.integrate(PaperTables.fig2(spark)).asTable
    val vax = "Vaccination Rate (1+ dose)"
    val lo = Analytics.argExtreme(it, "City", vax, smallest = true)
    val hi = Analytics.argExtreme(it, "City", vax, smallest = false)
    println(s"lowest vaccination rate:  ${lo.get._1} (${lo.get._2}%)")
    println(s"highest vaccination rate: ${hi.get._1} (${hi.get._2}%)")
    val r1 = Analytics.pearson(it, vax, "Death Rate (per 100k residents)")
    val r2 = Analytics.pearson(it, "Total Cases", vax)
    println(f"corr(vaccination, death rate) = $r1%.2f   (paper: 0.16)")
    println(f"corr(cases, vaccination)      = $r2%.2f   (paper: 0.9)")
    spark.stop()
  }
}
