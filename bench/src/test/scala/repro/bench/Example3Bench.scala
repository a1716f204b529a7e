package repro.bench

import repro.SparkSpec
import repro.analyze.Analytics
import repro.core.FullDisjunction
import repro.demo.PaperTables

/** Paper artifact: Example 3 — analysis over the Fig 3 integrated table.
  * Paper numbers: Boston lowest / Toronto highest vaccination rate;
  * corr(vaccination, death rate) = 0.16; corr(cases, vaccination) = 0.9.
  */
class Example3Bench extends SparkSpec {

  test("Example 3: extremes and correlations match the paper") {
    val it = FullDisjunction.integrate(PaperTables.fig2(spark)).asTable
    val vax = "Vaccination Rate (1+ dose)"
    val lo = Analytics.argExtreme(it, "City", vax, smallest = true).get
    val hi = Analytics.argExtreme(it, "City", vax, smallest = false).get
    val r1 = Analytics.pearson(it, vax, "Death Rate (per 100k residents)")
    val r2 = Analytics.pearson(it, "Total Cases", vax)

    BenchUtil.header("Example 3 — analysis over FD(T1,T2,T3)")
    BenchUtil.row("metric", "paper", "measured")
    BenchUtil.row("lowest vaccination rate", "Boston", s"${lo._1} (${lo._2}%)")
    BenchUtil.row("highest vaccination rate", "Toronto", s"${hi._1} (${hi._2}%)")
    BenchUtil.row("corr(vaccination, death rate)", "0.16", f"$r1%.2f")
    BenchUtil.row("corr(cases, vaccination)", "0.9", f"$r2%.2f")

    assert(lo._1 == "Boston" && hi._1 == "Toronto")
    assert(math.abs(r1 - 0.16) < 0.005)
    assert(math.abs(r2 - 0.90) < 0.005)
  }
}
