package repro.analyze

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.core.FullDisjunction
import repro.demo.PaperTables

/** Example 3: the paper's analysis numbers over the integrated table. */
class AnalyticsSpec extends SparkSpec {

  import spark.implicits._

  private lazy val integrated =
    FullDisjunction.integrate(PaperTables.fig2(spark)).asTable

  test("Example 3: corr(vaccination rate, death rate) = 0.16") {
    val r = Analytics.pearson(integrated,
      "Vaccination Rate (1+ dose)", "Death Rate (per 100k residents)")
    assert(math.abs(r - 0.16) < 0.005, s"got $r, paper reports 0.16")
  }

  test("Example 3: corr(total cases, vaccination rate) = 0.9") {
    val r = Analytics.pearson(integrated,
      "Total Cases", "Vaccination Rate (1+ dose)")
    assert(math.abs(r - 0.90) < 0.005, s"got $r, paper reports 0.9")
  }

  test("Example 3: Boston has the lowest vaccination rate") {
    val lo = Analytics.argExtreme(integrated, "City",
      "Vaccination Rate (1+ dose)", smallest = true)
    assert(lo.map(_._1).contains("Boston"))
    assert(lo.map(_._2).contains(62.0))
  }

  test("Example 3: Toronto has the highest vaccination rate") {
    val hi = Analytics.argExtreme(integrated, "City",
      "Vaccination Rate (1+ dose)", smallest = false)
    assert(hi.map(_._1).contains("Toronto"))
    assert(hi.map(_._2).contains(83.0))
  }

  test("correlation ignores rows where either side is null or unparsable") {
    // Only Berlin/Barcelona/Boston have both vax and death rates.
    val n = integrated
      .select(ValueParser.numeric(col("Vaccination Rate (1+ dose)")).as("a"),
              ValueParser.numeric(col("Death Rate (per 100k residents)")).as("b"))
      .where(col("a").isNotNull && col("b").isNotNull)
      .count()
    assert(n == 3)
  }

  test("oracle: pearson matches DuckDB corr on plain numeric strings") {
    val df = Seq(("1", "2"), ("2", "5"), ("3", "4"), ("4", "9")).toDF("x", "y")
    val sparkR = Analytics.pearson(df, "x", "y")
    val duckDf = Seq(Tuple1(sparkR)).toDF("r")
    Oracle.assertEquivalent(
      duckDf,
      "SELECT corr(CAST(x AS DOUBLE), CAST(y AS DOUBLE)) AS r FROM t",
      "t" -> df)
  }

  test("oracle: describe matches DuckDB aggregates") {
    val df = Seq("10", "20", "30", "40", null).toDF("v")
    val d = Analytics.describe(df, Seq("v"))
      .select(col("column"), col("n"), col("mean"), col("min"), col("max"))
    Oracle.assertEquivalent(
      d,
      """SELECT 'v' AS "column", CAST(count(CAST(v AS DOUBLE)) AS DOUBLE) AS n,
        |       avg(CAST(v AS DOUBLE)) AS mean, min(CAST(v AS DOUBLE)) AS min,
        |       max(CAST(v AS DOUBLE)) AS max
        |FROM t""".stripMargin,
      "t" -> df)
  }

  test("describe handles suffixed open-data values") {
    val rows = Analytics.describe(integrated, Seq("Total Cases")).collect()
    assert(rows.length == 1)
    val r = rows.head
    assert(r.getDouble(1) == 4.0) // 1.4M, 2.68M, 263k, 2M
    assert(r.getDouble(3) == 263000.0)
    assert(r.getDouble(4) == 2680000.0)
  }
}
