package repro.core

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.demo.PaperTables

/** The demo's alternative integrator (Fig 6): folded FULL OUTER JOINs. */
class OuterJoinIntegrationSpec extends SparkSpec {

  private def rendered4(it: IntegratedTable) =
    it.rendered.collect().map(r =>
      (r.getString(0), r.getString(1), r.getString(2), r.getString(3))).toSet

  test("Fig 8(a): T4 ⟗ T5 ⟗ T6 — 5 rows, J&J approver lost") {
    val it = OuterJoinIntegration.integrate(PaperTables.fig7(spark))
    assert(rendered4(it) == PaperTables.fig8aExpected)
  }

  test("Fig 8(a): no output row connects J&J to FDA") {
    val it = OuterJoinIntegration.integrate(PaperTables.fig7(spark))
    val rows = it.asTable.collect()
    assert(!rows.exists(r => Set("J&J", "JnJ")(r.getString(1)) && r.getString(2) == "FDA"))
  }

  test("null join keys never match (t12 and t14 both stay unmatched)") {
    val it = OuterJoinIntegration.integrate(Seq(
      "T4" -> PaperTables.t4(spark), "T5" -> PaperTables.t5(spark)))
    // t12 (approver null) and t14 (approver null) must not pair up.
    val tids = it.tuples.collect().map((r => r.getSeq[String](r.fieldIndex("tids")).toSet)).toSet
    assert(tids == Set(Set("t11", "t13"), Set("t12"), Set("t14")))
  }

  test("oracle: fold of FULL OUTER JOINs matches DuckDB on Fig 7") {
    val it = OuterJoinIntegration.integrate(PaperTables.fig7(spark))
    val sparkDf = it.asTable
      .select(col("Vaccine").as("vaccine"), col("Approver").as("approver"),
              col("Country").as("country"))
    Oracle.assertEquivalent(
      sparkDf,
      """WITH step1 AS (
        |  SELECT t4.vaccine AS vaccine,
        |         coalesce(t4.approver, t5.approver) AS approver,
        |         t5.country AS country
        |  FROM t4 FULL JOIN t5 ON t4.approver = t5.approver
        |)
        |SELECT coalesce(step1.vaccine, t6.vaccine) AS vaccine,
        |       step1.approver AS approver,
        |       coalesce(step1.country, t6.country) AS country
        |FROM step1 FULL JOIN t6
        |  ON step1.vaccine = t6.vaccine AND step1.country = t6.country""".stripMargin,
      "t4" -> PaperTables.t4(spark).drop("TID"),
      "t5" -> PaperTables.t5(spark).drop("TID"),
      "t6" -> PaperTables.t6(spark).drop("TID"),
    )
  }

  test("oracle: FULL OUTER USING chain matches DuckDB on a no-null instance") {
    import spark.implicits._
    val a = Seq(("k1", "x1"), ("k2", "x2")).toDF("k", "x")
    val b = Seq(("k2", "y2"), ("k3", "y3")).toDF("k", "y")
    val it = OuterJoinIntegration.integrate(Seq("A" -> a, "B" -> b))
    val sparkDf = it.asTable.select(col("k"), col("x"), col("y"))
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT k, x, y FROM a FULL JOIN b USING (k)",
      "a" -> a, "b" -> b)
  }

  test("outer join is order-sensitive where FD is not") {
    val o1 = rendered4(OuterJoinIntegration.integrate(PaperTables.fig7(spark)))
    val o2 = rendered4(OuterJoinIntegration.integrate(PaperTables.fig7(spark).reverse))
    assert(o1 != o2) // T6 ⟗ T5 ⟗ T4 pairs tuples differently
  }

  test("tables sharing no columns degrade to the outer union") {
    import spark.implicits._
    val a = Seq(("1", "2")).toDF("p", "q")
    val b = Seq(("3", "4")).toDF("r", "s")
    val it = OuterJoinIntegration.integrate(Seq("A" -> a, "B" -> b))
    assert(it.asTable.count() == 2)
  }
}
