package repro.gen

import repro.SparkSpec

/** Fig 5: the GPT-3 substitute must emit the paper's exact table. */
class QueryTableGenSpec extends SparkSpec {

  test("Fig 5: COVID prompt yields the exact 5×5 table") {
    val df = QueryTableGen.generate(spark,
      "a table about COVID-19 cases with 5 columns and 5 rows")
    assert(df.columns.toSeq == Seq("Country", "Cases", "Deaths", "Recovered", "Active"))
    val rows = df.collect().map(r => (0 until 5).map(r.getString).toVector)
    val expected = Vector(
      Vector("USA", "5742812", "178701", "2633567", "2930544"),
      Vector("Brazil", "3713876", "116476", "2788841", "808559"),
      Vector("India", "3444061", "61529", "2643788", "738744"),
      Vector("Russia", "982822", "16841", "745930", "219051"),
      Vector("Mexico", "704016", "73814", "442309", "187893"),
    )
    assert(rows.toVector.sortBy(_.apply(1).toLong)(Ordering[Long].reverse) == expected)
  }

  test("Fig 5: Russia's Active value is the paper's literal (not derived)") {
    val df = QueryTableGen.generate(spark, "covid cases")
    val russia = df.collect().find(_.getString(0) == "Russia").get
    assert(russia.getString(4) == "219051")
    assert(russia.getString(1).toLong - russia.getString(2).toLong -
      russia.getString(3).toLong != russia.getString(4).toLong)
  }

  test("generation is deterministic for a fixed prompt") {
    val a = QueryTableGen.generate(spark, "covid cases").collect().toSeq
    val b = QueryTableGen.generate(spark, "covid cases").collect().toSeq
    assert(a == b)
  }

  test("row/column budgets are honored") {
    val df = QueryTableGen.generate(spark, "covid cases", rows = 8, cols = 3)
    assert(df.columns.length == 3 && df.count() == 8)
  }

  test("vaccine prompts yield vaccine query tables") {
    val df = QueryTableGen.generate(spark, "table of vaccines and approvers")
    assert(df.columns.toSeq == Seq("Vaccine", "Approver", "Country"))
    assert(df.count() > 0)
  }

  test("unknown prompts fall back to a deterministic generic table") {
    val a = QueryTableGen.generate(spark, "llamas of the andes").collect().toSeq
    val b = QueryTableGen.generate(spark, "llamas of the andes").collect().toSeq
    assert(a == b && a.nonEmpty)
  }
}
