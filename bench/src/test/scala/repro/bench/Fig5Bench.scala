package repro.bench

import repro.SparkSpec
import repro.gen.QueryTableGen

/** Paper artifact: Fig 5 — GPT-3 query-table generation (substituted by
  * the deterministic KB-backed generator; same 5×5 table).
  */
class Fig5Bench extends SparkSpec {

  test("Fig 5: the COVID prompt regenerates the paper's table") {
    val df = QueryTableGen.generate(spark,
      "a table about COVID-19 cases with 5 columns and 5 rows")
    BenchUtil.header("Fig 5 — generated query table")
    BenchUtil.row(df.columns.toSeq: _*)
    val rows = df.collect().map(r => (0 until 5).map(r.getString))
    rows.sortBy(-_.apply(1).toLong).foreach(r => BenchUtil.row(r: _*))
    val usa = rows.find(_.head == "USA").get
    assert(usa == Seq("USA", "5742812", "178701", "2633567", "2930544"))
    assert(rows.length == 5)
    println("paper: identical 5 rows (Fig 5) — MATCH")
  }
}
