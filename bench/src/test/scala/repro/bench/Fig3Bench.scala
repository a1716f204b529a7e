package repro.bench

import repro.SparkSpec
import repro.core.FullDisjunction
import repro.demo.PaperTables

/** Paper artifact: Fig 3 — FD(T1,T2,T3) via ALITE.
  * Paper rows: 7 integrated tuples f1..f7 (see PaperTables.fig3Expected).
  */
class Fig3Bench extends SparkSpec {

  test("Fig 3: ALITE integrates the COVID tables into 7 tuples") {
    val (it, secs) = BenchUtil.timed {
      val r = FullDisjunction.integrate(PaperTables.fig2(spark))
      r.rendered.collect() // force
      r
    }
    BenchUtil.header(f"Fig 3 — FD(T1,T2,T3) [${secs}%.1f s]")
    BenchUtil.row("TIDs" +: it.columnNames: _*)
    val got = it.rendered.collect().map(r =>
      (r.getString(0), r.getString(1), r.getString(2), r.getString(3),
       r.getString(4), r.getString(5)))
    got.sortBy(_._1).foreach(t => BenchUtil.row(t.productIterator.toSeq: _*))
    assert(got.toSet == PaperTables.fig3Expected)
    println("paper: identical 7 rows (Fig 3) — MATCH")
  }
}
