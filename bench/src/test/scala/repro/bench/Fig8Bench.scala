package repro.bench

import repro.SparkSpec
import repro.core.{FullDisjunction, IntegratedTable, OuterJoinIntegration}
import repro.demo.PaperTables
import repro.er.EntityResolver

/** Paper artifact: Fig 8 — outer join vs FD over Fig 7, and ER over both.
  * Paper: (a) 5 rows, J&J approver lost; (b) 3 rows incl. J&J→FDA;
  * (c) 4 rows, f9/f10 unresolved; (d) 2 fully resolved entities.
  */
class Fig8Bench extends SparkSpec {

  private def dump(title: String, it: IntegratedTable): Unit = {
    BenchUtil.header(title)
    BenchUtil.row("TIDs" +: it.columnNames: _*)
    it.rendered.collect().sortBy(_.getString(0))
      .foreach(r => BenchUtil.row((0 to 3).map(r.getString): _*))
  }

  test("Fig 8(a)/(b): outer join produces 5 rows, FD produces 3") {
    val tables = PaperTables.fig7(spark)
    val (oj, tOj) = BenchUtil.timed(OuterJoinIntegration.integrate(tables))
    val (fd, tFd) = BenchUtil.timed(FullDisjunction.integrate(tables))
    dump(f"Fig 8(a) — outer join [$tOj%.1f s]", oj)
    dump(f"Fig 8(b) — ALITE FD [$tFd%.1f s]", fd)
    val ojRows = oj.rendered.collect().map(r => (0 to 3).map(r.getString))
    val fdRows = fd.rendered.collect().map(r => (0 to 3).map(r.getString))
    assert(ojRows.map(s => (s(0), s(1), s(2), s(3))).toSet == PaperTables.fig8aExpected)
    assert(fdRows.map(s => (s(0), s(1), s(2), s(3))).toSet == PaperTables.fig8bExpected)
    println("paper: 5 rows (a) / 3 rows (b) — MATCH")
  }

  test("Fig 8(c)/(d): ER resolves 4 entities over outer join, 2 over FD") {
    val tables = PaperTables.fig7(spark)
    val erOj = EntityResolver.resolve(OuterJoinIntegration.integrate(tables))
    val erFd = EntityResolver.resolve(FullDisjunction.integrate(tables))
    dump("Fig 8(c) — ER over outer join", erOj)
    dump("Fig 8(d) — ER over FD", erFd)
    def triples(it: IntegratedTable) =
      it.rendered.collect().map(r => (r.getString(1), r.getString(2), r.getString(3))).toSet
    assert(triples(erOj) == PaperTables.fig8cExpected)
    assert(triples(erFd) == PaperTables.fig8dExpected)
    println("paper: 4 rows with f9/f10 unresolved (c) / 2 complete entities (d) — MATCH")
  }
}
