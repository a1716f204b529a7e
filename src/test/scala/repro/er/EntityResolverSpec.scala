package repro.er

import repro.SparkSpec
import repro.core.{FullDisjunction, OuterJoinIntegration}
import repro.demo.PaperTables

/** The ER downstream application over both integration operators —
  * Fig 8(c) and Fig 8(d), exactly.
  */
class EntityResolverSpec extends SparkSpec {

  private def rendered3(it: repro.core.IntegratedTable) =
    it.rendered.collect().map(r =>
      (r.getString(1), r.getString(2), r.getString(3))).toSet

  test("Fig 8(c): ER over the outer join leaves f9 and f10 unresolved") {
    val oj = OuterJoinIntegration.integrate(PaperTables.fig7(spark))
    val er = EntityResolver.resolve(oj)
    assert(rendered3(er) == PaperTables.fig8cExpected)
    assert(er.asTable.count() == 4)
  }

  test("Fig 8(d): ER over FD resolves everything into two entities") {
    val fd = FullDisjunction.integrate(PaperTables.fig7(spark))
    val er = EntityResolver.resolve(fd)
    assert(rendered3(er) == PaperTables.fig8dExpected)
    assert(er.asTable.count() == 2)
  }

  test("FD + ER recovers the complete J&J fact that outer join + ER cannot") {
    val fd = EntityResolver.resolve(FullDisjunction.integrate(PaperTables.fig7(spark)))
    val oj = EntityResolver.resolve(OuterJoinIntegration.integrate(PaperTables.fig7(spark)))
    def complete(it: repro.core.IntegratedTable) =
      it.asTable.collect().count(r => (1 to 3).forall(!r.isNullAt(_)))
    assert(complete(fd) == 2) // both entities fully filled
    assert(complete(oj) == 1) // only Pfizer
  }

  test("a single shared attribute is not enough evidence to merge") {
    val oj = OuterJoinIntegration.integrate(PaperTables.fig7(spark))
    val er = EntityResolver.resolve(oj)
    // f9 (JnJ, ±, ⊥) must stay a singleton even though other rows carry JnJ.
    val tids = er.tuples.collect().map((r => r.getSeq[String](r.fieldIndex("tids")).toSet))
    assert(tids.contains(Set("t12")))
  }

  test("conflicting attributes block a merge") {
    val fd = FullDisjunction.integrate(PaperTables.fig7(spark))
    val er = EntityResolver.resolve(fd)
    // Pfizer and J&J agree on Approver+Country but conflict on Vaccine.
    assert(er.asTable.count() == 2)
  }

  test("minAgreements=1 collapses the outer-join result further") {
    val oj = OuterJoinIntegration.integrate(PaperTables.fig7(spark))
    val strict = EntityResolver.resolve(oj, minAgreements = 2).asTable.count()
    val loose = EntityResolver.resolve(oj, minAgreements = 1).asTable.count()
    assert(loose < strict)
  }

  test("ER is idempotent on an already-resolved table") {
    val fd = FullDisjunction.integrate(PaperTables.fig7(spark))
    val once = EntityResolver.resolve(fd)
    val twice = EntityResolver.resolve(once)
    assert(rendered3(once) == rendered3(twice))
  }
}
