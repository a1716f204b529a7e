package repro.lake

import repro.SparkSpec

class LakeGenSpec extends SparkSpec {

  private lazy val gen = LakeGen.generate(spark, sf = 0.01, seed = 7)

  test("generation is deterministic in (sf, seed)") {
    val g2 = LakeGen.generate(spark, sf = 0.01, seed = 7)
    assert(gen.lake.tableNames == g2.lake.tableNames)
    val t = "cases_p0"
    assert(gen.lake.table(t).collect().toSeq == g2.lake.table(t).collect().toSeq)
  }

  test("all families are present") {
    val fams = gen.truth.family.values.toSet
    assert(fams == Set("cases", "vax", "vaccine", "tpch", "noise"))
  }

  test("ground truth only references existing tables") {
    val names = gen.lake.tableNames.toSet
    val refs = gen.truth.unionable.keySet ++ gen.truth.unionable.values.flatten ++
      gen.truth.joinable.keys.map(_._1) ++ gen.truth.joinable.values.flatten
    assert(refs.subsetOf(names))
  }

  test("unionable partitions cover disjoint city sets") {
    val cities = Seq("cases_p0", "cases_p1").map { t =>
      gen.lake.table(t).collect().flatMap(r => Option(r.getString(0))).toSet
    }
    assert(cities(0).intersect(cities(1)).isEmpty)
  }

  test("the KB types every generated city") {
    val cities = gen.lake.table("cases_p0").collect()
      .flatMap(r => Option(r.getString(0)))
    assert(cities.forall(c => gen.kb.contains(repro.util.Norm.basic(c))))
  }

  test("TPC-H fragments share the custkey domain") {
    val ck = gen.lake.table("cust_keys").collect().map(_.getString(0)).toSet
    val oc = gen.lake.table("orders_cust").collect().map(_.getString(1)).toSet
    assert(oc.subsetOf(ck))
  }

  test("vaccine fragments use spelling variants of KB entities") {
    val vs = gen.lake.table("vac_frag0_a").collect().flatMap(r => Option(r.getString(0))).toSet
    val allVariants = KnowledgeBase.vaccineVariants.values.flatten.toSet
    assert(vs.subsetOf(allVariants))
  }

  test("lake scales with sf") {
    val small = gen.lake.tableNames.size
    val bigger = LakeGen.generate(spark, sf = 0.05, seed = 7).lake.tableNames.size
    assert(bigger > small)
  }
}
