package repro.core

import repro.SparkSpec
import repro.demo.PaperTables

/** The outer-union representation underpinning both integrators. */
class AlignedTuplesSpec extends SparkSpec {

  import spark.implicits._

  private lazy val alignment = new HolisticMatcher().align(PaperTables.fig7(spark))

  test("TID columns become provenance, not data") {
    val t = AlignedTuples.forTable("T4", PaperTables.t4(spark), alignment).collect()
    assert(t.map(r => r.getSeq[String](r.fieldIndex("tids")).head).toSet == Set("t11", "t12"))
    assert(t.head.getSeq[String](t.head.fieldIndex("vals")).size == alignment.numIids)
  }

  test("tables without a TID column get generated provenance ids") {
    val df = Seq(("x", "y")).toDF("a", "b")
    val al = new HolisticMatcher().align(Seq("T" -> df))
    val t = AlignedTuples.forTable("T", df, al).collect()
    assert(t.head.getSeq[String](t.head.fieldIndex("tids")).head.startsWith("T#"))
  }

  test("empty strings and whitespace become missing nulls") {
    val df = Seq(("x", ""), ("  ", "y")).toDF("a", "b")
    val al = new HolisticMatcher().align(Seq("T" -> df))
    val rows = AlignedTuples.build(Seq("T" -> df), al).collect()
    val vals = rows.map(r => r.getSeq[String](r.fieldIndex("vals")).toVector).toSet
    assert(vals == Set(Vector("x", null), Vector(null, "y")))
  }

  test("rows with no values at all are dropped") {
    val df = Seq(("x", "y"), (null, null)).toDF("a", "b")
    val al = new HolisticMatcher().align(Seq("T" -> df))
    assert(AlignedTuples.build(Seq("T" -> df), al).count() == 1)
  }

  test("coverage mask marks exactly the table's own integration IDs") {
    val t5 = AlignedTuples.forTable("T5", PaperTables.t5(spark), alignment).collect()
    val covered = t5.head.getAs[Long]("covered")
    val t5Iids = alignment.iidOf.collect { case (ColumnKey("T5", _), iid) => iid }.toSet
    (0 until alignment.numIids).foreach { i =>
      assert(((covered & (1L << i)) != 0) == t5Iids.contains(i))
    }
  }

  test("values are trimmed before integration") {
    val a = Seq(("k1 ", "v")).toDF("k", "x")
    val b = Seq((" k1", "w")).toDF("k", "y")
    val it = FullDisjunction.integrate(Seq("A" -> a, "B" -> b))
    assert(it.asTable.count() == 1) // "k1 " and " k1" join after trimming
  }
}
