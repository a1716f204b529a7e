package repro.analyze

import org.apache.spark.sql.functions.col

import repro.SparkSpec

class ValueParserSpec extends SparkSpec {

  import spark.implicits._

  test("driver-side parsing of the paper's value formats") {
    assert(ValueParser.parse("63%").contains(63.0))
    assert(ValueParser.parse("1.4M").contains(1400000.0))
    assert(ValueParser.parse("263k").contains(263000.0))
    assert(ValueParser.parse("2M").contains(2000000.0))
    assert(ValueParser.parse("147").contains(147.0))
    assert(ValueParser.parse("-3.5").contains(-3.5))
    assert(ValueParser.parse("1.2b").contains(1.2e9))
    assert(ValueParser.parse("1,234").contains(1234.0))
  }

  test("driver-side parser rejects garbage") {
    assert(ValueParser.parse(null).isEmpty)
    assert(ValueParser.parse("").isEmpty)
    assert(ValueParser.parse("Berlin").isEmpty)
    assert(ValueParser.parse("12x").isEmpty)
  }

  test("Spark-side parser agrees with the driver-side parser") {
    val inputs = Seq("63%", "1.4M", "263k", "2M", "147", "-3.5", "1.2b",
      "1,234", "Berlin", "", "12x", " 82% ", "0", "0.0", "100%", "9k")
    val got = inputs.toDF("v")
      .select(ValueParser.numeric(col("v")).as("n"))
      .collect()
      .map(r => if (r.isNullAt(0)) None else Some(r.getDouble(0)))
    val expected = inputs.map(ValueParser.parse)
    assert(got.toSeq == expected)
  }

  test("null column values parse to null") {
    val got = Seq[Option[String]](None, Some("5"))
      .toDF("v").select(ValueParser.numeric(col("v")).as("n")).collect()
    assert(got(0).isNullAt(0) && got(1).getDouble(0) == 5.0)
  }
}
