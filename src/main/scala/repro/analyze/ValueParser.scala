package repro.analyze

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** Parses open-data value strings into numbers for the analysis stage.
  *
  * The paper's integrated table (Fig 3) carries values like "63%",
  * "1.4M", "263k", "147"; aggregation and correlation need doubles.
  */
object ValueParser {

  /** Driver-side parser (used by tests and local analytics). */
  def parse(s: String): Option[Double] = {
    if (s == null) return None
    val t = s.trim.toLowerCase.replace(",", "")
    if (t.isEmpty) None
    else if (t.endsWith("%")) t.dropRight(1).toDoubleOption
    else if (t.endsWith("m")) t.dropRight(1).toDoubleOption.map(_ * 1e6)
    else if (t.endsWith("k")) t.dropRight(1).toDoubleOption.map(_ * 1e3)
    else if (t.endsWith("b")) t.dropRight(1).toDoubleOption.map(_ * 1e9)
    else t.toDoubleOption
  }

  /** Column expression with identical semantics (Spark-side analytics). */
  def numeric(c: Column): Column = {
    val t = lower(regexp_replace(trim(c), ",", ""))
    val body = regexp_extract(t, "^(-?\\d+(?:\\.\\d+)?)([%mkb]?)$", 1)
    val suffix = regexp_extract(t, "^(-?\\d+(?:\\.\\d+)?)([%mkb]?)$", 2)
    val base = when(body === "", lit(null).cast("double")).otherwise(body.cast("double"))
    base * when(suffix === "m", 1e6)
      .when(suffix === "k", 1e3)
      .when(suffix === "b", 1e9)
      .otherwise(1.0)
  }
}
