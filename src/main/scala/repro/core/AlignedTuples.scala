package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Outer union of an integration set into integration-ID space.
  *
  * Every input tuple becomes a row of the universal schema:
  *
  *   - `vals`    array<string> of length `numIids` (null = no value);
  *   - `covered` Long bitmask of the integration IDs the source table has
  *               a column for — a null inside the mask is a *missing* null
  *               (± in the paper), a null outside it is a *produced* null
  *               (⊥) introduced by padding;
  *   - `tabs`    sorted source-table names (used to enforce FD's
  *               one-tuple-per-table rule);
  *   - `tids`    sorted provenance tuple IDs. If the input has a `TID`
  *               column it is used verbatim (the paper's figures name
  *               tuples t1..t16); otherwise IDs are `<table>#<row>`.
  */
object AlignedTuples {

  val ValsCol = "vals"
  val CoveredCol = "covered"
  val TabsCol = "tabs"
  val TidsCol = "tids"

  /** Stable string key of a `vals` array (arrays with null elements are
    * not reliable join/group keys, so everything keys on this).
    */
  def valsKey(vals: Column): Column =
    concat_ws("\u0001", transform(vals, v => coalesce(v, lit("\u0000"))))

  /** Stable string key identifying a tuple (values + provenance). */
  def tupleKey(vals: Column, tids: Column): Column =
    concat(valsKey(vals), lit("\u0002"), concat_ws(",", tids))

  /** Build the outer union for one table. */
  def forTable(table: String, df: DataFrame, alignment: Alignment): DataFrame = {
    val cols = df.columns
    val tidExpr: Column = cols.find(SchemaMatcher.isTid) match {
      case Some(tidCol) => col(tidCol).cast("string")
      case None =>
        concat(lit(table + "#"), monotonically_increasing_id().cast("string"))
    }
    val byIid: Map[Int, String] = alignment.iidOf.collect {
      case (ColumnKey(t, idx), iid) if t == table => iid -> cols(idx)
    }
    val vals = array((0 until alignment.numIids).map { iid =>
      byIid.get(iid) match {
        case Some(c) =>
          // Trim and null-out empty strings: open data CSVs encode missing
          // values as "" and the FD must treat them as missing nulls.
        val v = trim(col(c).cast("string"))
          when(v.isNull || v === "", lit(null: String)).otherwise(v)
        case None => lit(null: String).cast("string")
      }
    }: _*)
    df.select(
      vals.as(ValsCol),
      lit(alignment.coverage(table)).as(CoveredCol),
      array(lit(table)).as(TabsCol),
      array(tidExpr).as(TidsCol),
    ).where(exists(col(ValsCol), v => v.isNotNull)) // all-null rows carry no fact
  }

  /** Outer union of the whole integration set. */
  def build(tables: Seq[(String, DataFrame)], alignment: Alignment): DataFrame =
    tables.map { case (t, df) => forTable(t, df, alignment) }.reduce(_.unionAll(_))
}
