package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

import AlignedTuples._

/** ALITE's integration result: tuples in integration-ID space plus the
  * alignment that produced them.
  *
  * `tuples` columns: `vals` (array<string>), `covered` (Long bitmask of
  * attributes some contributing table had a column for), `tabs`, `tids`.
  */
final case class IntegratedTable(alignment: Alignment, tuples: DataFrame) {

  /** Output attribute names (one per integration ID). */
  def columnNames: Vector[String] = alignment.names

  /** Plain relational view: `TIDs` + one string column per integration ID.
    * Missing and produced nulls are both SQL nulls here (analytics view).
    */
  def asTable: DataFrame = {
    val valueCols = columnNames.zipWithIndex.map { case (n, i) =>
      col(ValsCol).getItem(i).as(n)
    }
    tuples.select(col(TidsCol).as("TIDs") +: valueCols: _*)
  }

  /** Presentation view distinguishing the paper's two null kinds: a cell
    * is `±` when the attribute was covered by a contributing table but the
    * value was missing in the input, `⊥` when no contributing table had
    * the attribute (null produced by integration padding).
    */
  def rendered: DataFrame = {
    val valueCols = columnNames.zipWithIndex.map { case (n, i) =>
      val covered = col(CoveredCol).bitwiseAND(lit(1L << i)) =!= 0L
      coalesce(col(ValsCol).getItem(i), when(covered, lit("±")).otherwise(lit("⊥"))).as(n)
    }
    tuples.select(concat_ws(",", col(TidsCol)).as("TIDs") +: valueCols: _*)
  }
}

/** Spark implementation of ALITE's Full Disjunction.
  *
  * Semantics (see DESIGN.md §2): one output tuple per maximal set S of
  * input tuples with ≤1 tuple per table, join-consistent on every
  * integration ID, and connected via shared non-null equal attributes;
  * value-subsumed outputs removed. Nulls never join.
  *
  * Algorithm: pairwise complementation closure. Each round joins the
  * frontier (tuples discovered last round) against all tuples, once per
  * attribute index so Catalyst gets an equi-join key, keeps consistent
  * table-disjoint pairs, and coalesces them into combined tuples; fixpoint
  * when a round yields nothing new. Lineage is cut every round with
  * `localCheckpoint` (iterative algorithm). Finally, value-duplicate rows
  * are merged (keeping maximal TID-sets) and dominated rows removed via
  * per-attribute subsumption joins.
  */
object FullDisjunction extends Integrator {

  override def name: String = "alite-fd"

  /** Align with `matcher` and integrate with FD. */
  override def integrate(tables: Seq[(String, DataFrame)],
                         matcher: SchemaMatcher): IntegratedTable = {
    require(tables.nonEmpty, "integration set is empty")
    val alignment = matcher.align(tables)
    val t0 = AlignedTuples.build(tables, alignment)
    IntegratedTable(alignment, integrateAligned(t0, alignment.numIids))
  }

  /** FD over an already-aligned outer union (`AlignedTuples.build` shape).
    * Exposed separately so baselines (ParaFD) can share representation.
    */
  def integrateAligned(t0: DataFrame, m: Int, maxRounds: Int = 32): DataFrame = {
    require(m >= 1, "no aligned attributes")
    val closed = closure(t0, m, maxRounds)
    subsume(dedupValues(closed), m)
      .select(ValsCol, CoveredCol, TabsCol, TidsCol)
  }

  // ---------------------------------------------------------------- closure

  private[core] def withKeys(df: DataFrame): DataFrame =
    df.withColumn("vkey", valsKey(col(ValsCol)))
      .withColumn("key", tupleKey(col(ValsCol), col(TidsCol)))

  private def prefixed(df: DataFrame, p: String): DataFrame =
    df.select(df.columns.map(c => col(c).as(p + c)): _*)

  private def closure(t0: DataFrame, m: Int, maxRounds: Int): DataFrame = {
    // `all` is the lazy union of per-round checkpointed frontiers — only the
    // fresh tuples of a round are ever materialized.
    val base = withKeys(t0).dropDuplicates("key").localCheckpoint()
    var generations = Vector(base)
    def all = generations.reduce(_ unionByName _)
    var frontier = base
    var round = 0
    while (round < maxRounds && !frontier.isEmpty) {
      round += 1
      val combined = withKeys(combineRound(frontier, all, m)).dropDuplicates("key")
      val fresh = combined
        .join(all.select(col("key")), Seq("key"), "left_anti")
        .select(base.columns.map(col): _*)
        .localCheckpoint()
      frontier = fresh
      if (!fresh.isEmpty) generations :+= fresh
    }
    require(frontier.isEmpty,
      s"FD closure did not converge within $maxRounds rounds")
    all
  }

  /** All consistent, connected, table-disjoint pairs (frontier × all),
    * coalesced into combined tuples.
    */
  private[core] def combineRound(frontier: DataFrame, all: DataFrame, m: Int): DataFrame = {
    val a = prefixed(frontier, "a_")
    val b = prefixed(all, "b_")
    def av(j: Int): Column = col("a_" + ValsCol).getItem(j)
    def bv(j: Int): Column = col("b_" + ValsCol).getItem(j)
    val consistent = (0 until m)
      .map(j => av(j).isNull || bv(j).isNull || (av(j) === bv(j)))
      .reduce(_ && _)
    val tableDisjoint =
      size(array_intersect(col("a_" + TabsCol), col("b_" + TabsCol))) === 0
    val perAttr = (0 until m).map { i =>
      a.join(b, (av(i) === bv(i)) && tableDisjoint && consistent)
    }
    perAttr.reduce(_ unionAll _).select(
      zip_with(col("a_" + ValsCol), col("b_" + ValsCol), (x, y) => coalesce(x, y)).as(ValsCol),
      col("a_" + CoveredCol).bitwiseOR(col("b_" + CoveredCol)).as(CoveredCol),
      array_sort(array_union(col("a_" + TabsCol), col("b_" + TabsCol))).as(TabsCol),
      array_sort(array_union(col("a_" + TidsCol), col("b_" + TidsCol))).as(TidsCol),
    )
  }

  // ------------------------------------------------- dedup and subsumption

  /** Keep the union of ⊆-maximal TID-sets among value-identical tuples:
    * the closure materializes every connected consistent subset, but FD is
    * defined over maximal sets only.
    */
  private val mergeMaximalTidSets = udf { (tidsets: Seq[Seq[String]]) =>
    val sets = tidsets.map(_.toSet).distinct
    val maximal = sets.filter(s => !sets.exists(t => t != s && s.subsetOf(t)))
    maximal.flatten.distinct.sorted
  }

  private[core] def dedupValues(closed: DataFrame): DataFrame =
    closed
      .groupBy("vkey")
      .agg(
        first(ValsCol).as(ValsCol),
        expr(s"bit_or($CoveredCol)").as(CoveredCol),
        array_sort(array_distinct(flatten(collect_list(TabsCol)))).as(TabsCol),
        mergeMaximalTidSets(collect_list(TidsCol)).as(TidsCol),
      )

  /** Remove value-dominated tuples. `u` dominates `t` when `u` agrees with
    * every non-null value of `t` and has strictly more non-null values.
    * Joined on `t`'s first non-null attribute (a dominator must share it).
    */
  private[core] def subsume(dedup: DataFrame, m: Int): DataFrame = {
    val nn = size(filter(col(ValsCol), v => v.isNotNull))
    val firstIdx = coalesce(
      (0 until m).map(j => when(col(ValsCol).getItem(j).isNotNull, lit(j))): _*)
    val t = prefixed(dedup.withColumn("nn", nn).withColumn("fi", firstIdx), "t_")
    val u = prefixed(dedup.withColumn("nn", nn), "u_")
    def tv(j: Int): Column = col("t_" + ValsCol).getItem(j)
    def uv(j: Int): Column = col("u_" + ValsCol).getItem(j)
    val dominates = (0 until m)
      .map(j => tv(j).isNull || (uv(j) === tv(j)))
      .reduce(_ && _) && (col("u_nn") > col("t_nn"))
    val dominatedKeys = (0 until m).map { i =>
      t.where(col("t_fi") === i)
        .join(u, (uv(i) === tv(i)) && dominates)
        .select(col("t_vkey").as("vkey"))
    }.reduce(_ unionAll _).distinct()
    dedup.join(dominatedKeys, Seq("vkey"), "left_anti")
  }
}
