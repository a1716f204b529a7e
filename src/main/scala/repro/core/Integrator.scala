package repro.core

import org.apache.spark.sql.DataFrame

/** A pluggable integration operator (§2.2, §3.2): DIALITE ships ALITE's
  * Full Disjunction as the default and outer join as the demo alternative,
  * and users can register additional operators.
  */
trait Integrator {
  def name: String

  def integrate(tables: Seq[(String, DataFrame)],
                matcher: SchemaMatcher = new HolisticMatcher()): IntegratedTable
}

object Integrator {
  /** The operators demonstrated in the paper. */
  def builtin: Map[String, Integrator] = Map(
    FullDisjunction.name      -> FullDisjunction,
    OuterJoinIntegration.name -> OuterJoinIntegration,
  )
}
