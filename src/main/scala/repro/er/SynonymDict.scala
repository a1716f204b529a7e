package repro.er

import repro.lake.KnowledgeBase
import repro.util.Norm

/** Value-equivalence dictionary for the ER substrate.
  *
  * `py_entitymatching` learns a matcher from labeled pairs; offline we
  * substitute the learned signal with an explicit equivalence dictionary
  * derived from the KnowledgeBase's spelling variants (which is exactly
  * what its features would have to learn to resolve "JnJ" ≡ "J&J" and
  * "USA" ≡ "United States"). Users can extend it with their own pairs.
  */
final class SynonymDict(extra: Map[String, String] = Map.empty) {

  /** normalized variant -> canonical display form. */
  private val canonicalOf: Map[String, String] = {
    val b = Map.newBuilder[String, String]
    for ((canon, vs) <- KnowledgeBase.vaccineVariants; v <- vs)
      b += Norm.alnum(v) -> canon
    for ((canon, vs) <- KnowledgeBase.countryVariants; v <- vs)
      b += Norm.alnum(v) -> canon
    b ++= extra.map { case (k, v) => Norm.alnum(k) -> v }
    b.result()
  }

  /** Canonical display form of a value ("United States" for "usa"). */
  def canonical(v: String): String =
    if (v == null) null
    else canonicalOf.getOrElse(Norm.alnum(v), v.trim)

  /** Equivalence key used for matching (normalized canonical form). */
  def key(v: String): String =
    if (v == null) null else Norm.alnum(canonical(v))

  /** True when two non-null values denote the same real-world value. */
  def equivalent(a: String, b: String): Boolean =
    a != null && b != null && key(a) == key(b)
}

object SynonymDict {
  /** Dictionary used in the demo (paper's Fig 8: USA/United States and
    * JnJ/J&J must resolve; the canonical forms shown there are
    * "United States" and "J&J").
    */
  val default: SynonymDict = new SynonymDict(Map(
    "United States" -> "United States",
    "USA" -> "United States",
    "US" -> "United States",
    "United States of America" -> "United States",
  ))
}
