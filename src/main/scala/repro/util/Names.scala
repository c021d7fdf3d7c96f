package repro.util

/** Predicate-IRI → identifier sanitisation shared by every storage layout.
  *
  * Predicates like `wsdbm:follows` must become legal Parquet column names
  * and filesystem path fragments. The mapping must be *injective per
  * predicate set*, which [[forPredicates]] guarantees by suffixing
  * collisions with a stable index.
  */
object Names {

  /** Lossy single-name sanitisation: non `[A-Za-z0-9_]` → `_`. */
  def sanitize(predicate: String): String = {
    val cleaned = predicate.map(c => if (c.isLetterOrDigit || c == '_') c else '_')
    if (cleaned.isEmpty || cleaned.head.isDigit) "p_" + cleaned else cleaned
  }

  /** Injective mapping predicate → column/path name for a whole predicate
    * set. Collisions after sanitisation get `_2`, `_3`, … suffixes in the
    * sorted order of the original predicates, so the mapping is stable
    * across runs for the same predicate set.
    */
  def forPredicates(predicates: Seq[String]): Map[String, String] = {
    val sorted = predicates.distinct.sorted
    val used = scala.collection.mutable.Set.empty[String]
    sorted.map { p =>
      val base = sanitize(p)
      var name = base
      var k = 2
      while (used.contains(name)) { name = s"${base}_$k"; k += 1 }
      used += name
      p -> name
    }.toMap
  }
}
