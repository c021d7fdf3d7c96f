package repro.baselines

import java.nio.file.Files

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.sparql.{BgpQuery, Iri, Lit, TriplePattern, Var}

/** Behaviour-faithful Rya stand-in (Punnoose et al., 2012).
  *
  * Rya stores whole triples as Accumulo keys in three sorted index
  * layouts (SPO, POS, OSP), so point and short-range lookups are very
  * fast. Its weakness — the one the paper measures — is join processing:
  * Accumulo has no in-memory distributed join pipeline, so each join step
  * materialises its intermediate result before the next begins.
  *
  * We model exactly those two properties:
  *   - three sorted copies of the triple table ("indexes"); each pattern
  *     reads the copy matching its bound positions;
  *   - pattern-at-a-time execution where **every intermediate result is
  *     written to and re-read from disk** before the next join — fast when
  *     intermediates are tiny (Rya's good queries), disastrous when they
  *     are not (C/F queries in the paper).
  */
final class RyaLike(
    spark: SparkSession,
    indexes: Map[String, DataFrame], // "spo" | "pos" | "osp" -> (s, p, o)
    scratchDir: String,
) {

  /** Rya-style index selection from the pattern's bound positions. */
  private[baselines] def indexFor(tp: TriplePattern): String =
    if (!tp.s.isVariable) "spo"
    else if (!tp.o.isVariable) "osp"
    else "pos" // predicate is always bound in our fragment

  /** Bindings DataFrame for one pattern via an index lookup. */
  private def evalPattern(tp: TriplePattern): DataFrame = {
    var df = indexes(indexFor(tp)).where(col("p") === tp.p.value)
    (tp.s, tp.o) match {
      case (sv: Var, ov: Var) if sv == ov => df = df.where(col("s") === col("o"))
      case _                               => ()
    }
    tp.s match {
      case Iri(c) => df = df.where(col("s") === c)
      case Lit(c) => df = df.where(col("s") === c)
      case _      => ()
    }
    tp.o match {
      case Iri(c) => df = df.where(col("o") === c)
      case Lit(c) => df = df.where(col("o") === c)
      case _      => ()
    }
    val cols = Seq(
      tp.s match { case Var(n) => Some(col("s") as n); case _ => None },
      tp.o match { case Var(n) if tp.o != tp.s => Some(col("o") as n); case _ => None },
    ).flatten
    if (cols.isEmpty) df.select(lit(true) as "__ground") else df.select(cols: _*)
  }

  /** Rya's join reordering: constant-bearing patterns first, then query
    * order, keeping connectivity when possible.
    */
  private[baselines] def orderPatterns(patterns: Seq[TriplePattern]): Seq[TriplePattern] = {
    def constants(tp: TriplePattern): Int =
      Seq(tp.s, tp.o).count(!_.isVariable)
    val remaining = scala.collection.mutable.ArrayBuffer(patterns: _*)
    val ordered = Vector.newBuilder[TriplePattern]
    var bound = Set.empty[Var]
    while (remaining.nonEmpty) {
      val connected = remaining.filter(_.variables.exists(bound.contains))
      val pool = if (bound.isEmpty || connected.isEmpty) remaining.toSeq else connected.toSeq
      val next = pool.maxBy(constants)
      remaining -= next
      ordered += next
      bound ++= next.variables
    }
    ordered.result()
  }

  /** Materialise a DataFrame to the scratch dir and read it back — the
    * disk round-trip that models Accumulo's join pipeline.
    */
  private def materialize(df: DataFrame, step: Int, queryId: String): DataFrame = {
    val path = s"$scratchDir/$queryId/step_$step"
    df.write.mode("overwrite").parquet(path)
    spark.read.parquet(path)
  }

  /** Run a query pattern-at-a-time with disk-materialised intermediates. */
  def query(q: BgpQuery): DataFrame = {
    val queryId = java.util.UUID.randomUUID().toString
    val ordered = orderPatterns(q.patterns)
    var acc = evalPattern(ordered.head)
    ordered.tail.zipWithIndex.foreach { case (tp, i) =>
      acc = materialize(acc, i, queryId)
      val df = evalPattern(tp)
      val shared = acc.columns.toSeq.intersect(df.columns.toSeq)
      acc = if (shared.isEmpty) acc.crossJoin(df) else acc.join(df, shared, "inner")
    }
    val out = acc.select(q.effectiveProjection.map(v => col(v.name)): _*)
    if (q.distinct) out.distinct() else out
  }
}

object RyaLike {

  private val IndexNames = Seq("spo", "pos", "osp")

  /** In-memory build (tests): the three "indexes" are views of the same
    * DataFrame; a scratch temp dir holds the intermediates.
    */
  def build(triples: DataFrame): RyaLike = {
    val scratch = Files.createTempDirectory("rya-scratch").toString
    new RyaLike(triples.sparkSession, IndexNames.map(_ -> triples).toMap, scratch)
  }

  /** Rya loading phase (Table 1): three sorted Parquet copies. */
  def writeTo(triples: DataFrame, dir: String): Unit = {
    val cached = triples.cache()
    def sorted(cols: String*): DataFrame =
      cached.repartition(col(cols.head)).sortWithinPartitions(cols.map(col): _*)
    sorted("s", "p", "o").write.mode("overwrite").parquet(s"$dir/spo")
    sorted("p", "o", "s").write.mode("overwrite").parquet(s"$dir/pos")
    sorted("o", "s", "p").write.mode("overwrite").parquet(s"$dir/osp")
    cached.unpersist()
    ()
  }

  /** Open a store written by [[writeTo]]. */
  def loadFrom(spark: SparkSession, dir: String): RyaLike = {
    val scratch = Files.createTempDirectory("rya-scratch").toString
    val idx = IndexNames.map(n => n -> spark.read.parquet(s"$dir/$n")).toMap
    new RyaLike(spark, idx, scratch)
  }
}
