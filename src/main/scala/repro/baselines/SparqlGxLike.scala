package repro.baselines

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions.col
import org.apache.spark.sql.types.{StringType, StructField, StructType}

import repro.core.GraphStats
import repro.sparql.{BgpQuery, Iri, Lit, TriplePattern, Var}

/** Behaviour-faithful SPARQLGX stand-in (Graux et al., ISWC 2016).
  *
  * What the paper credits/blames SPARQLGX for, and what we therefore model:
  *   - **Vertical Partitioning only** — one file per predicate, *plain
  *     compressed text* (`s \t o` lines), which is why its footprint is the
  *     smallest in Table 1;
  *   - **compiles queries to direct Spark (RDD) operations, not Spark
  *     SQL** — no Catalyst, no columnar Parquet scans; joins are RDD
  *     `join`s over string pairs;
  *   - **its own statistics for join ordering** — per-predicate triple
  *     counts, selective (constant-carrying) patterns first, connectivity
  *     maintained greedily.
  */
final class SparqlGxLike(
    spark: SparkSession,
    tables: Map[String, RDD[(String, String)]],
    counts: Map[String, Long],
) {

  private def emptyRdd: RDD[(String, String)] =
    spark.sparkContext.emptyRDD[(String, String)]

  /** SPARQLGX's join ordering: ascending estimated size; constants shrink
    * the estimate sharply; each next pattern must share a variable with
    * the already-joined set when possible.
    */
  private[baselines] def orderPatterns(patterns: Seq[TriplePattern]): Seq[TriplePattern] = {
    def weight(tp: TriplePattern): Double = {
      var w = counts.getOrElse(tp.p.value, 0L).toDouble
      if (!tp.s.isVariable) w *= 0.01
      if (!tp.o.isVariable) w *= 0.01
      w
    }
    val remaining = scala.collection.mutable.ArrayBuffer(patterns: _*)
    val ordered = Vector.newBuilder[TriplePattern]
    var bound = Set.empty[Var]
    while (remaining.nonEmpty) {
      val connected = remaining.filter(_.variables.exists(bound.contains))
      val pool = if (bound.isEmpty || connected.isEmpty) remaining.toSeq else connected.toSeq
      val next = pool.minBy(weight)
      remaining -= next
      ordered += next
      bound ++= next.variables
    }
    ordered.result()
  }

  /** Evaluate one pattern to an RDD of variable bindings. */
  private def evalPattern(tp: TriplePattern): RDD[Map[String, String]] = {
    val base = tables.getOrElse(tp.p.value, emptyRdd)
    val filtered = base.filter { case (s, o) =>
      (tp.s match { case Iri(c) => s == c; case Lit(c) => s == c; case _: Var => true }) &&
      (tp.o match { case Iri(c) => o == c; case Lit(c) => o == c; case _: Var => true }) &&
      (tp.s match { case v: Var if tp.o == v => s == o; case _ => true })
    }
    filtered.map { case (s, o) =>
      val m1 = tp.s match { case Var(n) => Map(n -> s); case _ => Map.empty[String, String] }
      tp.o match { case Var(n) => m1 + (n -> o); case _ => m1 }
    }
  }

  /** Join two binding RDDs on their shared variables (RDD-level, as
    * SPARQLGX's generated code does); cartesian when disjoint.
    */
  private def joinBindings(
      left: RDD[Map[String, String]], leftVars: Set[String],
      right: RDD[Map[String, String]], rightVars: Set[String],
  ): RDD[Map[String, String]] = {
    val shared = leftVars.intersect(rightVars).toSeq.sorted
    if (shared.isEmpty) left.cartesian(right).map { case (a, b) => a ++ b }
    else {
      val l = left.keyBy(m => shared.map(m))
      val r = right.keyBy(m => shared.map(m))
      l.join(r).values.map { case (a, b) => a ++ b }
    }
  }

  /** Run a query; result is converted to a DataFrame (string columns named
    * after the projected variables) purely for comparison with the oracle.
    */
  def query(q: BgpQuery): DataFrame = {
    val ordered = orderPatterns(q.patterns)
    var acc = evalPattern(ordered.head)
    var accVars = ordered.head.variables.map(_.name).toSet
    ordered.tail.foreach { tp =>
      val vars = tp.variables.map(_.name).toSet
      acc = joinBindings(acc, accVars, evalPattern(tp), vars)
      accVars ++= vars
    }
    val proj = q.effectiveProjection.map(_.name)
    val rows = acc.map(m => Row.fromSeq(proj.map(m)))
    val schema = StructType(proj.map(StructField(_, StringType)))
    val df = spark.createDataFrame(rows, schema)
    if (q.distinct) df.distinct() else df
  }
}

object SparqlGxLike {

  /** In-memory build (tests): RDD views over the triples DataFrame. */
  def build(triples: DataFrame): SparqlGxLike = {
    val spark = triples.sparkSession
    val stats = GraphStats.compute(triples)
    val tables = stats.predicates.map { p =>
      p -> triples.where(col("p") === p).select("s", "o")
        .rdd.map(r => (r.getString(0), r.getString(1)))
    }.toMap
    new SparqlGxLike(spark, tables, stats.predicates.map(p => p -> stats(p).tripleCount).toMap)
  }

  /** SPARQLGX loading phase: per-predicate gzip **text** directories (one
    * partitioned write) + a stats file. This is the path timed/measured for
    * Table 1; text is what keeps SPARQLGX's footprint the smallest.
    */
  def writeTo(triples: DataFrame, dir: String): Unit = {
    val cached = triples.cache()
    val stats = GraphStats.compute(cached)
    cached
      .select(org.apache.spark.sql.functions.concat_ws("\t", col("s"), col("o")) as "value",
              col("p"))
      .repartition(col("p"))
      .write.mode("overwrite").partitionBy("p").option("compression", "gzip")
      .text(s"$dir/data")
    repro.core.Prost.writeStats(stats, s"$dir/stats.tsv")
    cached.unpersist()
    ()
  }

  /** Open a store written by [[writeTo]]. Partition pruning limits each
    * predicate's RDD to its own gzip files; from there on everything is
    * RDD-level, as in SPARQLGX's generated code.
    */
  def loadFrom(spark: SparkSession, dir: String): SparqlGxLike = {
    val stats = repro.core.Prost.readStats(s"$dir/stats.tsv")
    val data = spark.read.text(s"$dir/data")
    val tables = stats.predicates.map { p =>
      p -> data.where(col("p") === p).select("value").rdd.map { r =>
        val line = r.getString(0)
        val i = line.indexOf('\t')
        (line.substring(0, i), line.substring(i + 1))
      }
    }.toMap
    new SparqlGxLike(spark, tables, stats.predicates.map(p => p -> stats(p).tripleCount).toMap)
  }
}
