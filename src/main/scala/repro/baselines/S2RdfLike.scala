package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.GraphStats
import repro.sparql.{BgpQuery, Iri, Lit, TriplePattern, Var}

/** Behaviour-faithful S2RDF stand-in (Schätzle et al., VLDB 2016).
  *
  * S2RDF extends Vertical Partitioning with **ExtVP**: for every predicate
  * pair and join position it precomputes the semi-join reduction of one VP
  * table against the other, so at query time each triple pattern can read
  * a table already stripped of dangling tuples. That is what makes it the
  * fastest *querier* and by far the slowest/largest *loader* in the
  * paper's Tables 1–2 — the trade-off we reproduce.
  *
  * Positions (as in S2RDF's default configuration): SS (subject–subject),
  * SO (subject of p1 = object of p2), OS (object of p1 = subject of p2).
  * OO is not materialised; patterns joining object–object fall back to VP.
  */
final class S2RdfLike(
    val spark: SparkSession,
    vp: Map[String, DataFrame],
    ext: Map[String, DataFrame],          // position -> (p1, p2, s, o)
    vpSizes: Map[String, Long],
    extSizes: Map[(String, String, String), Long], // (pos, p1, p2) -> rows
) {

  import S2RdfLike.{Positions, emptySo}

  /** The precomputed reduction of `p1` against `p2` at `pos`, if any. */
  private def extTable(pos: String, p1: String, p2: String): Option[DataFrame] =
    extSizes.get((pos, p1, p2)).map { _ =>
      ext(pos).where(col("p1") === p1 && col("p2") === p2).select("s", "o")
    }

  /** Pick the smallest applicable table for pattern `tp` within `query`:
    * every other pattern sharing a variable offers a candidate reduction;
    * the smallest one wins, VP is the fallback.
    */
  private[baselines] def chooseTable(tp: TriplePattern, query: BgpQuery): (DataFrame, Long) = {
    val vpTable = vp.getOrElse(tp.p.value, emptySo(spark))
    val vpSize = vpSizes.getOrElse(tp.p.value, 0L)
    val candidates = for {
      other <- query.patterns if other ne tp
      pos <- Seq(
        (tp.s, other.s, "SS"), (tp.s, other.o, "SO"), (tp.o, other.s, "OS"),
      ).collect { case (a: Var, b: Var, p) if a == b => p }
      size <- extSizes.get((pos, tp.p.value, other.p.value))
    } yield (pos, other.p.value, size)
    if (candidates.isEmpty) (vpTable, vpSize)
    else {
      val (pos, p2, size) = candidates.minBy(_._3)
      if (size < vpSize) (extTable(pos, tp.p.value, p2).get, size) else (vpTable, vpSize)
    }
  }

  /** Bindings DataFrame for one pattern from its chosen `(s, o)` table. */
  private def evalPattern(tp: TriplePattern, table: DataFrame): DataFrame = {
    var df = table
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

  /** Run a query: per-pattern table selection, then size-ordered,
    * connectivity-aware DataFrame joins (S2RDF runs on Spark SQL).
    */
  def query(q: BgpQuery): DataFrame = {
    val chosen: Map[TriplePattern, (DataFrame, Long)] =
      q.patterns.map(tp => tp -> chooseTable(tp, q)).toMap
    def weight(tp: TriplePattern): Double = {
      var w = chosen(tp)._2.toDouble
      if (!tp.s.isVariable) w *= 0.01
      if (!tp.o.isVariable) w *= 0.01
      w
    }
    val remaining = scala.collection.mutable.ArrayBuffer(q.patterns: _*)
    var acc: DataFrame = null
    var bound = Set.empty[Var]
    while (remaining.nonEmpty) {
      val connected = remaining.filter(_.variables.exists(bound.contains))
      val pool = if (acc == null || connected.isEmpty) remaining.toSeq else connected.toSeq
      val next = pool.minBy(weight)
      remaining -= next
      val df = evalPattern(next, chosen(next)._1)
      acc =
        if (acc == null) df
        else {
          val shared = acc.columns.toSeq.intersect(df.columns.toSeq)
          if (shared.isEmpty) acc.crossJoin(df) else acc.join(df, shared, "inner")
        }
      bound ++= next.variables
    }
    val out = acc.select(q.effectiveProjection.map(v => col(v.name)): _*)
    if (q.distinct) out.distinct() else out
  }
}

object S2RdfLike {

  val Positions: Seq[String] = Seq("SS", "SO", "OS")

  private def emptySo(spark: SparkSession): DataFrame = {
    import org.apache.spark.sql.types._
    spark.createDataFrame(
      spark.sparkContext.emptyRDD[org.apache.spark.sql.Row],
      StructType(Seq(StructField("s", StringType), StructField("o", StringType))),
    )
  }

  /** The ExtVP precomputation, as three bulk self-joins producing
    * `(p1, p2, s, o)` tables (one per position). Joining against the
    * *distinct* partner keys makes each output row a semi-join survivor,
    * no dedup needed.
    */
  private def extTables(triples: DataFrame): Map[String, DataFrame] = {
    val t = triples
    val bySubject = t.select(col("p") as "p2", col("s") as "k").distinct()
    val byObject  = t.select(col("p") as "p2", col("o") as "k").distinct()
    val left = t.select(col("p") as "p1", col("s"), col("o"))
    Map(
      "SS" -> left.join(bySubject, left("s") === bySubject("k") && col("p1") =!= col("p2"))
                  .select("p1", "p2", "s", "o"),
      "SO" -> left.join(byObject, left("s") === byObject("k"))
                  .select("p1", "p2", "s", "o"),
      "OS" -> left.join(bySubject, left("o") === bySubject("k"))
                  .select("p1", "p2", "s", "o"),
    )
  }

  private def sizesOf(ext: Map[String, DataFrame]): Map[(String, String, String), Long] =
    ext.flatMap { case (pos, df) =>
      df.groupBy("p1", "p2").count().collect()
        .map(r => (pos, r.getString(0), r.getString(1)) -> r.getLong(2))
    }

  /** In-memory build (tests): lazy views; the ExtVP sizes still have to be
    * computed eagerly because table selection needs them.
    */
  def build(triples: DataFrame): S2RdfLike = {
    val spark = triples.sparkSession
    val stats = GraphStats.compute(triples)
    val vp = stats.predicates.map(p =>
      p -> triples.where(col("p") === p).select("s", "o")).toMap
    val ext = extTables(triples).map { case (k, df) => k -> df.cache() }
    new S2RdfLike(spark, vp, ext,
      stats.predicates.map(p => p -> stats(p).tripleCount).toMap, sizesOf(ext))
  }

  /** S2RDF loading phase (the Table 1 cost): VP Parquet + the three ExtVP
    * families + stats + size metadata.
    *
    * Faithful to the original system, the reductions are computed **one
    * predicate at a time** (S2RDF issues one SQL job per ExtVP table
    * family) — this per-table job storm, not the byte volume, is what
    * makes its loading phase an order of magnitude slower than everyone
    * else's in the paper's Table 1.
    */
  def writeTo(triples: DataFrame, dir: String): Unit = {
    val cached = triples.cache()
    val stats = GraphStats.compute(cached)
    repro.core.VpStore.write(cached, stats, s"$dir/vp")

    val bySubject = cached.select(col("p") as "p2", col("s") as "k").distinct().cache()
    val byObject  = cached.select(col("p") as "p2", col("o") as "k").distinct().cache()
    for (pos <- Positions) {
      val out = java.nio.file.Paths.get(s"$dir/extvp_$pos")
      if (java.nio.file.Files.exists(out)) {
        import scala.jdk.StreamConverters._
        java.nio.file.Files.walk(out).toScala(Seq).reverse.foreach(java.nio.file.Files.delete)
      }
    }
    stats.predicates.foreach { p1 =>
      val left = cached.where(col("p") === p1)
        .select(lit(p1) as "p1", col("s"), col("o"))
      def append(pos: String, df: DataFrame): Unit =
        df.select("p1", "p2", "s", "o")
          .write.mode("append").partitionBy("p1", "p2").parquet(s"$dir/extvp_$pos")
      append("SS", left.join(bySubject.where(col("p2") =!= p1), left("s") === bySubject("k")))
      append("SO", left.join(byObject, left("s") === byObject("k")))
      append("OS", left.join(bySubject, left("o") === bySubject("k")))
    }
    bySubject.unpersist(); byObject.unpersist()
    val loadedExt = Positions.map(pos =>
      pos -> cached.sparkSession.read.parquet(s"$dir/extvp_$pos")).toMap
    val sizes = sizesOf(loadedExt)
    val sizeLines = sizes.toSeq.sortBy(_.toString).map { case ((pos, p1, p2), n) =>
      s"$pos\t$p1\t$p2\t$n"
    }
    java.nio.file.Files.write(
      java.nio.file.Paths.get(s"$dir/ext_sizes.tsv"),
      scala.jdk.CollectionConverters.SeqHasAsJava(sizeLines).asJava,
      java.nio.charset.StandardCharsets.UTF_8)
    repro.core.Prost.writeStats(stats, s"$dir/stats.tsv")
    cached.unpersist()
    ()
  }

  /** Open a store written by [[writeTo]]. */
  def loadFrom(spark: SparkSession, dir: String): S2RdfLike = {
    val stats = repro.core.Prost.readStats(s"$dir/stats.tsv")
    val vpStore = repro.core.VpStore.load(spark, s"$dir/vp", stats.predicates)
    val vp = stats.predicates.map(p => p -> vpStore.tableFor(p)).toMap
    val ext = Positions.map(pos => pos -> spark.read.parquet(s"$dir/extvp_$pos")).toMap
    val sizes = scala.jdk.CollectionConverters.ListHasAsScala(
      java.nio.file.Files.readAllLines(java.nio.file.Paths.get(s"$dir/ext_sizes.tsv"))
    ).asScala.filter(_.nonEmpty).map { line =>
      val Array(pos, p1, p2, n) = line.split("\t")
      (pos, p1, p2) -> n.toLong
    }.toMap
    new S2RdfLike(spark, vp, ext,
      stats.predicates.map(p => p -> stats(p).tripleCount).toMap, sizes)
  }
}
