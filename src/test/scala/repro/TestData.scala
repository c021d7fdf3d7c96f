package repro

import org.apache.spark.sql.DataFrame

import repro.baselines.{RyaLike, S2RdfLike, SparqlGxLike}
import repro.core.{GraphStats, Prost, ProstDb}
import repro.sparql.{BgpQuery, BgpSql}
import repro.watdiv.WatDivGen

/** Shared fixtures for the whole test run: one small WatDiv-like graph and
  * one instance of every engine, all lazily built against the shared
  * SparkSession, so the expensive parts (generation, PT aggregation,
  * ExtVP precomputation) run once per JVM.
  */
object TestData {

  /** ~6k triples; large enough that every benchmark query is non-trivial,
    * small enough for the DuckDB oracle to ingest per assertion.
    */
  val Scale = 0.05

  lazy val triples: DataFrame = {
    val df = WatDivGen.generate(SparkSpec.shared, Scale).cache()
    df.count() // force materialisation once
    df
  }

  lazy val stats: GraphStats = GraphStats.compute(triples)

  lazy val prost: ProstDb = Prost.loadInMemory(triples)

  lazy val sparqlGx: SparqlGxLike = SparqlGxLike.build(triples)

  lazy val s2rdf: S2RdfLike = S2RdfLike.build(triples)

  lazy val rya: RyaLike = RyaLike.build(triples)

  /** Assert `result` matches DuckDB's answer for `query` over the shared
    * graph — the central correctness check of the reproduction.
    */
  def oracleCheck(result: DataFrame, query: BgpQuery): Unit =
    Oracle.assertEquivalent(result, BgpSql.toSql(query), "triples" -> triples)
}
