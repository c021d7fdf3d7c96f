package repro.baselines

import java.nio.file.Files

import repro.{SparkSpec, TestData}
import repro.sparql.{Iri, Lit, SparqlParser, TriplePattern, Var}
import repro.watdiv.WatDivQueries

class RyaLikeSpec extends SparkSpec {

  for (nq <- WatDivQueries.All) {
    test(s"${nq.name}: Rya-like matches the oracle") {
      TestData.oracleCheck(TestData.rya.query(nq.query), nq.query)
    }
  }

  test("index selection: bound subject reads SPO") {
    assert(TestData.rya.indexFor(
      TriplePattern(Iri("wsdbm:User1"), Iri("wsdbm:likes"), Var("o"))) == "spo")
  }

  test("index selection: bound object reads OSP") {
    assert(TestData.rya.indexFor(
      TriplePattern(Var("s"), Iri("foaf:age"), Lit("25"))) == "osp")
  }

  test("index selection: predicate-only pattern reads POS") {
    assert(TestData.rya.indexFor(
      TriplePattern(Var("s"), Iri("wsdbm:likes"), Var("o"))) == "pos")
  }

  test("join ordering puts constant-bearing patterns first") {
    val q = WatDivQueries.F3.query
    val ordered = TestData.rya.orderPatterns(q.patterns)
    assert(!ordered.head.s.isVariable || !ordered.head.o.isVariable)
  }

  test("join ordering keeps connectivity when possible") {
    val ordered = TestData.rya.orderPatterns(WatDivQueries.C2.query.patterns)
    var bound = ordered.head.variables.toSet
    ordered.tail.foreach { tp =>
      assert(tp.variables.exists(bound.contains), s"disconnected join at $tp")
      bound ++= tp.variables
    }
  }

  test("parquet write/load round trip answers queries correctly") {
    val dir = Files.createTempDirectory("rya").toString
    RyaLike.writeTo(TestData.triples, dir)
    val loaded = RyaLike.loadFrom(spark, dir)
    TestData.oracleCheck(loaded.query(WatDivQueries.S7.query), WatDivQueries.S7.query)
  }

  test("the written store has all three index layouts") {
    val dir = Files.createTempDirectory("rya2").toString
    RyaLike.writeTo(TestData.triples, dir)
    for (idx <- Seq("spo", "pos", "osp"))
      assert(Files.exists(java.nio.file.Paths.get(s"$dir/$idx")), idx)
  }

  test("three index copies triple the footprint of one (Table 1 shape)") {
    val dir = Files.createTempDirectory("rya3").toString
    RyaLike.writeTo(TestData.triples, dir)
    val sizes = Seq("spo", "pos", "osp")
      .map(i => repro.util.Timing.dirBytes(java.nio.file.Paths.get(s"$dir/$i")))
    assert(sizes.forall(_ > 0))
    val total = sizes.sum
    assert(total > sizes.max * 2, "three copies expected")
  }
}
