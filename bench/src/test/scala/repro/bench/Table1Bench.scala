package repro.bench

import repro.SparkSpec

/** Reproduces **Table 1** of the paper: on-disk size and loading time of
  * the four systems over the WatDiv-like graph.
  *
  * Expected shape (paper, WatDiv100M): SPARQLGX smallest and fastest to
  * load; PRoST ~2.3x SPARQLGX's size (two partitionings) at a similar load
  * time; Rya ~3.4x SPARQLGX (three index copies); S2RDF the largest and
  * roughly an order of magnitude slower to load (ExtVP precomputation).
  */
class Table1Bench extends SparkSpec {
  import BenchFixture.env

  test("Table 1: build all four stores and print the table") {
    val reports = env.loadReports
    println(env.table1String(reports))
    assert(reports.map(_.system) == Seq("PRoST", "SPARQLGX", "S2RDF", "Rya"))
    assert(reports.forall(r => r.bytes > 0 && r.millis > 0))
  }

  test("shape: SPARQLGX has the smallest footprint") {
    val bySystem = env.loadReports.map(r => r.system -> r.bytes).toMap
    assert(bySystem("SPARQLGX") < bySystem.removed("SPARQLGX").values.min)
  }

  test("shape: PRoST stores roughly two copies' worth (more than SPARQLGX)") {
    val bySystem = env.loadReports.map(r => r.system -> r.bytes).toMap
    assert(bySystem("PRoST") > bySystem("SPARQLGX"))
  }

  test("shape: S2RDF is the largest store (ExtVP blowup)") {
    val bySystem = env.loadReports.map(r => r.system -> r.bytes).toMap
    assert(bySystem("S2RDF") > bySystem.removed("S2RDF").values.max)
  }

  test("shape: S2RDF is by far the slowest loader") {
    val bySystem = env.loadReports.map(r => r.system -> r.millis).toMap
    assert(bySystem("S2RDF") > 2 * bySystem("PRoST"),
      s"S2RDF=${bySystem("S2RDF")}ms PRoST=${bySystem("PRoST")}ms")
  }

  test("shape: PRoST's loading time stays within a small factor of SPARQLGX's") {
    // Paper: 25m32s vs 20m01s (1.28x) — but on the cluster both loads are
    // dominated by parsing 5 GB of N-Triples off HDFS. Locally the parse is
    // trivial, so PRoST's extra work (the Property Table aggregation and a
    // second copy of the data) shows as a larger multiple. Within an order
    // of magnitude — unlike S2RDF — is the preserved shape.
    val bySystem = env.loadReports.map(r => r.system -> r.millis).toMap
    assert(bySystem("PRoST") < 8 * bySystem("SPARQLGX"),
      s"PRoST=${bySystem("PRoST")}ms SPARQLGX=${bySystem("SPARQLGX")}ms")
  }
}
