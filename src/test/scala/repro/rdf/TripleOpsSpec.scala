package repro.rdf

import java.nio.file.Files

import repro.SparkSpec

class TripleOpsSpec extends SparkSpec {

  private def sample = TripleOps.fromSeq(spark, Seq(
    ("ex:a", "ex:p", "ex:b"),
    ("ex:a", "ex:p", "ex:b"), // duplicate
    ("ex:a", "ex:q", "lit value"),
    ("ex:b", "ex:p", "ex:c"),
  ))

  test("fromSeq produces the canonical columns") {
    assert(sample.columns.toSeq == Seq("s", "p", "o"))
  }

  test("canonical enforces set semantics") {
    assert(TripleOps.canonical(sample).count() == 3)
  }

  test("canonical reorders columns") {
    val reordered = sample.select("o", "p", "s")
    assert(TripleOps.canonical(reordered).columns.toSeq == Seq("s", "p", "o"))
  }

  test("predicates are distinct and sorted") {
    assert(TripleOps.predicates(sample) == Seq("ex:p", "ex:q"))
  }

  test("text round trip preserves the graph") {
    val dir = Files.createTempDirectory("triples-text").toString
    val canon = TripleOps.canonical(sample)
    TripleOps.writeText(canon, s"$dir/t")
    val back = TripleOps.readText(spark, s"$dir/t")
    assert(back.collect().map(_.toSeq).toSet == canon.collect().map(_.toSeq).toSet)
  }

  test("text round trip keeps literals with spaces intact") {
    val dir = Files.createTempDirectory("triples-text2").toString
    TripleOps.writeText(sample, s"$dir/t")
    val back = TripleOps.readText(spark, s"$dir/t")
    assert(back.where("p = 'ex:q'").select("o").collect().head.getString(0) == "lit value")
  }
}
