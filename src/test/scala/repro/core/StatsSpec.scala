package repro.core

import repro.SparkSpec
import repro.rdf.TripleOps

class StatsSpec extends SparkSpec {

  private lazy val graph = TripleOps.fromSeq(spark, Seq(
    ("ex:a", "ex:p", "ex:x"),
    ("ex:a", "ex:p", "ex:y"),
    ("ex:b", "ex:p", "ex:x"),
    ("ex:a", "ex:q", "1"),
    ("ex:b", "ex:q", "2"),
    ("ex:c", "ex:q", "3"),
    ("ex:a", "ex:r", "only"),
  ))

  private lazy val stats = GraphStats.compute(graph)

  test("triple counts per predicate") {
    assert(stats("ex:p").tripleCount == 3)
    assert(stats("ex:q").tripleCount == 3)
    assert(stats("ex:r").tripleCount == 1)
  }

  test("distinct subjects per predicate") {
    assert(stats("ex:p").distinctSubjects == 2)
    assert(stats("ex:q").distinctSubjects == 3)
    assert(stats("ex:r").distinctSubjects == 1)
  }

  test("max per subject detects multi-valued predicates") {
    assert(stats("ex:p").maxPerSubject == 2)
    assert(stats("ex:p").isMultiValued)
    assert(!stats("ex:q").isMultiValued)
  }

  test("unknown predicate yields zero stats") {
    val st = stats("ex:missing")
    assert(st.tripleCount == 0 && st.distinctSubjects == 0 && !st.isMultiValued)
  }

  test("hasPredicate distinguishes present from absent") {
    assert(stats.hasPredicate("ex:p"))
    assert(!stats.hasPredicate("ex:missing"))
  }

  test("totalTriples sums all predicates") {
    assert(stats.totalTriples == 7)
  }

  test("predicates are sorted") {
    assert(stats.predicates == Seq("ex:p", "ex:q", "ex:r"))
  }

  test("stats on the WatDiv graph agree with direct SQL") {
    val s = repro.TestData.stats
    val t = repro.TestData.triples
    t.createOrReplaceTempView("t_stats_check")
    val row = spark.sql(
      "SELECT count(*), count(distinct s) FROM t_stats_check WHERE p = 'wsdbm:likes'"
    ).collect().head
    assert(s("wsdbm:likes").tripleCount == row.getLong(0))
    assert(s("wsdbm:likes").distinctSubjects == row.getLong(1))
  }

  test("TSV round trip preserves every field") {
    val dir = java.nio.file.Files.createTempDirectory("stats").toString
    Prost.writeStats(stats, s"$dir/stats.tsv")
    val back = Prost.readStats(s"$dir/stats.tsv")
    assert(back == stats)
  }
}
