package repro.util

import org.scalatest.funsuite.AnyFunSuite

class NamesSpec extends AnyFunSuite {

  test("colon is replaced") {
    assert(Names.sanitize("wsdbm:follows") == "wsdbm_follows")
  }

  test("slashes and dots are replaced") {
    assert(Names.sanitize("http://x.org/p") == "http___x_org_p")
  }

  test("leading digit gets a prefix") {
    assert(Names.sanitize("1abc").head != '1')
  }

  test("empty string gets a prefix") {
    assert(Names.sanitize("").nonEmpty)
  }

  test("forPredicates is injective on colliding names") {
    val m = Names.forPredicates(Seq("ex:p", "ex/p", "ex.p"))
    assert(m.values.toSet.size == 3)
  }

  test("forPredicates is stable across call order") {
    val a = Names.forPredicates(Seq("ex:p", "ex/p"))
    val b = Names.forPredicates(Seq("ex/p", "ex:p"))
    assert(a == b)
  }

  test("forPredicates keys cover the input") {
    val preds = Seq("rdf:type", "wsdbm:likes", "foaf:age")
    assert(Names.forPredicates(preds).keySet == preds.toSet)
  }

  test("already-clean names pass through") {
    assert(Names.forPredicates(Seq("clean_name"))("clean_name") == "clean_name")
  }
}
