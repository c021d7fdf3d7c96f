package repro.sparql

import org.scalatest.funsuite.AnyFunSuite

class SparqlParserSpec extends AnyFunSuite {
  import SparqlParser.{parse, ParseException}

  test("single pattern with all variables") {
    val q = parse("SELECT ?s ?o WHERE { ?s ex:p ?o }")
    assert(q.patterns == Seq(TriplePattern(Var("s"), Iri("ex:p"), Var("o"))))
    assert(q.projection == Seq(Var("s"), Var("o")))
    assert(!q.distinct)
  }

  test("SELECT * projects every variable in first-seen order") {
    val q = parse("SELECT * WHERE { ?a ex:p ?b . ?b ex:q ?c }")
    assert(q.projection.isEmpty)
    assert(q.effectiveProjection == Seq(Var("a"), Var("b"), Var("c")))
  }

  test("DISTINCT flag is recognised") {
    assert(parse("SELECT DISTINCT ?a WHERE { ?a ex:p ?b }").distinct)
  }

  test("distinct keyword is case-insensitive") {
    assert(parse("select distinct ?a where { ?a ex:p ?b }").distinct)
  }

  test("string literal object") {
    val q = parse("""SELECT ?s WHERE { ?s foaf:age "25" }""")
    assert(q.patterns.head.o == Lit("25"))
  }

  test("bare number becomes a literal") {
    val q = parse("SELECT ?s WHERE { ?s foaf:age 25 }")
    assert(q.patterns.head.o == Lit("25"))
  }

  test("prefixed IRI object") {
    val q = parse("SELECT ?s WHERE { ?s rdf:type wsdbm:User }")
    assert(q.patterns.head.o == Iri("wsdbm:User"))
  }

  test("angle-bracket IRIs keep their content verbatim") {
    val q = parse("SELECT ?s WHERE { ?s <http://example.org/p> ?o }")
    assert(q.patterns.head.p == Iri("http://example.org/p"))
  }

  test("constant subject is parsed") {
    val q = parse("SELECT ?o WHERE { wsdbm:Retailer2 gr:offers ?o }")
    assert(q.patterns.head.s == Iri("wsdbm:Retailer2"))
  }

  test("multiple patterns separated by dots") {
    val q = parse("SELECT * WHERE { ?a ex:p ?b . ?b ex:q ?c . ?c ex:r ?d }")
    assert(q.patterns.length == 3)
  }

  test("trailing dot before closing brace is tolerated") {
    val q = parse("SELECT ?a WHERE { ?a ex:p ?b . }")
    assert(q.patterns.length == 1)
  }

  test("missing dots between patterns are tolerated") {
    val q = parse("SELECT * WHERE { ?a ex:p ?b ?b ex:q ?c }")
    assert(q.patterns.length == 2)
  }

  test("newlines and extra whitespace are ignored") {
    val q = parse("SELECT ?a\nWHERE {\n  ?a ex:p ?b .\n}\n")
    assert(q.patterns.length == 1)
  }

  test("comments are skipped") {
    val q = parse("# header\nSELECT ?a WHERE { ?a ex:p ?b . # inline\n }")
    assert(q.patterns.length == 1)
  }

  test("PREFIX declarations are accepted and skipped") {
    val q = parse("PREFIX wsdbm: <http://db.uwaterloo.ca/~galuc/wsdbm/>\nSELECT ?a WHERE { ?a wsdbm:likes ?b }")
    assert(q.patterns.head.p == Iri("wsdbm:likes"))
  }

  test("escaped quote inside a literal") {
    val q = parse("SELECT ?s WHERE { ?s ex:p \"a\\\"b\" }")
    assert(q.patterns.head.o == Lit("a\"b"))
  }

  test("dollar-sign variables are accepted") {
    val q = parse("SELECT $a WHERE { $a ex:p ?b }")
    assert(q.projection == Seq(Var("a")))
  }

  test("variable used in subject and object positions") {
    val q = parse("SELECT ?x WHERE { ?x ex:p ?x }")
    assert(q.patterns.head.s == q.patterns.head.o)
  }

  test("allVariables deduplicates and keeps order") {
    val q = parse("SELECT * WHERE { ?b ex:p ?a . ?a ex:q ?b }")
    assert(q.allVariables == Seq(Var("b"), Var("a")))
  }

  test("keywords are case-insensitive") {
    val q = parse("select ?a wHeRe { ?a ex:p ?b }")
    assert(q.projection == Seq(Var("a")))
  }

  test("error: projecting an unbound variable") {
    val e = intercept[ParseException](parse("SELECT ?z WHERE { ?a ex:p ?b }"))
    assert(e.getMessage.contains("not bound"))
  }

  test("error: empty BGP") {
    intercept[ParseException](parse("SELECT ?a WHERE { }"))
  }

  test("error: missing WHERE") {
    intercept[ParseException](parse("SELECT ?a { ?a ex:p ?b }"))
  }

  test("error: missing closing brace") {
    intercept[ParseException](parse("SELECT ?a WHERE { ?a ex:p ?b"))
  }

  test("error: variable as predicate") {
    intercept[ParseException](parse("SELECT ?a WHERE { ?a ?p ?b }"))
  }

  test("error: literal as predicate") {
    intercept[ParseException](parse("SELECT ?a WHERE { ?a \"p\" ?b }"))
  }

  test("error: no projection") {
    intercept[ParseException](parse("SELECT WHERE { ?a ex:p ?b }"))
  }

  test("error: empty variable name") {
    intercept[ParseException](parse("SELECT ? WHERE { ?a ex:p ?b }"))
  }

  test("error: unterminated string") {
    intercept[ParseException](parse("SELECT ?a WHERE { ?a ex:p \"oops }"))
  }

  test("error: unterminated IRI") {
    intercept[ParseException](parse("SELECT ?a WHERE { ?a <http://x ?b }"))
  }

  test("error: garbage after incomplete pattern") {
    intercept[ParseException](parse("SELECT ?a WHERE { ?a ex:p }"))
  }

  test("round trip: toString of a parsed query reparses to the same AST") {
    val original = parse("""SELECT DISTINCT ?a ?b WHERE { ?a ex:p ?b . ?b ex:q "lit" . ?a rdf:type ex:C }""")
    val reparsed = parse(original.toString)
    assert(reparsed == original)
  }
}
