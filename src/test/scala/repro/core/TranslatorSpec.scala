package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.sparql.{Iri, Lit, SparqlParser, TriplePattern, Var}

class TranslatorSpec extends AnyFunSuite {
  import SparqlParser.parse

  // Hand-made statistics: a big predicate, a mid one, two small ones.
  private val stats = GraphStats(Map(
    "ex:big"   -> PredicateStats("ex:big", 100000, 20000, 5),
    "ex:mid"   -> PredicateStats("ex:mid", 5000, 5000, 1),
    "ex:small" -> PredicateStats("ex:small", 100, 100, 1),
    "ex:tiny"  -> PredicateStats("ex:tiny", 10, 10, 1),
  ))
  private val translator = new Translator(stats)

  test("patterns sharing a subject become one PT node") {
    val tree = translator.translate(parse(
      "SELECT * WHERE { ?s ex:mid ?a . ?s ex:small ?b . ?t ex:tiny ?c }"))
    val pts = tree.nodes.collect { case n: PtJtNode => n }
    val vps = tree.nodes.collect { case n: VpJtNode => n }
    assert(pts.size == 1 && pts.head.patterns.size == 2)
    assert(vps.size == 1)
  }

  test("single-pattern groups become VP nodes") {
    val tree = translator.translate(parse(
      "SELECT * WHERE { ?a ex:mid ?b . ?b ex:small ?c }"))
    assert(tree.nodes.forall(_.isInstanceOf[VpJtNode]))
    assert(tree.nodes.size == 2)
  }

  test("vpOnly mode never produces PT nodes") {
    val tree = translator.translate(parse(
      "SELECT * WHERE { ?s ex:mid ?a . ?s ex:small ?b . ?s ex:tiny ?c }"), vpOnly = true)
    assert(tree.nodes.size == 3)
    assert(tree.nodes.forall(_.isInstanceOf[VpJtNode]))
  }

  test("a star query becomes a single PT node, saving all joins") {
    val tree = translator.translate(parse(
      "SELECT * WHERE { ?s ex:big ?a . ?s ex:mid ?b . ?s ex:small ?c }"))
    assert(tree.nodes.size == 1)
    assert(tree.root.isInstanceOf[PtJtNode])
  }

  test("the heaviest node becomes the root") {
    val tree = translator.translate(parse(
      "SELECT * WHERE { ?a ex:big ?b . ?b ex:small ?c }"))
    assert(tree.root.asInstanceOf[VpJtNode].pattern.p.value == "ex:big")
  }

  test("a literal pattern is pushed to a leaf (computed first)") {
    val tree = translator.translate(parse(
      """SELECT * WHERE { ?a ex:mid ?b . ?b ex:mid "x" . ?b ex:big ?c }"""), vpOnly = true)
    val rootPred = tree.root.asInstanceOf[VpJtNode].pattern
    assert(!rootPred.hasLiteral, s"literal pattern must not be the root:\n${tree.pretty}")
    // The literal-bearing node is a leaf.
    val literalNode = tree.nodes.find(_.patterns.exists(_.hasLiteral)).get
    assert(literalNode.children.isEmpty)
  }

  test("literal weighting: literal beats IRI constant beats variable") {
    val varW = translator.patternWeight(TriplePattern(Var("a"), Iri("ex:mid"), Var("b")))
    val iriW = translator.patternWeight(TriplePattern(Var("a"), Iri("ex:mid"), Iri("ex:x")))
    val litW = translator.patternWeight(TriplePattern(Var("a"), Iri("ex:mid"), Lit("x")))
    assert(litW < iriW && iriW < varW)
  }

  test("constant subject reduces the weight to a point lookup") {
    val free = translator.patternWeight(TriplePattern(Var("a"), Iri("ex:big"), Var("b")))
    val bound = translator.patternWeight(TriplePattern(Iri("ex:s1"), Iri("ex:big"), Var("b")))
    assert(bound < free / 100)
  }

  test("unknown predicate weighs zero (empty result: most selective)") {
    assert(translator.patternWeight(TriplePattern(Var("a"), Iri("ex:none"), Var("b"))) == 0.0)
  }

  test("PT node weight is bounded by its rarest member's subjects") {
    val node = PtJtNode(Var("s"), Seq(
      TriplePattern(Var("s"), Iri("ex:big"), Var("a")),
      TriplePattern(Var("s"), Iri("ex:tiny"), Var("b")),
    ))
    assert(translator.nodeWeight(node) <= 10.0)
  }

  test("PT node with a literal is weighted heavily toward the leaves") {
    val plain = PtJtNode(Var("s"), Seq(
      TriplePattern(Var("s"), Iri("ex:mid"), Var("a")),
      TriplePattern(Var("s"), Iri("ex:small"), Var("b")),
    ))
    val withLit = PtJtNode(Var("s"), Seq(
      TriplePattern(Var("s"), Iri("ex:mid"), Var("a")),
      TriplePattern(Var("s"), Iri("ex:small"), Lit("x")),
    ))
    assert(translator.nodeWeight(withLit) < translator.nodeWeight(plain))
  }

  test("every pattern of the query appears in exactly one node") {
    val q = parse("SELECT * WHERE { ?s ex:mid ?a . ?s ex:small ?b . ?a ex:big ?c . ?c ex:tiny ?d }")
    val tree = translator.translate(q)
    val covered = tree.nodes.flatMap(_.patterns)
    assert(covered.sortBy(_.toString) == q.patterns.sortBy(_.toString))
  }

  test("connected nodes are attached via shared variables where possible") {
    val tree = translator.translate(parse(
      "SELECT * WHERE { ?a ex:big ?b . ?b ex:mid ?c . ?c ex:small ?d }"))
    def edgesShareVar(n: JtNode): Boolean = n.children.forall { c =>
      n.ownVariables.intersect(c.subtreeVariables).nonEmpty && edgesShareVar(c)
    }
    assert(edgesShareVar(tree.root), tree.pretty)
  }

  test("projection and distinct are carried into the tree") {
    val tree = translator.translate(parse(
      "SELECT DISTINCT ?a WHERE { ?a ex:mid ?b }"))
    assert(tree.projection == Seq(Var("a")))
    assert(tree.distinct)
  }

  test("pretty printing names node kinds") {
    val tree = translator.translate(parse(
      "SELECT * WHERE { ?s ex:mid ?a . ?s ex:small ?b . ?a ex:big ?c }"))
    assert(tree.pretty.contains("PT["))
    assert(tree.pretty.contains("VP["))
  }
}
