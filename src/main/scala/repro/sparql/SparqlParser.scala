package repro.sparql

/** Hand-written tokenizer + recursive-descent parser for the SPARQL
  * fragment used throughout the reproduction:
  *
  * {{{
  * query   := prefix* "SELECT" "DISTINCT"? projection "WHERE" "{" triples "}"
  * prefix  := "PREFIX" PNAME ":" IRIREF          // recorded, then ignored:
  *                                               // data keeps prefixed names
  * proj    := "*" | var+
  * triples := pattern ("." pattern)* "."?
  * pattern := term term term
  * term    := var | literal | iri
  * var     := "?" NAME
  * literal := '"' chars '"' | NUMBER
  * iri     := "<" chars ">" | PNAME ":" NAME | NAME
  * }}}
  *
  * IRIs written as `<...>` are kept verbatim without the angle brackets so
  * queries can reference whatever form the data uses.
  */
object SparqlParser {

  /** Thrown on any syntax error, with a human-readable position message. */
  final case class ParseException(message: String) extends RuntimeException(message)

  private sealed trait Token
  private case class TWord(s: String) extends Token // keywords, prefixed names, bare names
  private case class TVar(name: String) extends Token
  private case class TLit(value: String) extends Token
  private case object TLBrace extends Token
  private case object TRBrace extends Token
  private case object TDot extends Token
  private case object TStar extends Token

  private def tokenize(input: String): Vector[Token] = {
    val out = Vector.newBuilder[Token]
    var i = 0
    val n = input.length
    def err(msg: String): Nothing =
      throw ParseException(s"$msg at offset $i in query")
    while (i < n) {
      val c = input(i)
      if (c.isWhitespace) i += 1
      else if (c == '#') { // comment to end of line
        while (i < n && input(i) != '\n') i += 1
      } else if (c == '{') { out += TLBrace; i += 1 }
      else if (c == '}') { out += TRBrace; i += 1 }
      else if (c == '.') { out += TDot; i += 1 }
      else if (c == '*') { out += TStar; i += 1 }
      else if (c == '?' || c == '$') {
        val start = i + 1
        i += 1
        while (i < n && (input(i).isLetterOrDigit || input(i) == '_')) i += 1
        if (i == start) err("empty variable name")
        out += TVar(input.substring(start, i))
      } else if (c == '"') {
        val start = i + 1
        i += 1
        val sb = new StringBuilder
        var closed = false
        while (i < n && !closed) {
          input(i) match {
            case '\\' if i + 1 < n => sb += input(i + 1); i += 2
            case '"'               => closed = true; i += 1
            case ch                => sb += ch; i += 1
          }
        }
        if (!closed) err(s"unterminated string literal starting at $start")
        out += TLit(sb.toString)
      } else if (c == '<') {
        val close = input.indexOf('>', i)
        if (close < 0) err("unterminated IRI")
        out += TWord(input.substring(i + 1, close))
        i = close + 1
      } else if (c.isDigit || (c == '-' && i + 1 < n && input(i + 1).isDigit)) {
        val start = i
        i += 1
        while (i < n && (input(i).isDigit || input(i) == '.')) i += 1
        out += TLit(input.substring(start, i))
      } else if (c.isLetter || c == '_') {
        val start = i
        while (i < n && (input(i).isLetterOrDigit || input(i) == '_' ||
                         input(i) == ':' || input(i) == '-' || input(i) == '/')) i += 1
        out += TWord(input.substring(start, i))
      } else err(s"unexpected character '$c'")
    }
    out.result()
  }

  /** Parse `input` into a [[BgpQuery]]; throws [[ParseException]] on error. */
  def parse(input: String): BgpQuery = {
    val tokens = tokenize(input)
    var pos = 0
    def peek: Option[Token] = if (pos < tokens.length) Some(tokens(pos)) else None
    def next(): Token = {
      if (pos >= tokens.length) throw ParseException("unexpected end of query")
      val t = tokens(pos); pos += 1; t
    }
    def expectWord(kw: String): Unit = next() match {
      case TWord(w) if w.equalsIgnoreCase(kw) => ()
      case other => throw ParseException(s"expected '$kw', found $other")
    }

    // PREFIX declarations: accepted and skipped — data uses prefixed names.
    var scanning = true
    while (scanning) peek match {
      case Some(TWord(w)) if w.equalsIgnoreCase("PREFIX") =>
        next() // PREFIX
        next() // pname: (tokenizer folds "ex:" into one word)
        next() // <iri> target
      case _ => scanning = false
    }

    expectWord("SELECT")
    val distinct = peek match {
      case Some(TWord(w)) if w.equalsIgnoreCase("DISTINCT") => next(); true
      case _ => false
    }
    val projection = Vector.newBuilder[Var]
    var star = false
    var reading = true
    while (reading) peek match {
      case Some(TVar(v)) => next(); projection += Var(v)
      case Some(TStar)   => next(); star = true
      case _             => reading = false
    }
    val proj = projection.result()
    if (!star && proj.isEmpty)
      throw ParseException("SELECT needs at least one variable or *")
    expectWord("WHERE")
    next() match {
      case TLBrace => ()
      case other   => throw ParseException(s"expected '{', found $other")
    }

    def term(): Term = next() match {
      case TVar(v)  => Var(v)
      case TLit(l)  => Lit(l)
      case TWord(w) => Iri(w)
      case other    => throw ParseException(s"expected a term, found $other")
    }

    val patterns = Vector.newBuilder[TriplePattern]
    var inBgp = true
    while (inBgp) peek match {
      case Some(TRBrace) => next(); inBgp = false
      case Some(TDot)    => next() // tolerate separators / trailing dot
      case None          => throw ParseException("unterminated BGP: missing '}'")
      case _ =>
        val s = term()
        val p = term() match {
          case i: Iri => i
          case other  => throw ParseException(s"predicate must be an IRI, found $other")
        }
        val o = term()
        patterns += TriplePattern(s, p, o)
    }
    val pats = patterns.result()
    if (pats.isEmpty) throw ParseException("empty basic graph pattern")

    val query = BgpQuery(if (star) Seq.empty else proj, pats, distinct)
    val bound = query.allVariables.toSet
    val unbound = query.projection.filterNot(bound)
    if (unbound.nonEmpty)
      throw ParseException(s"projected variables not bound in BGP: ${unbound.mkString(", ")}")
    query
  }
}
