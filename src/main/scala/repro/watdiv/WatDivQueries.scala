package repro.watdiv

import repro.sparql.{BgpQuery, SparqlParser}

/** The WatDiv "basic testing" query set, re-authored against the
  * reproduction schema with the same shape classes and literal placement
  * as the original twenty queries:
  *
  *   - C1–C3: complex — large mixed patterns, many joins, big results;
  *   - F1–F5: snowflake — two or three stars connected by path edges;
  *   - L1–L5: linear — chains of 2–3 patterns, one strong constant;
  *   - S1–S7: star — one subject with 3–8 patterns.
  *
  * Constants reference low-numbered entities, which
  * [[WatDivSchema.sizes]] keeps valid at every scale.
  */
object WatDivQueries {

  /** One benchmark query: its WatDiv-style name, its group letter and the
    * SPARQL text.
    */
  final case class NamedQuery(name: String, group: String, sparql: String) {
    /** Parsed form (parsing is cheap; done on demand). */
    def query: BgpQuery = SparqlParser.parse(sparql)
  }

  val C1 = NamedQuery("C1", "C",
    """SELECT * WHERE {
      |  ?v0 rdf:type wsdbm:Product .
      |  ?v0 sorg:caption ?v1 .
      |  ?v0 rev:hasReview ?v2 .
      |  ?v2 rev:rating ?v3 .
      |  ?v2 rev:reviewer ?v4 .
      |  ?v4 sorg:nationality ?v5 .
      |  ?v4 wsdbm:likes ?v6 .
      |  ?v6 wsdbm:hasGenre ?v7 .
      |}""".stripMargin)

  val C2 = NamedQuery("C2", "C",
    """SELECT * WHERE {
      |  ?v0 sorg:legalName ?v1 .
      |  ?v0 gr:offers ?v2 .
      |  ?v2 gr:includes ?v3 .
      |  ?v3 sorg:caption ?v4 .
      |  ?v3 rev:hasReview ?v5 .
      |  ?v5 rev:reviewer ?v6 .
      |  ?v6 foaf:age ?v7 .
      |  ?v6 sorg:nationality wsdbm:Country7 .
      |}""".stripMargin)

  val C3 = NamedQuery("C3", "C",
    """SELECT * WHERE {
      |  ?v0 wsdbm:likes ?v1 .
      |  ?v0 wsdbm:friendOf ?v2 .
      |  ?v0 foaf:age ?v3 .
      |  ?v0 wsdbm:gender ?v4 .
      |  ?v0 foaf:givenName ?v5 .
      |  ?v0 sorg:nationality ?v6 .
      |}""".stripMargin)

  val F1 = NamedQuery("F1", "F",
    """SELECT * WHERE {
      |  ?v0 rdf:type wsdbm:Product .
      |  ?v0 sorg:caption ?v1 .
      |  ?v0 rev:hasReview ?v2 .
      |  ?v2 rev:rating ?v3 .
      |  ?v2 rev:reviewer ?v4 .
      |}""".stripMargin)

  val F2 = NamedQuery("F2", "F",
    """SELECT * WHERE {
      |  ?v0 foaf:homepage ?v1 .
      |  ?v0 wsdbm:likes ?v2 .
      |  ?v2 sorg:caption ?v3 .
      |  ?v2 wsdbm:hasGenre wsdbm:Genre4 .
      |  ?v1 sorg:url ?v4 .
      |  ?v1 wsdbm:hits ?v5 .
      |}""".stripMargin)

  val F3 = NamedQuery("F3", "F",
    """SELECT * WHERE {
      |  ?v0 sorg:contentRating "PG" .
      |  ?v0 rev:hasReview ?v1 .
      |  ?v1 rev:title ?v2 .
      |  ?v1 rev:reviewer ?v3 .
      |  ?v3 sorg:nationality wsdbm:Country6 .
      |  ?v3 foaf:age ?v4 .
      |}""".stripMargin)

  val F4 = NamedQuery("F4", "F",
    """SELECT * WHERE {
      |  ?v0 gr:includes ?v1 .
      |  ?v1 wsdbm:hasGenre wsdbm:Genre5 .
      |  ?v0 gr:price ?v2 .
      |  ?v0 gr:validFrom ?v3 .
      |  ?v4 wsdbm:makesPurchase ?v5 .
      |  ?v5 wsdbm:purchaseFor ?v1 .
      |  ?v1 sorg:caption ?v6 .
      |}""".stripMargin)

  val F5 = NamedQuery("F5", "F",
    """SELECT * WHERE {
      |  wsdbm:Retailer3 gr:offers ?v1 .
      |  ?v1 gr:includes ?v2 .
      |  ?v1 gr:price ?v3 .
      |  ?v2 sorg:description ?v4 .
      |  ?v2 rdf:type wsdbm:Product .
      |}""".stripMargin)

  val L1 = NamedQuery("L1", "L",
    """SELECT * WHERE {
      |  ?v0 wsdbm:subscribes wsdbm:Website1 .
      |  ?v0 wsdbm:likes ?v2 .
      |  ?v2 sorg:caption ?v3 .
      |}""".stripMargin)

  val L2 = NamedQuery("L2", "L",
    """SELECT * WHERE {
      |  ?v0 sorg:nationality wsdbm:Country2 .
      |  ?v0 wsdbm:makesPurchase ?v1 .
      |  ?v1 wsdbm:purchaseFor ?v2 .
      |}""".stripMargin)

  val L3 = NamedQuery("L3", "L",
    """SELECT * WHERE {
      |  ?v0 wsdbm:likes ?v1 .
      |  ?v0 wsdbm:subscribes wsdbm:Website3 .
      |}""".stripMargin)

  val L4 = NamedQuery("L4", "L",
    """SELECT * WHERE {
      |  ?v0 wsdbm:subscribes ?v1 .
      |  ?v0 foaf:age "25" .
      |}""".stripMargin)

  val L5 = NamedQuery("L5", "L",
    """SELECT * WHERE {
      |  wsdbm:Retailer1 gr:offers ?v1 .
      |  ?v1 gr:includes ?v2 .
      |  ?v2 sorg:caption ?v3 .
      |}""".stripMargin)

  val S1 = NamedQuery("S1", "S",
    """SELECT * WHERE {
      |  ?v0 gr:includes ?v1 .
      |  wsdbm:Retailer2 gr:offers ?v0 .
      |  ?v0 gr:price ?v3 .
      |  ?v0 gr:serialNumber ?v4 .
      |  ?v0 gr:validFrom ?v5 .
      |  ?v0 gr:validThrough ?v6 .
      |  ?v0 sorg:eligibleRegion ?v7 .
      |}""".stripMargin)

  val S2 = NamedQuery("S2", "S",
    """SELECT * WHERE {
      |  ?v0 sorg:nationality wsdbm:Country1 .
      |  ?v0 wsdbm:gender ?v1 .
      |  ?v0 foaf:age ?v2 .
      |  ?v0 rdf:type wsdbm:User .
      |}""".stripMargin)

  val S3 = NamedQuery("S3", "S",
    """SELECT * WHERE {
      |  ?v0 rdf:type wsdbm:Product .
      |  ?v0 sorg:caption ?v1 .
      |  ?v0 wsdbm:hasGenre wsdbm:Genre1 .
      |  ?v0 sorg:publisher ?v2 .
      |}""".stripMargin)

  val S4 = NamedQuery("S4", "S",
    """SELECT * WHERE {
      |  ?v0 foaf:age "30" .
      |  ?v0 wsdbm:gender "female" .
      |  ?v0 foaf:givenName ?v1 .
      |}""".stripMargin)

  val S5 = NamedQuery("S5", "S",
    """SELECT * WHERE {
      |  ?v0 rdf:type wsdbm:Product .
      |  ?v0 sorg:description ?v1 .
      |  ?v0 sorg:contentSize ?v2 .
      |  ?v0 sorg:expires ?v3 .
      |}""".stripMargin)

  val S6 = NamedQuery("S6", "S",
    """SELECT * WHERE {
      |  ?v0 wsdbm:hasGenre wsdbm:Genre2 .
      |  ?v0 sorg:author ?v1 .
      |  ?v0 rdf:type wsdbm:Product .
      |}""".stripMargin)

  val S7 = NamedQuery("S7", "S",
    """SELECT * WHERE {
      |  ?v0 rdf:type wsdbm:Review .
      |  ?v0 rev:rating "7" .
      |  ?v0 rev:reviewer ?v1 .
      |}""".stripMargin)

  /** The full basic set, in the paper's C, F, L, S order. */
  val All: Seq[NamedQuery] =
    Seq(C1, C2, C3, F1, F2, F3, F4, F5, L1, L2, L3, L4, L5, S1, S2, S3, S4, S5, S6, S7)

  /** Group letter -> queries, preserving order. */
  val ByGroup: Seq[(String, Seq[NamedQuery])] =
    Seq("C", "F", "L", "S").map(g => g -> All.filter(_.group == g))

  /** Full group names as the paper's Table 2 prints them. */
  val GroupNames: Map[String, String] =
    Map("C" -> "Complex", "F" -> "Snowflake", "L" -> "Linear", "S" -> "Star")
}
