package repro.watdiv

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.rdf.TripleOps
import WatDivSchema._

/** Deterministic WatDiv-like RDF graph generator.
  *
  * All randomness is derived from `xxhash64(salt, entity-id)`, so the graph
  * is a pure function of `(scale, seed)` — independent of partitioning,
  * core count and execution order. That determinism is what lets the DuckDB
  * oracle, the four engines and the benchmarks all see the identical graph.
  *
  * The generator reproduces WatDiv's structural diversity:
  *   - ~45 predicates whose cardinalities span three orders of magnitude;
  *   - star-heavy entities (users and offers carry up to ~12 attributes);
  *   - multi-valued predicates (`follows`, `likes`, `hasGenre`, …);
  *   - partial attribute coverage (30–80%), which makes the Property Table
  *     NULL-heavy — the exact pathology the paper's Parquet choice targets;
  *   - skewed in-degree on popular products/users (triangular skew).
  */
object WatDivGen {

  /** Hash-derived non-negative pseudo-random value per row. */
  private def h(salt: String, cols: Column*): Column =
    abs(xxhash64((lit(salt) +: cols): _*))

  /** Uniform pick in [0, n). */
  private def pick(salt: String, n: Long, cols: Column*): Column =
    h(salt, cols: _*) % n

  /** Skewed pick in [0, n): min of two uniforms — low IDs are "popular". */
  private def skewPick(salt: String, n: Long, cols: Column*): Column =
    least(h(salt + "#a", cols: _*) % n, h(salt + "#b", cols: _*) % n)

  /** Coverage predicate: true for `pct`% of rows. */
  private def covered(salt: String, pct: Int, cols: Column*): Column =
    h(salt + "#cov", cols: _*) % 100 < pct

  private def uri(prefix: String, idCol: Column): Column =
    concat(lit(prefix), idCol.cast("string"))

  private def datePool(salt: String, cols: Column*): Column = {
    // 3 years of month-aligned dates: plenty of duplicates, stable lexical form.
    val year  = lit(2017) + pick(salt + "#y", 3, cols: _*)
    val month = lpad((pick(salt + "#m", 12, cols: _*) + 1).cast("string"), 2, "0")
    val day   = lpad((pick(salt + "#d", 28, cols: _*) + 1).cast("string"), 2, "0")
    concat(year.cast("string"), lit("-"), month, lit("-"), day)
  }

  /** Generate the full graph as a canonical `(s, p, o)` DataFrame.
    *
    * @param scale size multiplier; 1.0 ≈ 130k triples, 10 ≈ 1.3M
    * @param seed  folded into every hash salt
    */
  def generate(spark: SparkSession, scale: Double, seed: Long = 0L): DataFrame = {
    val sz = sizes(scale)
    val tag = s"#$seed#"

    def hh(salt: String, cols: Column*): Column = h(tag + salt, cols: _*)
    def pk(salt: String, n: Long, cols: Column*): Column = pick(tag + salt, n, cols: _*)
    def sk(salt: String, n: Long, cols: Column*): Column = skewPick(tag + salt, n, cols: _*)
    def cv(salt: String, pct: Int, cols: Column*): Column = covered(tag + salt, pct, cols: _*)

    /** `count` entities as a single `id` column. */
    def ids(count: Long): DataFrame = spark.range(count).toDF("id")

    /** Single-valued attribute block: one triple per covered entity. */
    def attr(base: DataFrame, prefix: String, pred: String, pct: Int, value: Column): DataFrame =
      base
        .where(if (pct >= 100) lit(true) else cv(pred, pct, col("id")))
        .select(uri(prefix, col("id")) as "s", lit(pred) as "p", value.cast("string") as "o")

    /** Multi-valued edge block: entity `id` gets `hash % (maxMult+1)` slots,
      * each slot yields one object. Duplicate (s,p,o) rows collapse later
      * under RDF set semantics, thinning the multiplicity tail slightly.
      */
    def fanout(count: Long, prefix: String, pred: String, maxMult: Int)(obj: (Column, Column) => Column): DataFrame = {
      val base = spark.range(count * maxMult).select(
        (col("id") / maxMult).cast("long") as "eid",
        (col("id") % maxMult).cast("long") as "slot",
      )
      base
        .where(col("slot") < hh(pred + "#mult", col("eid")) % (maxMult + 1))
        .select(
          uri(prefix, col("eid")) as "s",
          lit(pred) as "p",
          obj(col("eid"), col("slot")).cast("string") as "o",
        )
    }

    val users     = ids(sz.users)
    val products  = ids(sz.products)
    val reviews   = ids(sz.reviews)
    val offers    = ids(sz.offers)
    val retailers = ids(sz.retailers)
    val websites  = ids(sz.websites)
    val purchases = ids(sz.purchases)
    val cities    = ids(sz.cities)

    def typed(base: DataFrame, prefix: String, clazz: String): DataFrame =
      attr(base, prefix, RdfType, 100, lit(clazz))

    val genderPool   = array(lit("male"), lit("female"))
    val ratingPool   = array(lit("G"), lit("PG"), lit("PG-13"), lit("R"))
    val languagePool = array(lit("en"), lit("de"), lit("fr"), lit("es"), lit("it"),
                             lit("pt"), lit("nl"), lit("pl"), lit("ja"), lit("zh"))
    val paymentPool  = array(lit("Cash"), lit("CreditCard"), lit("PayPal"), lit("Invoice"))

    val blocks = Seq(
      // ---- users ---------------------------------------------------------
      typed(users, "wsdbm:User", UserClass),
      attr(users, "wsdbm:User", UserId, 100, col("id")),
      attr(users, "wsdbm:User", GivenName, 70, concat(lit("Name"), pk(GivenName, 150, col("id")))),
      attr(users, "wsdbm:User", FamilyName, 70, concat(lit("Family"), pk(FamilyName, 200, col("id")))),
      attr(users, "wsdbm:User", Email, 50, concat(lit("user"), col("id"), lit("@example.org"))),
      attr(users, "wsdbm:User", Age, 50, lit(18) + pk(Age, 20, col("id"))),
      attr(users, "wsdbm:User", Gender, 60, element_at(genderPool, (pk(Gender, 2, col("id")) + 1).cast("int"))),
      attr(users, "wsdbm:User", Nationality, 80, uri("wsdbm:Country", pk(Nationality, sz.countries, col("id")))),
      attr(users, "wsdbm:User", GradeLevel, 40, pk(GradeLevel, 14, col("id"))),
      attr(users, "wsdbm:User", Homepage, 30, uri("wsdbm:Website", pk(Homepage, sz.websites, col("id")))),
      fanout(sz.users, "wsdbm:User", Follows, 5)((e, s) => uri("wsdbm:User", sk(Follows, sz.users, e, s))),
      fanout(sz.users, "wsdbm:User", FriendOf, 4)((e, s) => uri("wsdbm:User", pk(FriendOf, sz.users, e, s))),
      fanout(sz.users, "wsdbm:User", Likes, 4)((e, s) => uri("wsdbm:Product", sk(Likes, sz.products, e, s))),
      fanout(sz.users, "wsdbm:User", Subscribes, 2)((e, s) => uri("wsdbm:Website", pk(Subscribes, sz.websites, e, s))),

      // ---- products ------------------------------------------------------
      typed(products, "wsdbm:Product", ProductClass),
      attr(products, "wsdbm:Product", Caption, 50, concat(lit("caption"), pk(Caption, 1000, col("id")))),
      attr(products, "wsdbm:Product", Description, 60, concat(lit("description of product "), col("id"))),
      attr(products, "wsdbm:Product", ContentRating, 40, element_at(ratingPool, (pk(ContentRating, 4, col("id")) + 1).cast("int"))),
      attr(products, "wsdbm:Product", ContentSize, 30, pk(ContentSize, 1000, col("id"))),
      attr(products, "wsdbm:Product", Expires, 20, datePool(tag + Expires, col("id"))),
      attr(products, "wsdbm:Product", Publisher, 40, uri("wsdbm:Retailer", pk(Publisher, sz.retailers, col("id")))),
      attr(products, "wsdbm:Product", Author, 30, uri("wsdbm:User", pk(Author, sz.users, col("id")))),
      attr(products, "wsdbm:Product", ProductCategory, 100, uri("wsdbm:ProductCategory", pk(ProductCategory, sz.categories, col("id")))),
      fanout(sz.products, "wsdbm:Product", HasGenre, 2)((e, s) => uri("wsdbm:Genre", pk(HasGenre, sz.genres, e, s))),

      // ---- reviews (plus the Product -> Review edge) ---------------------
      typed(reviews, "wsdbm:Review", ReviewClass),
      attr(reviews, "wsdbm:Review", Reviewer, 100, uri("wsdbm:User", pk(Reviewer, sz.users, col("id")))),
      attr(reviews, "wsdbm:Review", Rating, 100, lit(1) + pk(Rating, 10, col("id"))),
      attr(reviews, "wsdbm:Review", ReviewTitle, 100, concat(lit("title"), pk(ReviewTitle, 500, col("id")))),
      attr(reviews, "wsdbm:Review", ReviewText, 80, concat(lit("text of review "), col("id"))),
      attr(reviews, "wsdbm:Review", TotalVotes, 40, pk(TotalVotes, 50, col("id"))),
      reviews.select(
        uri("wsdbm:Product", sk(tag + HasReview, sz.products, col("id"))) as "s",
        lit(HasReview) as "p",
        uri("wsdbm:Review", col("id")).cast("string") as "o",
      ),

      // ---- offers (plus the Retailer -> Offer edge) ----------------------
      typed(offers, "wsdbm:Offer", OfferClass),
      attr(offers, "wsdbm:Offer", Includes, 100, uri("wsdbm:Product", sk(Includes, sz.products, col("id")))),
      attr(offers, "wsdbm:Offer", Price, 100, pk(Price, 5000, col("id")) + lit(1)),
      attr(offers, "wsdbm:Offer", SerialNumber, 100, concat(lit("sn"), col("id"))),
      attr(offers, "wsdbm:Offer", ValidFrom, 60, datePool(tag + ValidFrom, col("id"))),
      attr(offers, "wsdbm:Offer", ValidThrough, 60, datePool(tag + ValidThrough, col("id"))),
      attr(offers, "wsdbm:Offer", EligibleRegion, 40, uri("wsdbm:Country", pk(EligibleRegion, sz.countries, col("id")))),
      offers.select(
        uri("wsdbm:Retailer", pk(tag + OffersPred, sz.retailers, col("id"))) as "s",
        lit(OffersPred) as "p",
        uri("wsdbm:Offer", col("id")).cast("string") as "o",
      ),

      // ---- purchases (plus the User -> Purchase edge) --------------------
      typed(purchases, "wsdbm:Purchase", PurchaseClass),
      attr(purchases, "wsdbm:Purchase", PurchaseFor, 100, uri("wsdbm:Product", sk(PurchaseFor, sz.products, col("id")))),
      attr(purchases, "wsdbm:Purchase", PurchaseDate, 100, datePool(tag + PurchaseDate, col("id"))),
      purchases.select(
        uri("wsdbm:User", sk(tag + MakesPurchase, sz.users, col("id"))) as "s",
        lit(MakesPurchase) as "p",
        uri("wsdbm:Purchase", col("id")).cast("string") as "o",
      ),

      // ---- retailers -----------------------------------------------------
      typed(retailers, "wsdbm:Retailer", RetailerClass),
      attr(retailers, "wsdbm:Retailer", LegalName, 100, concat(lit("Retailer Corp "), col("id"))),
      attr(retailers, "wsdbm:Retailer", PaymentAccepted, 50, element_at(paymentPool, (pk(PaymentAccepted, 4, col("id")) + 1).cast("int"))),
      attr(retailers, "wsdbm:Retailer", RetailerCountry, 100, uri("wsdbm:Country", pk(RetailerCountry, sz.countries, col("id")))),

      // ---- websites ------------------------------------------------------
      typed(websites, "wsdbm:Website", WebsiteClass),
      attr(websites, "wsdbm:Website", Url, 100, concat(lit("http://example.org/site"), col("id"))),
      attr(websites, "wsdbm:Website", Hits, 80, pk(Hits, 100000, col("id"))),
      attr(websites, "wsdbm:Website", Language, 60, element_at(languagePool, (pk(Language, 10, col("id")) + 1).cast("int"))),

      // ---- cities / genres / countries / categories ----------------------
      typed(cities, "wsdbm:City", CityClass),
      attr(cities, "wsdbm:City", ParentCountry, 100, uri("wsdbm:Country", pk(ParentCountry, sz.countries, col("id")))),
      typed(ids(sz.genres), "wsdbm:Genre", GenreClass),
      typed(ids(sz.countries), "wsdbm:Country", CountryClass),
      typed(ids(sz.categories), "wsdbm:ProductCategory", CategoryClass),
    )

    TripleOps.canonical(blocks.reduce(_ unionByName _))
  }
}
