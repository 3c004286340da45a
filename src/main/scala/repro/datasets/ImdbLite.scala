package repro.datasets

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.core._

/** JOB/IMDb-shaped synthetic dataset (paper §8.1 substitution).
  *
  * Mirrors the property-graph conversion the paper performs on IMDb:
  * entity tables become vertex labels, relationship tables become n-n
  * edges with (string-heavy, NULL-heavy) properties, and foreign keys
  * become 1-n edges. All 33 JOB query shapes run against it with
  * predicates over the synthesized dictionary domains.
  */
object ImdbLite {

  private def P(name: String, t: PType = PLongT) = PropertyDef(name, t)

  val schema: GraphSchema = GraphSchema(
    vertices = IndexedSeq(
      VertexDef("title", IndexedSeq(
        P("kind", PStringT), P("production_year"), P("episode_nr"), P("title", PStringT))),
      VertexDef("name", IndexedSeq(
        P("name", PStringT), P("gender", PStringT), P("name_pcode_cf", PStringT))),
      VertexDef("company_name", IndexedSeq(P("name", PStringT), P("country_code", PStringT))),
      VertexDef("keyword", IndexedSeq(P("keyword", PStringT))),
      VertexDef("movie_info", IndexedSeq(
        P("info_type", PStringT), P("info", PStringT), P("note", PStringT))),
      VertexDef("mov_info_2", IndexedSeq(P("info_type", PStringT), P("info", PStringT))),
      VertexDef("person_info", IndexedSeq(P("info_type", PStringT), P("note", PStringT))),
      VertexDef("aka_name", IndexedSeq(P("name", PStringT))),
      VertexDef("complete_cast", IndexedSeq(P("subject", PStringT), P("status", PStringT)))
    ),
    edges = IndexedSeq(
      EdgeDef("movie_companies", "title", "company_name", NN, IndexedSeq(
        P("company_type", PStringT), P("note", PStringT))),
      EdgeDef("cast_info", "title", "name", NN, IndexedSeq(
        P("note", PStringT), P("role", PStringT), P("pname", PStringT), P("nr_order"))),
      EdgeDef("movie_keyword", "title", "keyword", NN, IndexedSeq.empty),
      EdgeDef("movie_link", "title", "title", NN, IndexedSeq(P("link_type", PStringT))),
      EdgeDef("has_movie_info", "title", "movie_info", OneN, IndexedSeq.empty),
      EdgeDef("has_mov_info_2", "title", "mov_info_2", OneN, IndexedSeq.empty),
      EdgeDef("has_person_info", "name", "person_info", OneN, IndexedSeq.empty),
      EdgeDef("has_aka_name", "name", "aka_name", OneN, IndexedSeq.empty),
      EdgeDef("has_complete_cast", "title", "complete_cast", OneN, IndexedSeq.empty)
    )
  )

  // Dictionary domains; the JOB predicate constants all resolve here.
  val kinds = Seq("movie", "tv series", "video", "episode", "video game", "tv movie", "short")
  val personNames: Seq[String] =
    Seq("Robert Downey Jr.", "Angela Smith", "Angelina Ford", "Tony Stark", "Tim Burton",
      "Timothy Green", "Queen Latifah", "Yoko Ono", "Anthony Yo", "Anna Lee", "Brian May",
      "Bela Tarr", "Boris Karloff") ++ (0 until 300).map(i => f"person$i%03d surname$i%03d")
  val companyNames: Seq[String] =
    Seq("Warner Film Studio", "Universal Film", "Nordisk Film", "Polar Film GmbH",
      "Shochiku Films", "Mosfilm") ++ (0 until 200).map(i => f"company$i%03d")
  val countryCodes = Seq("[us]", "[de]", "[jp]", "[ru]", "[pl]", "[se]", "[fr]", "[gb]", "[it]", "[in]")
  val keywords: Seq[String] =
    Seq("sequel", "character-name-in-title", "marvel-cinematic-universe", "superhero",
      "murder", "hero", "computer-animation", "based-on-novel", "revenge", "love") ++
      (0 until 150).map(i => f"kw$i%03d")
  val infoTypes = Seq("release dates", "genres", "countries", "budget")
  val mii2Types = Seq("rating", "votes", "top 250 rank", "bottom 10 rank")
  val infos: Seq[String] =
    Seq("Sweden", "Germany", "USA", "Drama", "Horror", "Comedy", "Thriller",
      "USA: January 2005", "USA: internet release 2009", "Japan: June 2001",
      "Japan: May 2008", "Germany: 2003") ++ (0 until 60).map(i => f"info$i%03d")
  val miNotes = Seq("(internet premiere)", "(theatrical)", "(dvd)", "(tv)")
  val mcNotes: Seq[String] =
    Seq("(co-production)", "(theatrical) (France)", "(theatrical) (USA)", "(worldwide) (2005)",
      "(worldwide) (200x)", "(Japan) (theatrical)", "(USA) (video)", "(2006) (USA)",
      "(presents)", "(in association with)")
  val ciNotes: Seq[String] =
    Seq("(voice)", "(voice: English version)", "(uncredited)", "(voice) (uncredited)",
      "(archive footage)", "(as himself)")
  val roles = Seq("actor", "actress", "producer", "director", "writer")
  val linkTypes = Seq("follows", "followedBy", "features", "references", "remake of")
  val pcodes = ('A' to 'Z').map(c => s"${c}123")
  val ratings: Seq[String] = (10 to 99).map(r => s"${r / 10}.${r % 10}")
  val piTypes = Seq("mini biography", "trivia", "quotes")
  val piNotes = Seq("Volker Boehm", "Pete Ross", "Anonymous") ++ (0 until 30).map(i => f"editor$i%02d")
  val ccSubjects = Seq("cast", "crew")
  val ccStatuses = Seq("complete", "complete+verified", "partial")
  val titles: Seq[String] = Seq("Shrek 2", "The Follow-Up", "Dark Horizon") ++
    (0 until 500).map(i => f"title$i%04d")

  def apply(spark: SparkSession, nTitles: Long, seed: Long = 11): GraphData = {
    import spark.implicits._
    val nT = nTitles
    val nN = nT * 5 / 3
    val nCn = math.max(50L, nT / 15)
    val nK = math.max(50L, nT / 15)
    val nMi = nT * 3
    val nMii = nT * 2
    val nPi = nN * 3 / 4
    val nAn = nN * 3 / 5
    val nCc = nT / 2

    val title = spark.range(nT).select(
      $"id" as "vid",
      GenUtil.dictCol(kinds, seed + 1) as "kind",
      GenUtil.longCol(1930, 2016, seed + 2, nullFrac = 0.1) as "production_year",
      GenUtil.longCol(1, 200, seed + 3, nullFrac = 0.7) as "episode_nr",
      GenUtil.dictCol(titles, seed + 4) as "title")

    val name = spark.range(nN).select(
      $"id" as "vid",
      GenUtil.dictCol(personNames, seed + 5) as "name",
      GenUtil.dictCol(Seq("m", "f"), seed + 6, nullFrac = 0.2) as "gender",
      GenUtil.dictCol(pcodes, seed + 7, nullFrac = 0.1) as "name_pcode_cf")

    val companyName = spark.range(nCn).select(
      $"id" as "vid",
      GenUtil.dictCol(companyNames, seed + 8) as "name",
      GenUtil.dictCol(countryCodes, seed + 9) as "country_code")

    val keyword = spark.range(nK).select(
      $"id" as "vid", GenUtil.dictCol(keywords, seed + 10) as "keyword")

    val movieInfo = spark.range(nMi).select(
      $"id" as "vid",
      GenUtil.dictCol(infoTypes, seed + 11) as "info_type",
      GenUtil.dictCol(infos, seed + 12) as "info",
      GenUtil.dictCol(miNotes, seed + 13, nullFrac = 0.6) as "note")

    val movInfo2 = spark.range(nMii).select(
      $"id" as "vid",
      GenUtil.dictCol(mii2Types, seed + 14) as "info_type",
      GenUtil.dictCol(ratings, seed + 15) as "info")

    val personInfo = spark.range(nPi).select(
      $"id" as "vid",
      GenUtil.dictCol(piTypes, seed + 16) as "info_type",
      GenUtil.dictCol(piNotes, seed + 17, nullFrac = 0.5) as "note")

    val akaName = spark.range(nAn).select(
      $"id" as "vid", GenUtil.dictCol(personNames, seed + 18) as "name")

    val completeCast = spark.range(nCc).select(
      $"id" as "vid",
      GenUtil.dictCol(ccSubjects, seed + 19) as "subject",
      GenUtil.dictCol(ccStatuses, seed + 20) as "status")

    // Relationship (n-n) edges with NULL-heavy string properties — 5 of 7
    // edge properties here exceed 50 % NULLs, like IMDb's edge tables.
    val movieCompanies = GenUtil.nnEdges(spark, nT, nCn, avgDeg = 2.5, cap = 12, seed + 30)
      .withColumn("company_type", GenUtil.dictCol(Seq("production company", "distributors"), seed + 31))
      .withColumn("note", GenUtil.dictCol(mcNotes, seed + 32, nullFrac = 0.5))
    val castInfo = GenUtil.nnEdges(spark, nT, nN, avgDeg = 10, cap = 60, seed + 33)
      .withColumn("note", GenUtil.dictCol(ciNotes, seed + 34, nullFrac = 0.6))
      .withColumn("role", GenUtil.dictCol(roles, seed + 35, nullFrac = 0.1))
      .withColumn("pname", GenUtil.dictCol(personNames, seed + 36, nullFrac = 0.55))
      .withColumn("nr_order", GenUtil.longCol(1, 100, seed + 37, nullFrac = 0.6))
    val movieKeyword = GenUtil.nnEdges(spark, nT, nK, avgDeg = 4, cap = 20, seed + 38)
    val movieLink = GenUtil.nnEdges(spark, nT, nT, avgDeg = 1.2, cap = 8, seed + 39)
      .withColumn("link_type", GenUtil.dictCol(linkTypes, seed + 40))

    // Foreign-key (1-n) edges: each child row belongs to exactly one parent.
    def fk(nChild: Long, nParent: Long, s: Long) = spark.range(nChild).select(
      (rand(s) * nParent).cast("long") as "src", $"id" as "dst")

    GraphData(schema,
      Map("title" -> title, "name" -> name, "company_name" -> companyName,
        "keyword" -> keyword, "movie_info" -> movieInfo, "mov_info_2" -> movInfo2,
        "person_info" -> personInfo, "aka_name" -> akaName, "complete_cast" -> completeCast),
      Map(
        "movie_companies" -> movieCompanies,
        "cast_info" -> castInfo,
        "movie_keyword" -> movieKeyword,
        "movie_link" -> movieLink,
        "has_movie_info" -> fk(nMi, nT, seed + 41),
        "has_mov_info_2" -> fk(nMii, nT, seed + 42),
        "has_person_info" -> fk(nPi, nN, seed + 43),
        "has_aka_name" -> fk(nAn, nN, seed + 44),
        "has_complete_cast" -> fk(nCc, nT, seed + 45)
      ))
  }
}
