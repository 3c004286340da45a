package repro.datasets

import repro.query._

/** All 33 JOB queries (first variant, paper Appendix C) over the ImdbLite
  * schema, with predicate constants adapted to the synthetic dictionary
  * domains. As in the paper's conversion, most queries are star joins
  * around `title`; every query runs as count(*). Join orders are left-deep
  * from the star center, which is what GF-RV/GF-CL use (§8.7.2).
  */
object JobQueries {

  private val T = QVar("t", "title")
  private def v(n: String, l: String) = QVar(n, l)

  // Star legs from t (aliases needed only when edge properties are used).
  private def mc(alias: String = "") = QEdge("movie_companies", "t", "cn", alias)
  private def ci(alias: String = "") = QEdge("cast_info", "t", "n", alias)
  private def mk = QEdge("movie_keyword", "t", "k")
  private def ml(alias: String = "") = QEdge("movie_link", "t", "t2", alias)
  private def hmi = QEdge("has_movie_info", "t", "mi")
  private def hmi2 = QEdge("has_mov_info_2", "t", "mii")
  private def han = QEdge("has_aka_name", "n", "an")
  private def hpi = QEdge("has_person_info", "n", "pi")
  private def hcc = QEdge("has_complete_cast", "t", "cc")

  private val CN = v("cn", "company_name")
  private val N = v("n", "name")
  private val K = v("k", "keyword")
  private val MI = v("mi", "movie_info")
  private val MII = v("mii", "mov_info_2")
  private val T2 = v("t2", "title")
  private val AN = v("an", "aka_name")
  private val PI = v("pi", "person_info")
  private val CC = v("cc", "complete_cast")

  private def q(name: String, vars: Seq[QVar], edges: Seq[QEdge], preds: Seq[Pred]): Query =
    Query(name, vars, edges, preds, anchor = "t", joinOrder = edges.indices)

  private def yearGt(y: Long) = CmpConst(VProp("t", "production_year"), GT, y)
  private def yearGe(y: Long) = CmpConst(VProp("t", "production_year"), GE, y)
  private def yearLe(y: Long) = CmpConst(VProp("t", "production_year"), LE, y)
  private def kw(s: String) = StrPred(VProp("k", "keyword"), SEq(s))
  private def kind(s: String) = StrPred(VProp("t", "kind"), SEq(s))
  private def cc_(p: String, t: StrTest) = StrPred(VProp("cn", p), t)
  private def miIs(p: String, t: StrTest) = StrPred(VProp("mi", p), t)
  private def miiIs(p: String, t: StrTest) = StrPred(VProp("mii", p), t)

  def all: Seq[Query] = Seq(
    q("1a", Seq(T, CN, MII), Seq(mc("mc"), hmi2), Seq(
      StrPred(EProp("mc", "company_type"), SEq("production company")),
      StrPred(EProp("mc", "note"), SContains("co-production")),
      miiIs("info_type", SEq("top 250 rank")))),

    q("2a", Seq(T, CN, K), Seq(mc(), mk), Seq(
      cc_("country_code", SEq("[de]")), kw("character-name-in-title"))),

    q("3a", Seq(T, K, MI), Seq(mk, hmi), Seq(
      yearGt(2005), StrPred(VProp("k", "keyword"), SContains("sequel")), miIs("info", SEq("Sweden")))),

    q("4a", Seq(T, K, MII), Seq(mk, hmi2), Seq(
      yearGt(2005), StrPred(VProp("k", "keyword"), SContains("sequel")),
      miiIs("info_type", SEq("rating")), miiIs("info", SCmp(GT, "5.0")))),

    q("5a", Seq(T, CN, MI), Seq(mc("mc"), hmi), Seq(
      yearGt(2005),
      StrPred(EProp("mc", "company_type"), SEq("production company")),
      StrPred(EProp("mc", "note"), SContains("theatrical")),
      StrPred(EProp("mc", "note"), SContains("France")))),

    q("6a", Seq(T, N, K), Seq(ci(), mk), Seq(
      yearGt(2010), StrPred(VProp("n", "name"), SContains("Downey")),
      kw("marvel-cinematic-universe"))),

    q("7a", Seq(T, T2, N, AN, PI), Seq(ml("ml"), ci(), han, hpi), Seq(
      yearGe(1980), yearLe(1995),
      StrPred(EProp("ml", "link_type"), SEq("features")),
      StrPred(VProp("n", "name_pcode_cf"), SCmp(GE, "A")),
      StrPred(VProp("n", "name_pcode_cf"), SCmp(LE, "F999")),
      StrPred(VProp("n", "gender"), SEq("m")),
      StrPred(VProp("an", "name"), SContains("An")),
      StrPred(VProp("pi", "info_type"), SEq("mini biography")),
      StrPred(VProp("pi", "note"), SEq("Volker Boehm")))),

    q("8a", Seq(T, CN, N, AN), Seq(mc("mc"), ci("ci"), han), Seq(
      StrPred(EProp("mc", "note"), SContains("Japan")),
      cc_("country_code", SEq("[jp]")),
      StrPred(EProp("ci", "note"), SEq("(voice: English version)")),
      StrPred(EProp("ci", "role"), SEq("actress")),
      StrPred(VProp("n", "name"), SContains("Yo")))),

    q("9a", Seq(T, CN, N, AN), Seq(mc("mc"), ci("ci"), han), Seq(
      yearGe(2005), yearLe(2015),
      StrPred(EProp("mc", "note"), SContains("USA")),
      cc_("country_code", SEq("[us]")),
      StrPred(EProp("ci", "role"), SEq("actress")),
      StrPred(EProp("ci", "note"), SStartsWith("(voice")),
      StrPred(VProp("n", "gender"), SEq("f")),
      StrPred(VProp("n", "name"), SContains("Ang")))),

    q("10a", Seq(T, CN, N), Seq(mc(), ci("ci")), Seq(
      yearGt(2005), cc_("country_code", SEq("[ru]")),
      StrPred(EProp("ci", "note"), SContains("uncredited")),
      StrPred(EProp("ci", "note"), SContains("voice")),
      StrPred(EProp("ci", "role"), SEq("actor")))),

    q("11a", Seq(T, T2, CN, K), Seq(ml("ml"), mc("mc"), mk), Seq(
      yearGt(1950), yearLe(2000),
      StrPred(EProp("ml", "link_type"), SIn(Set("follows", "followedBy"))),
      StrPred(EProp("mc", "company_type"), SEq("production company")),
      cc_("country_code", SNe("[pl]")),
      cc_("name", SContains("Film")),
      kw("sequel"))),

    q("12a", Seq(T, MI, CN, MII), Seq(hmi, mc("mc"), hmi2), Seq(
      yearGe(2005), yearLe(2008),
      miiIs("info", SCmp(GT, "8.0")),
      miIs("info_type", SEq("genres")), miIs("info", SEq("Drama")),
      StrPred(EProp("mc", "company_type"), SEq("production company")),
      cc_("country_code", SEq("[us]")),
      miiIs("info_type", SEq("rating")))),

    q("13a", Seq(T, MI, CN, MII), Seq(hmi, mc("mc"), hmi2), Seq(
      kind("movie"),
      miIs("info_type", SEq("release dates")),
      StrPred(EProp("mc", "company_type"), SEq("production company")),
      cc_("country_code", SEq("[de]")),
      miiIs("info_type", SEq("rating")))),

    q("14a", Seq(T, MI, K, MII), Seq(hmi, mk, hmi2), Seq(
      yearGt(2010), kind("movie"),
      miIs("info", SEq("USA")), miIs("info_type", SEq("countries")),
      kw("murder"),
      miiIs("info", SCmp(LT, "8.5")), miiIs("info_type", SEq("rating")))),

    q("15a", Seq(T, MI, CN, K), Seq(hmi, mc("mc"), mk), Seq(
      yearGt(2000),
      miIs("info", SStartsWith("USA:")),
      miIs("note", SContains("internet")),
      miIs("info_type", SEq("release dates")),
      StrPred(EProp("mc", "note"), SContains("worldwide")),
      StrPred(EProp("mc", "note"), SContains("200")),
      cc_("country_code", SEq("[us]")))),

    q("16a", Seq(T, K, CN, N, AN), Seq(mk, mc(), ci(), han), Seq(
      CmpConst(VProp("t", "episode_nr"), GE, 50),
      CmpConst(VProp("t", "episode_nr"), LT, 100),
      kw("character-name-in-title"),
      cc_("country_code", SEq("[us]")))),

    q("17a", Seq(T, N, CN, K), Seq(ci(), mc(), mk), Seq(
      StrPred(VProp("n", "name"), SStartsWith("B")),
      cc_("country_code", SEq("[us]")),
      kw("character-name-in-title"))),

    q("18a", Seq(T, MI, MII, N), Seq(hmi, hmi2, ci()), Seq(
      miIs("info_type", SEq("budget")),
      miiIs("info_type", SEq("votes")),
      StrPred(VProp("n", "name"), SContains("Tim")),
      StrPred(VProp("n", "gender"), SEq("m")))),

    q("19a", Seq(T, MI, CN, N, AN), Seq(hmi, mc("mc"), ci("ci"), han), Seq(
      yearGe(2005), yearLe(2009),
      miIs("info_type", SEq("release dates")),
      miIs("info", SStartsWith("Japan:")),
      StrPred(EProp("mc", "note"), SContains("USA")),
      cc_("country_code", SEq("[us]")),
      StrPred(EProp("ci", "note"), SStartsWith("(voice")),
      StrPred(VProp("n", "gender"), SEq("f")),
      StrPred(EProp("ci", "role"), SEq("actress")),
      StrPred(VProp("n", "name"), SContains("Ang")))),

    q("20a", Seq(T, K, CC, N), Seq(mk, hcc, ci("ci")), Seq(
      yearGt(1950), kind("movie"),
      kw("superhero"),
      StrPred(VProp("cc", "subject"), SEq("cast")),
      StrPred(VProp("cc", "status"), SIn(Set("complete", "complete+verified"))),
      StrPred(EProp("ci", "pname"), SContains("Tony")),
      StrPred(EProp("ci", "pname"), SContains("Stark")))),

    q("21a", Seq(T, MI, CN, K, T2), Seq(hmi, mc("mc"), mk, ml("ml")), Seq(
      yearGe(1950), yearLe(2000),
      miIs("info", SEq("Germany")),
      StrPred(EProp("mc", "company_type"), SEq("production company")),
      cc_("country_code", SNe("[pl]")),
      cc_("name", SContains("Film")),
      StrPred(VProp("k", "keyword"), SContains("sequel")),
      StrPred(EProp("ml", "link_type"), SIn(Set("follows", "followedBy"))))),

    q("22a", Seq(T, MI, MII, CN, K), Seq(hmi, hmi2, mc("mc"), mk), Seq(
      yearGt(2008), kind("movie"),
      miIs("info", SEq("USA")), miIs("info_type", SEq("countries")),
      miiIs("info_type", SEq("rating")), miiIs("info", SCmp(LT, "7.0")),
      StrPred(EProp("mc", "note"), SContains("200")),
      cc_("country_code", SNe("[us]")),
      kw("murder"))),

    q("23a", Seq(T, MI, CN, K, CC), Seq(hmi, mc(), mk, hcc), Seq(
      yearGt(2000), kind("movie"),
      miIs("info_type", SEq("release dates")),
      miIs("note", SContains("internet")),
      miIs("info", SStartsWith("USA:")),
      cc_("country_code", SEq("[us]")),
      StrPred(VProp("cc", "status"), SEq("complete+verified")))),

    q("24a", Seq(T, MI, CN, N, AN, K), Seq(hmi, mc(), ci("ci"), han, mk), Seq(
      yearGt(2010),
      miIs("info_type", SEq("release dates")),
      miIs("info", SStartsWith("USA:")),
      cc_("country_code", SEq("[us]")),
      StrPred(EProp("ci", "note"), SStartsWith("(voice")),
      StrPred(EProp("ci", "role"), SEq("actress")),
      StrPred(VProp("n", "gender"), SEq("f")),
      kw("hero"))),

    q("25a", Seq(T, MI, MII, K, N), Seq(hmi, hmi2, mk, ci()), Seq(
      miIs("info_type", SEq("genres")), miIs("info", SEq("Horror")),
      miiIs("info_type", SEq("votes")),
      kw("murder"),
      StrPred(VProp("n", "gender"), SEq("m")))),

    q("26a", Seq(T, MII, K, N, CC), Seq(hmi2, mk, ci("ci"), hcc), Seq(
      yearGt(2000), kind("movie"),
      miiIs("info", SCmp(GT, "7.0")), miiIs("info_type", SEq("rating")),
      kw("superhero"),
      StrPred(EProp("ci", "pname"), SContains("man")),
      StrPred(VProp("cc", "subject"), SEq("cast")),
      StrPred(VProp("cc", "status"), SIn(Set("complete", "complete+verified"))))),

    q("27a", Seq(T, MI, K, T2, CN, CC), Seq(hmi, mk, ml("ml"), mc("mc"), hcc), Seq(
      yearGe(1950), yearLe(2000),
      miIs("info", SEq("Sweden")),
      kw("sequel"),
      StrPred(EProp("ml", "link_type"), SIn(Set("follows", "followedBy"))),
      StrPred(EProp("mc", "company_type"), SEq("production company")),
      cc_("name", SContains("Film")),
      cc_("country_code", SNe("[pl]")),
      StrPred(VProp("cc", "status"), SEq("complete+verified")))),

    q("28a", Seq(T, MI, MII, K, CN, CC), Seq(hmi, hmi2, mk, mc("mc"), hcc), Seq(
      yearGt(2000), kind("movie"),
      miIs("info", SEq("Germany")), miIs("info_type", SEq("countries")),
      miiIs("info", SCmp(LT, "8.5")), miiIs("info_type", SEq("rating")),
      kw("murder"),
      StrPred(EProp("mc", "note"), SContains("200")),
      cc_("country_code", SNe("[us]")),
      StrPred(VProp("cc", "subject"), SEq("crew")),
      StrPred(VProp("cc", "status"), SNe("complete+verified")))),

    q("29a", Seq(T, MI, K, CC, N, AN, PI, CN), Seq(hmi, mk, hcc, ci("ci"), han, hpi, mc()), Seq(
      yearGe(2000), yearLe(2010),
      StrPred(VProp("t", "title"), SEq("Shrek 2")),
      miIs("info_type", SEq("release dates")),
      miIs("info", SStartsWith("Japan:")),
      kw("computer-animation"),
      StrPred(VProp("cc", "status"), SEq("complete+verified")),
      StrPred(VProp("cc", "subject"), SEq("crew")),
      StrPred(EProp("ci", "role"), SEq("actress")),
      StrPred(EProp("ci", "pname"), SContains("Queen")),
      StrPred(EProp("ci", "note"), SContains("(voice")),
      StrPred(VProp("n", "gender"), SEq("f")),
      StrPred(VProp("n", "name"), SContains("An")),
      StrPred(VProp("pi", "info_type"), SEq("trivia")),
      cc_("country_code", SEq("[us]")))),

    q("30a", Seq(T, MI, MII, K, N, CC), Seq(hmi, hmi2, mk, ci(), hcc), Seq(
      yearGt(2000),
      miIs("info_type", SEq("genres")), miIs("info", SEq("Horror")),
      miiIs("info_type", SEq("votes")),
      kw("murder"),
      StrPred(VProp("n", "gender"), SEq("m")),
      StrPred(VProp("cc", "subject"), SIn(Set("cast", "crew"))),
      StrPred(VProp("cc", "status"), SEq("complete+verified")))),

    q("31a", Seq(T, MI, MII, K, N, CN), Seq(hmi, hmi2, mk, ci(), mc()), Seq(
      miIs("info_type", SEq("genres")), miIs("info", SEq("Horror")),
      miiIs("info_type", SEq("votes")),
      kw("murder"),
      StrPred(VProp("n", "gender"), SEq("m")))),

    q("32a", Seq(T, K, T2), Seq(mk, ml()), Seq(
      kw("character-name-in-title"))),

    Query("33a",
      vars = Seq(v("t1", "title"), v("t2", "title"), v("mii1", "mov_info_2"),
        v("mii2", "mov_info_2"), v("cn1", "company_name"), v("cn2", "company_name")),
      edges = Seq(
        QEdge("movie_link", "t1", "t2", alias = "ml"),
        QEdge("has_mov_info_2", "t1", "mii1"),
        QEdge("movie_companies", "t1", "cn1"),
        QEdge("has_mov_info_2", "t2", "mii2"),
        QEdge("movie_companies", "t2", "cn2")),
      preds = Seq(
        StrPred(VProp("t1", "kind"), SEq("tv series")),
        StrPred(VProp("t2", "kind"), SEq("tv series")),
        StrPred(EProp("ml", "link_type"), SIn(Set("follows", "followedBy"))),
        CmpConst(VProp("t2", "production_year"), GE, 2005),
        CmpConst(VProp("t2", "production_year"), LE, 2008),
        StrPred(VProp("mii1", "info_type"), SEq("rating")),
        StrPred(VProp("mii2", "info_type"), SEq("rating")),
        StrPred(VProp("mii2", "info"), SCmp(LT, "3.0")),
        StrPred(VProp("cn1", "country_code"), SEq("[us]"))),
      anchor = "t1", joinOrder = Seq(0, 1, 2, 3, 4))
  )
}
