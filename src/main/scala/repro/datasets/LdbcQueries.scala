package repro.datasets

import repro.query._

/** The paper's modified LDBC SNB Interactive Short (IS) and Complex (IC)
  * queries (Appendix B), expressed over the LdbcLite schema. As in the
  * paper: fixed-length patterns, no ORDER BY, no shortest paths; every
  * query runs as count(*) on all systems so runtimes measure join+filter
  * work uniformly. Join orders are the paper's left-deep plans: start at
  * the selective anchor and extend outward.
  */
object LdbcQueries {

  /** Build the query set for a dataset of `nPersons` (anchor constants are
    * derived from dataset size, like the paper's fixed person/comment IDs).
    */
  def all(nPersons: Long): Seq[Query] = {
    val nC = nPersons * 8
    val pAnchor = LdbcLite.personId(nPersons / 2)
    val cAnchor = LdbcLite.commentId(nC / 2)
    val dateMid = 1_200_000_000L
    val dateLo = 1_050_000_000L
    val dateHi = 1_350_000_000L

    def pid(v: String) = CmpConst(VProp(v, "id"), EQ, pAnchor)
    def cid(v: String) = CmpConst(VProp(v, "id"), EQ, cAnchor)

    Seq(
      Query("IS01",
        vars = Seq(QVar("p", "person"), QVar("pl", "place")),
        edges = Seq(QEdge("personIsLocatedIn", "p", "pl")),
        preds = Seq(pid("p")),
        anchor = "p", joinOrder = Seq(0)),

      Query("IS02",
        vars = Seq(QVar("p", "person"), QVar("c", "comment"), QVar("post", "post"), QVar("op", "person")),
        edges = Seq(
          QEdge("hasCreator", "c", "p"),
          QEdge("replyOfPost", "c", "post"),
          QEdge("postHasCreator", "post", "op")),
        preds = Seq(pid("p")),
        anchor = "p", joinOrder = Seq(0, 1, 2)),

      Query("IS03",
        vars = Seq(QVar("p", "person"), QVar("friend", "person")),
        edges = Seq(QEdge("knows", "p", "friend", alias = "k")),
        preds = Seq(pid("p")),
        anchor = "p", joinOrder = Seq(0)),

      Query("IS04",
        vars = Seq(QVar("comment", "comment")),
        edges = Seq.empty,
        preds = Seq(cid("comment")),
        anchor = "comment", joinOrder = Seq.empty),

      Query("IS05",
        vars = Seq(QVar("comment", "comment"), QVar("p", "person")),
        edges = Seq(QEdge("hasCreator", "comment", "p")),
        preds = Seq(cid("comment")),
        anchor = "comment", joinOrder = Seq(0)),

      Query("IS06",
        vars = Seq(QVar("comment", "comment"), QVar("pst", "post"), QVar("f", "forum"), QVar("p", "person")),
        edges = Seq(
          QEdge("replyOfPost", "comment", "pst"),
          QEdge("containerOf", "f", "pst"),
          QEdge("hasModerator", "f", "p")),
        preds = Seq(cid("comment")),
        anchor = "comment", joinOrder = Seq(0, 1, 2)),

      Query("IS07",
        vars = Seq(QVar("mAuth", "person"), QVar("cmt0", "comment"), QVar("cmt1", "comment"), QVar("rAuth", "person")),
        edges = Seq(
          QEdge("hasCreator", "cmt0", "mAuth"),
          QEdge("replyOfComment", "cmt1", "cmt0"),
          QEdge("hasCreator", "cmt1", "rAuth")),
        preds = Seq(pid("mAuth")),
        anchor = "mAuth", joinOrder = Seq(0, 1, 2)),

      Query("IC01",
        vars = Seq(QVar("p", "person"), QVar("p1", "person"), QVar("p2", "person"),
          QVar("op", "person"), QVar("pl", "place")),
        edges = Seq(
          QEdge("knows", "p", "p1"),
          QEdge("knows", "p1", "p2"),
          QEdge("knows", "p2", "op"),
          QEdge("personIsLocatedIn", "op", "pl")),
        preds = Seq(pid("p")),
        anchor = "p", joinOrder = Seq(0, 1, 2, 3)),

      Query("IC02",
        vars = Seq(QVar("p", "person"), QVar("frnd", "person"), QVar("msg", "comment")),
        edges = Seq(
          QEdge("knows", "p", "frnd"),
          QEdge("hasCreator", "msg", "frnd")),
        preds = Seq(pid("p"), CmpConst(VProp("msg", "creationDate"), LT, dateMid)),
        anchor = "p", joinOrder = Seq(0, 1)),

      Query("IC03",
        vars = Seq(QVar("person", "person"), QVar("p1", "person"), QVar("op", "person"),
          QVar("pl", "place"), QVar("mx", "comment"), QVar("px", "place"),
          QVar("my", "comment"), QVar("py", "place")),
        edges = Seq(
          QEdge("knows", "person", "p1"),
          QEdge("knows", "p1", "op"),
          QEdge("personIsLocatedIn", "op", "pl"),
          QEdge("hasCreator", "mx", "op"),
          QEdge("commentIsLocatedIn", "mx", "px"),
          QEdge("hasCreator", "my", "op"),
          QEdge("commentIsLocatedIn", "my", "py")),
        preds = Seq(pid("person"),
          CmpConst(VProp("mx", "creationDate"), GE, dateLo),
          CmpConst(VProp("mx", "creationDate"), LE, dateHi),
          CmpConst(VProp("my", "creationDate"), GE, dateLo),
          CmpConst(VProp("my", "creationDate"), LE, dateHi),
          StrPred(VProp("px", "name"), SEq("place_42")),
          StrPred(VProp("py", "name"), SEq("place_43"))),
        anchor = "person", joinOrder = Seq(0, 1, 2, 3, 4, 5, 6)),

      Query("IC04",
        vars = Seq(QVar("p", "person"), QVar("frnd", "person"), QVar("pst", "post"), QVar("t", "tag")),
        edges = Seq(
          QEdge("knows", "p", "frnd"),
          QEdge("postHasCreator", "pst", "frnd"),
          QEdge("hasTag", "pst", "t")),
        preds = Seq(pid("p"),
          CmpConst(VProp("pst", "creationDate"), GE, dateLo),
          CmpConst(VProp("pst", "creationDate"), LE, dateHi)),
        anchor = "p", joinOrder = Seq(0, 1, 2)),

      Query("IC05",
        vars = Seq(QVar("p1", "person"), QVar("p2", "person"), QVar("p3", "person"),
          QVar("f", "forum"), QVar("pst", "post")),
        edges = Seq(
          QEdge("knows", "p1", "p2"),
          QEdge("knows", "p2", "p3"),
          QEdge("hasMember", "f", "p3", alias = "hm"),
          QEdge("containerOf", "f", "pst")),
        preds = Seq(pid("p1"), CmpConst(EProp("hm", "joinDate"), GT, dateMid)),
        anchor = "p1", joinOrder = Seq(0, 1, 2, 3)),

      Query("IC06",
        vars = Seq(QVar("p1", "person"), QVar("p2", "person"), QVar("p3", "person"),
          QVar("pst", "post"), QVar("t1", "tag"), QVar("t2", "tag")),
        edges = Seq(
          QEdge("knows", "p1", "p2"),
          QEdge("knows", "p2", "p3"),
          QEdge("postHasCreator", "pst", "p3"),
          QEdge("hasTag", "pst", "t1"),
          QEdge("hasTag", "pst", "t2")),
        preds = Seq(pid("p1"),
          StrPred(VProp("t1", "name"), SEq("tag_7")),
          StrPred(VProp("t2", "name"), SNe("tag_7"))),
        anchor = "p1", joinOrder = Seq(0, 1, 2, 3, 4)),

      Query("IC07",
        vars = Seq(QVar("p", "person"), QVar("cmt", "comment"), QVar("frnd", "person")),
        edges = Seq(
          QEdge("hasCreator", "cmt", "p"),
          QEdge("likes", "frnd", "cmt", alias = "l")),
        preds = Seq(pid("p"), CmpConst(EProp("l", "creationDate"), GT, dateLo)),
        anchor = "p", joinOrder = Seq(0, 1)),

      Query("IC08",
        vars = Seq(QVar("p", "person"), QVar("pst", "post"), QVar("cmt", "comment"), QVar("cmtAuth", "person")),
        edges = Seq(
          QEdge("postHasCreator", "pst", "p"),
          QEdge("replyOfPost", "cmt", "pst"),
          QEdge("hasCreator", "cmt", "cmtAuth")),
        preds = Seq(pid("p")),
        anchor = "p", joinOrder = Seq(0, 1, 2)),

      Query("IC09",
        vars = Seq(QVar("p1", "person"), QVar("p2", "person"), QVar("p3", "person"), QVar("cmt", "comment")),
        edges = Seq(
          QEdge("knows", "p1", "p2"),
          QEdge("knows", "p2", "p3"),
          QEdge("hasCreator", "cmt", "p3")),
        preds = Seq(pid("p1"), CmpConst(VProp("cmt", "creationDate"), LT, dateMid)),
        anchor = "p1", joinOrder = Seq(0, 1, 2)),

      Query("IC11",
        vars = Seq(QVar("p1", "person"), QVar("p2", "person"), QVar("p3", "person"),
          QVar("org", "org"), QVar("pl", "place")),
        edges = Seq(
          QEdge("knows", "p1", "p2"),
          QEdge("knows", "p2", "p3"),
          QEdge("workAt", "p3", "org", alias = "w"),
          QEdge("orgIsLocatedIn", "org", "pl")),
        preds = Seq(pid("p1"),
          CmpConst(EProp("w", "year"), LT, 2016),
          StrPred(VProp("pl", "name"), SEq("place_10"))),
        anchor = "p1", joinOrder = Seq(0, 1, 2, 3)),

      Query("IC12",
        vars = Seq(QVar("p1", "person"), QVar("p2", "person"), QVar("cmt", "comment"),
          QVar("pst", "post"), QVar("t", "tag"), QVar("tc", "tagclass"), QVar("tc2", "tagclass")),
        edges = Seq(
          QEdge("knows", "p1", "p2"),
          QEdge("hasCreator", "cmt", "p2"),
          QEdge("replyOfPost", "cmt", "pst"),
          QEdge("hasTag", "pst", "t"),
          QEdge("hasType", "t", "tc"),
          QEdge("isSubclassOf", "tc", "tc2")),
        preds = Seq(pid("p1"), StrPred(VProp("tc", "name"), SEq("tagclass_3"))),
        anchor = "p1", joinOrder = Seq(0, 1, 2, 3, 4, 5))
    )
  }
}
