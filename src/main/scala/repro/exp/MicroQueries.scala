package repro.exp

import repro.query._

/** The paper's microbenchmark query shapes (Tables 3, 4, 5): k-hop path
  * enumerations with optional edge-property predicates, in forward or
  * backward plan variants.
  */
object MicroQueries {

  /** k-hop path query over one edge label.
    *
    * @param forward  forward plan (matches left-to-right) vs backward plan
    *                 (anchors on the last vertex and extends right-to-left)
    * @param filtered when set, adds `lastEdge.<firstProp> > c` — Table 5's
    *                 FILTER variant; None is the COUNT(*) variant
    * @param propName edge property for the filter (default: first property)
    */
  def khop(edgeLabel: String, vLabel: String, hops: Int, forward: Boolean,
           filtered: Option[Long], propName: String = "since"): Query = {
    val vars = (0 to hops).map(i => QVar(s"v$i", vLabel))
    val edges = (0 until hops).map { i =>
      val needAlias = filtered.isDefined && {
        // The filter applies to the edge joined last in the plan.
        if (forward) i == hops - 1 else i == 0
      }
      QEdge(edgeLabel, s"v$i", s"v${i + 1}", alias = if (needAlias) "eLast" else "")
    }
    val preds = filtered.toSeq.map(c => CmpConst(EProp("eLast", propName), GT, c))
    val dir = if (forward) "F" else "B"
    Query(s"${hops}H-$dir${if (filtered.isDefined) "-filter" else ""}",
      vars, edges, preds,
      anchor = if (forward) "v0" else s"v$hops",
      joinOrder = if (forward) edges.indices else edges.indices.reverse)
  }

  /** Table 3's 2-hop: each edge's property greater than the previous
    * edge's (reads both edges' properties in list order).
    */
  def twoHopCrossPred(edgeLabel: String, vLabel: String, propName: String,
                      forward: Boolean = true): Query = {
    val vars = (0 to 2).map(i => QVar(s"v$i", vLabel))
    val edges = Seq(
      QEdge(edgeLabel, "v0", "v1", alias = "e0"),
      QEdge(edgeLabel, "v1", "v2", alias = "e1"))
    val preds = Seq(CmpProps(EProp("e1", propName), GT, EProp("e0", propName)))
    Query(s"2H-cross-${if (forward) "F" else "B"}", vars, edges, preds,
      anchor = if (forward) "v0" else "v2",
      joinOrder = if (forward) Seq(0, 1) else Seq(1, 0))
  }
}
