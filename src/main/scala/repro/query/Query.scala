package repro.query

/** Engine-neutral query model: a subgraph pattern (the joins), a
  * conjunction of predicates, and a manually chosen left-deep join order —
  * the paper hand-picks best left-deep plans for GF-RV/GF-CL (§8.7).
  */
final case class QVar(name: String, label: String)

/** A query edge `(srcVar)-[:label]->(dstVar)`; `alias` names the edge
  * variable when predicates reference its properties ("" otherwise).
  */
final case class QEdge(label: String, srcVar: String, dstVar: String, alias: String = "")

sealed trait CmpOp { def sql: String }
case object LT extends CmpOp { val sql = "<" }
case object LE extends CmpOp { val sql = "<=" }
case object GT extends CmpOp { val sql = ">" }
case object GE extends CmpOp { val sql = ">=" }
case object EQ extends CmpOp { val sql = "=" }
case object NE extends CmpOp { val sql = "<>" }

/** A property reference: vertex variable + property, or edge alias +
  * property.
  */
sealed trait Operand {
  def varName: String
  def prop: String
  def isEdge: Boolean
}
final case class VProp(varName: String, prop: String) extends Operand { val isEdge = false }
final case class EProp(varName: String, prop: String) extends Operand { val isEdge = true }

sealed trait Pred {
  def operands: Seq[Operand]
}
/** Numeric comparison against a constant. */
final case class CmpConst(l: Operand, op: CmpOp, c: Long) extends Pred {
  def operands: Seq[Operand] = Seq(l)
}
/** Numeric comparison between two properties (e.g. e2.date > e1.date). */
final case class CmpProps(l: Operand, op: CmpOp, r: Operand) extends Pred {
  def operands: Seq[Operand] = Seq(l, r)
}
sealed trait StrTest
final case class SEq(s: String) extends StrTest
final case class SNe(s: String) extends StrTest
final case class SIn(ss: Set[String]) extends StrTest
final case class SContains(s: String) extends StrTest
final case class SStartsWith(s: String) extends StrTest
final case class SCmp(op: CmpOp, s: String) extends StrTest

/** String predicate; on columnar stores it is evaluated purely on
  * dictionary codes (the constant side is translated once per query).
  */
final case class StrPred(l: Operand, test: StrTest) extends Pred {
  def operands: Seq[Operand] = Seq(l)
}

/** @param name      query identifier (e.g. "IC05", "JOB-12a")
  * @param vars      vertex variables with their (fixed) labels
  * @param edges     the pattern's edges
  * @param preds     conjunctive predicates
  * @param anchor    the scan variable of the left-deep plan
  * @param joinOrder indices into `edges`, the manual join order; each edge
  *                  must touch an already-bound variable (tree patterns)
  */
final case class Query(
    name: String,
    vars: Seq[QVar],
    edges: Seq[QEdge],
    preds: Seq[Pred],
    anchor: String,
    joinOrder: Seq[Int]
) {
  require(joinOrder.sorted == edges.indices.sorted, s"$name: join order must cover all edges")
  val varByName: Map[String, QVar] = vars.map(v => v.name -> v).toMap
  require(varByName.contains(anchor), s"$name: unknown anchor $anchor")
  require(edges.forall(e => varByName.contains(e.srcVar) && varByName.contains(e.dstVar)),
    s"$name: edge references unknown var")

  def edgeByAlias(alias: String): QEdge = {
    val e = edges.find(_.alias == alias)
    require(e.isDefined, s"$name: unknown edge alias $alias")
    e.get
  }

  /** Validate the join order is a connected left-deep tree from the anchor. */
  def validateOrder(): Unit = {
    var bound = Set(anchor)
    joinOrder.foreach { ei =>
      val e = edges(ei)
      require(bound.contains(e.srcVar) || bound.contains(e.dstVar),
        s"$name: edge $ei (${e.srcVar}->${e.dstVar}) not connected to bound vars $bound")
      bound = bound + e.srcVar + e.dstVar
    }
    require(vars.forall(v => bound.contains(v.name)), s"$name: unbound vars")
  }
  validateOrder()
}
