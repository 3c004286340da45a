package repro.core

/** Property value type. All engine-level values are Longs: numeric
  * properties directly, string properties as dictionary codes (columnar
  * configs) or raw bytes (row configs). NULL is `Values.Null`.
  */
sealed trait PType extends Serializable
case object PLongT extends PType
case object PStringT extends PType

object Values {
  /** Engine-level NULL sentinel (same as [[repro.compress.NullCompressedColumn.Null]]). */
  final val Null: Long = Long.MinValue
}

final case class PropertyDef(name: String, ptype: PType)

final case class VertexDef(name: String, props: IndexedSeq[PropertyDef]) {
  def propIdx(p: String): Int = {
    val i = props.indexWhere(_.name == p)
    require(i >= 0, s"vertex label $name has no property $p")
    i
  }
}

/** Edge cardinality (paper §3, structure (iii)).
  *  - NN: many-to-many
  *  - NOne: n-1 — each source vertex has at most one out-edge (single
  *    cardinality in the forward direction); owner of edge properties = src
  *  - OneN: 1-n — each destination vertex has at most one in-edge; owner = dst
  *  - OneOne: both single
  */
sealed trait Card extends Serializable {
  def singleFwd: Boolean
  def singleBwd: Boolean
}
case object NN extends Card { val singleFwd = false; val singleBwd = false }
case object NOne extends Card { val singleFwd = true; val singleBwd = false }
case object OneN extends Card { val singleFwd = false; val singleBwd = true }
case object OneOne extends Card { val singleFwd = true; val singleBwd = true }

final case class EdgeDef(
    name: String,
    src: String,
    dst: String,
    card: Card,
    props: IndexedSeq[PropertyDef]
) {
  def hasProps: Boolean = props.nonEmpty
  def singleCardinality: Boolean = card.singleFwd || card.singleBwd
  def propIdx(p: String): Int = {
    val i = props.indexWhere(_.name == p)
    require(i >= 0, s"edge label $name has no property $p")
    i
  }
}

/** A fully structured property-graph schema (Guideline 3): every edge label
  * has fixed endpoint labels, labels determine properties, and cardinality
  * constraints are declared — the structure the paper's compression
  * exploits.
  */
final case class GraphSchema(
    vertices: IndexedSeq[VertexDef],
    edges: IndexedSeq[EdgeDef]
) extends Serializable {
  val vertexIdx: Map[String, Int] = vertices.map(_.name).zipWithIndex.toMap
  val edgeIdx: Map[String, Int] = edges.map(_.name).zipWithIndex.toMap

  def vertex(name: String): VertexDef = vertices(vertexIdx(name))
  def edge(name: String): EdgeDef = edges(edgeIdx(name))
  def srcLabelOf(e: Int): Int = vertexIdx(edges(e).src)
  def dstLabelOf(e: Int): Int = vertexIdx(edges(e).dst)

  require(edges.forall(e => vertexIdx.contains(e.src) && vertexIdx.contains(e.dst)),
    "edge endpoint labels must exist")
}
