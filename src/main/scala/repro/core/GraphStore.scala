package repro.core

import repro.compress.Dictionary
import repro.storage._

/** In-memory graph database instance under one [[StorageConfig]].
  *
  * Mirrors GraphflowDB's storage components (paper §2): topology in
  * doubly-indexed adjacency structures partitioned by edge label, vertex
  * properties, and edge properties — each realised per the configuration
  * (GF-RV rows vs the columnar ladder).
  */
final class GraphStore(
    val schema: GraphSchema,
    val config: StorageConfig,
    val vertexCounts: Array[Int],
    val edgeCounts: Array[Int],
    vertexCols: Array[ColumnSet], // per vertex label; null when row storage
    vertexRows: Array[RowStore],  // per vertex label; null when columnar
    fwdAdj: Array[Adjacency],     // per edge label
    bwdAdj: Array[Adjacency],
    val edgeProps: Array[EdgePropAccessor]
) extends Serializable {

  def columnar: Boolean = config.columnar

  def adjacency(edgeLabel: Int, forward: Boolean): Adjacency =
    if (forward) fwdAdj(edgeLabel) else bwdAdj(edgeLabel)

  /** Numeric value or dictionary code of a vertex property; Values.Null if
    * NULL. For string properties under row storage use `vertexString`.
    */
  def vertexLong(label: Int, v: Int, prop: Int): Long =
    if (columnar) vertexCols(label).get(v, prop)
    else vertexRows(label).readLong(v, prop)

  /** Offset-to-value accessor with the column bound once (vectorized
    * filter path; falls back to the key-scan on row storage).
    */
  def vertexLongReader(label: Int, prop: Int): Long => Long =
    if (columnar) {
      val col = vertexCols(label).cols(prop)
      off => col.get(off.toInt)
    } else {
      val rows = vertexRows(label)
      off => rows.readLong(off.toInt, prop)
    }

  def vertexString(label: Int, v: Int, prop: Int): String =
    if (columnar) vertexCols(label).getString(v, prop)
    else vertexRows(label).readString(v, prop)

  /** Dictionary of a string vertex property; null under row storage. */
  def vertexDict(label: Int, prop: Int): Dictionary =
    if (columnar) vertexCols(label).dicts(prop) else null

  // ---- memory accounting (Table 2 components) ----

  def vertexPropBytes: Long =
    if (columnar) vertexCols.map(_.bytes).sum else vertexRows.map(_.bytes).sum

  def edgePropBytes: Long = edgeProps.map(_.bytes).sum

  def fwdAdjBytes: Long = fwdAdj.map(_.bytes).sum
  def bwdAdjBytes: Long = bwdAdj.map(_.bytes).sum

  def totalBytes: Long = vertexPropBytes + edgePropBytes + fwdAdjBytes + bwdAdjBytes

  /** Per-label adjacency + (owner-column) property bytes — Table 4's
    * "Mem (in MB)" column for a single edge label.
    */
  def labelBytes(edgeLabel: Int): Long =
    fwdAdj(edgeLabel).bytes + bwdAdj(edgeLabel).bytes + edgeProps(edgeLabel).bytes
}
