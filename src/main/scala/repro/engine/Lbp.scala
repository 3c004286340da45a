package repro.engine

import repro.core.{GraphStore, Values}
import repro.query._
import repro.storage.{CsrAdjacency, EdgePropAccessor, SingleAdjacency}
import repro.util.ByteWidthArray

/** List-based processor — LBP (paper §6). Intermediate tuples are a set of
  * factorized ''list groups'' (flat when `curIdx >= 0`, otherwise an unflat
  * list of tuples); blocks have variable lengths equal to adjacency-list
  * lengths and point directly into the CSR arrays instead of materializing
  * lists (ListExtend), and `count(*)` multiplies group sizes instead of
  * enumerating tuples (§6.2).
  */
object Lbp {

  /** A block of values: the engine's read-only view over CSR slices,
    * scratch arrays, scan ranges, or a single value.
    */
  sealed trait LongReader {
    def get(i: Int): Long
  }
  // Readers are allocated once per operator and re-pointed per list —
  // block processors reuse their vector objects, so LBP does no per-list
  // allocation on the hot path.
  private final class RangeReader extends LongReader {
    var start: Long = 0L
    def get(i: Int): Long = start + i
  }
  /** Points into an adjacency array — no copy (paper §6.2, ListExtend). */
  private final class SliceReader(a: ByteWidthArray) extends LongReader {
    var off: Int = 0
    def get(i: Int): Long = a.get(off + i)
  }
  private final class ScratchReader extends LongReader {
    var a: Array[Long] = null
    def get(i: Int): Long = a(i)
  }
  /** Forward property-page handles: the page base is fixed for the whole
    * adjacency list, so handles are base + page-level offsets.
    */
  private final class BasedSliceReader(ev: ByteWidthArray) extends LongReader {
    var off: Int = 0
    var base: Long = 0L
    def get(i: Int): Long = base + ev.get(off + i)
  }
  /** Backward property-page handles: pageBase(neighbour) + page offset,
    * with the page store bound directly (no generic handle dispatch).
    */
  private final class BwdPageHandleReader(pages: repro.storage.PropertyPages,
                                          ev: ByteWidthArray, nbrs: ByteWidthArray) extends LongReader {
    var off: Int = 0
    def get(i: Int): Long = pages.pageBase(nbrs.get(off + i)) + ev.get(off + i)
  }
  private final class ConstReader extends LongReader {
    var value: Long = 0L
    def get(i: Int): Long = value
  }
  /** Lazily resolves edge property handles from the adjacency slice
    * (generic fallback; the specialized variants above skip dispatch).
    */
  private final class HandleReader(props: EdgePropAccessor, forward: Boolean,
                                   ev: ByteWidthArray, nbrs: ByteWidthArray) extends LongReader {
    var own: Long = 0L
    var off: Int = 0
    def get(i: Int): Long =
      props.handle(own, nbrs.get(off + i),
        if (ev == null) 0L else ev.get(off + i), forward)
  }

  /** One factorized group of equal-length blocks (paper §6.1). */
  private final class ListGroup {
    var size: Int = 0
    var sel: Array[Int] = null // selection vector over [0, size); null = all
    var selLen: Int = 0
    var curIdx: Int = -1       // >= 0: flattened to that position

    def numPos: Int = if (sel != null) selLen else size
    @inline def posAt(i: Int): Int = if (sel != null) sel(i) else i
    def tupleCount: Long = if (curIdx >= 0) 1L else numPos.toLong
  }

  /** The intermediate chunk: the Cartesian product of its list groups. */
  private final class Chunk(numV: Int, numE: Int) {
    val groups = scala.collection.mutable.ArrayBuffer.empty[ListGroup]
    val vGroup = Array.fill(numV)(-1)
    val vReader = new Array[LongReader](numV)
    val eGroup = Array.fill(numE)(-1)
    val eReader = new Array[LongReader](numE)

    def newGroup(): Int = { groups += new ListGroup; groups.length - 1 }

    def tupleCount: Long = {
      var prod = 1L
      var i = 0
      while (i < groups.length) { prod *= groups(i).tupleCount; i += 1 }
      prod
    }
  }

  private abstract class Op {
    def open(): Unit
    def next(): Boolean
  }

  /** Filter the group's positions by the vectorized predicates; returns
    * whether the state is still alive. Operand bindings are resolved once
    * per block; the comparison runs in a tight loop (paper §6.2: all
    * primitive computations happen inside loops over blocks). Selection
    * compaction is in place (writes trail reads).
    */
  private def filterGroup(preds: Array[VecPred], gi: Int, g: ListGroup,
                          buf: Array[Int], chunk: Chunk): Boolean = {
    if (preds == null || preds.length == 0) return g.tupleCount > 0
    var j = 0
    while (j < preds.length) {
      if (!applyVecPred(preds(j), gi, g, chunk, buf)) return false
      j += 1
    }
    g.tupleCount > 0
  }

  private def readerOf(chunk: Chunk, r: OperandRef): LongReader =
    if (r.isEdge) chunk.eReader(r.slot) else chunk.vReader(r.slot)
  private def groupOf(chunk: Chunk, r: OperandRef): Int =
    if (r.isEdge) chunk.eGroup(r.slot) else chunk.vGroup(r.slot)

  /** Value of an operand whose group is flattened. */
  private def flatValue(chunk: Chunk, r: OperandRef): Long = {
    val grp = chunk.groups(groupOf(chunk, r))
    assert(grp.curIdx >= 0, "non-active operand must be in a flattened group")
    r.access(readerOf(chunk, r).get(grp.curIdx))
  }

  private def cmpOk(op: Int, a: Long, b: Long): Boolean = (op: @scala.annotation.switch) match {
    case 0 => a < b
    case 1 => a <= b
    case 2 => a > b
    case 3 => a >= b
    case 4 => a == b
    case _ => a != b
  }

  private def opCode(op: repro.query.CmpOp): Int = op match {
    case repro.query.LT => 0
    case repro.query.LE => 1
    case repro.query.GT => 2
    case repro.query.GE => 3
    case repro.query.EQ => 4
    case repro.query.NE => 5
  }

  private def mirror(op: Int): Int = op match {
    case 0 => 2; case 1 => 3; case 2 => 0; case 3 => 1; case other => other
  }

  private def applyVecPred(vp: VecPred, gi: Int, g: ListGroup, chunk: Chunk,
                           buf: Array[Int]): Boolean = {
    val lhsActive = groupOf(chunk, vp.lhs) == gi && g.curIdx < 0
    vp match {
      case c: VecCmp =>
        val rhsActive = c.rhs != null && groupOf(chunk, c.rhs) == gi && g.curIdx < 0
        val op = opCode(c.op)
        if (!lhsActive && !rhsActive) {
          // Fully flat: evaluate once for the current tuple.
          val a = flatValue(chunk, c.lhs)
          val b = if (c.rhs == null) c.const else flatValue(chunk, c.rhs)
          return a != Values.Null && b != Values.Null && cmpOk(op, a, b)
        }
        val nPos = g.numPos
        var n = 0
        if (lhsActive && !rhsActive) {
          val rd = readerOf(chunk, vp.lhs)
          val access = vp.lhs.access
          val b = if (c.rhs == null) c.const else flatValue(chunk, c.rhs)
          if (b == Values.Null) { g.sel = buf; g.selLen = 0; return false }
          var i = 0
          while (i < nPos) {
            val p = g.posAt(i)
            val x = access(rd.get(p))
            if (x != Values.Null && cmpOk(op, x, b)) { buf(n) = p; n += 1 }
            i += 1
          }
        } else if (!lhsActive && rhsActive) {
          val a = flatValue(chunk, c.lhs)
          if (a == Values.Null) { g.sel = buf; g.selLen = 0; return false }
          val rd = readerOf(chunk, c.rhs)
          val access = c.rhs.access
          val mop = mirror(op)
          var i = 0
          while (i < nPos) {
            val p = g.posAt(i)
            val x = access(rd.get(p))
            if (x != Values.Null && cmpOk(mop, x, a)) { buf(n) = p; n += 1 }
            i += 1
          }
        } else {
          // Both operands in the active group (e.g. edge vs neighbour prop).
          val rdL = readerOf(chunk, vp.lhs)
          val accL = vp.lhs.access
          val rdR = readerOf(chunk, c.rhs)
          val accR = c.rhs.access
          var i = 0
          while (i < nPos) {
            val p = g.posAt(i)
            val a = accL(rdL.get(p))
            val b = accR(rdR.get(p))
            if (a != Values.Null && b != Values.Null && cmpOk(op, a, b)) { buf(n) = p; n += 1 }
            i += 1
          }
        }
        g.sel = buf
        g.selLen = n
        n > 0

      case s: VecInSet =>
        if (!lhsActive) {
          val a = flatValue(chunk, s.lhs)
          val in = a != Values.Null && java.util.Arrays.binarySearch(s.codes, a) >= 0
          return if (s.negate) a != Values.Null && !in else in
        }
        val rd = readerOf(chunk, s.lhs)
        val access = s.lhs.access
        val codes = s.codes
        val nPos = g.numPos
        var n = 0
        var i = 0
        while (i < nPos) {
          val p = g.posAt(i)
          val x = access(rd.get(p))
          if (x != Values.Null) {
            val in = java.util.Arrays.binarySearch(codes, x) >= 0
            if (in != s.negate) { buf(n) = p; n += 1 }
          }
          i += 1
        }
        g.sel = buf
        g.selLen = n
        n > 0
    }
  }

  private final class LScan(step: ScanStep, n: Int, chunk: Chunk,
                            blockSize: Int, lo: Int, hi: Int) extends Op {
    private val gi = chunk.newGroup()
    chunk.vGroup(step.vSlot) = gi
    private val g = chunk.groups(gi)
    private val buf = new Array[Int](blockSize)
    private val range = new RangeReader
    chunk.vReader(step.vSlot) = range
    private var cur = lo

    def open(): Unit = { cur = lo }
    def next(): Boolean = {
      while (cur < hi) {
        val size = math.min(blockSize, hi - cur)
        g.size = size
        g.sel = null
        g.curIdx = -1
        range.start = cur
        cur += size
        if (filterGroup(step.vecPreds, gi, g, buf, chunk)) return true
      }
      false
    }
  }

  /** n-n / 1-n join: flattens the input group and emits the adjacency list
    * of each input value as a new unflat group whose blocks point into the
    * CSR (no materialization).
    */
  private final class LListExtend(child: Op, step: ExtendStep, chunk: Chunk) extends Op {
    private val adj = step.adj.asInstanceOf[CsrAdjacency]
    private val inGi = chunk.vGroup(step.fromSlot)
    private val inG = chunk.groups(inGi)
    private val gi = chunk.newGroup()
    private val g = chunk.groups(gi)
    chunk.vGroup(step.toSlot) = gi
    if (step.eSlot >= 0) chunk.eGroup(step.eSlot) = gi
    private var buf = new Array[Int](1024)
    private var inPos = 0
    private var inLen = 0
    private var inWasFlat = false

    private val nbrReader = new SliceReader(adj.nbrs)
    chunk.vReader(step.toSlot) = nbrReader
    // Edge-handle reader specialized once per step by store layout.
    private val basedReader = step.props match {
      case _: repro.storage.PropertyPages if step.forward && adj.edgeVals != null =>
        new BasedSliceReader(adj.edgeVals)
      case _ => null
    }
    private val bwdPageReader = step.props match {
      case pages: repro.storage.PropertyPages if !step.forward && adj.edgeVals != null =>
        new BwdPageHandleReader(pages, adj.edgeVals, adj.nbrs)
      case _ => null
    }
    private val evSliceReader = step.props match {
      case _: repro.storage.EdgeColumnStore if adj.edgeVals != null =>
        new SliceReader(adj.edgeVals)
      case _ => null
    }
    private val genericReader = new HandleReader(step.props, step.forward, adj.edgeVals, adj.nbrs)
    if (step.eSlot >= 0) chunk.eReader(step.eSlot) =
      if (basedReader != null) basedReader
      else if (bwdPageReader != null) bwdPageReader
      else if (evSliceReader != null) evSliceReader
      else genericReader
    private val pages = step.props match {
      case p: repro.storage.PropertyPages => p
      case _                              => null
    }

    def open(): Unit = { child.open(); inPos = 0; inLen = 0 }

    def next(): Boolean = {
      while (true) {
        if (inPos >= inLen) {
          if (!child.next()) return false
          inWasFlat = inG.curIdx >= 0
          inLen = if (inWasFlat) 1 else inG.numPos
          inPos = 0
        }
        if (!inWasFlat) inG.curIdx = inG.posAt(inPos) // flatten step by step
        inPos += 1
        val own = chunk.vReader(step.fromSlot).get(inG.curIdx)
        val s = adj.start(own.toInt)
        if (s >= 0) {
          val e = adj.end(own.toInt)
          g.size = e - s
          g.sel = null
          g.curIdx = -1
          if (buf.length < g.size) buf = new Array[Int](Integer.highestOneBit(g.size - 1) << 1)
          nbrReader.off = s
          if (step.eSlot >= 0) {
            if (basedReader != null) { basedReader.off = s; basedReader.base = pages.pageBase(own) }
            else if (bwdPageReader != null) bwdPageReader.off = s
            else if (evSliceReader != null) evSliceReader.off = s
            else { genericReader.own = own; genericReader.off = s }
          }
          if (filterGroup(step.vecPreds, gi, g, buf, chunk)) return true
        }
      }
      false
    }
  }

  /** 1-1 / n-1 join over a vertex-column adjacency: appends blocks to the
    * input's own group (values need not be factored out), gathering the
    * single neighbour per position and dropping positions without one.
    */
  private final class LColumnExtend(child: Op, step: ExtendStep, chunk: Chunk) extends Op {
    private val adj = step.adj.asInstanceOf[SingleAdjacency]
    private val gi = chunk.vGroup(step.fromSlot)
    private val g = chunk.groups(gi)
    chunk.vGroup(step.toSlot) = gi
    if (step.eSlot >= 0) chunk.eGroup(step.eSlot) = gi
    private var scratch = new Array[Long](1024)
    private var hScratch: Array[Long] = null
    private var selBuf = new Array[Int](1024)
    private val flatNbr = new ConstReader
    private val flatHandle = new ConstReader
    private val scratchReader = new ScratchReader
    private val hScratchReader = new ScratchReader

    def open(): Unit = child.open()

    def next(): Boolean = {
      while (child.next()) {
        if (g.curIdx >= 0) {
          val own = chunk.vReader(step.fromSlot).get(g.curIdx)
          val nbr = adj.nbr(own.toInt)
          if (nbr != Values.Null) {
            flatNbr.value = nbr
            chunk.vReader(step.toSlot) = flatNbr
            if (step.eSlot >= 0) {
              flatHandle.value = step.props.handle(own, nbr, 0L, step.forward)
              chunk.eReader(step.eSlot) = flatHandle
            }
            if (filterGroup(step.vecPreds, gi, g, selBuf, chunk)) return true
          }
        } else {
          if (scratch.length < g.size) {
            val cap = Integer.highestOneBit(g.size - 1) << 1
            scratch = new Array[Long](cap)
            selBuf = new Array[Int](cap)
            if (hScratch != null) hScratch = new Array[Long](cap)
          }
          if (step.eSlot >= 0 && hScratch == null) hScratch = new Array[Long](scratch.length)
          val nPos = g.numPos
          var n = 0
          var i = 0
          while (i < nPos) {
            val p = g.posAt(i)
            val own = chunk.vReader(step.fromSlot).get(p)
            val nbr = adj.nbr(own.toInt)
            if (nbr != Values.Null) {
              scratch(p) = nbr
              if (hScratch != null) hScratch(p) = step.props.handle(own, nbr, 0L, step.forward)
              selBuf(n) = p
              n += 1
            }
            i += 1
          }
          g.sel = selBuf
          g.selLen = n
          scratchReader.a = scratch
          chunk.vReader(step.toSlot) = scratchReader
          if (step.eSlot >= 0) { hScratchReader.a = hScratch; chunk.eReader(step.eSlot) = hScratchReader }
          if (n > 0 && filterGroup(step.vecPreds, gi, g, selBuf, chunk)) return true
        }
      }
      false
    }
  }

  /** Run a plan, returning count(*): per chunk state, the product of group
    * sizes — aggregation on the compressed (factorized) representation.
    */
  def count(store: GraphStore, plan: Plan, blockSize: Int = 1024): Long =
    countRange(store, plan, 0, store.vertexCounts(plan.scan.label), blockSize)

  /** Count over a sub-range of the scan — the unit of parallelism for
    * [[repro.spark.ParallelRunner]].
    */
  def countRange(store: GraphStore, plan: Plan, lo: Int, hi: Int, blockSize: Int = 1024): Long = {
    require(store.columnar, "LBP runs on columnar stores (GF-CL / GF-CV storage)")
    val chunk = new Chunk(plan.numVSlots, plan.numESlots)
    var op: Op = new LScan(plan.scan, store.vertexCounts(plan.scan.label), chunk, blockSize, lo, hi)
    plan.extendSteps.foreach { s =>
      op = if (s.single) new LColumnExtend(op, s, chunk) else new LListExtend(op, s, chunk)
    }
    op.open()
    var total = 0L
    while (op.next()) total += chunk.tupleCount
    total
  }

  def count(store: GraphStore, q: Query): Long = count(store, Compiler.compile(q, store))
}
