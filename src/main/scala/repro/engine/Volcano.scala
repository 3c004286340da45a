package repro.engine

import repro.core.{GraphStore, Values}
import repro.query._
import repro.storage.{CsrAdjacency, SingleAdjacency}

/** Volcano-style tuple-at-a-time processor (paper §6, Example 2): the
  * processor of GF-RV (row storage) and GF-CV (columnar storage). One
  * `next()` call per produced tuple; joins are index nested loops over the
  * adjacency structures; predicates are evaluated per tuple.
  */
object Volcano {

  private final class Tuple(numV: Int, numE: Int) extends ReadCtx {
    val vs = new Array[Long](numV)
    val es = new Array[Long](numE)
    def v(slot: Int): Long = vs(slot)
    def e(slot: Int): Long = es(slot)
  }

  private abstract class Op {
    def open(): Unit
    def next(): Boolean
  }

  private final class ScanOp(step: ScanStep, n: Int, t: Tuple) extends Op {
    private var cur = 0
    def open(): Unit = { cur = 0 }
    def next(): Boolean = {
      if (cur >= n) return false
      t.vs(step.vSlot) = cur
      cur += 1
      true
    }
  }

  /** Standalone Filter operator — as in Volcano-style plans (Fig. 2), every
    * predicate evaluation is another per-tuple iterator call.
    */
  private final class FilterOp(child: Op, preds: Array[CompiledPred], t: Tuple) extends Op {
    def open(): Unit = child.open()
    def next(): Boolean = {
      while (child.next()) {
        if (passes(preds, t)) return true
      }
      false
    }
  }

  private final class ExtendCsrOp(child: Op, step: ExtendStep, t: Tuple) extends Op {
    private val adj = step.adj.asInstanceOf[CsrAdjacency]
    private var i = 0
    private var end = 0
    private var own = 0L
    def open(): Unit = { child.open(); i = 0; end = 0 }
    def next(): Boolean = {
      while (true) {
        while (i < end) {
          val nbr = adj.nbr(i)
          t.vs(step.toSlot) = nbr
          if (step.eSlot >= 0)
            t.es(step.eSlot) = step.props.handle(own, nbr, adj.edgeVal(i), step.forward)
          i += 1
          return true
        }
        if (!child.next()) return false
        own = t.vs(step.fromSlot)
        val s = adj.start(own.toInt)
        if (s >= 0) { i = s; end = adj.end(own.toInt) } else { i = 0; end = 0 }
      }
      false
    }
  }

  private final class ExtendSingleOp(child: Op, step: ExtendStep, t: Tuple) extends Op {
    private val adj = step.adj.asInstanceOf[SingleAdjacency]
    def open(): Unit = child.open()
    def next(): Boolean = {
      while (child.next()) {
        val own = t.vs(step.fromSlot)
        val nbr = adj.nbr(own.toInt)
        if (nbr != Values.Null) {
          t.vs(step.toSlot) = nbr
          if (step.eSlot >= 0)
            t.es(step.eSlot) = step.props.handle(own, nbr, 0L, step.forward)
          return true
        }
      }
      false
    }
  }

  @inline private def passes(preds: Array[CompiledPred], ctx: ReadCtx): Boolean = {
    var i = 0
    while (i < preds.length) {
      if (!preds(i).eval(ctx)) return false
      i += 1
    }
    true
  }

  /** Execute the plan and return count(*): the number of result tuples —
    * tuple-at-a-time, so every result is enumerated.
    */
  def count(store: GraphStore, plan: Plan): Long = {
    val t = new Tuple(plan.numVSlots, plan.numESlots)
    var op: Op = new ScanOp(plan.scan, store.vertexCounts(plan.scan.label), t)
    if (plan.scan.preds.nonEmpty) op = new FilterOp(op, plan.scan.preds, t)
    plan.extendSteps.foreach { s =>
      op = if (s.single) new ExtendSingleOp(op, s, t) else new ExtendCsrOp(op, s, t)
      if (s.preds.nonEmpty) op = new FilterOp(op, s.preds, t)
    }
    op.open()
    var c = 0L
    while (op.next()) c += 1
    c
  }

  def count(store: GraphStore, q: Query): Long = count(store, Compiler.compile(q, store))
}
