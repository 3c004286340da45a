package repro.query

import repro.compress.Dictionary
import repro.core.{GraphStore, Values}
import repro.storage.{Adjacency, EdgePropAccessor}

/** Read context handed to compiled predicates: engines expose the current
  * binding of each vertex slot (a positional offset) and each edge slot
  * (a property handle).
  */
trait ReadCtx {
  def v(slot: Int): Long
  def e(slot: Int): Long
}

/** A predicate compiled against one [[GraphStore]]: property accessors are
  * resolved to the store's structures and string constants are translated
  * to dictionary codes (columnar) or compared on raw strings (row storage).
  */
trait CompiledPred extends Serializable {
  def eval(ctx: ReadCtx): Boolean
}

/** An operand resolved against the store: which tuple slot it reads
  * (vertex offset or edge handle) and the storage access from that value
  * to the property's Long (numeric or dictionary code).
  */
final class OperandRef(val isEdge: Boolean, val slot: Int, val access: Long => Long)
    extends Serializable

/** Predicates in vectorized form for the list-based processor: the operand
  * bindings are resolved once per block, and the comparison runs in a tight
  * loop over the block (paper §6.2, Filter). Only available on columnar
  * stores, where string predicates reduce to dictionary-code comparisons.
  */
sealed trait VecPred extends Serializable { def lhs: OperandRef }
/** `lhs op rhs` (rhs == null means `lhs op const`). NULL operands fail. */
final class VecCmp(val lhs: OperandRef, val op: CmpOp, val rhs: OperandRef,
                   val const: Long) extends VecPred
/** Sorted-code-set membership (IN / CONTAINS / STARTS WITH / string range);
  * `negate` flips it (NOT IN), still failing NULLs.
  */
final class VecInSet(val lhs: OperandRef, val codes: Array[Long],
                     val negate: Boolean) extends VecPred

/** One step of the physical left-deep plan, shared by both processors. */
sealed trait PlanStep extends Serializable

final case class ScanStep(label: Int, vSlot: Int, preds: Array[CompiledPred],
                          vecPreds: Array[VecPred]) extends PlanStep

/** Join step along one pattern edge.
  *
  * @param single   true when the traversal direction has single cardinality
  *                 and the store holds it as a vertex column (ColumnExtend)
  * @param eSlot    slot for the edge handle, -1 when no predicate needs it
  */
final case class ExtendStep(
    edgeLabel: Int,
    forward: Boolean,
    fromSlot: Int,
    toSlot: Int,
    eSlot: Int,
    adj: Adjacency,
    props: EdgePropAccessor,
    single: Boolean,
    preds: Array[CompiledPred],
    vecPreds: Array[VecPred]
) extends PlanStep

final case class Plan(
    scan: ScanStep,
    extendSteps: Array[ExtendStep],
    numVSlots: Int,
    numESlots: Int
) extends Serializable

object Compiler {

  /** Compile a [[Query]] against a store into a physical plan. */
  def compile(q: Query, store: GraphStore): Plan = {
    val schema = store.schema
    val vSlot: Map[String, Int] = q.vars.map(_.name).zipWithIndex.toMap

    // Edge slots only for aliases referenced by predicates.
    val neededAliases: Set[String] =
      q.preds.flatMap(_.operands).collect { case EProp(a, _) => a }.toSet
    val eSlot: Map[String, Int] = neededAliases.toSeq.sorted.zipWithIndex.toMap

    def compilePred(p: Pred): CompiledPred = PredCompiler.compile(p, q, store, vSlot, eSlot)
    def compileVec(ps: Seq[Pred]): Array[VecPred] =
      if (store.columnar) ps.map(p => PredCompiler.compileVec(p, q, store, vSlot, eSlot)).toArray
      else null

    // Assign each predicate to the earliest step binding all its operands.
    var bound = Set(q.anchor)
    var boundEdges = Set.empty[String]
    def ready(p: Pred): Boolean = p.operands.forall {
      case VProp(v, _) => bound.contains(v)
      case EProp(a, _) => boundEdges.contains(a)
    }
    var remaining = q.preds.toList
    def takeReady(): Seq[Pred] = {
      val (now, later) = remaining.partition(ready)
      remaining = later
      now
    }

    val scanPreds = takeReady()
    val scanStep = ScanStep(schema.vertexIdx(q.varByName(q.anchor).label), vSlot(q.anchor),
      scanPreds.map(compilePred).toArray, compileVec(scanPreds))

    val steps = q.joinOrder.map { ei =>
      val e = q.edges(ei)
      val forward = bound.contains(e.srcVar)
      val (fromVar, toVar) = if (forward) (e.srcVar, e.dstVar) else (e.dstVar, e.srcVar)
      require(!bound.contains(toVar), s"${q.name}: cyclic patterns not supported (var $toVar)")
      bound += toVar
      if (e.alias.nonEmpty) boundEdges += e.alias
      val el = schema.edgeIdx(e.label)
      val adj = store.adjacency(el, forward)
      val stepPreds = takeReady()
      ExtendStep(
        edgeLabel = el,
        forward = forward,
        fromSlot = vSlot(fromVar),
        toSlot = vSlot(toVar),
        eSlot = if (e.alias.nonEmpty) eSlot.getOrElse(e.alias, -1) else -1,
        adj = adj,
        props = store.edgeProps(el),
        single = adj.isInstanceOf[repro.storage.SingleAdjacency],
        preds = stepPreds.map(compilePred).toArray,
        vecPreds = compileVec(stepPreds)
      )
    }.toArray

    require(remaining.isEmpty, s"${q.name}: predicates never bound: $remaining")
    Plan(scanStep, steps, q.vars.length, eSlot.size)
  }
}

private object PredCompiler {

  /** Vectorized compilation (columnar stores only): operands become
    * (slot, storage access) pairs, string tests become dictionary-code
    * constants or sorted code sets.
    */
  def compileVec(p: Pred, q: Query, store: GraphStore,
                 vSlot: Map[String, Int], eSlot: Map[String, Int]): VecPred = {
    val schema = store.schema

    def ref(o: Operand): OperandRef = o match {
      case VProp(v, prop) =>
        val label = schema.vertexIdx(q.varByName(v).label)
        val pi = schema.vertices(label).propIdx(prop)
        new OperandRef(isEdge = false, vSlot(v), store.vertexLongReader(label, pi))
      case EProp(a, prop) =>
        val edge = q.edgeByAlias(a)
        val el = schema.edgeIdx(edge.label)
        val pi = schema.edges(el).propIdx(prop)
        new OperandRef(isEdge = true, eSlot(a), store.edgeProps(el).longReader(pi))
    }

    def dictOf(o: Operand): repro.compress.Dictionary = o match {
      case VProp(v, prop) =>
        val label = schema.vertexIdx(q.varByName(v).label)
        store.vertexDict(label, schema.vertices(label).propIdx(prop))
      case EProp(a, prop) =>
        val edge = q.edgeByAlias(a)
        val el = schema.edgeIdx(edge.label)
        store.edgeProps(el).dict(schema.edges(el).propIdx(prop))
    }

    def codeSet(o: Operand, pred: String => Boolean): Array[Long] = {
      val d = dictOf(o)
      require(d != null, "string predicate on non-string property")
      val a = d.codesWhere(pred).toArray
      java.util.Arrays.sort(a)
      a
    }

    p match {
      case CmpConst(l, op, c) => new VecCmp(ref(l), op, null, c)
      case CmpProps(l, op, r) => new VecCmp(ref(l), op, ref(r), 0L)
      case StrPred(l, test) => test match {
        case SEq(s) =>
          new VecCmp(ref(l), EQ, null, dictOf(l).encodeOpt(s).map(_.toLong).getOrElse(-1L))
        case SNe(s) =>
          new VecCmp(ref(l), NE, null, dictOf(l).encodeOpt(s).map(_.toLong).getOrElse(-1L))
        case SIn(ss)        => new VecInSet(ref(l), codeSet(l, ss.contains), negate = false)
        case SContains(s)   => new VecInSet(ref(l), codeSet(l, _.contains(s)), negate = false)
        case SStartsWith(s) => new VecInSet(ref(l), codeSet(l, _.startsWith(s)), negate = false)
        case SCmp(op, s) =>
          new VecInSet(ref(l), codeSet(l, w => op match {
            case LT => w < s; case LE => w <= s; case GT => w > s
            case GE => w >= s; case EQ => w == s; case NE => w != s
          }), negate = false)
      }
    }
  }

  def compile(p: Pred, q: Query, store: GraphStore,
              vSlot: Map[String, Int], eSlot: Map[String, Int]): CompiledPred = {
    val schema = store.schema

    // Long-valued reader for an operand (numeric value or dict code).
    def longReader(o: Operand): ReadCtx => Long = o match {
      case VProp(v, prop) =>
        val label = schema.vertexIdx(q.varByName(v).label)
        val pi = schema.vertices(label).propIdx(prop)
        val slot = vSlot(v)
        ctx => store.vertexLong(label, ctx.v(slot).toInt, pi)
      case EProp(a, prop) =>
        val edge = q.edgeByAlias(a)
        val el = schema.edgeIdx(edge.label)
        val pi = schema.edges(el).propIdx(prop)
        val slot = eSlot(a)
        val props = store.edgeProps(el)
        ctx => props.getLong(ctx.e(slot), pi)
    }

    def stringReader(o: Operand): ReadCtx => String = o match {
      case VProp(v, prop) =>
        val label = schema.vertexIdx(q.varByName(v).label)
        val pi = schema.vertices(label).propIdx(prop)
        val slot = vSlot(v)
        ctx => store.vertexString(label, ctx.v(slot).toInt, pi)
      case EProp(a, prop) =>
        val edge = q.edgeByAlias(a)
        val el = schema.edgeIdx(edge.label)
        val pi = schema.edges(el).propIdx(prop)
        val slot = eSlot(a)
        val props = store.edgeProps(el)
        ctx => props.getString(ctx.e(slot), pi)
    }

    def dictOf(o: Operand): Dictionary = o match {
      case VProp(v, prop) =>
        val label = schema.vertexIdx(q.varByName(v).label)
        store.vertexDict(label, schema.vertices(label).propIdx(prop))
      case EProp(a, prop) =>
        val edge = q.edgeByAlias(a)
        val el = schema.edgeIdx(edge.label)
        store.edgeProps(el).dict(schema.edges(el).propIdx(prop))
    }

    def cmp(op: CmpOp, a: Long, b: Long): Boolean = op match {
      case LT => a < b
      case LE => a <= b
      case GT => a > b
      case GE => a >= b
      case EQ => a == b
      case NE => a != b
    }

    p match {
      case CmpConst(l, op, c) =>
        val rd = longReader(l)
        new CompiledPred {
          def eval(ctx: ReadCtx): Boolean = {
            val x = rd(ctx)
            x != Values.Null && cmp(op, x, c)
          }
        }
      case CmpProps(l, op, r) =>
        val rl = longReader(l)
        val rr = longReader(r)
        new CompiledPred {
          def eval(ctx: ReadCtx): Boolean = {
            val a = rl(ctx)
            val b = rr(ctx)
            a != Values.Null && b != Values.Null && cmp(op, a, b)
          }
        }
      case StrPred(l, test) =>
        if (store.columnar) compileStrOnCodes(longReader(l), dictOf(l), test)
        else compileStrOnStrings(stringReader(l), test)
    }
  }

  /** Columnar: the constant side becomes a code or code set once; the scan
    * compares fixed-width codes without decoding (paper §5.1).
    */
  private def compileStrOnCodes(rd: ReadCtx => Long, dict: Dictionary, test: StrTest): CompiledPred = {
    require(dict != null, "string predicate on non-string property")
    def codeSet(pred: String => Boolean): Array[Long] = {
      val a = dict.codesWhere(pred).toArray
      java.util.Arrays.sort(a)
      a
    }
    test match {
      case SEq(s) =>
        val code = dict.encodeOpt(s).map(_.toLong).getOrElse(-1L)
        new CompiledPred { def eval(ctx: ReadCtx): Boolean = rd(ctx) == code }
      case SNe(s) =>
        val code = dict.encodeOpt(s).map(_.toLong).getOrElse(-1L)
        new CompiledPred {
          def eval(ctx: ReadCtx): Boolean = { val x = rd(ctx); x != Values.Null && x != code }
        }
      case SIn(ss) =>
        val codes = codeSet(ss.contains)
        new CompiledPred {
          def eval(ctx: ReadCtx): Boolean = {
            val x = rd(ctx)
            x != Values.Null && java.util.Arrays.binarySearch(codes, x) >= 0
          }
        }
      case SContains(s) =>
        val codes = codeSet(_.contains(s))
        new CompiledPred {
          def eval(ctx: ReadCtx): Boolean = {
            val x = rd(ctx)
            x != Values.Null && java.util.Arrays.binarySearch(codes, x) >= 0
          }
        }
      case SStartsWith(s) =>
        val codes = codeSet(_.startsWith(s))
        new CompiledPred {
          def eval(ctx: ReadCtx): Boolean = {
            val x = rd(ctx)
            x != Values.Null && java.util.Arrays.binarySearch(codes, x) >= 0
          }
        }
      case SCmp(op, s) =>
        val codes = codeSet(w => op match {
          case LT => w < s; case LE => w <= s; case GT => w > s
          case GE => w >= s; case EQ => w == s; case NE => w != s
        })
        new CompiledPred {
          def eval(ctx: ReadCtx): Boolean = {
            val x = rd(ctx)
            x != Values.Null && java.util.Arrays.binarySearch(codes, x) >= 0
          }
        }
    }
  }

  /** Row storage: decode the raw bytes and compare strings per tuple — the
    * cost GF-RV pays.
    */
  private def compileStrOnStrings(rd: ReadCtx => String, test: StrTest): CompiledPred = {
    val f: String => Boolean = test match {
      case SEq(s)         => x => x == s
      case SNe(s)         => x => x != s
      case SIn(ss)        => x => ss.contains(x)
      case SContains(s)   => x => x.contains(s)
      case SStartsWith(s) => x => x.startsWith(s)
      case SCmp(op, s) => op match {
        case LT => x => x < s; case LE => x => x <= s; case GT => x => x > s
        case GE => x => x >= s; case EQ => x => x == s; case NE => x => x != s
      }
    }
    new CompiledPred {
      def eval(ctx: ReadCtx): Boolean = {
        val x = rd(ctx)
        x != null && f(x)
      }
    }
  }
}
