package repro.core

import scala.collection.immutable.BitSet

/** Column-major, driver-side store of encoded rows.
  *
  * Qd-tree construction (both Greedy §4 and WOODBLOCK §5.2.1) runs over an
  * in-memory set of encoded tuples — the full small-scale dataset or a
  * sample. Column-major doubles + bitmask row sets keep candidate-cut
  * evaluation and min-max tightening cache-friendly.
  */
final class ColumnStore(val meta: TableMeta, val cols: Array[Array[Double]]) {
  require(cols.length == meta.nCols, s"${cols.length} columns vs meta ${meta.nCols}")
  val n: Int = if (cols.isEmpty) 0 else cols(0).length

  @inline def value(c: Int, r: Int): Double = cols(c)(r)

  /** Row-accessor closure for Pred/QExpr eval. */
  @inline def rowFn(r: Int): Int => Double = c => cols(c)(r)

  /** Bitmask (over all n rows) of rows satisfying predicate p. */
  def evalPred(p: Pred): Array[Long] = {
    val b = Bits.alloc(n)
    p match {
      case LePred(cn, v) =>
        val a = cols(meta.idx(cn)); var r = 0
        while (r < n) { if (a(r) <= v) Bits.set(b, r); r += 1 }
      case GePred(cn, v) =>
        val a = cols(meta.idx(cn)); var r = 0
        while (r < n) { if (a(r) >= v) Bits.set(b, r); r += 1 }
      case InPred(cn, codes) =>
        val a = cols(meta.idx(cn))
        val cs = BitSet.fromSpecific(codes); var r = 0
        while (r < n) { if (cs.contains(a(r).toInt)) Bits.set(b, r); r += 1 }
      case AdvPred(i, positive) =>
        val d = meta.advCuts(i)
        val la = cols(meta.idx(d.left)); val ra = cols(meta.idx(d.right))
        var r = 0
        while (r < n) {
          val sat = d.cmp match {
            case "<"  => la(r) < ra(r)
            case "<=" => la(r) <= ra(r)
            case "="  => la(r) == ra(r)
          }
          if (sat == positive) Bits.set(b, r); r += 1
        }
    }
    b
  }

  /** Bitmask of rows satisfying query expression q (row-level truth). */
  def evalQuery(q: QExpr): Array[Long] = q match {
    case QPred(p)  => evalPred(p)
    case QAnd(cs)  => cs.map(evalQuery).reduce(Bits.and)
    case QOr(cs)   =>
      val r = Bits.alloc(n)
      for (c <- cs) { val m = evalQuery(c); var i = 0; while (i < r.length) { r(i) |= m(i); i += 1 } }
      r
  }

  /** Exact selectivity of q over the store. */
  def selectivity(q: QExpr): Double = if (n == 0) 0.0 else Bits.count(evalQuery(q)).toDouble / n

  /** Min-max/dictionary tighten `base` over the rows in `rowsMask`, for the
    * given queried columns only (others keep base's bounds — queries never
    * touch them). Advanced-cut tri-states are recomputed exactly.
    */
  def tighten(base: NodeDesc, rowsMask: Array[Long], queriedCols: IndexedSeq[Int]): NodeDesc = {
    val acc = new StatsAcc(meta, queriedCols)
    Bits.foreach(rowsMask)(r => acc.add(this, r))
    acc.toDesc(base)
  }

  /** One-pass tightening of both children of a cut: rows of `nodeMask` go to
    * the left child when set in `cutMask`. Returns (leftDesc, rightDesc,
    * leftCount, rightCount).
    */
  def tightenChildren(
      baseLeft: NodeDesc,
      baseRight: NodeDesc,
      nodeMask: Array[Long],
      cutMask: Array[Long],
      queriedCols: IndexedSeq[Int]): (NodeDesc, NodeDesc, Int, Int) = {
    val l = new StatsAcc(meta, queriedCols)
    val rr = new StatsAcc(meta, queriedCols)
    Bits.foreach(nodeMask) { r =>
      if (Bits.get(cutMask, r)) l.add(this, r) else rr.add(this, r)
    }
    (l.toDesc(baseLeft), rr.toDesc(baseRight), l.count, rr.count)
  }
}

/** Accumulates per-column min/max, categorical code sets and advanced-cut
  * truth counts over a set of rows — a block's min-max index / SMA (§8).
  */
final class StatsAcc(meta: TableMeta, queriedCols: IndexedSeq[Int]) {
  private val qc = queriedCols.toArray
  private val qlo = Array.fill(qc.length)(Double.PositiveInfinity)
  private val qhi = Array.fill(qc.length)(Double.NegativeInfinity)
  private val qmask: Array[java.util.BitSet] =
    qc.map(i => if (meta.columns(i).isCategorical) new java.util.BitSet(meta.columns(i).domainSize) else null)
  private val advTrue = new Array[Int](meta.nAdv)
  var count: Int = 0

  def add(store: ColumnStore, r: Int): Unit = {
    var k = 0
    while (k < qc.length) {
      val v = store.cols(qc(k))(r)
      if (qmask(k) != null) qmask(k).set(v.toInt)
      else { if (v < qlo(k)) qlo(k) = v; if (v > qhi(k)) qhi(k) = v }
      k += 1
    }
    var a = 0
    while (a < advTrue.length) {
      val d = meta.advCuts(a)
      if (meta.evalAdv(a, store.cols(meta.idx(d.left))(r), store.cols(meta.idx(d.right))(r))) advTrue(a) += 1
      a += 1
    }
    count += 1
  }

  /** Tightened description: observed stats override base on queried columns. */
  def toDesc(base: NodeDesc): NodeDesc = {
    val lo = base.lo.clone(); val hi = base.hi.clone()
    val masks = base.masks.clone(); val adv = base.adv.clone()
    var k = 0
    while (k < qc.length) {
      val i = qc(k)
      if (qmask(k) != null) masks(i) = BitSet.fromBitMaskNoCopy(qmask(k).toLongArray)
      else { lo(i) = qlo(k); hi(i) = qhi(k) }
      k += 1
    }
    var a = 0
    while (a < adv.length) {
      adv(a) =
        if (count == 0) base.adv(a)
        else if (advTrue(a) == count) AdvState.AllTrue
        else if (advTrue(a) == 0) AdvState.AllFalse
        else AdvState.Mixed
      a += 1
    }
    new NodeDesc(lo, hi, masks, adv)
  }
}
