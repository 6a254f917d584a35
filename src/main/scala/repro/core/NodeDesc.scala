package repro.core

import scala.collection.immutable.BitSet

/** Tri-state for advanced cuts in a node description (§6.1).
  * `Mixed` = records may or may not satisfy the cut; `AllTrue` = every record
  * satisfies it; `AllFalse` = no record satisfies it.
  */
object AdvState {
  val Mixed: Byte = 0
  val AllTrue: Byte = 1
  val AllFalse: Byte = 2
}

/** Semantic description of a qd-tree node (Table 1 + §6.1):
  *   - `lo`/`hi`: the range hypercube, inclusive integral bounds per column;
  *   - `masks`: per categorical column, the set of codes that may appear;
  *   - `adv`:   per advanced cut, a tri-state.
  *
  * Descriptions are *sound*: a record outside the description can never be
  * stored under the node. They double as per-block min-max/dictionary
  * statistics once tightened from data (§3.2 "freeze the tree and replace
  * each leaf's range with a min-max index").
  */
final class NodeDesc(
    val lo: Array[Double],
    val hi: Array[Double],
    val masks: Array[BitSet], // null entry for numeric columns
    val adv: Array[Byte]) extends Serializable {

  /** Is the described subspace definitely empty? */
  def isEmpty: Boolean = {
    var i = 0
    while (i < lo.length) {
      if (lo(i) > hi(i)) return true
      if (masks(i) != null && masks(i).isEmpty) return true
      i += 1
    }
    false
  }

  /** May this subspace contain a record satisfying `p`? Sound (never false
    * when a contained record satisfies p), used for block skipping (§3.3).
    */
  def mayContain(meta: TableMeta, p: Pred): Boolean = p match {
    case LePred(c, v) =>
      val i = meta.idx(c); lo(i) <= v
    case GePred(c, v) =>
      val i = meta.idx(c); hi(i) >= v
    case InPred(c, codes) =>
      val i = meta.idx(c)
      if (masks(i) != null) codes.exists(masks(i).contains)
      else codes.exists(k => k >= lo(i) && k <= hi(i))
    case AdvPred(a, positive) =>
      if (positive) adv(a) != AdvState.AllFalse else adv(a) != AdvState.AllTrue
  }

  /** May this subspace contain a record satisfying query `q`? AND intersects
    * iff all conjuncts do; OR iff any disjunct does (§3.3).
    */
  def intersects(meta: TableMeta, q: QExpr): Boolean = q match {
    case QPred(p)  => mayContain(meta, p)
    case QAnd(cs)  => cs.forall(intersects(meta, _))
    case QOr(cs)   => cs.exists(intersects(meta, _))
  }

  /** Child description after applying cut `p` (left = satisfies p,
    * right = satisfies ¬p). Integral domains keep complements exact.
    */
  def restrict(meta: TableMeta, p: Pred, left: Boolean): NodeDesc = {
    val nlo = lo.clone(); val nhi = hi.clone()
    val nmasks = masks.clone(); val nadv = adv.clone()
    p match {
      case LePred(c, v) =>
        val i = meta.idx(c)
        if (left) nhi(i) = math.min(nhi(i), v) else nlo(i) = math.max(nlo(i), v + 1)
      case GePred(c, v) =>
        val i = meta.idx(c)
        if (left) nlo(i) = math.max(nlo(i), v) else nhi(i) = math.min(nhi(i), v - 1)
      case InPred(c, codes) =>
        val i = meta.idx(c)
        val cs = BitSet.fromSpecific(codes)
        val base = if (nmasks(i) != null) nmasks(i) else BitSet.fromSpecific(lo(i).toInt to hi(i).toInt)
        nmasks(i) = if (left) base & cs else base &~ cs
      case AdvPred(a, positive) =>
        nadv(a) = if (left == positive) AdvState.AllTrue else AdvState.AllFalse
    }
    new NodeDesc(nlo, nhi, nmasks, nadv)
  }

  override def toString: String = {
    val parts = lo.indices.map { i =>
      if (masks(i) != null) s"m${masks(i).size}" else s"[${lo(i)},${hi(i)}]"
    }
    s"Desc(${parts.mkString(";")};adv=${adv.mkString("")})"
  }
}

object NodeDesc {
  /** Root description: the full table space, all advanced cuts Mixed. */
  def root(meta: TableMeta): NodeDesc = {
    val n = meta.nCols
    val lo = new Array[Double](n); val hi = new Array[Double](n)
    val masks = new Array[BitSet](n)
    var i = 0
    while (i < n) {
      val cm = meta.columns(i)
      lo(i) = cm.lo; hi(i) = cm.hi
      if (cm.isCategorical) masks(i) = BitSet.fromSpecific(0 until cm.domainSize)
      i += 1
    }
    new NodeDesc(lo, hi, masks, new Array[Byte](meta.nAdv))
  }
}
