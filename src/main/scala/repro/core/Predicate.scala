package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions.col

/** Unary / advanced predicates over the encoded table.
  *
  * These are both the *candidate cuts* of qd-tree construction (§3.4) and
  * the atoms of workload queries. All literals are integral (encoded), so
  * complements stay closed: ¬(c <= v) ≡ (c >= v+1).
  */
sealed trait Pred {
  /** Evaluate on one encoded row; `value(i)` is the row's value for column i. */
  def eval(meta: TableMeta, value: Int => Double): Boolean
  /** Lower to a Catalyst Column over the encoded DataFrame. */
  def toColumn(meta: TableMeta): Column
  /** Columns referenced (by index into meta.columns). */
  def colsUsed(meta: TableMeta): Seq[Int]
}

/** col <= v (numeric). */
final case class LePred(colName: String, v: Double) extends Pred {
  def eval(meta: TableMeta, value: Int => Double): Boolean = value(meta.idx(colName)) <= v
  def toColumn(meta: TableMeta): Column = col(colName) <= v
  def colsUsed(meta: TableMeta): Seq[Int] = Seq(meta.idx(colName))
  override def toString = s"$colName <= $v"
}

/** col >= v (numeric). */
final case class GePred(colName: String, v: Double) extends Pred {
  def eval(meta: TableMeta, value: Int => Double): Boolean = value(meta.idx(colName)) >= v
  def toColumn(meta: TableMeta): Column = col(colName) >= v
  def colsUsed(meta: TableMeta): Seq[Int] = Seq(meta.idx(colName))
  override def toString = s"$colName >= $v"
}

/** col IN (codes) — categorical equality / IN. */
final case class InPred(colName: String, codes: Set[Int]) extends Pred {
  require(codes.nonEmpty, "IN with empty set")
  def eval(meta: TableMeta, value: Int => Double): Boolean = codes.contains(value(meta.idx(colName)).toInt)
  def toColumn(meta: TableMeta): Column = col(colName).isInCollection(codes.map(_.toDouble))
  def colsUsed(meta: TableMeta): Seq[Int] = Seq(meta.idx(colName))
  override def toString = s"$colName IN ${codes.toSeq.sorted.mkString("(", ",", ")")}"
}

/** Advanced cut AC_idx (positive) or its negation ¬AC_idx (§6.1). */
final case class AdvPred(idx: Int, positive: Boolean = true) extends Pred {
  def eval(meta: TableMeta, value: Int => Double): Boolean = {
    val d = meta.advCuts(idx)
    val r = meta.evalAdv(idx, value(meta.idx(d.left)), value(meta.idx(d.right)))
    if (positive) r else !r
  }
  def toColumn(meta: TableMeta): Column = {
    val d = meta.advCuts(idx)
    val c = d.cmp match {
      case "<"  => col(d.left) < col(d.right)
      case "<=" => col(d.left) <= col(d.right)
      case "="  => col(d.left) === col(d.right)
    }
    if (positive) c else !c
  }
  def colsUsed(meta: TableMeta): Seq[Int] = {
    val d = meta.advCuts(idx)
    Seq(meta.idx(d.left), meta.idx(d.right))
  }
  override def toString = s"${if (positive) "" else "NOT "}AC$idx"
}

/** Boolean query tree: arbitrary AND/OR of unary predicates (§3.3). */
sealed trait QExpr {
  def eval(meta: TableMeta, value: Int => Double): Boolean
  def toColumn(meta: TableMeta): Column
  /** All atomic predicates appearing in the expression. */
  def preds: Seq[Pred]
}
final case class QPred(p: Pred) extends QExpr {
  def eval(meta: TableMeta, value: Int => Double): Boolean = p.eval(meta, value)
  def toColumn(meta: TableMeta): Column = p.toColumn(meta)
  def preds: Seq[Pred] = Seq(p)
  override def toString = p.toString
}
final case class QAnd(children: Seq[QExpr]) extends QExpr {
  require(children.nonEmpty)
  def eval(meta: TableMeta, value: Int => Double): Boolean = children.forall(_.eval(meta, value))
  def toColumn(meta: TableMeta): Column = children.map(_.toColumn(meta)).reduce(_ && _)
  def preds: Seq[Pred] = children.flatMap(_.preds)
  override def toString = children.mkString("(", " AND ", ")")
}
final case class QOr(children: Seq[QExpr]) extends QExpr {
  require(children.nonEmpty)
  def eval(meta: TableMeta, value: Int => Double): Boolean = children.exists(_.eval(meta, value))
  def toColumn(meta: TableMeta): Column = children.map(_.toColumn(meta)).reduce(_ || _)
  def preds: Seq[Pred] = children.flatMap(_.preds)
  override def toString = children.mkString("(", " OR ", ")")
}

object QExpr {
  def and(es: QExpr*): QExpr = QAnd(es)
  def or(es: QExpr*): QExpr = QOr(es)
  def pred(p: Pred): QExpr = QPred(p)
}

/** A named workload query. */
final case class Query(name: String, expr: QExpr)

object Workload {
  /** Candidate cut extraction (§3.4): all pushed-down unary predicates of
    * the workload, deduplicated. Range predicates become LE/GE cuts; IN/=
    * become IN cuts; advanced predicates become positive AdvPred cuts.
    */
  def candidateCuts(queries: Seq[Query]): IndexedSeq[Pred] = {
    val seen = scala.collection.mutable.LinkedHashSet[Pred]()
    for (q <- queries; p <- q.expr.preds) {
      val cut = p match {
        case AdvPred(i, _) => AdvPred(i, positive = true)
        case other         => other
      }
      seen += cut
    }
    seen.toIndexedSeq
  }

  /** Column indices referenced anywhere in the workload (incl. advanced
    * cuts' operands) — the only columns descriptions need to track tightly.
    */
  def queriedCols(meta: TableMeta, queries: Seq[Query]): IndexedSeq[Int] =
    queries.flatMap(_.expr.preds).flatMap(_.colsUsed(meta)).distinct.sorted.toIndexedSeq
}
