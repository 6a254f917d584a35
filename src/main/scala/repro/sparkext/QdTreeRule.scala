package repro.sparkext

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.catalyst.plans.logical.{Filter, LogicalPlan}
import org.apache.spark.sql.catalyst.rules.Rule
import org.apache.spark.sql.execution.datasources.{HadoopFsRelation, LogicalRelation}
import repro.core._

/** Registry of qd-trees keyed by the storage path of the partitioned
  * dataset they index. `QdTreeRule` consults it during optimization.
  */
object QdTreeRegistry {
  private val trees = scala.collection.concurrent.TrieMap[String, QdTree]()
  def register(path: String, tree: QdTree): Unit = trees.put(normalize(path), tree)
  def clear(): Unit = trees.clear()
  def lookup(path: String): Option[QdTree] = trees.get(normalize(path))
  private def normalize(p: String): String = p.stripSuffix("/").replaceFirst("^file:", "")
}

/** Catalyst optimizer rule implementing §3.3's transparent query routing:
  * "we intercept queries submitted by users and augment them with a
  * BID IN (...) clause that lists the pruned set of block IDs."
  *
  * The rule matches a Filter over a file-source relation whose path has a
  * registered qd-tree, converts the Catalyst predicate back into the
  * workload query algebra (conservatively — unsupported conjuncts are
  * dropped, which can only enlarge the BID list, never lose rows), routes it
  * through the tree, and injects the partition-column predicate that
  * Spark's partition pruning then uses to skip blocks.
  *
  * Install with: `spark.experimental.extraOptimizations ++= Seq(QdTreeRule)`.
  */
object QdTreeRule extends Rule[LogicalPlan] {

  override def apply(plan: LogicalPlan): LogicalPlan = plan.transformUp {
    case f @ Filter(cond, child) if !hasBidPredicate(cond) =>
      treeFor(child) match {
        case Some(tree) =>
          val bidAttr = child.output.find(_.name.equalsIgnoreCase("bid"))
          toQExpr(cond, tree.meta) match {
            case Some(q) if bidAttr.isDefined =>
              val bids = tree.blockIds(q)
              if (bids.size < tree.numLeaves) {
                val attr = bidAttr.get
                val lits = bids.map(b => Literal.create(b, attr.dataType))
                Filter(And(cond, In(attr, lits)), child)
              } else f
            case _ => f
          }
        case None => f
      }
  }

  private def hasBidPredicate(e: Expression): Boolean = e.exists {
    case In(a: AttributeReference, _) if a.name.equalsIgnoreCase("bid") => true
    case EqualTo(a: AttributeReference, _) if a.name.equalsIgnoreCase("bid") => true
    case _ => false
  }

  private def treeFor(plan: LogicalPlan): Option[QdTree] = plan.collectFirst {
    case lr: LogicalRelation if lr.relation.isInstanceOf[HadoopFsRelation] =>
      lr.relation.asInstanceOf[HadoopFsRelation]
  }.flatMap { fs =>
    fs.location.rootPaths.iterator
      .map(p => QdTreeRegistry.lookup(p.toUri.getPath))
      .collectFirst { case Some(t) => t }
  }

  /** Conservative Catalyst-expression -> QExpr translation. Returns None
    * when nothing usable survives. Dropping an unsupported conjunct is safe
    * (weaker predicate => superset of intersecting blocks); an unsupported
    * disjunct invalidates its whole OR.
    */
  private[sparkext] def toQExpr(e: Expression, meta: TableMeta): Option[QExpr] = e match {
    case And(l, r) =>
      (toQExpr(l, meta), toQExpr(r, meta)) match {
        case (Some(a), Some(b)) => Some(QAnd(Seq(a, b)))
        case (Some(a), None)    => Some(a)
        case (None, Some(b))    => Some(b)
        case _                  => None
      }
    case Or(l, r) =>
      for (a <- toQExpr(l, meta); b <- toQExpr(r, meta)) yield QOr(Seq(a, b))
    case cmp: BinaryComparison =>
      (attrName(cmp.left), litValue(cmp.right), attrName(cmp.right), litValue(cmp.left)) match {
        case (Some(c), Some(v), _, _) => unary(cmp, c, v, flipped = false, meta)
        case (_, _, Some(c), Some(v)) => unary(cmp, c, v, flipped = true, meta)
        case (Some(a), _, Some(b), _) => advanced(cmp, a, b, meta)
        case _                        => None
      }
    case In(a, list) if attrName(a).isDefined && list.forall(_.isInstanceOf[Literal]) =>
      val c = attrName(a).get
      if (!meta.colIndex.contains(c)) None
      else {
        val codes = list.map(l => toDouble(l.asInstanceOf[Literal].value).toInt).toSet
        if (meta(c).isCategorical) Some(QPred(InPred(c, codes)))
        else Some(QOr(codes.toSeq.sorted.map(v =>
          QAnd(Seq(QPred(LePred(c, v)), QPred(GePred(c, v)))))))
      }
    case _ => None
  }

  private def unary(cmp: BinaryComparison, c: String, v: Double, flipped: Boolean,
                    meta: TableMeta): Option[QExpr] = {
    if (!meta.colIndex.contains(c)) return None
    // flipped: literal cmp attr, e.g. 5 < x  ≡  x > 5.
    val expr = (cmp, flipped) match {
      case (_: LessThan, false) | (_: GreaterThan, true)            => QPred(LePred(c, v - 1))
      case (_: LessThanOrEqual, false) | (_: GreaterThanOrEqual, true) => QPred(LePred(c, v))
      case (_: GreaterThan, false) | (_: LessThan, true)            => QPred(GePred(c, v + 1))
      case (_: GreaterThanOrEqual, false) | (_: LessThanOrEqual, true) => QPred(GePred(c, v))
      case (_: EqualTo, _) =>
        if (meta(c).isCategorical) QPred(InPred(c, Set(v.toInt)))
        else QAnd(Seq(QPred(LePred(c, v)), QPred(GePred(c, v))))
      case _ => return None
    }
    Some(expr)
  }

  private def advanced(cmp: BinaryComparison, a: String, b: String, meta: TableMeta): Option[QExpr] = {
    val asked = cmp match {
      case _: LessThan           => Some((a, "<", b, true))
      case _: LessThanOrEqual    => Some((a, "<=", b, true))
      case _: GreaterThan        => Some((b, "<", a, true))
      case _: GreaterThanOrEqual => Some((b, "<=", a, true))
      case _: EqualTo            => Some((a, "=", b, true))
      case _                     => None
    }
    asked.flatMap { case (l, op, r, pos) =>
      val i = meta.advCuts.indexWhere(d => d.left == l && d.cmp == op && d.right == r)
      val j = if (op == "=") meta.advCuts.indexWhere(d => d.left == r && d.cmp == op && d.right == l) else -1
      if (i >= 0) Some(QPred(AdvPred(i, pos)))
      else if (j >= 0) Some(QPred(AdvPred(j, pos)))
      else None
    }
  }

  private def attrName(e: Expression): Option[String] = e match {
    case a: AttributeReference => Some(a.name)
    case Cast(a: AttributeReference, _, _, _) => Some(a.name)
    case _ => None
  }

  private def litValue(e: Expression): Option[Double] = e match {
    case Literal(v, _) if v != null => Some(toDouble(v))
    case Cast(Literal(v, _), _, _, _) if v != null => Some(toDouble(v))
    case _ => None
  }

  private def toDouble(v: Any): Double = v match {
    case d: Double  => d
    case f: Float   => f.toDouble
    case i: Int     => i.toDouble
    case l: Long    => l.toDouble
    case s: Short   => s.toDouble
    case b: Byte    => b.toDouble
    case d: java.math.BigDecimal => d.doubleValue
    case d: org.apache.spark.sql.types.Decimal => d.toDouble
    case other      => other.toString.toDouble
  }

  /** Convenience installer. */
  def install(spark: SparkSession): Unit =
    if (!spark.experimental.extraOptimizations.contains(QdTreeRule))
      spark.experimental.extraOptimizations ++= Seq(QdTreeRule)
}
