package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions.{lit, when}

/** A node of a query-data routing tree (§3). */
sealed trait QdNode { def desc: NodeDesc }

/** Internal node: records satisfying `cut` route left, the rest right. */
final case class QdInternal(desc: NodeDesc, cut: Pred, left: QdNode, right: QdNode) extends QdNode

/** Leaf = one storage block with a complete semantic description. */
final case class QdLeaf(desc: NodeDesc, bid: Int, size: Long) extends QdNode

/** The query-data routing tree (§3).
  *
  * Routing a record: evaluate each internal node's cut, go left on true —
  * every record lands in exactly one leaf (completeness, §3.1/§3.2).
  * Routing a query: return the IDs of all leaves whose semantic description
  * intersects the query (§3.3); the query is then augmented with
  * `BID IN (...)` so the engine prunes all other blocks.
  */
final class QdTree(val meta: TableMeta, val root: QdNode) extends Serializable {

  /** Leaves in BID order. BIDs are assigned by construction in DFS order. */
  lazy val leaves: IndexedSeq[QdLeaf] = {
    def collect(n: QdNode): Vector[QdLeaf] = n match {
      case l: QdLeaf            => Vector(l)
      case QdInternal(_, _, a, b) => collect(a) ++ collect(b)
    }
    val ls = collect(root).sortBy(_.bid)
    require(ls.map(_.bid) == ls.indices.map(identity), "leaf BIDs must be 0..k-1")
    ls
  }

  def numLeaves: Int = leaves.size

  def depth: Int = {
    def d(n: QdNode): Int = n match {
      case _: QdLeaf              => 1
      case QdInternal(_, _, a, b) => 1 + math.max(d(a), d(b))
    }
    d(root)
  }

  /** Route one encoded record to its block ID (§3.1). */
  def routeRow(value: Int => Double): Int = {
    var n = root
    while (true) {
      n match {
        case QdLeaf(_, bid, _)           => return bid
        case QdInternal(_, cut, l, r)    => n = if (cut.eval(meta, value)) l else r
      }
    }
    -1 // unreachable
  }

  /** Catalyst routing expression: a nested CASE WHEN computing the BID for
    * every row of the encoded DataFrame — the "custom partitioning column"
    * used with `DataFrameWriter.partitionBy`.
    *
    * NOTE: Janino code generation for deeply nested CASE WHEN degrades
    * badly past ~50 leaves; prefer `routeColumn` (same semantics, executor-
    * side tree walk) for production-size trees.
    */
  def routeExpr: Column = {
    def go(n: QdNode): Column = n match {
      case QdLeaf(_, bid, _)        => lit(bid)
      case QdInternal(_, cut, l, r) => when(cut.toColumn(meta), go(l)).otherwise(go(r))
    }
    go(root)
  }

  /** Scalable routing column: ships the (serializable) tree to executors
    * and walks it per row — the paper's vectorizable record routing (§3.1).
    * Semantically identical to `routeExpr`.
    */
  def routeColumn: Column = {
    val self = this
    val names = meta.columns.map(_.name)
    val route = org.apache.spark.sql.functions.udf(
      (r: org.apache.spark.sql.Row) => self.routeRow(i => r.getDouble(i)))
    route(org.apache.spark.sql.functions.struct(names.map(org.apache.spark.sql.functions.col): _*))
  }

  /** IDs of all blocks a query may need (§3.3): scan leaf descriptions and
    * keep those that intersect.
    */
  def blockIds(q: QExpr): Seq[Int] = leaves.collect {
    case l if l.desc.intersects(meta, q) => l.bid
  }

  /** Replace leaf descriptions with tightened (min-max-index) versions,
    * e.g. computed from the fully routed dataset (§3.2 "freeze the tree").
    * Leaves without an entry keep their cut-derived description.
    */
  def withTightenedLeaves(descs: Map[Int, NodeDesc], sizes: Map[Int, Long] = Map.empty): QdTree = {
    def go(n: QdNode): QdNode = n match {
      case l @ QdLeaf(d, bid, sz) =>
        QdLeaf(descs.getOrElse(bid, d), bid, sizes.getOrElse(bid, sz))
      case QdInternal(d, c, a, b) => QdInternal(d, c, go(a), go(b))
    }
    new QdTree(meta, go(root))
  }

  /** Human-readable dump (for interpreting learned trees, §7.7). */
  def render: String = {
    val sb = new StringBuilder
    def go(n: QdNode, indent: Int, label: String): Unit = {
      val pad = "  " * indent
      n match {
        case QdLeaf(_, bid, sz)       => sb.append(s"$pad$label leaf bid=$bid size=$sz\n")
        case QdInternal(_, cut, l, r) =>
          sb.append(s"$pad$label [$cut]\n"); go(l, indent + 1, "T:"); go(r, indent + 1, "F:")
      }
    }
    go(root, 0, "root")
    sb.toString
  }
}
