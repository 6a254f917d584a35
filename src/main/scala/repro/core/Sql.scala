package repro.core

/** Renders predicates/queries as portable SQL over the encoded table —
  * used to run the same query on DuckDB (the correctness oracle). Encoded
  * columns may be stored as strings on the oracle side, so every column
  * reference is explicitly cast to DOUBLE.
  */
object Sql {

  private def col(c: String): String = s"CAST($c AS DOUBLE)"

  def pred(meta: TableMeta, p: Pred): String = p match {
    case LePred(c, v)   => s"${col(c)} <= $v"
    case GePred(c, v)   => s"${col(c)} >= $v"
    case InPred(c, cs)  => s"${col(c)} IN (${cs.toSeq.sorted.map(_.toDouble).mkString(", ")})"
    case AdvPred(i, pos) =>
      val d = meta.advCuts(i)
      val base = s"${col(d.left)} ${d.cmp} ${col(d.right)}"
      if (pos) base else s"NOT ($base)"
  }

  def expr(meta: TableMeta, q: QExpr): String = q match {
    case QPred(p)  => pred(meta, p)
    case QAnd(cs)  => cs.map(c => s"(${expr(meta, c)})").mkString(" AND ")
    case QOr(cs)   => cs.map(c => s"(${expr(meta, c)})").mkString(" OR ")
  }
}
