package repro.core

/** Kind of an encoded column. All columns are dictionary/integer-encoded
  * (§3: "the literals are dictionary-encoded as integers"), so every encoded
  * value is an integral Double.
  */
sealed trait ColKind
object ColKind {
  /** Ordered numeric domain (ints, quantized decimals, epoch-day dates). */
  case object Numeric extends ColKind
  /** Unordered categorical domain with codes [0, domainSize). */
  case object Categorical extends ColKind
}

/** Metadata for one encoded column.
  *
  * @param name       column name in the encoded DataFrame
  * @param kind       numeric vs categorical
  * @param lo         inclusive domain minimum (numeric; 0 for categorical)
  * @param hi         inclusive domain maximum (numeric; domainSize-1 for categorical)
  * @param dict       categorical code -> original string value, if known
  */
final case class ColumnMeta(
    name: String,
    kind: ColKind,
    lo: Double,
    hi: Double,
    dict: Option[IndexedSeq[String]] = None) {
  def domainSize: Int = (hi - lo).toInt + 1
  def isCategorical: Boolean = kind == ColKind.Categorical
}

/** Definition of an advanced (binary, two-column) cut, §6.1.
  * `left cmp right` where cmp ∈ {<, <=, =}; e.g. l_commitdate < l_receiptdate.
  */
final case class AdvCutDef(left: String, cmp: String, right: String) {
  require(Set("<", "<=", "=").contains(cmp), s"unsupported advanced-cut cmp: $cmp")
  override def toString: String = s"$left $cmp $right"
}

/** Schema of the encoded table plus the workload's advanced cuts.
  *
  * Advanced cuts live here because node semantic descriptions carry one
  * tri-state slot per advanced cut (the paper's `n.adv_cuts` bit vector).
  */
final case class TableMeta(columns: IndexedSeq[ColumnMeta], advCuts: IndexedSeq[AdvCutDef] = IndexedSeq.empty) {
  val colIndex: Map[String, Int] = columns.iterator.map(_.name).zipWithIndex.toMap
  def apply(name: String): ColumnMeta = columns(colIndex(name))
  def idx(name: String): Int = colIndex(name)
  def nCols: Int = columns.length
  def nAdv: Int = advCuts.length

  /** Evaluate advanced cut `a` on encoded values. */
  def evalAdv(a: Int, leftV: Double, rightV: Double): Boolean = advCuts(a).cmp match {
    case "<"  => leftV < rightV
    case "<=" => leftV <= rightV
    case "="  => leftV == rightV
  }
}
