package repro.core

/** The MaxSkip objective (§2.1, Eq. 1).
  *
  * A block P can be skipped for query q when q provably matches nothing in
  * P, judged against P's statistics/semantic description. C(P) = |P| × (#
  * queries that skip P); C(𝒫) = Σ C(P). Access fraction = 1 − C(𝒫)/(|V|·|W|).
  */
object CostModel {

  /** Number of workload queries that can skip a block with description d. */
  def skippedQueries(meta: TableMeta, w: Seq[QExpr], d: NodeDesc): Int = {
    var c = 0
    var i = 0
    while (i < w.length) { if (!d.intersects(meta, w(i))) c += 1; i += 1 }
    c
  }

  /** Total tuples skipped across the workload, Σ_P |P|·Σ_q S(P,q). */
  def skippedTuples(meta: TableMeta, w: Seq[QExpr], blocks: Seq[(Long, NodeDesc)]): Long =
    blocks.iterator.map { case (sz, d) => sz * skippedQueries(meta, w, d) }.sum

  /** Fraction of tuples accessed by the workload (Table 2's metric):
    * Σ_q Σ_{P not skipped} |P| ÷ (|V|·|W|).
    */
  def accessFraction(meta: TableMeta, w: Seq[QExpr], blocks: Seq[(Long, NodeDesc)]): Double = {
    val total = blocks.iterator.map(_._1).sum
    if (total == 0 || w.isEmpty) return 0.0
    1.0 - skippedTuples(meta, w, blocks).toDouble / (total.toDouble * w.length)
  }

  /** Per-query accessed tuple counts (for speedup CDFs and lower bounds). */
  def accessedPerQuery(meta: TableMeta, w: Seq[QExpr], blocks: Seq[(Long, NodeDesc)]): Array[Long] = {
    val out = new Array[Long](w.length)
    for ((sz, d) <- blocks; i <- w.indices)
      if (d.intersects(meta, w(i))) out(i) += sz
    out
  }

  /** True workload selectivity over a store — the lower bound for any
    * layout's access fraction (§7.1).
    */
  def selectivityLowerBound(store: ColumnStore, w: Seq[QExpr]): Double =
    if (w.isEmpty) 0.0 else w.map(store.selectivity).sum / w.length
}
