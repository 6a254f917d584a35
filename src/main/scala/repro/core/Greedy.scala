package repro.core

/** Result of constructing a qd-tree over a ColumnStore: the tree plus, per
  * leaf BID, the bitmask of store rows routed to that leaf.
  */
final case class BuildResult(tree: QdTree, leafMasks: IndexedSeq[Array[Long]]) {

  /** Tightened (min-max over actual routed rows) leaf descriptions. */
  def tightLeafDescs(store: ColumnStore, queriedCols: IndexedSeq[Int]): IndexedSeq[NodeDesc] =
    tree.leaves.zip(leafMasks).map { case (l, m) => store.tighten(l.desc, m, queriedCols) }

  /** Scan (access) fraction of the workload over the induced partitioning,
    * judged with tightened per-block statistics — the paper's logical metric.
    */
  def scanFraction(store: ColumnStore, w: Seq[QExpr], queriedCols: IndexedSeq[Int]): Double = {
    val blocks = tree.leaves.zip(tightLeafDescs(store, queriedCols)).map { case (l, d) => (l.size, d) }
    CostModel.accessFraction(store.meta, w, blocks)
  }
}

/** Greedy top-down qd-tree construction (Algorithm 1, §4).
  *
  * Starting from a root holding all tuples, repeatedly split any leaf with
  * ≥ 2b tuples using the candidate cut that maximizes C(T ⊕ (p, n)) — the
  * number of tuples skipped over the workload — subject to both children
  * having ≥ b tuples; stop when no cut strictly improves C.
  */
object Greedy {

  /** @param store        construction tuples (full small-scale data or sample)
    * @param w            workload query expressions
    * @param cuts         candidate cut set (§3.4)
    * @param b            minimum tuples per block
    * @param relaxed      §6.2 overlap mode: allow ONE child below b (still >0)
    * @param maxLeaves    safety cap on leaf count
    */
  def build(
      store: ColumnStore,
      w: Seq[QExpr],
      cuts: IndexedSeq[Pred],
      b: Int,
      relaxed: Boolean = false,
      maxLeaves: Int = 1 << 20): BuildResult = {
    val meta = store.meta
    val queried = Workload.queriedCols(meta, w.zipWithIndex.map { case (e, i) => Query(s"q$i", e) })
    val cutMasks: IndexedSeq[Array[Long]] = cuts.map(store.evalPred)

    var bidCounter = 0
    val masksOut = scala.collection.mutable.ArrayBuffer[Array[Long]]()

    def mkLeaf(desc: NodeDesc, mask: Array[Long], size: Int): QdLeaf = {
      val l = QdLeaf(desc, bidCounter, size.toLong)
      bidCounter += 1
      masksOut += mask
      l
    }

    def grow(mask: Array[Long], size: Int, desc: NodeDesc): QdNode = {
      val minSize = if (relaxed) 1 else b
      if (size < b + minSize || bidCounter + 2 > maxLeaves) return mkLeaf(desc, mask, size)

      // Current node's skipping capacity with a tightened description.
      val selfTight = store.tighten(desc, mask, queried)
      val selfSkip = CostModel.skippedQueries(meta, w, selfTight).toLong * size

      var bestScore = selfSkip
      var bestCut = -1
      var bestLeft: (Array[Long], Int, NodeDesc) = null
      var bestRight: (Array[Long], Int, NodeDesc) = null

      var ci = 0
      while (ci < cuts.length) {
        val ln = Bits.countAnd(mask, cutMasks(ci))
        val rn = size - ln
        val legal =
          if (relaxed) ln >= 1 && rn >= 1 && (ln >= b || rn >= b)
          else ln >= b && rn >= b
        if (legal) {
          val cut = cuts(ci)
          val baseL = desc.restrict(meta, cut, left = true)
          val baseR = desc.restrict(meta, cut, left = false)
          val lm = Bits.and(mask, cutMasks(ci))
          val rm = Bits.andNot(mask, cutMasks(ci))
          val (ld, rd, lc, rc) = store.tightenChildren(baseL, baseR, mask, cutMasks(ci), queried)
          val score = CostModel.skippedQueries(meta, w, ld).toLong * lc +
                      CostModel.skippedQueries(meta, w, rd).toLong * rc
          if (score > bestScore) {
            bestScore = score; bestCut = ci
            bestLeft = (lm, lc, baseL); bestRight = (rm, rc, baseR)
          }
        }
        ci += 1
      }

      if (bestCut < 0) mkLeaf(desc, mask, size)
      else {
        val (lm, lc, ldesc) = bestLeft
        val (rm, rc, rdesc) = bestRight
        val left = grow(lm, lc, ldesc)
        val right = grow(rm, rc, rdesc)
        QdInternal(desc, cuts(bestCut), left, right)
      }
    }

    val rootDesc = NodeDesc.root(meta)
    val root = grow(Bits.full(store.n), store.n, rootDesc)
    BuildResult(new QdTree(meta, root), masksOut.toIndexedSeq)
  }
}
