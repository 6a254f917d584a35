package repro.ext

import repro.core._

/** Data overlap (§6.2): construct a qd-tree with the relaxed cutting
  * condition (one child may fall below b), then replicate every small block
  * into each of its *neighbor* large blocks. Two blocks are neighbors when
  * their hypercubes share N−1 dimension boundaries and are adjacent on the
  * remaining dimension. Queries then exploit completeness: when one block
  * provably contains every tuple a query needs, all other candidates are
  * pruned (§6.2.1).
  */
object Overlap {

  /** host bid -> replicated (small) bids stored inside it. */
  final case class Layout(result: BuildResult, b: Int, replicasOf: Map[Int, Seq[Int]], smallBids: Set[Int]) {
    /** Effective physical blocks: large blocks absorb their replicas. */
    def physicalBlocks(store: ColumnStore): Map[Int, Array[Long]] = {
      val leafMasks = result.leafMasks
      val large = result.tree.leaves.filter(l => !smallBids.contains(l.bid))
      large.map { l =>
        var m = leafMasks(l.bid).clone()
        for (rb <- replicasOf.getOrElse(l.bid, Nil)) m = or(m, leafMasks(rb))
        l.bid -> m
      }.toMap
    }
    private def or(a: Array[Long], b: Array[Long]): Array[Long] = {
      val r = a.clone(); var i = 0; while (i < r.length) { r(i) |= b(i); i += 1 }; r
    }
  }

  /** Is small block `s` a neighbor of host block `h`: adjacent (integral
    * domains: hi+1 == lo) on exactly one numeric dimension, and contained in
    * the host on every other dimension (the paper's "N−1 dimension
    * boundaries in common"; containment rather than equality is required so
    * Fig. 4's center block neighbors all four arms, whose cut-derived
    * hypercubes are wider on the shared dimension). Containment keeps the
    * host's union description complete after replication.
    */
  def neighbors(meta: TableMeta, s: NodeDesc, h: NodeDesc): Boolean = {
    var adjDim = -1
    var i = 0
    while (i < meta.nCols) {
      if (s.masks(i) != null) {
        if (!s.masks(i).subsetOf(h.masks(i))) return false
      } else {
        val contained = s.lo(i) >= h.lo(i) && s.hi(i) <= h.hi(i)
        if (!contained) {
          val adjacent = s.lo(i) == h.hi(i) + 1 || s.hi(i) + 1 == h.lo(i)
          if (!adjacent || adjDim >= 0) return false
          adjDim = i
        }
      }
      i += 1
    }
    adjDim >= 0
  }

  /** Build with relaxed greedy, then assign every small block to ALL of its
    * neighboring large blocks (Fig. 4's center record goes to all arms).
    */
  def build(store: ColumnStore, w: Seq[QExpr], cuts: IndexedSeq[Pred], b: Int): Layout = {
    val res = Greedy.build(store, w, cuts, b, relaxed = true)
    val leaves = res.tree.leaves
    val small = leaves.filter(_.size < b).map(_.bid).toSet
    val large = leaves.filter(_.size >= b)
    val replicas = scala.collection.mutable.Map[Int, List[Int]]().withDefaultValue(Nil)
    for (sb <- small) {
      val sd = leaves(sb).desc
      val hosts = large.filter(l => neighbors(store.meta, sd, l.desc))
      for (h <- hosts) replicas(h.bid) = sb :: replicas(h.bid)
    }
    Layout(res, b, replicas.toMap, small)
  }

  /** Tuples accessed per query under the overlap layout. Candidates are the
    * physical blocks whose contents intersect the query; completeness lets a
    * single covering block serve the query alone (§6.2.1).
    */
  def accessedPerQuery(store: ColumnStore, layout: Layout, w: Seq[QExpr]): Array[Long] = {
    val phys = layout.physicalBlocks(store).toSeq
    val sizes = phys.map { case (bid, m) => bid -> Bits.count(m).toLong }.toMap
    w.map { q =>
      val matchMask = store.evalQuery(q)
      val needed = Bits.count(matchMask)
      val candidates = phys.filter { case (_, m) => Bits.countAnd(m, matchMask) > 0 }
      if (candidates.isEmpty) 0L
      else {
        // A block covers the query if it holds every matching tuple.
        val covering = candidates.filter { case (_, m) => Bits.countAnd(m, matchMask) == needed }
        if (covering.nonEmpty) covering.map { case (bid, _) => sizes(bid) }.min
        else candidates.map { case (bid, _) => sizes(bid) }.sum
      }
    }.toArray
  }
}
