package repro.ext

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

/** §6.3 two-tree replication: T2 is built against the per-query access of
  * T1 with the combined objective Σ_q min(A_q, B_q).
  */
class TwoTreeSpec extends AnyFunSuite {
  val meta = Fixtures.meta

  // Workload with two "interest groups": cpu queries and mem queries. A
  // first tree optimized mostly for cpu leaves mem queries unskippable; the
  // second tree should focus on mem.
  val wCpu: IndexedSeq[QExpr] = IndexedSeq(QPred(LePred("cpu", 9)), QPred(GePred("cpu", 90)))
  val wMem: IndexedSeq[QExpr] = IndexedSeq(QPred(LePred("mem", 7)), QPred(GePred("mem", 56)))
  val w: IndexedSeq[QExpr] = wCpu ++ wMem

  test("second tree targets the queries the first tree serves poorly") {
    val store = Fixtures.store(4000, seed = 70)
    val cutsCpu = IndexedSeq[Pred](LePred("cpu", 9), GePred("cpu", 90))
    val cutsMem = IndexedSeq[Pred](LePred("mem", 7), GePred("mem", 56))

    // T1: only cpu cuts available -> mem queries scan everything.
    val t1 = Greedy.build(store, w, cutsCpu, b = 400)
    val tight1 = t1.tightLeafDescs(store, IndexedSeq(0, 1, 2))
    val blocks1 = t1.tree.leaves.zip(tight1).map { case (l, d) => (l.size, d) }
    val a1 = CostModel.accessedPerQuery(meta, w, blocks1)
    assert(a1(2) == store.n && a1(3) == store.n, "mem queries unskippable under T1")

    // T2 with both cut families available must pick mem cuts.
    val res = TwoTree.buildSecond(store, w, cutsCpu ++ cutsMem, b = 400, a1)
    val tight2 = res.second.tightLeafDescs(store, IndexedSeq(0, 1, 2))
    val blocks2 = res.second.tree.leaves.zip(tight2).map { case (l, d) => (l.size, d) }
    val a2 = CostModel.accessedPerQuery(meta, w, blocks2)
    assert(a2(2) < store.n && a2(3) < store.n, s"T2 should skip for mem queries: ${a2.mkString(",")}")

    // Combined accessed must dominate (be <=) both individual trees.
    for (i <- w.indices) {
      assert(res.combinedAccessedPerQuery(i) <= a1(i))
      assert(res.combinedAccessedPerQuery(i) <= math.max(a2(i), res.combinedAccessedPerQuery(i)))
    }
    val combined = res.combinedAccessedPerQuery.sum.toDouble
    assert(combined < a1.sum.toDouble, "two trees must beat one")
  }

  test("combined accessed matches min(A_q, B_q) recomputed from the trees") {
    val store = Fixtures.store(2000, seed = 71)
    val cuts = IndexedSeq[Pred](LePred("cpu", 9), GePred("cpu", 90), LePred("mem", 7), GePred("mem", 56))
    val t1 = Greedy.build(store, w, IndexedSeq(cuts(0), cuts(1)), b = 200)
    val tight1 = t1.tightLeafDescs(store, IndexedSeq(0, 1, 2))
    val a1 = CostModel.accessedPerQuery(meta, w, t1.tree.leaves.zip(tight1).map { case (l, d) => (l.size, d) })
    val res = TwoTree.buildSecond(store, w, cuts, b = 200, a1)
    val tight2 = res.second.tightLeafDescs(store, IndexedSeq(0, 1, 2))
    val a2 = CostModel.accessedPerQuery(meta, w, res.second.tree.leaves.zip(tight2).map { case (l, d) => (l.size, d) })
    for (i <- w.indices)
      assert(res.combinedAccessedPerQuery(i) == math.min(a1(i), a2(i)), s"q$i")
  }

  test("second tree leaves respect b and partition the store") {
    val store = Fixtures.store(2000, seed = 72)
    val cuts = IndexedSeq[Pred](LePred("cpu", 9), GePred("mem", 56))
    val a1 = Array.fill(w.length)(store.n.toLong)
    val res = TwoTree.buildSecond(store, w, cuts, b = 300, a1)
    assert(res.second.leafMasks.map(Bits.count).sum == store.n)
    for (l <- res.second.tree.leaves) assert(l.size >= 300)
  }
}
