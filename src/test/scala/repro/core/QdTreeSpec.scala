package repro.core

import org.scalatest.funsuite.AnyFunSuite

class QdTreeSpec extends AnyFunSuite {
  val meta = Fixtures.meta
  val root = NodeDesc.root(meta)

  /** Hand-built 3-leaf tree: cpu<=30 ? (prio IN {0} ? L0 : L1) : L2. */
  def tree: QdTree = {
    val cut1 = LePred("cpu", 30)
    val cut2 = InPred("prio", Set(0))
    val dL = root.restrict(meta, cut1, left = true)
    val dR = root.restrict(meta, cut1, left = false)
    val dLL = dL.restrict(meta, cut2, left = true)
    val dLR = dL.restrict(meta, cut2, left = false)
    new QdTree(meta, QdInternal(root, cut1,
      QdInternal(dL, cut2, QdLeaf(dLL, 0, 10), QdLeaf(dLR, 1, 20)),
      QdLeaf(dR, 2, 30)))
  }

  test("leaves are returned in BID order") {
    assert(tree.leaves.map(_.bid) == IndexedSeq(0, 1, 2))
    assert(tree.leaves.map(_.size) == IndexedSeq(10L, 20L, 30L))
  }

  test("numLeaves and depth") {
    assert(tree.numLeaves == 3)
    assert(tree.depth == 3)
  }

  test("routeRow walks cuts correctly") {
    def row(cpu: Double, mem: Double, prio: Double): Int => Double =
      c => Seq(cpu, mem, prio)(c)
    assert(tree.routeRow(row(10, 0, 0)) == 0)
    assert(tree.routeRow(row(10, 0, 1)) == 1)
    assert(tree.routeRow(row(31, 0, 0)) == 2)
    assert(tree.routeRow(row(30, 0, 2)) == 1) // boundary: cpu<=30 is left
  }

  test("blockIds prunes by description") {
    assert(tree.blockIds(QPred(GePred("cpu", 40))) == Seq(2))
    assert(tree.blockIds(QPred(LePred("cpu", 20))).sorted == Seq(0, 1))
    assert(tree.blockIds(QAnd(Seq(QPred(LePred("cpu", 20)), QPred(InPred("prio", Set(0)))))) == Seq(0))
    assert(tree.blockIds(QPred(InPred("prio", Set(1)))).sorted == Seq(1, 2))
    assert(tree.blockIds(QOr(Seq(QPred(GePred("cpu", 40)), QPred(InPred("prio", Set(0)))))).sorted == Seq(0, 2))
  }

  test("withTightenedLeaves swaps descriptions and sizes") {
    val tight = root.restrict(meta, LePred("cpu", 5), left = true)
    val t2 = tree.withTightenedLeaves(Map(0 -> tight), Map(0 -> 99L))
    assert(t2.leaves(0).desc eq tight)
    assert(t2.leaves(0).size == 99L)
    assert(t2.leaves(1).size == 20L)
    // Tighter desc can prune more.
    assert(!t2.leaves(0).desc.mayContain(meta, GePred("cpu", 10)))
  }

  test("render shows cuts and leaf sizes") {
    val s = tree.render
    assert(s.contains("cpu <= 30.0"))
    assert(s.contains("bid=2 size=30"))
  }

  test("BID invariants enforced") {
    val bad = new QdTree(meta, QdInternal(root, LePred("cpu", 10),
      QdLeaf(root, 1, 5), QdLeaf(root, 2, 5)))
    intercept[IllegalArgumentException](bad.leaves)
  }

  // Routing invariants across random trees built by greedy on random data.
  for (seed <- 0 until 5) {
    test(s"random-data tree: routeRow and blockIds are consistent (seed=$seed)") {
      val store = Fixtures.store(1200, seed = 100 + seed)
      val w = Seq[QExpr](QPred(LePred("cpu", 24)), QPred(GePred("mem", 32)),
        QPred(InPred("prio", Set(seed % 3))), QPred(AdvPred(0)))
      val cuts = Workload.candidateCuts(w.zipWithIndex.map { case (e, i) => Query(s"q$i", e) })
      val res = Greedy.build(store, w, cuts, b = 100)
      // Every row's routed leaf must intersect any query that matches the row.
      for (r <- 0 until store.n; q <- w if q.eval(meta, store.rowFn(r))) {
        val bid = res.tree.routeRow(store.rowFn(r))
        assert(res.tree.blockIds(q).contains(bid), s"row $r query $q leaf $bid")
      }
    }
  }
}
