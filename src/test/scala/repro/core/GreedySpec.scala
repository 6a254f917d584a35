package repro.core

import org.scalatest.funsuite.AnyFunSuite

class GreedySpec extends AnyFunSuite {
  val meta = Fixtures.meta

  def workload: Seq[QExpr] = Seq(
    QPred(LePred("cpu", 19)),
    QPred(GePred("cpu", 80)),
    QAnd(Seq(QPred(GePred("mem", 48)), QPred(InPred("prio", Set(2))))),
    QPred(InPred("prio", Set(0))),
    QPred(AdvPred(0)))

  def cuts: IndexedSeq[Pred] = Workload.candidateCuts(workload.zipWithIndex.map {
    case (e, i) => Query(s"q$i", e)
  })

  test("leaves partition the store: disjoint and exhaustive") {
    val store = Fixtures.store(2000, seed = 4)
    val res = Greedy.build(store, workload, cuts, b = 100)
    val masks = res.leafMasks
    assert(masks.map(Bits.count).sum == store.n)
    for (i <- masks.indices; j <- masks.indices if i < j)
      assert(Bits.countAnd(masks(i), masks(j)) == 0, s"leaves $i,$j overlap")
  }

  test("every leaf respects the minimum block size b") {
    val store = Fixtures.store(2000, seed = 5)
    val res = Greedy.build(store, workload, cuts, b = 150)
    for (l <- res.tree.leaves) assert(l.size >= 150, s"leaf ${l.bid} size ${l.size}")
  }

  test("routeRow agrees with construction leaf masks") {
    val store = Fixtures.store(1500, seed = 6)
    val res = Greedy.build(store, workload, cuts, b = 100)
    for (r <- 0 until store.n) {
      val bid = res.tree.routeRow(store.rowFn(r))
      assert(Bits.get(res.leafMasks(bid), r), s"row $r routed to $bid but not in mask")
    }
  }

  test("greedy beats a random partitioning on a skippable workload") {
    val store = Fixtures.store(4000, seed = 7)
    val res = Greedy.build(store, workload, cuts, b = 200)
    val frac = res.scanFraction(store, workload, IndexedSeq(0, 1, 2))
    // Random layout: every block has full-range stats -> nothing skipped
    // except by chance; greedy must do substantially better than full scan.
    assert(frac < 0.8, s"scan fraction $frac")
    assert(res.tree.numLeaves > 1)
  }

  test("greedy achieves the optimal split on a two-cluster dataset") {
    // Two clusters: cpu<10 ("hot") and cpu>=90 ("cold"); one query per cluster.
    val rows = (0 until 500).map(i => Array((i % 10).toDouble, (i % 64).toDouble, (i % 3).toDouble)) ++
               (0 until 500).map(i => Array((90 + i % 10).toDouble, (i % 64).toDouble, (i % 3).toDouble))
    val store = Encoder.fromRows(meta, rows)
    val w = Seq[QExpr](QPred(LePred("cpu", 9)), QPred(GePred("cpu", 90)))
    val cs = Workload.candidateCuts(w.zipWithIndex.map { case (e, i) => Query(s"q$i", e) })
    val res = Greedy.build(store, w, cs, b = 100)
    val frac = res.scanFraction(store, w, IndexedSeq(0))
    assert(res.tree.numLeaves == 2)
    assert(math.abs(frac - 0.5) < 1e-9) // each query scans exactly its half
  }

  test("no-gain workload yields a single leaf (greedy stops)") {
    val store = Fixtures.store(1000, seed = 8)
    val w = Seq[QExpr](QPred(LePred("cpu", 99))) // matches everything
    val cs = IndexedSeq[Pred](LePred("cpu", 49))
    val res = Greedy.build(store, w, cs, b = 100)
    assert(res.tree.numLeaves == 1)
  }

  test("store smaller than 2b yields a single leaf") {
    val store = Fixtures.store(150, seed = 9)
    val res = Greedy.build(store, workload, cuts, b = 100)
    assert(res.tree.numLeaves == 1)
    assert(res.tree.leaves.head.size == 150)
  }

  test("Fig. 3: greedy is forced to the disk cut and reaches ~50.5% scan") {
    val store = Fixtures.fig3Store(100000, seed = 10)
    val w = Seq(Fixtures.fig3Q1, Fixtures.fig3Q2)
    val res = Greedy.build(store, w, Fixtures.fig3Cuts, b = 1000)
    // Greedy makes the disk cut then stops: cpu cuts alone skip nothing.
    assert(res.tree.numLeaves == 2)
    val frac = res.scanFraction(store, w, IndexedSeq(0, 1))
    assert(math.abs(frac - 0.505) < 0.01, s"scan fraction $frac (paper: 50.5%)")
  }

  test("relaxed mode can produce one leaf smaller than b") {
    // Data: singleton center + two arms; queries select arm+center each.
    val m2 = TableMeta(IndexedSeq(ColumnMeta("x", ColKind.Numeric, 0, 99)))
    val rows = Seq.fill(200)(Array(10.0)) ++ Seq(Array(50.0)) ++ Seq.fill(200)(Array(90.0))
    val store = Encoder.fromRows(m2, rows)
    val w = Seq[QExpr](
      QAnd(Seq(QPred(GePred("x", 0)), QPred(LePred("x", 50)))),
      QAnd(Seq(QPred(GePred("x", 50)), QPred(LePred("x", 99)))))
    val cs = IndexedSeq[Pred](LePred("x", 49), LePred("x", 50), GePred("x", 51))
    val strict = Greedy.build(store, w, cs, b = 100)
    val relaxed = Greedy.build(store, w, cs, b = 100, relaxed = true)
    assert(relaxed.tree.leaves.exists(_.size < 100) || relaxed.tree.numLeaves >= strict.tree.numLeaves)
  }

  test("BuildResult.tightLeafDescs covers all routed rows") {
    val store = Fixtures.store(1000, seed = 11)
    val res = Greedy.build(store, workload, cuts, b = 100)
    val tight = res.tightLeafDescs(store, IndexedSeq(0, 1, 2))
    for ((l, d) <- res.tree.leaves.zip(tight)) {
      Bits.foreach(res.leafMasks(l.bid)) { r =>
        assert(store.value(0, r) >= d.lo(0) && store.value(0, r) <= d.hi(0))
      }
    }
  }
}
