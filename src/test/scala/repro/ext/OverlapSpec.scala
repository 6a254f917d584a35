package repro.ext

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

/** §6.2 data overlap, on the Fig. 4 scenario: four N-record "arm" regions
  * plus one center record shared by all four queries. Naive binary cutting
  * makes 3 of 4 queries read N extra tuples; overlap replicates the center
  * into every arm so each query reads exactly N+1.
  */
class OverlapSpec extends AnyFunSuite {

  val meta = TableMeta(IndexedSeq(
    ColumnMeta("x", ColKind.Numeric, 0, 100),
    ColumnMeta("y", ColKind.Numeric, 0, 100)))

  val N = 100
  def fig4Store: ColumnStore = {
    val rng = new java.util.Random(1)
    def arm(xLo: Int, xHi: Int, yLo: Int, yHi: Int) = Seq.fill(N)(Array(
      (xLo + rng.nextInt(xHi - xLo + 1)).toDouble,
      (yLo + rng.nextInt(yHi - yLo + 1)).toDouble))
    val rows = arm(0, 44, 45, 55) ++ arm(56, 100, 45, 55) ++
               arm(45, 55, 56, 100) ++ arm(45, 55, 0, 44) ++ Seq(Array(50.0, 50.0))
    Encoder.fromRows(meta, rows)
  }

  def rect(xLo: Double, xHi: Double, yLo: Double, yHi: Double): QExpr =
    QAnd(Seq(QPred(GePred("x", xLo)), QPred(LePred("x", xHi)),
             QPred(GePred("y", yLo)), QPred(LePred("y", yHi))))

  // Each query selects one arm plus the center; overlap only at the center.
  val queries = Seq(
    rect(0, 50, 45, 55),   // West + center
    rect(50, 100, 45, 55), // East + center
    rect(45, 55, 50, 100), // North + center
    rect(45, 55, 0, 50))   // South + center

  val cuts: IndexedSeq[Pred] = Workload.candidateCuts(
    queries.zipWithIndex.map { case (q, i) => Query(s"q$i", q) })

  test("each query matches exactly N+1 records") {
    val store = fig4Store
    for (q <- queries) assert(Bits.count(store.evalQuery(q)) == N + 1)
  }

  test("neighbors: containment on other dims + adjacency on one") {
    val root = NodeDesc.root(meta)
    val center = {
      var d = root
      d = d.restrict(meta, GePred("x", 45), left = true)
      d = d.restrict(meta, LePred("x", 55), left = true)
      d = d.restrict(meta, GePred("y", 45), left = true)
      d = d.restrict(meta, LePred("y", 55), left = true)
      d
    }
    val west = root.restrict(meta, LePred("x", 44), left = true)
    assert(Overlap.neighbors(meta, center, west))
    val south = {
      var d = root
      d = d.restrict(meta, GePred("x", 45), left = true)
      d = d.restrict(meta, LePred("x", 55), left = true)
      d = d.restrict(meta, LePred("y", 44), left = true)
      d
    }
    assert(Overlap.neighbors(meta, center, south))
    // Not adjacent: a far-away block.
    val far = root.restrict(meta, GePred("x", 80), left = true)
    assert(!Overlap.neighbors(meta, center, far))
    // Separated by a gap on x (no adjacency): east vs west.
    val east = root.restrict(meta, GePred("x", 56), left = true)
    assert(!Overlap.neighbors(meta, east, west))
  }

  test("strict construction forces >= one query to read ~2N+1 tuples") {
    val store = fig4Store
    val res = Greedy.build(store, queries, cuts, b = N)
    val tight = res.tightLeafDescs(store, IndexedSeq(0, 1))
    val blocks = res.tree.leaves.zip(tight).map { case (l, d) => (l.size, d) }
    val per = CostModel.accessedPerQuery(meta, queries, blocks)
    assert(per.max >= 2 * N, s"accessed=${per.mkString(",")}")
  }

  test("overlap layout: every query reads N+1 tuples (Fig. 4)") {
    val store = fig4Store
    val layout = Overlap.build(store, queries, cuts, b = N)
    assert(layout.smallBids.nonEmpty, "relaxed build should isolate the center record")
    val per = Overlap.accessedPerQuery(store, layout, queries)
    assert(per.forall(_ == N + 1), s"accessed=${per.mkString(",")} (want all ${N + 1})")
  }

  test("physical blocks absorb replicas: total stored rows = 4N+4 (center x4)") {
    val store = fig4Store
    val layout = Overlap.build(store, queries, cuts, b = N)
    val phys = layout.physicalBlocks(store)
    val stored = phys.values.map(Bits.count).sum
    assert(stored == 4 * N + 4, s"stored=$stored") // center replicated to 4 arms
  }
}
