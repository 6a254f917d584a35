package repro.core

import org.scalatest.funsuite.AnyFunSuite

class CostModelSpec extends AnyFunSuite {
  val meta = Fixtures.meta
  val store = Fixtures.store(1000, seed = 3)
  val root = NodeDesc.root(meta)

  test("skippedQueries counts non-intersecting queries") {
    val desc = root.restrict(meta, LePred("cpu", 30), left = true)
    val w = Seq[QExpr](
      QPred(GePred("cpu", 50)),      // skipped
      QPred(LePred("cpu", 10)),      // intersects
      QPred(GePred("cpu", 31)),      // skipped
      QPred(InPred("prio", Set(0)))) // intersects
    assert(CostModel.skippedQueries(meta, w, desc) == 2)
  }

  test("accessFraction: single full block is never skipped by intersecting queries") {
    val w = Seq[QExpr](QPred(LePred("cpu", 99)))
    val blocks = Seq((1000L, store.tighten(root, Bits.full(store.n), IndexedSeq(0, 1, 2))))
    assert(CostModel.accessFraction(meta, w, blocks) == 1.0)
  }

  test("accessFraction: perfectly split blocks give exact fraction") {
    val cut = LePred("cpu", 49)
    val m = store.evalPred(cut)
    val q = IndexedSeq(0, 1, 2)
    val b1 = (Bits.count(m).toLong, store.tighten(root.restrict(meta, cut, left = true), m, q))
    val inv = Bits.andNot(Bits.full(store.n), m)
    val b2 = (Bits.count(inv).toLong, store.tighten(root.restrict(meta, cut, left = false), inv, q))
    val w = Seq[QExpr](QPred(LePred("cpu", 49))) // touches only block 1
    val frac = CostModel.accessFraction(meta, w, Seq(b1, b2))
    assert(math.abs(frac - b1._1.toDouble / store.n) < 1e-12)
  }

  test("accessedPerQuery sums matching block sizes") {
    val cut = LePred("cpu", 49)
    val m = store.evalPred(cut)
    val q = IndexedSeq(0, 1, 2)
    val b1 = (Bits.count(m).toLong, store.tighten(root.restrict(meta, cut, left = true), m, q))
    val inv = Bits.andNot(Bits.full(store.n), m)
    val b2 = (Bits.count(inv).toLong, store.tighten(root.restrict(meta, cut, left = false), inv, q))
    val w = Seq[QExpr](QPred(LePred("cpu", 49)), QPred(GePred("cpu", 50)), QPred(LePred("cpu", 99)))
    val per = CostModel.accessedPerQuery(meta, w, Seq(b1, b2))
    assert(per(0) == b1._1 && per(1) == b2._1 && per(2) == store.n)
  }

  test("selectivityLowerBound is mean per-query selectivity") {
    val w = Seq[QExpr](QPred(LePred("cpu", 49)), QPred(GePred("cpu", 50)))
    val lb = CostModel.selectivityLowerBound(store, w)
    assert(math.abs(lb - 0.5) < 1e-9) // the two halves partition the store
  }

  test("skippedTuples and accessFraction are consistent") {
    val w = Seq[QExpr](QPred(LePred("cpu", 20)), QPred(GePred("mem", 60)))
    val q = IndexedSeq(0, 1, 2)
    val cut = LePred("cpu", 49)
    val m = store.evalPred(cut)
    val inv = Bits.andNot(Bits.full(store.n), m)
    val blocks = Seq(
      (Bits.count(m).toLong, store.tighten(root.restrict(meta, cut, left = true), m, q)),
      (Bits.count(inv).toLong, store.tighten(root.restrict(meta, cut, left = false), inv, q)))
    val skipped = CostModel.skippedTuples(meta, w, blocks)
    val frac = CostModel.accessFraction(meta, w, blocks)
    assert(math.abs((1.0 - skipped.toDouble / (store.n.toDouble * w.length)) - frac) < 1e-12)
  }
}
