package repro.core

import org.scalatest.funsuite.AnyFunSuite

class PredicateSpec extends AnyFunSuite {
  val meta = Fixtures.meta
  val store = Fixtures.store(2000, seed = 1)

  def manualCount(f: Int => Boolean): Int = (0 until store.n).count(f)

  test("LePred eval matches manual scan") {
    val p = LePred("cpu", 30)
    val m = store.evalPred(p)
    assert(Bits.count(m) == manualCount(r => store.value(0, r) <= 30))
    Bits.foreach(m)(r => assert(store.value(0, r) <= 30))
  }

  test("GePred eval matches manual scan") {
    val p = GePred("mem", 40)
    val m = store.evalPred(p)
    assert(Bits.count(m) == manualCount(r => store.value(1, r) >= 40))
  }

  test("InPred eval matches manual scan") {
    val p = InPred("prio", Set(0, 2))
    val m = store.evalPred(p)
    assert(Bits.count(m) == manualCount(r => Set(0.0, 2.0).contains(store.value(2, r))))
  }

  test("AdvPred positive and negative partition the rows") {
    val pos = store.evalPred(AdvPred(0, positive = true))
    val neg = store.evalPred(AdvPred(0, positive = false))
    assert(Bits.count(pos) + Bits.count(neg) == store.n)
    assert(Bits.countAnd(pos, neg) == 0)
    Bits.foreach(pos)(r => assert(store.value(1, r) < store.value(0, r)))
  }

  test("Pred.eval agrees with evalPred for every predicate type") {
    val preds: Seq[Pred] = Seq(LePred("cpu", 50), GePred("cpu", 50), InPred("prio", Set(1)), AdvPred(0))
    for (p <- preds) {
      val m = p match { case _ => store.evalPred(p) }
      for (r <- 0 until 200)
        assert(p.eval(meta, store.rowFn(r)) == Bits.get(m, r), s"$p row $r")
    }
  }

  test("QAnd / QOr eval") {
    val q = QAnd(Seq(QPred(LePred("cpu", 50)), QPred(GePred("mem", 32))))
    val m = store.evalQuery(q)
    assert(Bits.count(m) == manualCount(r => store.value(0, r) <= 50 && store.value(1, r) >= 32))
    val qo = QOr(Seq(QPred(LePred("cpu", 10)), QPred(GePred("cpu", 90))))
    val mo = store.evalQuery(qo)
    assert(Bits.count(mo) == manualCount(r => store.value(0, r) <= 10 || store.value(0, r) >= 90))
  }

  test("nested And-of-Or eval") {
    val q = QAnd(Seq(
      QOr(Seq(QPred(LePred("cpu", 20)), QPred(GePred("cpu", 80)))),
      QPred(InPred("prio", Set(0)))))
    val m = store.evalQuery(q)
    assert(Bits.count(m) == manualCount(r =>
      (store.value(0, r) <= 20 || store.value(0, r) >= 80) && store.value(2, r) == 0.0))
  }

  test("selectivity sums to expected fraction") {
    val s = store.selectivity(QPred(LePred("cpu", 49)))
    assert(math.abs(s - 0.5) < 0.05)
  }

  test("candidate cut extraction dedupes and normalizes adv preds") {
    val q1 = Query("a", QAnd(Seq(QPred(LePred("cpu", 10)), QPred(AdvPred(0, positive = false)))))
    val q2 = Query("b", QOr(Seq(QPred(LePred("cpu", 10)), QPred(InPred("prio", Set(1))))))
    val cuts = Workload.candidateCuts(Seq(q1, q2))
    assert(cuts.toSet == Set(LePred("cpu", 10), AdvPred(0, positive = true), InPred("prio", Set(1))))
  }

  test("queriedCols covers advanced-cut operands") {
    val qs = Seq(Query("a", QPred(AdvPred(0))))
    val qc = Workload.queriedCols(meta, qs)
    assert(qc == IndexedSeq(0, 1)) // cpu and mem
  }

  test("toColumn string rendering is stable for debugging") {
    assert(LePred("cpu", 10).toString == "cpu <= 10.0")
    assert(InPred("prio", Set(2, 0)).toString == "prio IN (0,2)")
    assert(AdvPred(0, positive = false).toString == "NOT AC0")
  }
}
