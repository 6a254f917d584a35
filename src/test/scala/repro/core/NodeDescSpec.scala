package repro.core

import org.scalatest.funsuite.AnyFunSuite

class NodeDescSpec extends AnyFunSuite {
  val meta = Fixtures.meta
  val store = Fixtures.store(3000, seed = 2)
  val root = NodeDesc.root(meta)
  val queried = IndexedSeq(0, 1, 2)

  test("root covers the whole domain") {
    assert(root.lo(0) == 0 && root.hi(0) == 99)
    assert(root.lo(1) == 0 && root.hi(1) == 63)
    assert(root.masks(2).size == 3)
    assert(root.adv(0) == AdvState.Mixed)
    assert(!root.isEmpty)
  }

  // Soundness: every row routed into a child satisfies the child's description.
  val cuts: Seq[Pred] = Seq(LePred("cpu", 30), GePred("mem", 48), InPred("prio", Set(1)), AdvPred(0))
  for (cut <- cuts) {
    test(s"restrict soundness for cut [$cut]") {
      val lDesc = root.restrict(meta, cut, left = true)
      val rDesc = root.restrict(meta, cut, left = false)
      val m = store.evalPred(cut)
      Bits.foreach(m) { r =>
        // Row satisfies cut -> must satisfy left description's constraints.
        assert(rowInDesc(lDesc, r), s"row $r not in left desc of $cut")
      }
      for (r <- 0 until store.n if !Bits.get(m, r))
        assert(rowInDesc(rDesc, r), s"row $r not in right desc of $cut")
    }
  }

  def rowInDesc(d: NodeDesc, r: Int): Boolean = {
    (0 until meta.nCols).forall { c =>
      val v = store.value(c, r)
      if (d.masks(c) != null) d.masks(c).contains(v.toInt)
      else v >= d.lo(c) && v <= d.hi(c)
    } && (0 until meta.nAdv).forall { a =>
      val sat = AdvPred(a).eval(meta, store.rowFn(r))
      d.adv(a) match {
        case x if x == AdvState.AllTrue  => sat
        case x if x == AdvState.AllFalse => !sat
        case _                            => true
      }
    }
  }

  test("range cut complements are exact on the integral domain") {
    val l = root.restrict(meta, LePred("cpu", 30), left = true)
    val r = root.restrict(meta, LePred("cpu", 30), left = false)
    assert(l.hi(0) == 30 && r.lo(0) == 31)
    val l2 = root.restrict(meta, GePred("cpu", 30), left = true)
    val r2 = root.restrict(meta, GePred("cpu", 30), left = false)
    assert(l2.lo(0) == 30 && r2.hi(0) == 29)
  }

  test("categorical cut splits the mask") {
    val l = root.restrict(meta, InPred("prio", Set(1)), left = true)
    val r = root.restrict(meta, InPred("prio", Set(1)), left = false)
    assert(l.masks(2).toSet == Set(1))
    assert(r.masks(2).toSet == Set(0, 2))
  }

  test("adv cut sets tri-states") {
    val l = root.restrict(meta, AdvPred(0), left = true)
    val r = root.restrict(meta, AdvPred(0), left = false)
    assert(l.adv(0) == AdvState.AllTrue && r.adv(0) == AdvState.AllFalse)
  }

  test("mayContain is sound: never false when a contained row matches") {
    val desc = root.restrict(meta, LePred("cpu", 30), left = true)
    val rows = store.evalPred(LePred("cpu", 30))
    val preds: Seq[Pred] = Seq(LePred("cpu", 10), GePred("cpu", 20), InPred("prio", Set(0)),
      AdvPred(0), AdvPred(0, positive = false), GePred("mem", 60))
    for (p <- preds) {
      val anyMatch = Bits.countAnd(rows, store.evalPred(p)) > 0
      if (anyMatch) assert(desc.mayContain(meta, p), s"$p wrongly skipped")
    }
  }

  test("mayContain prunes provably empty predicates") {
    val desc = root.restrict(meta, LePred("cpu", 30), left = true)
    assert(!desc.mayContain(meta, GePred("cpu", 31)))
    val d2 = root.restrict(meta, InPred("prio", Set(1)), left = true)
    assert(!d2.mayContain(meta, InPred("prio", Set(0, 2))))
    val d3 = root.restrict(meta, AdvPred(0), left = false)
    assert(!d3.mayContain(meta, AdvPred(0)))
    assert(d3.mayContain(meta, AdvPred(0, positive = false)))
  }

  test("intersects: AND requires all conjuncts, OR any disjunct") {
    val desc = root.restrict(meta, LePred("cpu", 30), left = true)
    val and = QAnd(Seq(QPred(LePred("cpu", 10)), QPred(GePred("cpu", 40))))
    assert(!desc.intersects(meta, and)) // cpu >= 40 impossible under cpu <= 30
    val or = QOr(Seq(QPred(GePred("cpu", 40)), QPred(LePred("cpu", 5))))
    assert(desc.intersects(meta, or))
  }

  test("tighten produces min-max over actual rows and never widens") {
    val mask = store.evalPred(LePred("cpu", 30))
    val desc = root.restrict(meta, LePred("cpu", 30), left = true)
    val t = store.tighten(desc, mask, queried)
    assert(t.hi(0) <= 30)
    assert(t.lo(0) >= 0)
    // All rows still inside.
    Bits.foreach(mask) { r =>
      assert(store.value(0, r) >= t.lo(0) && store.value(0, r) <= t.hi(0))
      assert(t.masks(2).contains(store.value(2, r).toInt))
    }
  }

  test("tighten computes exact adv tri-state") {
    val pos = store.evalPred(AdvPred(0))
    val t = store.tighten(root, pos, queried)
    assert(t.adv(0) == AdvState.AllTrue)
    val neg = store.evalPred(AdvPred(0, positive = false))
    val t2 = store.tighten(root, neg, queried)
    assert(t2.adv(0) == AdvState.AllFalse)
    val t3 = store.tighten(root, Bits.full(store.n), queried)
    assert(t3.adv(0) == AdvState.Mixed)
  }

  test("tightenChildren agrees with two separate tighten calls") {
    val nodeMask = Bits.full(store.n)
    val cut = LePred("mem", 20)
    val cutMask = store.evalPred(cut)
    val baseL = root.restrict(meta, cut, left = true)
    val baseR = root.restrict(meta, cut, left = false)
    val (ld, rd, lc, rc) = store.tightenChildren(baseL, baseR, nodeMask, cutMask, queried)
    assert(lc == Bits.count(cutMask) && rc == store.n - lc)
    val ldRef = store.tighten(baseL, Bits.and(nodeMask, cutMask), queried)
    val rdRef = store.tighten(baseR, Bits.andNot(nodeMask, cutMask), queried)
    for (c <- 0 until meta.nCols if ld.masks(c) == null) {
      assert(ld.lo(c) == ldRef.lo(c) && ld.hi(c) == ldRef.hi(c))
      assert(rd.lo(c) == rdRef.lo(c) && rd.hi(c) == rdRef.hi(c))
    }
    assert(ld.masks(2) == ldRef.masks(2) && rd.masks(2) == rdRef.masks(2))
    assert(ld.adv.sameElements(ldRef.adv) && rd.adv.sameElements(rdRef.adv))
  }

  test("isEmpty detects contradictory restrictions") {
    val d = root.restrict(meta, LePred("cpu", 10), left = true)
      .restrict(meta, GePred("cpu", 20), left = true)
    assert(d.isEmpty)
    val d2 = root.restrict(meta, InPred("prio", Set(0, 1, 2)), left = false)
    assert(d2.isEmpty)
  }
}
