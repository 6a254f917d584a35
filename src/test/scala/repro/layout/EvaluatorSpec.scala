package repro.layout

import repro.{SparkSpec, TestData}
import repro.core._

class EvaluatorSpec extends SparkSpec {

  lazy val (df, meta) = TestData.tpch
  lazy val queries = TestData.tpchQueries
  lazy val queried = Workload.queriedCols(meta, queries)
  lazy val w = queries.map(_.expr)

  test("access fraction is bounded by [selectivity, 1]") {
    val laid = Baselines.randomLayout(df, nBlocks = 16)
    val res = Evaluator.evaluate(laid, meta, w, queried)
    val lb = Evaluator.selectivityLowerBound(df, meta, w)
    assert(res.accessFraction <= 1.0 + 1e-12)
    assert(res.accessFraction >= lb - 1e-12, s"access=${res.accessFraction} lb=$lb")
  }

  test("random layout accesses nearly everything (Table 2 TPC-H baseline ~56% needs real queries; broad check)") {
    val laid = Baselines.randomLayout(df, nBlocks = 16)
    val res = Evaluator.evaluate(laid, meta, w, queried)
    // Random blocks have near-full ranges; most queries touch most blocks.
    assert(res.accessFraction > 0.3, s"${res.accessFraction}")
  }

  test("a qd-tree layout evaluates strictly better than random") {
    val store = TestData.tpchStore
    val cuts = Workload.candidateCuts(queries)
    val res = Greedy.build(store, w, cuts, b = 200)
    val laid = df.withColumn("bid", res.tree.routeExpr)
    val qd = Evaluator.evaluate(laid, meta, w, queried)
    val rnd = Evaluator.evaluate(Baselines.randomLayout(df, nBlocks = qd.nBlocks), meta, w, queried)
    assert(qd.accessFraction < rnd.accessFraction,
      s"qd=${qd.accessFraction} rnd=${rnd.accessFraction}")
  }

  test("evaluateStats agrees with driver CostModel on the collected store") {
    val store = TestData.tpchStore
    val cuts = Workload.candidateCuts(queries)
    val res = Greedy.build(store, w, cuts, b = 200)
    // Spark path: route the same (full=collected) data, compute stats.
    val laid = df.withColumn("bid", res.tree.routeExpr)
    val sparkRes = Evaluator.evaluate(laid, meta, w, queried)
    // Driver path: same partitioning judged via tightened leaf descs.
    val driverFrac = res.scanFraction(store, w, queried)
    assert(math.abs(sparkRes.accessFraction - driverFrac) < 1e-9,
      s"spark=${sparkRes.accessFraction} driver=$driverFrac")
  }

  test("matchingRows chunking returns the same counts as a single pass") {
    val a = Evaluator.matchingRows(df, meta, w.take(7), chunk = 3)
    val b = Evaluator.matchingRows(df, meta, w.take(7), chunk = 100)
    assert(a.toSeq == b.toSeq)
  }

  test("range layout on ingest-like column cannot skip date-free queries") {
    // Use o_totalprice as a fake ingest column: queries don't filter it.
    val laid = Baselines.rangeLayout(df, "o_totalprice", nBlocks = 16)
    val priceFree = w.filterNot(_.preds.exists(_.colsUsed(meta).contains(meta.idx("o_totalprice"))))
    val res = Evaluator.evaluate(laid, meta, priceFree.take(5), queried)
    assert(res.accessFraction > 0.5)
  }

  test("perQueryAccessed has one entry per query") {
    val laid = Baselines.randomLayout(df, nBlocks = 4)
    val res = Evaluator.evaluate(laid, meta, w, queried)
    assert(res.perQueryAccessed.length == w.length)
    assert(res.totalRows == df.count())
  }
}
