package repro.integration

import repro.{SparkSpec, TestData}
import repro.core._
import repro.layout._
import repro.woodblock.{Woodblock, WoodblockConfig}

/** Small-scale end-to-end version of the Table 2 pipeline on TPC-H:
  * all four layout schemes over the same encoded data, evaluated with the
  * same per-block statistics.
  */
class TpchEndToEndSpec extends SparkSpec {

  lazy val (df, meta) = TestData.tpch
  lazy val queries = TestData.tpchQueries
  lazy val w = queries.map(_.expr)
  lazy val queried = Workload.queriedCols(meta, queries)
  lazy val store = TestData.tpchStore
  lazy val cuts = Workload.candidateCuts(queries)
  val b = 150

  lazy val lowerBound = CostModel.selectivityLowerBound(store, w)

  lazy val randomFrac = {
    val nBlocks = math.max(2, store.n / b)
    Evaluator.evaluate(Baselines.randomLayout(df, nBlocks), meta, w, queried).accessFraction
  }

  lazy val bottomUpFrac = {
    val feats = BottomUp.selectFeatures(w, cuts, store, maxFeatures = 15)
    val layout = BottomUp.build(df, meta, w, feats, b)
    Evaluator.evaluate(layout.assign(df), meta, w, queried).accessFraction
  }

  lazy val greedyFrac = {
    val res = Greedy.build(store, w, cuts, b)
    Evaluator.evaluate(df.withColumn("bid", res.tree.routeExpr), meta, w, queried).accessFraction
  }

  lazy val rlFrac = {
    val res = Woodblock.train(store, w, cuts,
      WoodblockConfig(b = b, episodes = 40, updateEvery = 8, hidden = 64, seed = 7))
    Evaluator.evaluate(df.withColumn("bid", res.best.tree.routeExpr), meta, w, queried).accessFraction
  }

  test("all access fractions respect the selectivity lower bound") {
    for ((n, f) <- Seq("random" -> randomFrac, "bu" -> bottomUpFrac, "greedy" -> greedyFrac, "rl" -> rlFrac))
      assert(f >= lowerBound - 1e-9, s"$n=$f < lb=$lowerBound")
  }

  test("qd-tree layouts beat the random baseline (Table 2 ordering)") {
    assert(greedyFrac < randomFrac, s"greedy=$greedyFrac random=$randomFrac")
    assert(rlFrac < randomFrac, s"rl=$rlFrac random=$randomFrac")
  }

  test("greedy qd-tree beats Bottom-Up (Table 2: 26.3% vs 46.1%)") {
    assert(greedyFrac < bottomUpFrac, s"greedy=$greedyFrac bu=$bottomUpFrac")
  }

  test("RL is competitive with greedy (Table 2: 25.8% vs 26.3%)") {
    assert(rlFrac < greedyFrac * 1.5, s"rl=$rlFrac greedy=$greedyFrac")
  }

  test("bottom-up improves over random") {
    assert(bottomUpFrac <= randomFrac * 1.05, s"bu=$bottomUpFrac random=$randomFrac")
  }
}
