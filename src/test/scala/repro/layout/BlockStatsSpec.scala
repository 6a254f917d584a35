package repro.layout

import repro.{SparkSpec, TestData}
import repro.core._
import org.apache.spark.sql.functions._

class BlockStatsSpec extends SparkSpec {

  lazy val (df, meta) = TestData.tpch
  lazy val queried = Workload.queriedCols(meta, TestData.tpchQueries)

  test("stats sizes sum to the table size") {
    val laid = Baselines.randomLayout(df, nBlocks = 8)
    val stats = BlockStats.compute(laid, meta, queried)
    assert(stats.values.map(_._1).sum == df.count())
    assert(stats.size == 8)
  }

  test("per-block min/max matches a driver-side scan") {
    val laid = Baselines.randomLayout(df, nBlocks = 4, seed = 7).cache()
    val stats = BlockStats.compute(laid, meta, queried)
    val qIdx = meta.idx("l_quantity")
    for ((bid, (_, desc)) <- stats) {
      val r = laid.filter(col("bid") === bid)
        .agg(min(col("l_quantity")), max(col("l_quantity"))).collect()(0)
      assert(desc.lo(qIdx) == r.getDouble(0) && desc.hi(qIdx) == r.getDouble(1), s"bid=$bid")
    }
    laid.unpersist()
  }

  test("categorical masks contain exactly the observed codes") {
    val laid = Baselines.randomLayout(df, nBlocks = 4, seed = 8).cache()
    val stats = BlockStats.compute(laid, meta, queried)
    val ci = meta.idx("l_returnflag")
    for ((bid, (_, desc)) <- stats) {
      val observed = laid.filter(col("bid") === bid)
        .select("l_returnflag").distinct().collect().map(_.getDouble(0).toInt).toSet
      assert(desc.masks(ci).toSet == observed, s"bid=$bid")
    }
    laid.unpersist()
  }

  test("adv tri-states match exact counts") {
    // Layout by the advanced cut itself: one side AllTrue, other AllFalse.
    val laid = df.withColumn("bid", when(AdvPred(2).toColumn(meta), 0).otherwise(1))
    val stats = BlockStats.compute(laid, meta, queried)
    assert(stats(0)._2.adv(2) == AdvState.AllTrue)
    assert(stats(1)._2.adv(2) == AdvState.AllFalse)
    // Random layout: expect Mixed on a non-degenerate cut.
    val rnd = Baselines.randomLayout(df, nBlocks = 2, seed = 9)
    val rs = BlockStats.compute(rnd, meta, queried)
    assert(rs.values.forall(_._2.adv(2) == AdvState.Mixed))
  }

  test("Spark stats agree with driver-side tighten over the collected store") {
    val store = TestData.tpchStore
    val cut = LePred("l_quantity", 25)
    val laid = df.withColumn("bid", when(cut.toColumn(meta), 0).otherwise(1))
    val stats = BlockStats.compute(laid, meta, queried)
    val mask = store.evalPred(cut)
    val t0 = store.tighten(NodeDesc.root(meta), mask, queried)
    val d0 = stats(0)._2
    for (c <- queried) {
      if (d0.masks(c) == null) {
        assert(d0.lo(c) == t0.lo(c) && d0.hi(c) == t0.hi(c), meta.columns(c).name)
      } else assert(d0.masks(c) == t0.masks(c), meta.columns(c).name)
    }
    assert(d0.adv.sameElements(t0.adv))
  }
}
