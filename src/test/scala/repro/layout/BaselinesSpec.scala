package repro.layout

import repro.{SparkSpec, TestData}
import org.apache.spark.sql.functions._

class BaselinesSpec extends SparkSpec {

  lazy val (df, meta) = TestData.tpch

  test("randomLayout produces nBlocks roughly equal blocks") {
    val laid = Baselines.randomLayout(df, nBlocks = 10, seed = 1)
    val sizes = laid.groupBy("bid").count().collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    assert(sizes.keySet == (0 until 10).toSet)
    val total = sizes.values.sum
    assert(sizes.values.forall(s => s > total / 30 && s < total / 3))
  }

  test("randomLayout is deterministic in the seed") {
    val a = Baselines.randomLayout(df, 8, seed = 5).groupBy("bid").count().collect().sortBy(_.getInt(0)).toSeq
    val b = Baselines.randomLayout(df, 8, seed = 5).groupBy("bid").count().collect().sortBy(_.getInt(0)).toSeq
    assert(a.map(_.getLong(1)) == b.map(_.getLong(1)))
  }

  test("rangeLayout orders block ids with the column") {
    val laid = Baselines.rangeLayout(df, "o_orderdate", nBlocks = 8).cache()
    val stats = laid.groupBy("bid")
      .agg(min("o_orderdate").as("lo"), max("o_orderdate").as("hi"))
      .collect().map(r => (r.getInt(0), r.getDouble(1), r.getDouble(2))).sortBy(_._1)
    assert(stats.map(_._1).toSeq == (0 until 8))
    // Ranges are non-overlapping and increasing.
    for (w <- stats.toSeq.sliding(2) if w.size == 2) assert(w(0)._3 <= w(1)._2, s"${w(0)} vs ${w(1)}")
    laid.unpersist()
  }

  test("rangeLayout covers every row (bids within [0, nBlocks))") {
    val laid = Baselines.rangeLayout(df, "l_shipdate", nBlocks = 5)
    val r = laid.agg(min("bid"), max("bid"), count(lit(1))).collect()(0)
    assert(r.getInt(0) >= 0 && r.getInt(1) <= 4)
    assert(r.getLong(2) == df.count())
  }
}
