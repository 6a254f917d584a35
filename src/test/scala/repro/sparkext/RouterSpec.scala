package repro.sparkext

import java.nio.file.Files
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.execution.FileSourceScanExec
import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestData}
import repro.core._

class RouterSpec extends SparkSpec {

  lazy val (df, meta) = TestData.tpch
  lazy val queries = TestData.tpchQueries
  lazy val store = TestData.tpchStore
  lazy val cuts = Workload.candidateCuts(queries)
  lazy val result = Greedy.build(store, queries.map(_.expr), cuts, b = 150)

  lazy val path: String = {
    val p = Files.createTempDirectory("qdtree-router").toString
    Router.writePartitioned(df, result.tree, p)
    p
  }

  def filesRead(d: DataFrame): Long = {
    d.collect()
    d.queryExecution.executedPlan.collectLeaves().collectFirst {
      case s: FileSourceScanExec => s.metrics("numFiles").value
    }.getOrElse(-1L)
  }

  test("partitioned write creates one directory per leaf with data") {
    val dirs = new java.io.File(path).listFiles().filter(_.getName.startsWith("bid=")).map(_.getName)
    assert(dirs.nonEmpty)
    assert(dirs.length <= result.tree.numLeaves)
    // Row count preserved.
    assert(spark.read.parquet(path).count() == df.count())
  }

  test("routeExpr agrees with driver routeRow on every collected row") {
    val withBid = df.withColumn("bid", result.tree.routeExpr)
    val rows = withBid.collect()
    for (r <- rows.take(2000)) {
      val expect = result.tree.routeRow(c => r.getAs[Double](meta.columns(c).name))
      assert(r.getAs[Int]("bid") == expect)
    }
  }

  test("routeColumn (UDF walk) agrees with routeExpr (Catalyst CASE WHEN)") {
    val a = df.withColumn("bid", result.tree.routeExpr)
    val b = df.withColumn("bid", result.tree.routeColumn)
    val mismatch = a.select("bid").collect().map(_.getInt(0))
      .zip(b.select("bid").collect().map(_.getInt(0))).count { case (x, y) => x != y }
    assert(mismatch == 0)
  }

  test("routed query returns exactly the same rows as a full-table filter") {
    for (name <- Seq("q3#0", "q5#1", "q6#0", "q12#0", "q19#0", "q21#1")) {
      val q = queries.find(_.name == name).get
      val routed = Router.queryRouted(spark, path, result.tree, q.expr)
      val full = df.filter(q.expr.toColumn(meta))
      assert(routed.count() == full.count(), name)
    }
  }

  test("routed aggregate matches the DuckDB oracle (completeness end-to-end)") {
    for (name <- Seq("q4#0", "q10#0", "q17#0", "q19#1")) {
      val q = queries.find(_.name == name).get
      val routed = Router.queryRouted(spark, path, result.tree, q.expr)
        .agg(count(lit(1)).as("cnt"), sum(col("l_quantity")).as("qty"))
      val sql = s"SELECT count(*) AS cnt, sum(CAST(l_quantity AS DOUBLE)) AS qty " +
        s"FROM denorm WHERE ${Sql.expr(meta, q.expr)}"
      repro.Oracle.assertEquivalent(routed, sql, "denorm" -> df)
    }
  }

  test("BID IN filter prunes partitions at the file level") {
    val selective = queries.map(_.expr).minBy(q => result.tree.blockIds(q).size)
    val bids = result.tree.blockIds(selective)
    assume(bids.size < result.tree.numLeaves)
    val noRoute = filesRead(Router.queryNoRoute(spark, path, meta, selective))
    val routed = filesRead(Router.queryRouted(spark, path, result.tree, selective))
    assert(routed < noRoute, s"routed=$routed noRoute=$noRoute")
  }

  test("blockIds never misses a block containing matching rows") {
    val withBid = df.withColumn("bid", result.tree.routeExpr).cache()
    for (q <- queries.take(10)) {
      val bids = result.tree.blockIds(q.expr).toSet
      val actual = withBid.filter(q.expr.toColumn(meta))
        .select("bid").distinct().collect().map(_.getInt(0)).toSet
      assert(actual.subsetOf(bids), s"${q.name}: actual=$actual routed=$bids")
    }
    withBid.unpersist()
  }

  test("tightened leaves prune more than cut-only descriptions") {
    val withBid = df.withColumn("bid", result.tree.routeExpr)
    val stats = repro.layout.BlockStats.compute(withBid, meta, Workload.queriedCols(meta, queries))
    val tight = result.tree.withTightenedLeaves(stats.map { case (b, (_, d)) => b -> d },
      stats.map { case (b, (s, _)) => b -> s })
    val before = queries.map(q => result.tree.blockIds(q.expr).size).sum
    val after = queries.map(q => tight.blockIds(q.expr).size).sum
    assert(after <= before)
  }
}
