package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.harness._

/** spark-submit entrypoint for Fig. 6: data-routing (ingestion) throughput
  * through a qd-tree and per-query routing latency (query -> BID list).
  *
  * Usage: RoutingPerfJob [sf]
  */
object RoutingPerfJob {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("qdtree-routingperf")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val ctx = Contexts.tpch(spark, sf)
      val cfg = Table2.Config()
      val store = Encoder.collect(ctx.df, ctx.meta, maxRows = cfg.storeCap)
      val res = Greedy.build(store, ctx.w, ctx.cuts, Table2.scaledB(cfg.b, store.n, ctx.totalRows))

      // Data routing throughput: route the full table via the Catalyst
      // expression (records/second), and via the driver row-router.
      val t0 = System.nanoTime()
      val n = ctx.df.withColumn("bid", res.tree.routeColumn).filter("bid >= 0").count()
      val sparkMs = (System.nanoTime() - t0) / 1e6
      val t1 = System.nanoTime()
      var i = 0
      while (i < store.n) { res.tree.routeRow(store.rowFn(i)); i += 1 }
      val driverMs = (System.nanoTime() - t1) / 1e6

      // Query routing latency CDF.
      val lat = ctx.w.map { q =>
        val t = System.nanoTime(); res.tree.blockIds(q); (System.nanoTime() - t) / 1e6
      }.sorted
      println(f"== Routing performance (SF=$sf, rows=$n, leaves=${res.tree.numLeaves}) ==")
      println(f"spark routing throughput : ${n / (sparkMs / 1000)}%12.0f records/s")
      println(f"driver routing throughput: ${store.n / (driverMs / 1000)}%12.0f records/s")
      println(f"query routing latency ms : p50=${lat(lat.length / 2)}%6.3f p99=${lat((lat.length * 99) / 100)}%6.3f max=${lat.last}%6.3f")
    } finally spark.stop()
  }
}
