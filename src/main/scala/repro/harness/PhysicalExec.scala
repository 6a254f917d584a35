package repro.harness

import java.nio.file.Files
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core._
import repro.sparkext.Router

/** Physical-execution harness (§7.4.1/§7.5.1): each layout is materialized
  * as Parquet partitioned by BID; the workload runs as aggregations with the
  * qd-tree's `BID IN (...)` routing (or without — *no route*), and we
  * measure wall-clock per query.
  */
object PhysicalExec {

  final case class QueryTime(name: String, ms: Double, rows: Long)

  final case class LayoutRun(scheme: String, mode: String, totalMs: Double, perQuery: IndexedSeq[QueryTime]) {
    def meanMs: Double = if (perQuery.isEmpty) 0 else totalMs / perQuery.length
  }

  /** Write a laid-out DataFrame (with bid) as partitioned Parquet; returns path. */
  def materialize(laid: DataFrame, tag: String): String = {
    val p = Files.createTempDirectory(s"qdtree-phys-$tag").toString
    Router.writeLayout(laid, p)
    p
  }

  private def runOne(df: DataFrame): (Double, Long) = {
    val t0 = System.nanoTime()
    val row = df.agg(count(lit(1)).as("cnt"), sum(col(df.columns.head)).as("s")).collect()(0)
    ((System.nanoTime() - t0) / 1e6, row.getLong(0))
  }

  /** Execute the workload against a materialized layout.
    * @param tree when present, queries are routed (BID IN ...); pass None
    *             for the *no route* configuration.
    */
  def execute(
      spark: SparkSession,
      scheme: String,
      path: String,
      meta: TableMeta,
      queries: IndexedSeq[Query],
      tree: Option[QdTree]): LayoutRun = {
    val base = spark.read.parquet(path)
    val times = queries.map { q =>
      val filtered = tree match {
        case Some(t) =>
          val bids = t.blockIds(q.expr)
          base.filter(col("bid").isInCollection(bids)).filter(q.expr.toColumn(meta))
        case None => base.filter(q.expr.toColumn(meta))
      }
      val (ms, rows) = runOne(filtered)
      QueryTime(q.name, ms, rows)
    }
    LayoutRun(scheme, if (tree.isDefined) "route" else "no-route", times.map(_.ms).sum, times)
  }

  /** Group per-query times by template prefix ("q3#1" -> "q3"). */
  def byTemplate(run: LayoutRun): Seq[(String, Double)] =
    run.perQuery.groupBy(_.name.takeWhile(_ != '#')).view
      .mapValues(ts => ts.map(_.ms).sum / ts.length).toSeq
      .sortBy { case (n, _) => (n.length, n) }
}
