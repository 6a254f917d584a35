package repro.sparkext

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions.col
import repro.core._

/** Physical materialization and query-side routing (§3.1, §3.3, §7.1):
  * blocks become Parquet partitions keyed by the qd-tree-derived BID column;
  * queries are augmented with `BID IN (...)` so Catalyst's partition pruning
  * skips every block the tree excludes.
  */
object Router {

  /** Route every record through the tree (as one Catalyst expression) and
    * write the dataset partitioned by block id.
    */
  def writePartitioned(df: DataFrame, tree: QdTree, path: String): Unit =
    df.withColumn("bid", tree.routeColumn)
      .write.mode("overwrite").partitionBy("bid").parquet(path)

  /** Write any laid-out DataFrame (already carrying `bid`) the same way. */
  def writeLayout(dfWithBid: DataFrame, path: String): Unit =
    dfWithBid.write.mode("overwrite").partitionBy("bid").parquet(path)

  /** Read back and apply a query WITH qd-tree routing: the `BID IN (...)`
    * predicate prunes partitions, then the query predicate filters rows.
    */
  def queryRouted(spark: SparkSession, path: String, tree: QdTree, q: QExpr): DataFrame = {
    val bids = tree.blockIds(q)
    spark.read.parquet(path)
      .filter(col("bid").isInCollection(bids))
      .filter(q.toColumn(tree.meta))
  }

  /** Read back and apply a query WITHOUT routing (the paper's *no route*
    * configuration): only the engine's own best-effort skipping applies.
    */
  def queryNoRoute(spark: SparkSession, path: String, meta: TableMeta, q: QExpr): DataFrame =
    spark.read.parquet(path).filter(q.toColumn(meta))
}
