package repro.harness

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._
import repro.workload._

/** A fully prepared workload context: encoded data, metadata, queries, the
  * deployed baseline scheme, and the shared search space (§7.3: Bottom-Up,
  * Greedy and WOODBLOCK all get the same candidate cuts).
  */
final case class WorkloadContext(
    name: String,
    df: DataFrame,
    meta: TableMeta,
    queries: IndexedSeq[Query],
    /** "random" (TPC-H) or the name of the ingest-time column to range-partition. */
    baseline: String) {
  lazy val w: IndexedSeq[QExpr] = queries.map(_.expr)
  lazy val queried: IndexedSeq[Int] = Workload.queriedCols(meta, queries)
  lazy val cuts: IndexedSeq[Pred] = Workload.candidateCuts(queries)
  lazy val totalRows: Long = df.count()
}

/** Builders for the three evaluation workloads at bench scale (§7.2). */
object Contexts {

  /** TPC-H denorm; paper: SF=1000 ONE-MONTH slice (77M rows), 150 queries
    * with literals over the full date domain, random baseline. We size the
    * month slice as sf × 6M rows.
    */
  def tpch(spark: SparkSession, sf: Double = 0.1, seedsPerTemplate: Int = 10): WorkloadContext = {
    val rows = math.max(1000L, (6000000 * sf).toLong)
    val (df, meta) = TpchDenorm.monthEncoded(spark, rows)
    WorkloadContext("TPC-H", df.cache(), meta,
      TpchWorkload.queries(meta, seedsPerTemplate, litDomains = TpchDenorm.fullDateDomain),
      baseline = "random")
  }

  /** ErrorLog-Int substitute; paper: 100M rows / 1000 queries, range baseline. */
  def errorLogInt(spark: SparkSession, rows: Long = 600000, nQueries: Int = 1000): WorkloadContext =
    WorkloadContext("ErrLog-Int", ErrorLog.intTable(spark, rows).cache(), ErrorLog.intMeta,
      ErrorLog.intQueries(nQueries), baseline = "ingest_hour")

  /** ErrorLog-Ext substitute; paper: 81M rows / 1000 queries, range baseline. */
  def errorLogExt(spark: SparkSession, rows: Long = 600000, nQueries: Int = 1000): WorkloadContext =
    WorkloadContext("ErrLog-Ext", ErrorLog.extTable(spark, rows).cache(), ErrorLog.extMeta,
      ErrorLog.extQueries(nQueries), baseline = "ingest_hour")
}
