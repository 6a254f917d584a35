package repro.layout

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._

/** The logical-metric harness of §7.1: percentage of tuples accessed for a
  * whole workload under a given layout, plus the per-workload selectivity
  * lower bound. Uniform across all layout schemes — every scheme's blocks
  * are judged with the same per-block statistics (`BlockStats`).
  */
object Evaluator {

  final case class Result(
      accessFraction: Double,
      perQueryAccessed: Array[Long],
      totalRows: Long,
      nBlocks: Int) {
    def accessPercent: Double = accessFraction * 100
  }

  /** Evaluate a laid-out dataset (encoded DataFrame with a `bid` column). */
  def evaluate(df: DataFrame, meta: TableMeta, w: Seq[QExpr], queriedCols: IndexedSeq[Int]): Result = {
    val stats = BlockStats.compute(df, meta, queriedCols)
    evaluateStats(stats, meta, w)
  }

  /** Evaluate from precomputed per-block stats. */
  def evaluateStats(stats: Map[Int, (Long, NodeDesc)], meta: TableMeta, w: Seq[QExpr]): Result = {
    val blocks = stats.values.toSeq
    val per = CostModel.accessedPerQuery(meta, w, blocks.map { case (s, d) => (s, d) })
    val total = blocks.map(_._1).sum
    val frac = if (total == 0 || w.isEmpty) 0.0 else per.sum.toDouble / (total.toDouble * w.length)
    Result(frac, per, total, blocks.size)
  }

  /** Exact per-query matching-row counts (computed in Spark, chunked so one
    * aggregation never carries thousands of expressions).
    */
  def matchingRows(df: DataFrame, meta: TableMeta, w: Seq[QExpr], chunk: Int = 100): Array[Long] = {
    val out = new Array[Long](w.length)
    var off = 0
    while (off < w.length) {
      val qs = w.slice(off, math.min(off + chunk, w.length))
      val aggs = qs.zipWithIndex.map { case (q, i) =>
        sum(when(q.toColumn(meta), 1L).otherwise(0L)).as(s"q$i")
      }
      val row = df.agg(aggs.head, aggs.tail: _*).collect()(0)
      for (i <- qs.indices) out(off + i) = Option(row.getAs[Long](s"q$i")).getOrElse(0L)
      off += chunk
    }
    out
  }

  /** Workload selectivity (§7.1's lower bound), exact over the DataFrame. */
  def selectivityLowerBound(df: DataFrame, meta: TableMeta, w: Seq[QExpr]): Double = {
    val rows = matchingRows(df, meta, w)
    val total = df.count()
    if (total == 0 || w.isEmpty) 0.0 else rows.sum.toDouble / (total.toDouble * w.length)
  }
}
