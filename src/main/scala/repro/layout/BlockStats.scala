package repro.layout

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import scala.collection.immutable.BitSet
import repro.core._

/** Per-block statistics computed in Spark over a laid-out dataset: min-max
  * per queried numeric column (the SMA / zone-map of §8), the dictionary set
  * per queried categorical column, and advanced-cut tri-states. These are
  * exactly a tightened `NodeDesc` per block, so the same intersection check
  * drives skipping for every layout scheme — the evaluation harness of §7.1.
  */
object BlockStats {

  /** @param df encoded DataFrame carrying an integer `bid` column.
    * @return block id -> (row count, tightened description)
    */
  def compute(df: DataFrame, meta: TableMeta, queriedCols: IndexedSeq[Int]): Map[Int, (Long, NodeDesc)] = {
    val numCols = queriedCols.filter(i => !meta.columns(i).isCategorical)
    val catCols = queriedCols.filter(i => meta.columns(i).isCategorical)

    val aggs = Seq(count(lit(1)).as("__cnt")) ++
      numCols.flatMap { i =>
        val n = meta.columns(i).name
        Seq(min(col(n)).as(s"__lo_$i"), max(col(n)).as(s"__hi_$i"))
      } ++
      catCols.map { i =>
        val n = meta.columns(i).name
        collect_set(col(n)).as(s"__set_$i")
      } ++
      meta.advCuts.indices.map { a =>
        sum(when(AdvPred(a).toColumn(meta), 1L).otherwise(0L)).as(s"__adv_$a")
      }

    val rows = df.groupBy(col("bid").cast("int").as("bid")).agg(aggs.head, aggs.tail: _*).collect()
    val base = NodeDesc.root(meta)

    rows.map { r =>
      val bid = r.getAs[Int]("bid")
      val cnt = r.getAs[Long]("__cnt")
      val lo = base.lo.clone(); val hi = base.hi.clone()
      val masks = base.masks.clone(); val adv = base.adv.clone()
      for (i <- numCols) {
        lo(i) = r.getAs[Double](s"__lo_$i")
        hi(i) = r.getAs[Double](s"__hi_$i")
      }
      for (i <- catCols) {
        val codes = r.getSeq[Double](r.fieldIndex(s"__set_$i")).map(_.toInt)
        masks(i) = BitSet.fromSpecific(codes)
      }
      for (a <- meta.advCuts.indices) {
        val t = r.getAs[Long](s"__adv_$a")
        adv(a) =
          if (t == cnt) AdvState.AllTrue else if (t == 0L) AdvState.AllFalse else AdvState.Mixed
      }
      bid -> (cnt, new NodeDesc(lo, hi, masks, adv))
    }.toMap
  }
}
