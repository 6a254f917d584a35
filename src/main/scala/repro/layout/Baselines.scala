package repro.layout

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.IntegerType

/** Baseline partitioners of §7.3:
  *   - Random: shuffles records into a fixed number of blocks (the TPC-H
  *     baseline);
  *   - Range: range-partitions on an ingest-time column into equal-width
  *     buckets (the ErrorLog baseline — "the default scheme deployed").
  */
object Baselines {

  /** Random shuffler: every record lands in a uniform-random block. */
  def randomLayout(df: DataFrame, nBlocks: Int, seed: Long = 42): DataFrame =
    df.withColumn("bid", (rand(seed) * nBlocks).cast(IntegerType))

  /** Range partitioner on `colName` (e.g. an ingest-time column): the domain
    * is split into nBlocks equal-width ranges.
    */
  def rangeLayout(df: DataFrame, colName: String, nBlocks: Int): DataFrame = {
    val row = df.agg(min(col(colName)).as("lo"), max(col(colName)).as("hi")).collect()(0)
    val lo = row.getAs[Double]("lo")
    val hi = row.getAs[Double]("hi")
    val span = math.max(hi - lo, 1e-9)
    df.withColumn(
      "bid",
      least(lit(nBlocks - 1), floor((col(colName) - lo) / span * nBlocks)).cast(IntegerType))
  }
}
