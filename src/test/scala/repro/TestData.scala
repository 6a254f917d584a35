package repro

import org.apache.spark.sql.DataFrame
import repro.core._
import repro.workload._

/** Lazily-built shared datasets for Spark tests (one JVM per test run, so
  * these are computed once).
  */
object TestData {

  /** Tiny TPC-H denorm: ~3K rows. */
  lazy val tpch: (DataFrame, TableMeta) = {
    val (df, meta) = TpchDenorm.encoded(SparkSpec.shared, sf = 0.005, seed = 0)
    (df.cache(), meta)
  }

  lazy val tpchQueries: IndexedSeq[Query] = TpchWorkload.queries(tpch._2, seedsPerTemplate = 2)

  lazy val tpchStore: ColumnStore = Encoder.collect(tpch._1, tpch._2)

  /** Tiny ErrorLog-Int: 30K rows. */
  lazy val elInt: DataFrame = ErrorLog.intTable(SparkSpec.shared, 30000).cache()
  lazy val elIntQueries: IndexedSeq[Query] = ErrorLog.intQueries(100)

  lazy val elExt: DataFrame = ErrorLog.extTable(SparkSpec.shared, 30000).cache()
  lazy val elExtQueries: IndexedSeq[Query] = ErrorLog.extQueries(100)
}
