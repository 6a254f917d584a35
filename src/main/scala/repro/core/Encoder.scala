package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.DoubleType

/** How to encode one raw column into the integral-Double domain. */
sealed trait ColSpec { def name: String }
/** Numeric column; `scale` quantizes decimals (e.g. discount × 100). */
final case class NumCol(name: String, scale: Double = 1.0) extends ColSpec
/** String categorical: dictionary-encoded to codes [0, |dict|). */
final case class CatCol(name: String) extends ColSpec
/** Date column: encoded as days since 1970-01-01. */
final case class DateCol(name: String) extends ColSpec
/** Integer-valued categorical with a fixed domain [0, domain); the code IS
  * the raw value — required when two columns (e.g. c_nationkey and
  * s_nationkey) must share one dictionary for advanced equality cuts.
  */
final case class IntCatCol(name: String, domain: Int) extends ColSpec

/** Dictionary/integer encoding of a raw DataFrame (§3: all attribute values
  * live in [0, |Dom_i|) and literals are dictionary-encoded as integers).
  * The encoded DataFrame has one Double column per spec; `TableMeta` records
  * domains and dictionaries so queries/cuts can be lowered back to Catalyst.
  */
object Encoder {

  def encode(df: DataFrame, specs: Seq[ColSpec], advCuts: Seq[AdvCutDef] = Nil): (DataFrame, TableMeta) = {
    val spark = df.sparkSession
    val dicts: Map[String, IndexedSeq[String]] = specs.collect { case CatCol(n) =>
      val values = df.select(col(n).cast("string")).distinct().collect().map(_.getString(0)).sorted.toIndexedSeq
      n -> values
    }.toMap

    val encodedCols = specs.map {
      case NumCol(n, s) =>
        (if (s == 1.0) col(n).cast(DoubleType) else round(col(n) * s).cast(DoubleType)).as(n)
      case DateCol(n) =>
        datediff(col(n), lit("1970-01-01").cast("date")).cast(DoubleType).as(n)
      case CatCol(n) =>
        val dict = dicts(n)
        val codeOf = dict.zipWithIndex.toMap
        val enc = udf((s: String) => codeOf(s).toDouble)
        enc(col(n).cast("string")).as(n)
      case IntCatCol(n, _) =>
        col(n).cast(DoubleType).as(n)
    }
    val encoded = df.select(encodedCols: _*)

    // Domain bounds for numeric/date columns from the data itself.
    val numNames = specs.collect { case NumCol(n, _) => n; case DateCol(n) => n }
    val bounds: Map[String, (Double, Double)] =
      if (numNames.isEmpty) Map.empty
      else {
        val aggs = numNames.flatMap(n => Seq(min(col(n)).as(s"lo_$n"), max(col(n)).as(s"hi_$n")))
        val row = encoded.agg(aggs.head, aggs.tail: _*).collect()(0)
        numNames.map(n => n -> (row.getAs[Double](s"lo_$n"), row.getAs[Double](s"hi_$n"))).toMap
      }

    val metas = specs.map {
      case NumCol(n, _)    => val (lo, hi) = bounds(n); ColumnMeta(n, ColKind.Numeric, lo, hi)
      case DateCol(n)      => val (lo, hi) = bounds(n); ColumnMeta(n, ColKind.Numeric, lo, hi)
      case CatCol(n)       => ColumnMeta(n, ColKind.Categorical, 0, dicts(n).size - 1, Some(dicts(n)))
      case IntCatCol(n, d) => ColumnMeta(n, ColKind.Categorical, 0, d - 1)
    }.toIndexedSeq

    (encoded, TableMeta(metas, advCuts.toIndexedSeq))
  }

  /** Collect an encoded DataFrame (optionally sampled) into a driver-side
    * column store for tree construction. `maxRows` caps driver memory.
    */
  def collect(df: DataFrame, meta: TableMeta, fraction: Double = 1.0, seed: Long = 7,
              maxRows: Int = 2_000_000): ColumnStore = {
    val s = if (fraction < 1.0) df.sample(withReplacement = false, fraction, seed) else df
    val rows = s.limit(maxRows).collect()
    val n = rows.length
    val cols = Array.ofDim[Double](meta.nCols, n)
    var r = 0
    while (r < n) {
      val row = rows(r)
      var c = 0
      while (c < meta.nCols) {
        cols(c)(r) = row.getDouble(row.fieldIndex(meta.columns(c).name))
        c += 1
      }
      r += 1
    }
    new ColumnStore(meta, cols)
  }

  /** Build a store directly from in-memory rows (tests, microbenchmarks). */
  def fromRows(meta: TableMeta, rows: Seq[Array[Double]]): ColumnStore = {
    val n = rows.length
    val cols = Array.ofDim[Double](meta.nCols, n)
    var r = 0
    while (r < n) { var c = 0; while (c < meta.nCols) { cols(c)(r) = rows(r)(c); c += 1 }; r += 1 }
    new ColumnStore(meta, cols)
  }

  /** Decode helper for debugging/reporting. */
  def decode(meta: TableMeta, colName: String, code: Double): String =
    meta(colName).dict.map(_(code.toInt)).getOrElse(code.toString)
}
