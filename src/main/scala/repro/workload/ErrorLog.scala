package repro.workload

import java.util.Random
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.DoubleType
import repro.core._

/** Synthetic substitutes for the paper's two proprietary crash-dump
  * workloads (§7.2). The generators reproduce the structural properties the
  * paper credits for its results (see DESIGN.md):
  *
  *  - **ErrorLog-Int**: small categorical event type (8 values), an OS
  *    version strongly correlated with its build date, a one-week ingest
  *    window, a validity flag; 1000 highly selective queries (IN over
  *    categoricals, date ranges, prefix ("LIKE") and equality predicates).
  *  - **ErrorLog-Ext**: a ~3600-value categorical (app id, Zipf-skewed), a
  *    15-day window, more dimensions, 1000 queries of higher selectivity.
  *
  * Data is generated directly in the encoded integer domain.
  */
object ErrorLog {

  // ------------------------------------------------------------------ Int

  /** ErrorLog-Int table. Columns (all encoded, integral doubles):
    * event_type(8, skewed), os_version(40, skewed-recent),
    * os_build_day = 1000 + 30·version + U[0,30) (correlated),
    * os_major = version / 10 (prefix of the version "string"),
    * ingest_hour ∈ [0,168), validity(2, correlated with event),
    * country(30), severity(5, skewed), error_code (correlated with event),
    * record_size (never queried).
    */
  def intTable(spark: SparkSession, rows: Long, seed: Long = 11): DataFrame = {
    val u = (k: Int) => rand(seed + k)
    val event = floor(pow(u(0), 2) * 8).cast(DoubleType)
    val version = floor((lit(1.0) - pow(u(1), 2)) * 40).cast(DoubleType) // caps at 39 since u>0
    spark.range(rows)
      .withColumn("event_type", least(event, lit(7.0)))
      .withColumn("os_version", least(version, lit(39.0)))
      .withColumn("os_build_day", lit(1000.0) + col("os_version") * 30 + floor(u(2) * 30))
      .withColumn("os_major", floor(col("os_version") / 10))
      .withColumn("ingest_hour", floor(u(3) * 168))
      .withColumn("validity",
        when(col("event_type") < 4, when(u(4) < 0.95, 1.0).otherwise(0.0))
          .otherwise(when(u(4) < 0.5, 1.0).otherwise(0.0)))
      .withColumn("country", floor(u(5) * 30))
      .withColumn("severity", least(floor(pow(u(6), 2) * 5), lit(4.0)))
      .withColumn("error_code", col("event_type") * 1000 + floor(u(7) * 1000))
      .withColumn("record_size", floor(u(8) * 9900) + 100)
      .drop("id")
      .select(intMeta.columns.map(c => col(c.name).cast(DoubleType).as(c.name)): _*)
  }

  val intMeta: TableMeta = TableMeta(IndexedSeq(
    ColumnMeta("event_type", ColKind.Categorical, 0, 7),
    ColumnMeta("os_version", ColKind.Categorical, 0, 39),
    ColumnMeta("os_build_day", ColKind.Numeric, 1000, 1000 + 39 * 30 + 29),
    ColumnMeta("os_major", ColKind.Categorical, 0, 3),
    ColumnMeta("ingest_hour", ColKind.Numeric, 0, 167),
    ColumnMeta("validity", ColKind.Categorical, 0, 1),
    ColumnMeta("country", ColKind.Categorical, 0, 29),
    ColumnMeta("severity", ColKind.Categorical, 0, 4),
    ColumnMeta("error_code", ColKind.Numeric, 0, 7999),
    ColumnMeta("record_size", ColKind.Numeric, 100, 9999)))

  /** 1000 ErrorLog-Int queries: very low selectivity (paper: 0.0005%),
    * built from conjunctions over the five queried dimensions. Only ~25%
    * carry an ingest filter, and a broad one — so the deployed range-on-
    * ingest-time baseline cannot skip (Table 2: 100%).
    */
  def intQueries(n: Int = 1000, seed: Long = 21): IndexedSeq[Query] =
    (0 until n).map { i =>
      val rng = new Random(seed + i)
      val ev = skewedEvent(rng)
      val version = rng.nextInt(40)
      val parts = scala.collection.mutable.ArrayBuffer[QExpr]()
      rng.nextInt(4) match {
        // Range literals are quantized to a coarse grid (as real dashboards
        // round timestamps) — this keeps the deduplicated candidate-cut set
        // in the paper's "few hundreds to low thousands" range (§3.4).
        case 0 => // full drill-down: event + version + build-day window + severity
          parts += QPred(InPred("event_type", Set(ev)))
          parts += QPred(InPred("os_version", Set(version)))
          val a = 1000.0 + version * 30 + rng.nextInt(5) * 6
          parts += QAnd(Seq(QPred(GePred("os_build_day", a)), QPred(LePred("os_build_day", a + 5))))
          parts += QPred(InPred("severity", Set(rng.nextInt(5))))
          parts += QPred(InPred("validity", Set(1)))
        case 1 => // event + error-code band + validity
          parts += QPred(InPred("event_type", Set(ev)))
          val c = ev * 1000.0 + rng.nextInt(18) * 50
          parts += QAnd(Seq(QPred(GePred("error_code", c)), QPred(LePred("error_code", c + 20))))
          parts += QPred(InPred("validity", Set(1)))
          parts += QPred(InPred("country", Set(rng.nextInt(30))))
        case 2 => // "LIKE": version-prefix (major) + build-day range + severity
          parts += QPred(InPred("os_major", Set(rng.nextInt(4))))
          val a = 1000.0 + rng.nextInt(36) * 30
          parts += QAnd(Seq(QPred(GePred("os_build_day", a)), QPred(LePred("os_build_day", a + 10))))
          parts += QPred(InPred("severity", Set(3 + rng.nextInt(2))))
          parts += QPred(InPred("event_type", Set(ev, skewedEvent(rng))))
        case 3 => // version equality + country + ingest window (broad, 2-3 days)
          parts += QPred(InPred("os_version", Set(version)))
          parts += QPred(InPred("country", Set(rng.nextInt(30))))
          val a = (rng.nextInt(10) * 10).toDouble
          parts += QAnd(Seq(QPred(GePred("ingest_hour", a)), QPred(LePred("ingest_hour", a + 48 + rng.nextInt(3) * 12))))
          parts += QPred(InPred("validity", Set(1)))
      }
      Query(s"int#$i", QAnd(parts.toSeq))
    }

  private def skewedEvent(rng: Random): Int = {
    val u = rng.nextDouble()
    math.min(7, (u * u * 8).toInt)
  }

  // ------------------------------------------------------------------ Ext

  /** ErrorLog-Ext table: dominated by a ~3600-value Zipf-skewed app_id,
    * 15-day ingest window, its own version/build-date correlation.
    */
  def extTable(spark: SparkSession, rows: Long, seed: Long = 31): DataFrame = {
    val u = (k: Int) => rand(seed + k)
    spark.range(rows)
      .withColumn("app_id", least(floor(pow(u(0), 3) * 3600), lit(3599.0)))
      .withColumn("event_type", least(floor(pow(u(1), 2) * 10), lit(9.0)))
      .withColumn("os_version", least(floor((lit(1.0) - pow(u(2), 2)) * 60), lit(59.0)))
      .withColumn("os_build_day", lit(2000.0) + col("os_version") * 20 + floor(u(3) * 20))
      .withColumn("ingest_hour", floor(u(4) * 360))
      .withColumn("country", floor(u(5) * 50))
      .withColumn("severity", least(floor(pow(u(6), 2) * 5), lit(4.0)))
      .withColumn("error_code", col("event_type") * 1000 + floor(u(7) * 1000))
      .withColumn("record_size", floor(u(8) * 9900) + 100)
      .drop("id")
      .select(extMeta.columns.map(c => col(c.name).cast(DoubleType).as(c.name)): _*)
  }

  val extMeta: TableMeta = TableMeta(IndexedSeq(
    ColumnMeta("app_id", ColKind.Categorical, 0, 3599),
    ColumnMeta("event_type", ColKind.Categorical, 0, 9),
    ColumnMeta("os_version", ColKind.Categorical, 0, 59),
    ColumnMeta("os_build_day", ColKind.Numeric, 2000, 2000 + 59 * 20 + 19),
    ColumnMeta("ingest_hour", ColKind.Numeric, 0, 359),
    ColumnMeta("country", ColKind.Categorical, 0, 49),
    ColumnMeta("severity", ColKind.Categorical, 0, 4),
    ColumnMeta("error_code", ColKind.Numeric, 0, 9999),
    ColumnMeta("record_size", ColKind.Numeric, 100, 9999)))

  /** 1000 ErrorLog-Ext queries (paper selectivity: 0.0697% — higher than
    * Int). App ids are drawn from the data's own popularity distribution.
    */
  def extQueries(n: Int = 1000, seed: Long = 41): IndexedSeq[Query] =
    (0 until n).map { i =>
      val rng = new Random(seed + i)
      def zipfApp(): Int = { val u = rng.nextDouble(); math.min(3599, (u * u * u * 3600).toInt) }
      val parts = scala.collection.mutable.ArrayBuffer[QExpr]()
      rng.nextInt(3) match {
        case 0 => // app drill-down
          parts += QPred(InPred("app_id", Set(zipfApp(), zipfApp(), zipfApp())))
          parts += QPred(InPred("event_type", Set(rng.nextInt(10))))
        case 1 => // app + version
          parts += QPred(InPred("app_id", Set(zipfApp())))
          parts += QPred(InPred("os_version", Set(rng.nextInt(60), rng.nextInt(60))))
          parts += QPred(InPred("severity", Set(rng.nextInt(5))))
        case 2 => // event + error-code band + country (quantized literals)
          val ev = math.min(9, { val u = rng.nextDouble(); (u * u * 10).toInt })
          parts += QPred(InPred("event_type", Set(ev)))
          val c = ev * 1000.0 + rng.nextInt(19) * 50
          parts += QAnd(Seq(QPred(GePred("error_code", c)), QPred(LePred("error_code", c + 50))))
          parts += QPred(InPred("country", Set(rng.nextInt(50))))
      }
      Query(s"ext#$i", QAnd(parts.toSeq))
    }
}
