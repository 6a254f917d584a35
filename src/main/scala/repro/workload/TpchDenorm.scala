package repro.workload

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.SynthData
import repro.core._

/** The denormalized TPC-H table of §7.2: lineitem joined with orders,
  * customer, part and supplier so that every template's filters touch one
  * wide fact table ("we denormalize the TPC-H schema for the purpose of
  * obtaining a table that many filters touch").
  *
  * Substitution: the paper uses SF=1000 restricted to one month (77M rows);
  * we use TPC-H-lite at SF≈0.1 with the full date range and block sizes
  * scaled so the block *count* is comparable (see DESIGN.md).
  */
object TpchDenorm {

  /** Raw (pre-encoding) wide table. */
  def build(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    val li = SynthData.lineitemX(spark, sf, seed)
    val ord = SynthData.ordersX(spark, sf, seed + 100)
    val cust = SynthData.customer(spark, sf, seed + 200)
    val part = SynthData.partX(spark, sf, seed + 300)
    val supp = SynthData.supplier(spark, sf, seed + 400)
    li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .join(cust, ord("o_custkey") === cust("c_custkey"))
      .join(part, li("l_partkey") === part("p_partkey"))
      .join(supp, li("l_suppkey") === supp("s_suppkey"))
      .drop("o_orderkey", "c_custkey", "p_partkey", "s_suppkey")
  }

  /** The advanced (binary) cuts of §6.1, in AC-index order. */
  val advCuts: Seq[AdvCutDef] = Seq(
    AdvCutDef("c_nationkey", "=", "s_nationkey"),  // AC0
    AdvCutDef("l_shipdate", "<", "l_commitdate"),  // AC1
    AdvCutDef("l_commitdate", "<", "l_receiptdate")) // AC2

  /** Encoding spec: all literals become integers (§3). Nation keys are
    * integer categoricals with a fixed 0..24 domain so the AC0 equality
    * compares identical codes on both sides.
    */
  def specs: Seq[ColSpec] = Seq(
    NumCol("l_quantity"),
    NumCol("l_extendedprice", 100),
    NumCol("l_discount", 100),
    NumCol("l_tax", 100),
    CatCol("l_returnflag"),
    CatCol("l_linestatus"),
    DateCol("l_shipdate"),
    DateCol("l_commitdate"),
    DateCol("l_receiptdate"),
    CatCol("l_shipmode"),
    CatCol("l_shipinstruct"),
    CatCol("o_orderstatus"),
    NumCol("o_totalprice", 100),
    DateCol("o_orderdate"),
    CatCol("o_orderpriority"),
    IntCatCol("c_nationkey", 25),
    NumCol("c_acctbal", 100),
    CatCol("c_mktsegment"),
    CatCol("p_type"),
    NumCol("p_size"),
    NumCol("p_retailprice", 100),
    CatCol("p_brand"),
    CatCol("p_container"),
    IntCatCol("s_nationkey", 25))

  /** Build + encode in one step. */
  def encoded(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): (DataFrame, TableMeta) = {
    val raw = build(spark, sf, seed)
    Encoder.encode(raw, specs, advCuts)
  }

  // ---- one-month slice (the paper's actual evaluation table) -----------

  /** TPC-H date domain in epoch days (1992-01-01 .. 1998-12-31) — query
    * literals are drawn from here even though the partitioned table holds a
    * single month (§7.2: "we apply all partitioning techniques to an
    * one-month partition of the dataset"). Queries whose date ranges miss
    * the month are skipped outright by any layout's min-max index, which is
    * what gives the random baseline its 56%.
    */
  val fullDateDomain: Map[String, (Double, Double)] = {
    val lo = 8035.0 // days(1992-01-01)
    val hi = lo + 2557
    Map("l_shipdate" -> (lo, hi), "l_commitdate" -> (lo - 45, hi + 45),
        "l_receiptdate" -> (lo, hi + 30), "o_orderdate" -> (lo - 121, hi))
  }

  /** Direct generator of the one-month denormalized slice: shipdate falls
    * in March 1995; orderdate = shipdate − U[1,121] (TPC-H semantics);
    * commit/receipt dates are offsets of shipdate. Dimension attributes are
    * drawn directly — with random foreign keys the join produces independent
    * attributes anyway, so this is distribution-equivalent to `build` and
    * avoids generating ~85 months of data to keep one.
    */
  def monthBuild(spark: SparkSession, rows: Long, seed: Long = 0): DataFrame = {
    import org.apache.spark.sql.functions._
    import org.apache.spark.sql.types.{DateType, IntegerType}
    val u = (k: Int) => rand(seed + k)
    spark.range(rows)
      .withColumn("l_shipdate",
        expr("date_add(cast('1995-03-01' as date), cast(rand(100) * 31 as int))"))
      .withColumn("o_orderdate", expr("date_sub(l_shipdate, cast(rand(101) * 121 + 1 as int))"))
      .withColumn("l_commitdate", expr("date_add(l_shipdate, cast(rand(102) * 91 - 45 as int))"))
      .withColumn("l_receiptdate", expr("date_add(l_shipdate, cast(rand(103) * 30 + 1 as int))"))
      .withColumn("l_quantity", (u(0) * 50 + 1).cast(IntegerType))
      .withColumn("l_extendedprice", round(u(1) * 90000 + 900, 2))
      .withColumn("l_discount", round(u(2) * 0.10, 2))
      .withColumn("l_tax", round(u(3) * 0.08, 2))
      .withColumn("l_returnflag", element_at(array(lit("N"), lit("R"), lit("A")), (u(4) * 3 + 1).cast("int")))
      .withColumn("l_linestatus", element_at(array(lit("O"), lit("F")), (u(5) * 2 + 1).cast("int")))
      .withColumn("l_shipmode", element_at(array(lit("REG AIR"), lit("AIR"), lit("RAIL"), lit("SHIP"),
        lit("TRUCK"), lit("MAIL"), lit("FOB")), (u(6) * 7 + 1).cast("int")))
      .withColumn("l_shipinstruct", element_at(array(lit("DELIVER IN PERSON"), lit("COLLECT COD"),
        lit("NONE"), lit("TAKE BACK RETURN")), (u(7) * 4 + 1).cast("int")))
      .withColumn("o_orderstatus", element_at(array(lit("O"), lit("F"), lit("P")), (u(8) * 3 + 1).cast("int")))
      .withColumn("o_totalprice", round(u(9) * 500000 + 1000, 2))
      .withColumn("o_orderpriority", element_at(array(lit("1-URGENT"), lit("2-HIGH"), lit("3-MEDIUM"),
        lit("4-NOT SPECIFIED"), lit("5-LOW")), (u(10) * 5 + 1).cast("int")))
      .withColumn("c_nationkey", (u(11) * 25).cast(IntegerType))
      .withColumn("c_acctbal", round(u(12) * 10000 - 1000, 2))
      .withColumn("c_mktsegment", element_at(array(lit("BUILDING"), lit("AUTOMOBILE"), lit("MACHINERY"),
        lit("HOUSEHOLD"), lit("FURNITURE")), (u(13) * 5 + 1).cast("int")))
      .withColumn("p_type", element_at(array(lit("STANDARD"), lit("SMALL"), lit("MEDIUM"),
        lit("LARGE"), lit("ECONOMY"), lit("PROMO")), (u(14) * 6 + 1).cast("int")))
      .withColumn("p_size", (u(15) * 50 + 1).cast(IntegerType))
      .withColumn("p_retailprice", round(lit(900.0) + (col("id") % 1000) / 10.0, 2))
      .withColumn("p_brand", concat(lit("Brand#"), ((u(16) * 5 + 1).cast("int") * 10 +
        (u(17) * 5 + 1).cast("int")).cast("string")))
      .withColumn("p_container", concat(
        element_at(array(lit("SM"), lit("MED"), lit("LG"), lit("JUMBO"), lit("WRAP")), (u(18) * 5 + 1).cast("int")),
        lit(" "),
        element_at(array(lit("CASE"), lit("BOX"), lit("BAG"), lit("JAR"), lit("PKG"),
          lit("PACK"), lit("CAN"), lit("DRUM")), (u(19) * 8 + 1).cast("int"))))
      .withColumn("s_nationkey", (u(20) * 25).cast(IntegerType))
      .drop("id")
  }

  def monthEncoded(spark: SparkSession, rows: Long, seed: Long = 0): (DataFrame, TableMeta) =
    Encoder.encode(monthBuild(spark, rows, seed), specs, advCuts)
}
