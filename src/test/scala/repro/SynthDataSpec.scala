package repro

import org.apache.spark.sql.functions._
import repro.workload.{ErrorLog, TpchDenorm}

class SynthDataSpec extends SparkSpec {

  test("lineitemX: receiptdate strictly after shipdate") {
    val li = SynthData.lineitemX(spark, sf = 0.002)
    assert(li.filter(col("l_receiptdate") <= col("l_shipdate")).count() == 0)
  }

  test("lineitemX: commitdate within +-45 days of shipdate, both orders occur") {
    val li = SynthData.lineitemX(spark, sf = 0.002).cache()
    val early = li.filter(col("l_commitdate") < col("l_shipdate")).count()
    val late = li.filter(col("l_commitdate") > col("l_shipdate")).count()
    assert(early > 0 && late > 0)
    li.unpersist()
  }

  test("supplier nation keys stay in [0,25)") {
    val s = SynthData.supplier(spark, sf = 0.01)
    val r = s.agg(min("s_nationkey"), max("s_nationkey")).collect()(0)
    assert(r.getInt(0) >= 0 && r.getInt(1) < 25)
  }

  test("partX brands and containers have the expected domains") {
    val p = SynthData.partX(spark, sf = 0.01).cache()
    val brands = p.select("p_brand").distinct().count()
    val containers = p.select("p_container").distinct().count()
    assert(brands <= 25 && brands > 10)
    assert(containers <= 40 && containers > 20)
    p.unpersist()
  }

  test("denorm joins preserve lineitem cardinality") {
    val li = SynthData.lineitemX(spark, sf = 0.002)
    val denorm = TpchDenorm.build(spark, sf = 0.002)
    assert(denorm.count() == li.count())
  }

  test("denorm has all queried columns") {
    val denorm = TpchDenorm.build(spark, sf = 0.002)
    val expected = TpchDenorm.specs.map(_.name).toSet
    assert(expected.subsetOf(denorm.columns.toSet))
  }

  test("ErrorLog-Int columns respect declared domains") {
    val df = TestData.elInt
    for (c <- ErrorLog.intMeta.columns) {
      val r = df.agg(min(col(c.name)), max(col(c.name))).collect()(0)
      assert(r.getDouble(0) >= c.lo && r.getDouble(1) <= c.hi, s"${c.name}: $r")
    }
  }

  test("ErrorLog-Int: os_build_day is determined by os_version (correlation)") {
    val df = TestData.elInt
    val bad = df.filter(
      col("os_build_day") < lit(1000) + col("os_version") * 30 ||
      col("os_build_day") > lit(1000) + col("os_version") * 30 + 29).count()
    assert(bad == 0)
  }

  test("ErrorLog-Int: event type is skewed") {
    val df = TestData.elInt
    val counts = df.groupBy("event_type").count().collect().map(r => r.getDouble(0) -> r.getLong(1)).toMap
    assert(counts(0.0) > counts(7.0) * 2, s"$counts")
  }

  test("ErrorLog-Ext: app_id spans a large domain with skew") {
    val df = TestData.elExt
    val distinct = df.select("app_id").distinct().count()
    assert(distinct > 1000, s"only $distinct distinct apps")
    val top = df.groupBy("app_id").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(top > df.count() / 200, "head app should be popular")
  }

  test("ErrorLog generators are deterministic in the seed") {
    val a = ErrorLog.intTable(spark, 1000, seed = 5).agg(sum("error_code")).collect()(0).getDouble(0)
    val b = ErrorLog.intTable(spark, 1000, seed = 5).agg(sum("error_code")).collect()(0).getDouble(0)
    assert(a == b)
  }
}
