package repro.core

import repro.{SparkSpec, TestData}
import org.apache.spark.sql.functions._

class EncoderSpec extends SparkSpec {

  lazy val (df, meta) = TestData.tpch

  test("all encoded columns are integral doubles") {
    val row = df.limit(200).collect()
    for (r <- row; c <- meta.columns) {
      val v = r.getAs[Double](c.name)
      assert(v == math.floor(v), s"${c.name}=$v not integral")
    }
  }

  test("categorical dictionaries cover observed codes") {
    for (c <- meta.columns if c.isCategorical && c.dict.isDefined) {
      val distinct = df.select(col(c.name)).distinct().collect().map(_.getDouble(0).toInt)
      assert(distinct.forall(code => code >= 0 && code < c.dict.get.size), c.name)
    }
  }

  test("IntCatCol keeps raw values as codes with fixed domain") {
    val cn = meta("c_nationkey")
    assert(cn.isCategorical && cn.domainSize == 25)
    val mx = df.agg(max(col("c_nationkey"))).collect()(0).getDouble(0)
    assert(mx <= 24.0)
  }

  test("numeric domain bounds cover the data exactly") {
    for (c <- meta.columns if !c.isCategorical) {
      val r = df.agg(min(col(c.name)).as("lo"), max(col(c.name)).as("hi")).collect()(0)
      assert(r.getDouble(0) >= c.lo && r.getDouble(1) <= c.hi, c.name)
      assert(r.getDouble(0) == c.lo && r.getDouble(1) == c.hi,
        s"${c.name}: meta [${c.lo},${c.hi}] vs data [${r.getDouble(0)},${r.getDouble(1)}]")
    }
  }

  test("scaled NumCol: l_discount is raw x100") {
    val hi = meta("l_discount").hi
    assert(hi <= 10.0 && hi >= 5.0) // raw domain [0, 0.10]
  }

  test("DateCol: shipdate encodes to epoch days in the 1992-1999 window") {
    val c = meta("l_shipdate")
    assert(c.lo >= 8035 && c.hi <= 10600) // 1992-01-01=8035, 1999-01-01=10592
  }

  test("collect builds a consistent ColumnStore") {
    val store = TestData.tpchStore
    assert(store.n == df.count())
    assert(store.meta == meta)
    // Spot-check one column's min against Spark.
    val idx = meta.idx("l_quantity")
    val sparkMin = df.agg(min(col("l_quantity"))).collect()(0).getDouble(0)
    val storeMin = (0 until store.n).map(store.value(idx, _)).min
    assert(storeMin == sparkMin)
  }

  test("decode maps codes back to dictionary strings") {
    val dict = meta("l_returnflag").dict.get
    assert(dict.sorted == dict) // dictionary is sorted
    assert(Encoder.decode(meta, "l_returnflag", dict.indexOf("R").toDouble) == "R")
  }

  test("fromRows round-trips") {
    val m = Fixtures.meta
    val rows = Seq(Array(1.0, 2.0, 0.0), Array(3.0, 4.0, 2.0))
    val s = Encoder.fromRows(m, rows)
    assert(s.n == 2 && s.value(0, 1) == 3.0 && s.value(2, 0) == 0.0)
  }
}
