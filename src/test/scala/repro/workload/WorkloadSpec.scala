package repro.workload

import repro.{SparkSpec, TestData}
import repro.core._
import repro.layout.Evaluator

class WorkloadSpec extends SparkSpec {

  lazy val (df, meta) = TestData.tpch
  lazy val queries = TestData.tpchQueries
  lazy val store = TestData.tpchStore

  test("15 templates x 2 seeds = 30 queries with stable names") {
    assert(queries.length == 30)
    assert(queries.map(_.name).distinct.length == 30)
    assert(queries.count(_.name.startsWith("q19")) == 2)
  }

  test("candidate cuts land in the paper's 'hundreds' range at 10 seeds") {
    val qs = TpchWorkload.queries(meta, seedsPerTemplate = 10)
    val cuts = Workload.candidateCuts(qs)
    assert(cuts.length > 100 && cuts.length < 2000, s"${cuts.length} cuts")
  }

  test("query generation is deterministic in the seed") {
    val a = TpchWorkload.queries(meta, 2, seed = 99)
    val b = TpchWorkload.queries(meta, 2, seed = 99)
    assert(a.map(_.expr.toString) == b.map(_.expr.toString))
  }

  test("driver-store eval matches Spark eval for every query") {
    val sparkCounts = Evaluator.matchingRows(df, meta, queries.map(_.expr))
    for ((q, i) <- queries.zipWithIndex) {
      val driverCount = Bits.count(store.evalQuery(q.expr))
      assert(driverCount == sparkCounts(i), s"${q.name}: driver=$driverCount spark=${sparkCounts(i)}")
    }
  }

  test("DuckDB oracle agrees with Spark on representative templates") {
    import org.apache.spark.sql.functions._
    // One query per interesting shape: range+cat (q3), adv cut (q4/q12),
    // disjunctive (q19), nation equality (q5).
    for (name <- Seq("q3#0", "q4#0", "q5#0", "q12#0", "q19#0", "q21#0")) {
      val q = queries.find(_.name == name).get
      val got = df.filter(q.expr.toColumn(meta))
        .agg(count(lit(1)).as("cnt"), sum(col("l_quantity")).as("qty"))
      val sql = s"SELECT count(*) AS cnt, sum(CAST(l_quantity AS DOUBLE)) AS qty " +
        s"FROM denorm WHERE ${Sql.expr(meta, q.expr)}"
      repro.Oracle.assertEquivalent(got, sql, "denorm" -> df)
    }
  }

  test("q1 selects the majority of rows (scan-all template)") {
    val q1 = queries.find(_.name == "q1#0").get
    assert(store.selectivity(q1.expr) > 0.8)
  }

  test("q19 is a disjunction of three conjunctive blocks") {
    val q19 = queries.find(_.name == "q19#0").get
    q19.expr match {
      case QOr(blocks) =>
        assert(blocks.length == 3)
        assert(blocks.forall(_.isInstanceOf[QAnd]))
      case other => fail(s"unexpected shape $other")
    }
  }

  test("advanced-cut templates reference the declared AC indices") {
    val preds = queries.flatMap(_.expr.preds).collect { case a: AdvPred => a.idx }.toSet
    assert(preds == Set(0, 1, 2))
  }

  test("overall workload selectivity is moderate (paper: 21.3%)") {
    val lb = CostModel.selectivityLowerBound(store, queries.map(_.expr))
    assert(lb > 0.02 && lb < 0.6, s"selectivity $lb")
  }

  test("ErrorLog-Int queries are highly selective (paper: 0.0005%)") {
    val store = Encoder.collect(TestData.elInt, ErrorLog.intMeta)
    val lb = CostModel.selectivityLowerBound(store, TestData.elIntQueries.map(_.expr))
    assert(lb < 0.002, s"selectivity $lb")
  }

  test("ErrorLog-Ext queries are selective but less so than Int") {
    val storeI = Encoder.collect(TestData.elInt, ErrorLog.intMeta)
    val storeE = Encoder.collect(TestData.elExt, ErrorLog.extMeta)
    val lbI = CostModel.selectivityLowerBound(storeI, TestData.elIntQueries.map(_.expr))
    val lbE = CostModel.selectivityLowerBound(storeE, TestData.elExtQueries.map(_.expr))
    assert(lbE > lbI, s"ext=$lbE int=$lbI")
    assert(lbE < 0.02, s"ext=$lbE")
  }

  test("Sql rendering matches driver eval on DuckDB for a nested query") {
    import org.apache.spark.sql.functions._
    val q = QOr(Seq(
      QAnd(Seq(QPred(LePred("l_quantity", 10)), QPred(InPred("l_returnflag", Set(0))))),
      QPred(AdvPred(2, positive = false))))
    val got = df.filter(q.toColumn(meta)).agg(count(lit(1)).as("cnt"))
    repro.Oracle.assertEquivalent(got,
      s"SELECT count(*) AS cnt FROM denorm WHERE ${Sql.expr(meta, q)}", "denorm" -> df)
  }
}
