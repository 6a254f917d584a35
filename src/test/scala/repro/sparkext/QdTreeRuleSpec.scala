package repro.sparkext

import java.nio.file.Files
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.catalyst.expressions.In
import org.apache.spark.sql.execution.FileSourceScanExec
import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestData}
import repro.core._

class QdTreeRuleSpec extends SparkSpec {

  lazy val (df, meta) = TestData.tpch
  lazy val queries = TestData.tpchQueries
  lazy val store = TestData.tpchStore
  lazy val cuts = Workload.candidateCuts(queries)
  lazy val result = Greedy.build(store, queries.map(_.expr), cuts, b = 150)

  lazy val path: String = {
    val p = Files.createTempDirectory("qdtree-rule").toString
    Router.writePartitioned(df, result.tree, p)
    QdTreeRegistry.register(p, result.tree)
    QdTreeRule.install(spark)
    p
  }

  def filesRead(d: DataFrame): Long = {
    d.collect()
    d.queryExecution.executedPlan.collectLeaves().collectFirst {
      case s: FileSourceScanExec => s.metrics("numFiles").value
    }.getOrElse(-1L)
  }

  test("rule injects a BID IN predicate for a registered relation") {
    val q = queries.map(_.expr).minBy(q => result.tree.blockIds(q).size)
    val d = spark.read.parquet(path).filter(q.toColumn(meta))
    val optimized = d.queryExecution.optimizedPlan
    val hasBidIn = optimized.expressions.exists(_.exists {
      case In(a: org.apache.spark.sql.catalyst.expressions.AttributeReference, _) => a.name == "bid"
      case _ => false
    })
    assert(hasBidIn, optimized.toString)
  }

  test("rule-driven pruning reads fewer files and identical results") {
    val q = queries.map(_.expr).minBy(q => result.tree.blockIds(q).size)
    val withRule = spark.read.parquet(path).filter(q.toColumn(meta))
    val rows = withRule.count()
    val files = filesRead(spark.read.parquet(path).filter(q.toColumn(meta)))
    // Unregistered copy of the same data: no rule application.
    val p2 = Files.createTempDirectory("qdtree-rule-unreg").toString
    Router.writePartitioned(df, result.tree, p2)
    val without = spark.read.parquet(p2).filter(q.toColumn(meta))
    assert(without.count() == rows)
    assert(files < filesRead(spark.read.parquet(p2).filter(q.toColumn(meta))),
      s"rule should prune files")
  }

  test("rule preserves results for every template shape (vs raw table)") {
    for (name <- Seq("q1#0", "q3#0", "q6#0", "q18#0")) {
      val q = queries.find(_.name == name).get
      val viaRule = spark.read.parquet(path).filter(q.expr.toColumn(meta)).count()
      val direct = df.filter(q.expr.toColumn(meta)).count()
      assert(viaRule == direct, name)
    }
  }

  test("rule is idempotent: applying it to its own output changes nothing") {
    val q = queries.head.expr
    val d = spark.read.parquet(path).filter(q.toColumn(meta))
    val once = d.queryExecution.optimizedPlan
    val twice = QdTreeRule(once)
    assert(twice.fastEquals(once), s"rule re-applied:\n$twice")
  }

  // ---- translation unit tests -----------------------------------------

  def translate(c: org.apache.spark.sql.Column): Option[QExpr] = {
    val plan = df.filter(c).queryExecution.analyzed
    val cond = plan.collectFirst { case f: org.apache.spark.sql.catalyst.plans.logical.Filter => f.condition }.get
    QdTreeRule.toQExpr(cond, meta)
  }

  test("toQExpr translates comparisons with literal normalization") {
    assert(translate(col("l_quantity") < 10.0).contains(QPred(LePred("l_quantity", 9.0))))
    assert(translate(col("l_quantity") <= 10.0).contains(QPred(LePred("l_quantity", 10.0))))
    assert(translate(col("l_quantity") > 10.0).contains(QPred(GePred("l_quantity", 11.0))))
    assert(translate(lit(10.0) > col("l_quantity")).contains(QPred(LePred("l_quantity", 9.0))))
  }

  test("toQExpr translates equality by column kind") {
    assert(translate(col("l_returnflag") === 1.0).contains(QPred(InPred("l_returnflag", Set(1)))))
    translate(col("l_quantity") === 5.0) match {
      case Some(QAnd(Seq(QPred(LePred("l_quantity", 5.0)), QPred(GePred("l_quantity", 5.0))))) =>
      case other => fail(s"$other")
    }
  }

  test("toQExpr translates IN lists") {
    assert(translate(col("l_shipmode").isInCollection(Seq(1.0, 3.0)))
      .contains(QPred(InPred("l_shipmode", Set(1, 3)))))
  }

  test("toQExpr recognizes registered advanced cuts") {
    assert(translate(col("l_commitdate") < col("l_receiptdate")).contains(QPred(AdvPred(2))))
    assert(translate(col("c_nationkey") === col("s_nationkey")).contains(QPred(AdvPred(0))))
    // Unregistered column pair -> not translatable.
    assert(translate(col("l_shipdate") < col("l_receiptdate")).isEmpty)
  }

  test("toQExpr drops unsupported conjuncts but keeps the rest") {
    val c = (col("l_quantity") <= 10.0) && (col("l_extendedprice") * 2 > lit(50.0))
    assert(translate(c).contains(QPred(LePred("l_quantity", 10.0))))
  }

  test("toQExpr refuses an OR with an unsupported branch") {
    val c = (col("l_quantity") <= 10.0) || (col("l_extendedprice") * 2 > lit(50.0))
    assert(translate(c).isEmpty)
  }
}
