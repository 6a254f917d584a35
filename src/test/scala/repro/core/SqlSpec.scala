package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SqlSpec extends AnyFunSuite {
  val meta = Fixtures.meta

  test("range predicates") {
    assert(Sql.pred(meta, LePred("cpu", 10)) == "CAST(cpu AS DOUBLE) <= 10.0")
    assert(Sql.pred(meta, GePred("mem", 5)) == "CAST(mem AS DOUBLE) >= 5.0")
  }

  test("IN predicate renders sorted codes") {
    assert(Sql.pred(meta, InPred("prio", Set(2, 0))) == "CAST(prio AS DOUBLE) IN (0.0, 2.0)")
  }

  test("advanced predicates, positive and negated") {
    assert(Sql.pred(meta, AdvPred(0)) == "CAST(mem AS DOUBLE) < CAST(cpu AS DOUBLE)")
    assert(Sql.pred(meta, AdvPred(0, positive = false)) ==
      "NOT (CAST(mem AS DOUBLE) < CAST(cpu AS DOUBLE))")
  }

  test("nested expressions parenthesize correctly") {
    val q = QOr(Seq(
      QAnd(Seq(QPred(LePred("cpu", 10)), QPred(GePred("mem", 5)))),
      QPred(InPred("prio", Set(1)))))
    val s = Sql.expr(meta, q)
    assert(s == "((CAST(cpu AS DOUBLE) <= 10.0) AND (CAST(mem AS DOUBLE) >= 5.0)) OR (CAST(prio AS DOUBLE) IN (1.0))")
  }

  test("rendered SQL agrees with driver eval on DuckDB") {
    val store = Fixtures.store(500, seed = 3)
    val q = QAnd(Seq(QPred(LePred("cpu", 40)), QPred(AdvPred(0))))
    val expect = Bits.count(store.evalQuery(q))
    Class.forName("org.duckdb.DuckDBDriver")
    val conn = java.sql.DriverManager.getConnection("jdbc:duckdb:")
    try {
      conn.createStatement.execute("CREATE TABLE t (cpu VARCHAR, mem VARCHAR, prio VARCHAR)")
      val ps = conn.prepareStatement("INSERT INTO t VALUES (?,?,?)")
      for (r <- 0 until store.n) {
        ps.setString(1, store.value(0, r).toString)
        ps.setString(2, store.value(1, r).toString)
        ps.setString(3, store.value(2, r).toString)
        ps.addBatch()
      }
      ps.executeBatch()
      val rs = conn.createStatement.executeQuery(
        s"SELECT count(*) FROM t WHERE ${Sql.expr(meta, q)}")
      rs.next()
      assert(rs.getLong(1) == expect)
    } finally conn.close()
  }
}
