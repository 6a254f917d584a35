package repro.bench

import repro.SparkSpec
import repro.harness._

/** Physical execution (§7.4.1 / §7.5.1): wall-clock of the workload over
  * BID-partitioned Parquet per layout, qd-tree with routing vs *no route*.
  * Paper: TPC-H overall speedup 1.6× vs Bottom-Up (2.6× excluding scan-all
  * templates); ErrLog-Int 14× vs BU+; routing beats no-route by 16%/6.4%.
  */
class PhysicalExecBench extends SparkSpec {

  lazy val tpchCtx: WorkloadContext = Contexts.tpch(spark, sf = 0.05)
  lazy val tpchRuns: IndexedSeq[PhysicalExec.LayoutRun] = {
    val run = Table2.run(tpchCtx, Table2.Config(b = 4096, rlEpisodes = 150, rlTimeLimitMs = 60000))
    PhysicalExecPipeline.run(spark, tpchCtx, run)
  }

  lazy val intCtx: WorkloadContext = Contexts.errorLogInt(spark, rows = 300000, nQueries = 200)
  lazy val intRuns: IndexedSeq[PhysicalExec.LayoutRun] = {
    val run = Table2.run(intCtx, Table2.Config(b = 2048, rlEpisodes = 150, rlTimeLimitMs = 60000, seed = 1))
    PhysicalExecPipeline.run(spark, intCtx, run)
  }

  def total(runs: Seq[PhysicalExec.LayoutRun], scheme: String, mode: String): Double =
    runs.find(r => r.scheme == scheme && r.mode == mode).get.totalMs

  test("print physical execution: TPC-H (Fig. 5 analogue)") {
    println(PhysicalExecPipeline.render(tpchCtx, tpchRuns))
  }

  test("TPC-H: routed qd-tree beats Bottom-Up (paper: 1.6x overall)") {
    val qd = math.min(total(tpchRuns, "RL", "route"), total(tpchRuns, "Greedy", "route"))
    val bu = total(tpchRuns, "BottomUp", "no-route")
    assert(qd < bu, s"qd=$qd bu=$bu")
  }

  test("print physical execution: ErrorLog-Int (Fig. 7 analogue)") {
    println(PhysicalExecPipeline.render(intCtx, intRuns))
  }

  test("ErrLog-Int: routed qd-tree beats BottomUp+ by a large factor (paper: 14x)") {
    val qd = math.min(total(intRuns, "RL", "route"), total(intRuns, "Greedy", "route"))
    val bu = total(intRuns, "BottomUp+", "no-route")
    assert(qd * 1.5 < bu, s"qd=$qd bu=$bu")
  }

  test("ErrLog-Int: per-query speedup CDF (Fig. 7c analogue)") {
    val qd = intRuns.find(r => r.scheme == "RL" && r.mode == "route").get
    val base = intRuns.find(r => r.scheme == "Baseline").get
    val speedups = base.perQuery.zip(qd.perQuery).map { case (a, b) => a.ms / math.max(b.ms, 0.01) }.sorted
    val p50 = speedups(speedups.length / 2)
    println(f"ErrLog-Int per-query speedup vs baseline: p50=$p50%.1fx p90=${speedups((speedups.length * 9) / 10)}%.1fx")
    assert(p50 > 1.0, s"median speedup $p50")
  }

  test("routing vs no-route: routing never loses rows") {
    for (Seq(a, b) <- tpchRuns.groupBy(_.scheme).values.filter(_.size == 2).map(_.sortBy(_.mode))) {
      val rowsA = a.perQuery.map(_.rows)
      val rowsB = b.perQuery.map(_.rows)
      assert(rowsA == rowsB, s"${a.scheme}: route/no-route row counts differ")
    }
  }
}
