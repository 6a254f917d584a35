package repro.bench

import repro.SparkSpec
import repro.harness._

/** Shared bench-scale contexts and Table 2 runs (computed once per JVM and
  * reused by the physical-exec / robustness / learning-curve benches).
  */
object BenchData {
  lazy val spark = SparkSpec.shared

  /** Paper numbers for Table 2 (% tuples accessed). */
  val paperTable2: Map[(String, String), Double] = Map(
    ("TPC-H", "Baseline") -> 56.0, ("TPC-H", "BottomUp") -> 46.1,
    ("TPC-H", "Greedy") -> 26.3, ("TPC-H", "RL") -> 25.8,
    ("ErrLog-Int", "Baseline") -> 100.0, ("ErrLog-Int", "BottomUp+") -> 5.6,
    ("ErrLog-Int", "Greedy") -> 3.1, ("ErrLog-Int", "RL") -> 0.4,
    ("ErrLog-Ext", "Baseline") -> 100.0, ("ErrLog-Ext", "BottomUp+") -> 12.2,
    ("ErrLog-Ext", "Greedy") -> 1.7, ("ErrLog-Ext", "RL") -> 0.2)

  def renderWithPaper(r: Table2.RunResult): String = {
    val sb = new StringBuilder(r.render)
    sb.append("paper reference: ")
    sb.append(r.schemes.map(s =>
      s"${s.scheme}=${paperTable2.get((r.ctx.name, s.scheme)).map(v => f"$v%.1f%%").getOrElse("n/a")}")
      .mkString(" "))
    sb.append("\n")
    sb.toString
  }

  lazy val tpchCtx: WorkloadContext = Contexts.tpch(spark, sf = 0.1)
  lazy val tpchCfg: Table2.Config = Table2.Config(b = 4096, rlEpisodes = 1500, rlTimeLimitMs = 150000)
  lazy val tpchRun: Table2.RunResult = Table2.run(tpchCtx, tpchCfg)

  lazy val intCtx: WorkloadContext = Contexts.errorLogInt(spark, rows = 600000)
  lazy val intCfg: Table2.Config = Table2.Config(b = 2048, rlEpisodes = 1500,
    rlSample = 40000, rlTimeLimitMs = 240000, seed = 1)
  lazy val intRun: Table2.RunResult = Table2.run(intCtx, intCfg)

  lazy val extCtx: WorkloadContext = Contexts.errorLogExt(spark, rows = 600000)
  lazy val extCfg: Table2.Config = Table2.Config(b = 2048, rlEpisodes = 1500,
    rlSample = 40000, rlTimeLimitMs = 240000, seed = 2)
  lazy val extRun: Table2.RunResult = Table2.run(extCtx, extCfg)
}
