package repro.harness

import org.apache.spark.sql.SparkSession

/** Glue pipeline: materialize every Table 2 layout as partitioned Parquet
  * and execute the workload physically — the qd-tree both with routing and
  * in the *no route* configuration (§7.5.1).
  */
object PhysicalExecPipeline {

  def run(spark: SparkSession, ctx: WorkloadContext, t2: Table2.RunResult): IndexedSeq[PhysicalExec.LayoutRun] = {
    val runs = scala.collection.mutable.ArrayBuffer[PhysicalExec.LayoutRun]()
    for (s <- t2.schemes) {
      val path = PhysicalExec.materialize(s.layout, s.scheme.toLowerCase.filter(_.isLetter))
      // Every scheme executes without routing (its own partition pruning via
      // the engine only)...
      runs += PhysicalExec.execute(spark, s.scheme, path, ctx.meta, ctx.queries, tree = None)
      // ...and qd-trees additionally execute with BID routing.
      for (tree <- s.tree) {
        val stats = repro.layout.BlockStats.compute(s.layout, ctx.meta, ctx.queried)
        val tightened = tree.withTightenedLeaves(
          stats.map { case (b, (_, d)) => b -> d },
          stats.map { case (b, (sz, _)) => b -> sz })
        runs += PhysicalExec.execute(spark, s.scheme, path, ctx.meta, ctx.queries, Some(tightened))
      }
    }
    runs.toIndexedSeq
  }

  def render(ctx: WorkloadContext, runs: Seq[PhysicalExec.LayoutRun]): String = {
    val sb = new StringBuilder
    sb.append(s"== Physical execution: ${ctx.name} | rows=${ctx.totalRows} queries=${ctx.w.length} ==\n")
    sb.append(f"${"scheme"}%-12s ${"mode"}%-9s ${"total(s)"}%10s ${"mean(ms)"}%10s\n")
    for (r <- runs)
      sb.append(f"${r.scheme}%-12s ${r.mode}%-9s ${r.totalMs / 1000}%10.1f ${r.meanMs}%10.1f\n")
    // Per-template breakdown for the routed qd-tree vs the strongest
    // comparator (Fig. 5-style rows).
    val routed = runs.find(r => r.scheme == "RL" && r.mode == "route")
      .orElse(runs.find(r => r.scheme == "Greedy" && r.mode == "route"))
    val comparator = runs.find(r => r.scheme.startsWith("BottomUp") && r.mode == "no-route")
      .orElse(runs.find(r => r.scheme == "Baseline"))
    for (qd <- routed; bu <- comparator) {
      sb.append(s"\nper-template mean ms (${bu.scheme} vs ${qd.scheme}+route):\n")
      val qdT = PhysicalExec.byTemplate(qd).toMap
      for ((t, ms) <- PhysicalExec.byTemplate(bu))
        sb.append(f"  $t%-6s ${ms}%9.1f ${qdT.getOrElse(t, 0.0)}%9.1f  speedup=${ms / math.max(qdT.getOrElse(t, 1.0), 0.001)}%6.2fx\n")
    }
    sb.toString
  }
}
