package repro.harness

import org.apache.spark.sql.DataFrame
import repro.core._
import repro.layout._
import repro.woodblock.{EpisodePoint, Woodblock, WoodblockConfig}

/** The Table 2 harness (§7.3/§7.4/§7.5): builds every layout scheme over a
  * workload context and reports the percentage of tuples accessed, judged
  * uniformly with per-block statistics.
  */
object Table2 {

  final case class Config(
      b: Int = 4096,
      /** driver-side cap for greedy/bottom-up construction tuples. */
      storeCap: Int = 200000,
      /** WOODBLOCK sample size (paper: 0.1%–1% of the table). */
      rlSample: Int = 20000,
      rlEpisodes: Int = 300,
      rlTimeLimitMs: Long = 180000,
      rlHidden: Int = 128,
      seed: Long = 0)

  final case class SchemeResult(
      scheme: String,
      accessPercent: Double,
      nBlocks: Int,
      buildMs: Long,
      perQueryAccessed: Array[Long],
      layout: DataFrame,
      tree: Option[QdTree] = None,
      curve: IndexedSeq[EpisodePoint] = IndexedSeq.empty)

  final case class RunResult(
      ctx: WorkloadContext,
      lowerBoundPercent: Double,
      schemes: IndexedSeq[SchemeResult]) {
    def render: String = {
      val sb = new StringBuilder
      sb.append(f"== Table 2: ${ctx.name} | rows=${ctx.totalRows} queries=${ctx.w.length} " +
        f"cuts=${ctx.cuts.length} | selectivity lower bound=${lowerBoundPercent}%.4f%% ==\n")
      sb.append(f"${"scheme"}%-12s ${"access%"}%10s ${"blocks"}%8s ${"build(s)"}%9s\n")
      for (s <- schemes)
        sb.append(f"${s.scheme}%-12s ${s.accessPercent}%9.4f%% ${s.nBlocks}%8d ${s.buildMs / 1000.0}%9.1f\n")
      sb.toString
    }
  }

  private def timed[T](f: => T): (T, Long) = {
    val t0 = System.nanoTime(); val r = f; (r, (System.nanoTime() - t0) / 1000000)
  }

  private def eval(ctx: WorkloadContext, laid: DataFrame): Evaluator.Result =
    Evaluator.evaluate(laid, ctx.meta, ctx.w, ctx.queried)

  /** Scale b to a store that holds only a fraction of the table (§5.2.1). */
  def scaledB(b: Int, storeRows: Int, totalRows: Long): Int =
    math.max(2, math.ceil(b.toDouble * storeRows / totalRows).toInt)

  def baseline(ctx: WorkloadContext, cfg: Config): SchemeResult = {
    val nBlocks = math.max(2, (ctx.totalRows / cfg.b).toInt)
    val (laid, ms) = timed {
      if (ctx.baseline == "random") Baselines.randomLayout(ctx.df, nBlocks, cfg.seed + 42)
      else Baselines.rangeLayout(ctx.df, ctx.baseline, nBlocks)
    }
    val r = eval(ctx, laid)
    SchemeResult("Baseline", r.accessPercent, r.nBlocks, ms, r.perQueryAccessed, laid)
  }

  def bottomUp(ctx: WorkloadContext, cfg: Config, store: ColumnStore, tuned: Boolean): SchemeResult = {
    val name = if (tuned) "BottomUp+" else "BottomUp"
    val ((layout, laid), ms) = timed {
      val feats = BottomUp.selectFeatures(ctx.w, ctx.cuts, store, maxFeatures = 15,
        maxSelectivity = if (tuned) 0.1 else 1.0)
      val layout = BottomUp.build(ctx.df, ctx.meta, ctx.w, feats, cfg.b)
      (layout, layout.assign(ctx.df))
    }
    val r = eval(ctx, laid)
    SchemeResult(name, r.accessPercent, r.nBlocks, ms, r.perQueryAccessed, laid)
  }

  def greedy(ctx: WorkloadContext, cfg: Config, store: ColumnStore): SchemeResult = {
    val (res, ms) = timed {
      Greedy.build(store, ctx.w, ctx.cuts, scaledB(cfg.b, store.n, ctx.totalRows))
    }
    val laid = ctx.df.withColumn("bid", res.tree.routeColumn)
    val r = eval(ctx, laid)
    SchemeResult("Greedy", r.accessPercent, r.nBlocks, ms, r.perQueryAccessed, laid, Some(res.tree))
  }

  def woodblock(ctx: WorkloadContext, cfg: Config, sample: ColumnStore): SchemeResult = {
    val (res, ms) = timed {
      Woodblock.train(sample, ctx.w, ctx.cuts, WoodblockConfig(
        b = scaledB(cfg.b, sample.n, ctx.totalRows),
        episodes = cfg.rlEpisodes,
        hidden = cfg.rlHidden,
        seed = cfg.seed,
        timeLimitMs = cfg.rlTimeLimitMs))
    }
    val laid = ctx.df.withColumn("bid", res.best.tree.routeColumn)
    val r = eval(ctx, laid)
    SchemeResult("RL", r.accessPercent, r.nBlocks, ms, r.perQueryAccessed, laid,
      Some(res.best.tree), res.curve)
  }

  /** Run every scheme of Table 2 over a context. */
  def run(ctx: WorkloadContext, cfg: Config): RunResult = {
    val store = Encoder.collect(ctx.df, ctx.meta,
      fraction = math.min(1.0, cfg.storeCap.toDouble / ctx.totalRows), seed = cfg.seed,
      maxRows = cfg.storeCap)
    val sample =
      if (store.n <= cfg.rlSample) store
      else {
        val rng = new scala.util.Random(cfg.seed)
        val keep = rng.shuffle((0 until store.n).toVector).take(cfg.rlSample)
        Encoder.fromRows(ctx.meta, keep.map(r => Array.tabulate(ctx.meta.nCols)(c => store.value(c, r))))
      }
    val lb = Evaluator.selectivityLowerBound(ctx.df, ctx.meta, ctx.w) * 100
    val schemes = IndexedSeq(
      baseline(ctx, cfg),
      bottomUp(ctx, cfg, store, tuned = ctx.baseline != "random"),
      greedy(ctx, cfg, store),
      woodblock(ctx, cfg, sample))
    RunResult(ctx, lb, schemes)
  }
}
