package repro.core

import java.util.Random

/** Shared tiny tables for driver-side (non-Spark) core tests. */
object Fixtures {

  /** 3 columns + 1 advanced cut: cpu ∈ [0,100), mem ∈ [0,64),
    * prio ∈ {LOW, MED, HIGH}; AC0 = (mem < cpu).
    */
  val meta: TableMeta = TableMeta(
    IndexedSeq(
      ColumnMeta("cpu", ColKind.Numeric, 0, 99),
      ColumnMeta("mem", ColKind.Numeric, 0, 63),
      ColumnMeta("prio", ColKind.Categorical, 0, 2, Some(IndexedSeq("LOW", "MED", "HIGH")))),
    IndexedSeq(AdvCutDef("mem", "<", "cpu")))

  def store(n: Int, seed: Long = 0): ColumnStore = {
    val rng = new Random(seed)
    val rows = Seq.fill(n)(Array(
      rng.nextInt(100).toDouble,
      rng.nextInt(64).toDouble,
      rng.nextInt(3).toDouble))
    Encoder.fromRows(meta, rows)
  }

  /** The Fig. 3 microbenchmark space: cpu ∈ [0,100), disk ∈ [0,1000)
    * (disk scaled ×1000 to stay integral; the paper's disk<0.01 becomes
    * disk<10).
    */
  val fig3Meta: TableMeta = TableMeta(IndexedSeq(
    ColumnMeta("cpu", ColKind.Numeric, 0, 99),
    ColumnMeta("disk", ColKind.Numeric, 0, 999)))

  def fig3Store(n: Int, seed: Long = 0): ColumnStore = {
    val rng = new Random(seed)
    val rows = Seq.fill(n)(Array(rng.nextInt(100).toDouble, rng.nextInt(1000).toDouble))
    Encoder.fromRows(fig3Meta, rows)
  }

  /** Fig. 3 queries: Q1 = (cpu < 10 OR cpu > 90), Q2 = disk < 10. */
  val fig3Q1: QExpr = QOr(Seq(QPred(LePred("cpu", 9)), QPred(GePred("cpu", 91))))
  val fig3Q2: QExpr = QPred(LePred("disk", 9))
  /** The paper's candidate cuts: {cpu<10, cpu>90, disk<0.01}. */
  val fig3Cuts: IndexedSeq[Pred] = IndexedSeq(LePred("cpu", 9), GePred("cpu", 91), LePred("disk", 9))
}
