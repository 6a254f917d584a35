package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.woodblock.{Woodblock, WoodblockConfig}

/** spark-submit entrypoint for the §5.1 / Fig. 3 microbenchmark: on a 2-D
  * uniform dataset with a disjunctive query, Greedy is stuck at ~50.5% scan
  * while WOODBLOCK reaches ~10.4% (4.8×).
  *
  * Usage: Fig3Job [rows]
  */
object Fig3Job {
  def main(args: Array[String]): Unit = {
    val rows = args.headOption.map(_.toInt).getOrElse(100000)
    // Pure driver-side experiment; Spark session only for uniformity.
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("qdtree-fig3").getOrCreate()
    try {
      val meta = TableMeta(IndexedSeq(
        ColumnMeta("cpu", ColKind.Numeric, 0, 99),
        ColumnMeta("disk", ColKind.Numeric, 0, 999)))
      val rng = new java.util.Random(0)
      val store = Encoder.fromRows(meta,
        Seq.fill(rows)(Array(rng.nextInt(100).toDouble, rng.nextInt(1000).toDouble)))
      val q1: QExpr = QOr(Seq(QPred(LePred("cpu", 9)), QPred(GePred("cpu", 91))))
      val q2: QExpr = QPred(LePred("disk", 9))
      val cuts = IndexedSeq[Pred](LePred("cpu", 9), GePred("cpu", 91), LePred("disk", 9))
      val b = rows / 120

      val g = Greedy.build(store, Seq(q1, q2), cuts, b)
      val gFrac = g.scanFraction(store, Seq(q1, q2), IndexedSeq(0, 1))
      val rl = Woodblock.train(store, Seq(q1, q2), cuts,
        WoodblockConfig(b = b, episodes = 30, updateEvery = 5, hidden = 16, seed = 0))
      val rFrac = rl.best.scanFraction(store, Seq(q1, q2), IndexedSeq(0, 1))
      println(f"== Fig. 3 microbenchmark (rows=$rows) ==")
      println(f"Greedy    scan ratio: ${gFrac * 100}%6.2f%%   (paper: 50.5%%)")
      println(f"WOODBLOCK scan ratio: ${rFrac * 100}%6.2f%%   (paper: 10.4%%)")
      println(f"improvement: ${gFrac / rFrac}%4.2fx          (paper: 4.8x)")
    } finally spark.stop()
  }
}
